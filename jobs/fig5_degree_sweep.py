"""Figure 5: VDC vs JOD as the average degree of the Knows subgraph grows.

Paper: densify LDBC's Knows subgraph from avg degree 4.7 to 20/100/500/1000
by adding random edges; run SPSP, K-hop, RPQ Q1; annotate the average
number of δD differences per (non-empty) vertex. Expectation: JOD wins or
ties at low degree, VDC wins at high degree (its stored δJ spares the
on-demand join over ever-more in-neighbours); the avg-diffs annotation
stays small and does not grow with degree.

We densify to {4.7, 12, 24, 48} at reproduction scale — the same sweep
shape, bounded so a local session finishes the 24 cells.
"""
import numpy as np
import pandas as pd

from repro.graphs.generators import GraphData, ldbc_like
from repro.harness.runner import run_config
from repro.harness.tables import N_BATCHES, N_QUERIES, SCALE, emit, get_spark
from repro.harness.workloads import make_workload

DEGREES = (None, 12, 24, 48)  # None = generator default (~4.7)


def _knows_graph(avg_deg) -> GraphData:
    g = ldbc_like(scale=SCALE, knows_avg_degree=avg_deg)
    knows = g.edges[g.edges["label"] == "knows"].reset_index(drop=True)
    # Random integer weights (1..10) as in the paper's weighted-SPSP setup;
    # K-hop and RPQ ignore them.
    rng = np.random.default_rng(55)
    knows["weight"] = rng.integers(1, 11, len(knows))
    n_v = int(knows[["src", "dst"]].to_numpy().max()) + 1
    return GraphData(name=f"knows{avg_deg or 'base'}", edges=knows, n_vertices=n_v,
                     labels=("knows",))


def run(spark) -> pd.DataFrame:
    rows = []
    for avg_deg in DEGREES:
        g = _knows_graph(avg_deg)
        actual = round(len(g.edges) / g.n_vertices, 1)
        for kind, template in (("sssp", None), ("khop", None), ("rpq", "q1")):
            wl = make_workload(
                g, kind, n_queries=N_QUERIES, n_batches=N_BATCHES,
                template=template or "q1", seed=5,
            )
            for system in ("vdc", "jod"):
                out = run_config(spark, wl, system)
                per_qid = out.get("per_qid_diffs", {})
                n_keys = len(
                    pd.unique(out["final"][["qid", "v"]].apply(tuple, axis=1))
                ) if "final" in out and len(out["final"]) else 1
                avg_diffs = out["n_d_diffs"] / max(n_keys, 1)
                rows.append(
                    {
                        "avg_degree": actual,
                        "query": kind if kind != "rpq" else "rpq-q1",
                        "system": system,
                        "update_s": round(out["update_s"], 2),
                        "peak_bytes": out["peak_bytes"],
                        "avg_diffs_per_vertex": round(avg_diffs, 2),
                    }
                )
                print(f"[fig5] deg={actual} {kind}/{system}: "
                      f"{out['update_s']:.2f}s", flush=True)
    return emit("fig5_degree_sweep", pd.DataFrame(rows))


def main() -> None:
    run(get_spark("fig5"))


if __name__ == "__main__":
    main()
