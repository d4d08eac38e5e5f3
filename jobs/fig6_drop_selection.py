"""Figure 6: Random vs Degree difference dropping (10 K-hop queries, Skitter).

6a — sweep the drop probability p for Det-Drop and Prob-Drop under both
selection policies; report total dropped differences vs total update time.
Expectation: more drops → slower; Degree configurations are orders of
magnitude faster than Random at comparable dropped counts (hub differences
are the expensive ones to lose).

6b — micro-benchmark (Det-Drop, Random): recomputations of dropped
differences per vertex, bucketed by vertex degree, next to the degree
distribution. Expectation: recomputations concentrate on high-degree
vertices while the degree histogram concentrates on low degrees.
"""
import numpy as np
import pandas as pd

from repro.graphs.generators import skitter_like
from repro.harness.runner import run_config
from repro.harness.tables import N_QUERIES, SCALE, emit, envi, get_spark
from repro.harness.workloads import make_workload

N_BATCHES = envi("REPRO_FIG6_BATCHES", 10)
PS = (0.2, 0.5, 0.9)
BUCKETS = [1, 3, 10, 30, 100, 300, 1000, 10**9]


def run(spark) -> pd.DataFrame:
    g = skitter_like(scale=SCALE)
    wl = make_workload(g, "khop", n_queries=N_QUERIES, n_batches=N_BATCHES, seed=6)
    rows = []
    detail = {}
    for structure in ("det", "prob"):
        for policy in ("degree", "random"):
            for p in PS:
                out = run_config(spark, wl, structure, p=p, policy=policy)
                rows.append(
                    {
                        "structure": structure,
                        "policy": policy,
                        "p": p,
                        "n_dropped": out["n_dropped"],
                        "n_recomputed": out["n_recomputed"],
                        "update_s": round(out["update_s"], 2),
                        "droppedvt_bytes": out["dropped_struct_bytes"],
                    }
                )
                detail[(structure, policy, p)] = out
                print(f"[fig6] {structure}/{policy}/p={p}: {out['update_s']:.2f}s "
                      f"dropped={out['n_dropped']} recomputed={out['n_recomputed']}",
                      flush=True)
    df = emit("fig6a_drop_selection", pd.DataFrame(rows))

    # 6b: degree-bucketed recompute counts from the Det/Random/p=0.2 run.
    out = detail[("det", "random", PS[0])]
    deg = wl.degrees
    rc = pd.Series(
        {v: c for (qid, v), c in out["recompute_counts"].items()}, dtype=float
    ).groupby(level=0).sum()
    b_rows = []
    for lo, hi in zip([0] + BUCKETS[:-1], BUCKETS):
        in_b = deg[(deg > lo) & (deg <= hi)]
        if not len(in_b):
            continue
        mean_rc = rc.reindex(in_b.index).fillna(0).mean()
        b_rows.append(
            {
                "degree_bucket": f"({lo},{hi}]",
                "n_vertices": len(in_b),
                "avg_recomputations": round(float(mean_rc), 3),
            }
        )
    emit("fig6b_recompute_by_degree", pd.DataFrame(b_rows))
    return df


def main() -> None:
    run(get_spark("fig6"))


if __name__ == "__main__":
    main()
