"""Figure 4: Scratch vs VDC vs JOD — runtime and memory per workload.

Paper setup: 10 queries (SPSP, K-hop, RPQ Q1–Q3), plus WCC and PR, 100
insert-only batches of size 1 on Skitter/LiveJournal/Patents/Orkut and
LDBC. DD is not re-run here — the paper establishes VDC ≈ DD and uses VDC
as the operative baseline (see DESIGN.md §2). We report total update time
and peak modelled difference memory; PR/WCC run on two datasets to keep
the suite inside a local session budget.
"""
import pandas as pd

from repro.graphs.generators import (
    ldbc_like,
    livejournal_like,
    orkut_like,
    patents_like,
    skitter_like,
)
from repro.harness.runner import run_config
from repro.harness.tables import (
    N_BATCHES,
    N_QUERIES,
    SCALE,
    emit,
    envi,
    get_spark,
    scratch_time,
)
from repro.harness.workloads import make_workload

GRAPHS = {
    "skitter": skitter_like,
    "livejournal": livejournal_like,
    "patents": patents_like,
    "orkut": orkut_like,
}
PRWCC_BATCHES = envi("REPRO_PRWCC_BATCHES", 5)


def _cell(spark, wl, system, n_batches):
    if system == "scratch":
        total, _ = scratch_time(spark, wl, n_batches)
        return {"update_s": total, "peak_bytes": 0, "n_d": 0, "n_j": 0}
    out = run_config(spark, wl, system, max_batches=n_batches)
    return {
        "update_s": out["update_s"],
        "peak_bytes": out["peak_bytes"],
        "n_d": out["n_d_diffs"],
        "n_j": out["n_j_diffs"],
    }


def run(spark) -> pd.DataFrame:
    rows = []
    cells = []
    for gname, gen in GRAPHS.items():
        g = gen(scale=SCALE)
        for kind in ("sssp", "khop"):
            cells.append((gname, kind, make_workload(
                g, kind, n_queries=N_QUERIES, n_batches=N_BATCHES, seed=4
            ), N_BATCHES))
    ldbc = ldbc_like(scale=SCALE)
    for t in ("q1", "q2", "q3"):
        cells.append((f"ldbc", f"rpq-{t}", make_workload(
            ldbc, "rpq", template=t, n_queries=N_QUERIES, n_batches=N_BATCHES, seed=4
        ), N_BATCHES))
    for gname in ("skitter", "patents"):
        g = GRAPHS[gname](scale=SCALE)
        for kind in ("wcc", "pr"):
            cells.append((gname, kind, make_workload(
                g, kind, n_batches=PRWCC_BATCHES, seed=4
            ), PRWCC_BATCHES))

    for gname, kind, wl, nb in cells:
        for system in ("scratch", "vdc", "jod"):
            c = _cell(spark, wl, system, nb)
            rows.append({"graph": gname, "query": kind, "system": system, **c})
            print(f"[fig4] {gname}/{kind}/{system}: {c['update_s']:.2f}s "
                  f"{c['peak_bytes']/1e3:.0f}KB", flush=True)
    df = pd.DataFrame(rows)
    # headline ratios per workload
    piv = df.pivot_table(index=["graph", "query"], columns="system",
                         values=["update_s", "peak_bytes"], aggfunc="first")
    piv[("ratio", "mem_vdc_over_jod")] = (
        piv[("peak_bytes", "vdc")] / piv[("peak_bytes", "jod")]
    )
    piv[("ratio", "scratch_over_vdc")] = (
        piv[("update_s", "scratch")] / piv[("update_s", "vdc")]
    )
    emit("fig4_ratios", piv.reset_index())
    return emit("fig4_baselines", df)


def main() -> None:
    run(get_spark("fig4"))


if __name__ == "__main__":
    main()
