"""Figures 11/12 (Appendix B): impact of delete-batch probability.

Paper (LiveJournal): results are broadly stable across delete ratios; for
SPSP, VDC slows as deletions increase (negative multiplicities pile up in
a vanilla DC) while JOD/Det/Prob — which never store negatives thanks to
eager merging — hold steady or improve. Our VDC shares the eager-merged
store (DESIGN.md §3), so the expectation here is stability across ratios
for all systems, with VDC paying its constant δJ-maintenance overhead.
"""
import numpy as np
import pandas as pd

from repro.graphs.generators import livejournal_like
from repro.harness.runner import run_config
from repro.harness.tables import N_QUERIES, SCALE, emit, envi, get_spark
from repro.harness.workloads import make_workload

DELETE_PROBS = (0.0, 0.5, 1.0)
SYSTEMS = ("vdc", "jod", "det", "prob")
N_BATCHES = envi("REPRO_FIG12_BATCHES", 10)


def run(spark) -> pd.DataFrame:
    g = livejournal_like(scale=SCALE)
    rows = []
    for dp in DELETE_PROBS:
        wl = make_workload(
            g, "sssp", n_queries=N_QUERIES, n_batches=N_BATCHES,
            delete_prob=dp, seed=12,
        )
        for system in SYSTEMS:
            kw = {"p": 0.5, "policy": "degree"} if system in ("det", "prob") else {}
            out = run_config(spark, wl, system, **kw)
            rows.append(
                {
                    "delete_prob": dp,
                    "system": system,
                    "update_s": round(out["update_s"], 2),
                    "peak_bytes": out["peak_bytes"],
                    "n_d_diffs": out["n_d_diffs"],
                }
            )
            print(f"[fig12] dp={dp} {system}: {out['update_s']:.2f}s", flush=True)
    return emit("fig12_deletions", pd.DataFrame(rows))


def main() -> None:
    run(get_spark("fig12"))


if __name__ == "__main__":
    main()
