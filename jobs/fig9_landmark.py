"""Figure 9: Scratch vs Scratch-Landmark on SPSP workloads (§6.6).

Paper: 100 SPSP queries, 100 single-insert batches, 10 highest-degree
landmark indices maintained with Diff-IFE; Scratch-Landmark cuts Scratch
time by 43–83% (index maintenance time included). We run a scaled query
and batch count on two graphs; queries are vectorized through the engine
so the query count costs rows, not jobs.
"""
import numpy as np
import pandas as pd

from repro.graphs.generators import patents_like, skitter_like
from repro.harness.tables import SCALE, emit, envi, get_spark
from repro.harness.workloads import make_workload
from repro.landmark.index import run_landmark_experiment

N_BATCHES = envi("REPRO_FIG9_BATCHES", 5)
N_QUERIES = envi("REPRO_FIG9_QUERIES", 20)
N_LANDMARKS = envi("REPRO_FIG9_LANDMARKS", 10)

PAPER_IMPROVEMENT = {"skitter": "43-83% band", "patents": "43-83% band"}


def run(spark) -> pd.DataFrame:
    rows = []
    for gname, gen in (("skitter", skitter_like), ("patents", patents_like)):
        wl = make_workload(
            gen(scale=SCALE), "sssp", n_queries=N_QUERIES, n_batches=N_BATCHES, seed=9
        )
        res = run_landmark_experiment(
            spark, wl.initial, wl.batches, wl.spec.sources, wl.spec.targets,
            n_landmarks=N_LANDMARKS,
        )
        work_red = (
            100.0 * (1 - res.landmark_explored / res.scratch_explored)
            if res.scratch_explored
            else 0.0
        )
        rows.append(
            {
                "graph": gname,
                "scratch_s": round(res.scratch_s, 2),
                "scratch_landmark_s": round(res.landmark_s, 2),
                "improvement_pct": round(res.improvement_pct, 1),
                "explored_scratch": res.scratch_explored,
                "explored_landmark": res.landmark_explored,
                "work_reduction_pct": round(work_red, 1),
                "paper_improvement": PAPER_IMPROVEMENT[gname],
            }
        )
        print(f"[fig9] {gname}: scratch={res.scratch_s:.2f}s "
              f"landmark={res.landmark_s:.2f}s ({res.improvement_pct:.0f}%)",
              flush=True)
    return emit("fig9_landmark", pd.DataFrame(rows))


def main() -> None:
    run(get_spark("fig9"))


if __name__ == "__main__":
    main()
