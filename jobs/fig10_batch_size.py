"""Figure 10 (Appendix A): impact of batch size on DC vs Scratch.

Paper: K-hop workload; as batch size grows from 1 to 1M the VDC/Scratch
per-batch time ratio rises and crosses 1 above ~100K — DC is built for
near-real-time streams, not bulk reloads. We sweep batch sizes at
reproduction scale and report the per-batch time ratio.
"""
import numpy as np
import pandas as pd

from repro.graphs.generators import livejournal_like
from repro.harness.runner import run_config
from repro.harness.tables import N_QUERIES, SCALE, emit, envi, get_spark, scratch_time
from repro.harness.workloads import make_workload

BATCH_SIZES = (1, 10, 100, 1000)
N_BATCHES = envi("REPRO_FIG10_BATCHES", 3)


def run(spark) -> pd.DataFrame:
    g = livejournal_like(scale=SCALE)
    rows = []
    for bs in BATCH_SIZES:
        wl = make_workload(
            g, "khop", n_queries=N_QUERIES, n_batches=N_BATCHES, batch_size=bs, seed=10
        )
        s_total, s_times = scratch_time(spark, wl, N_BATCHES)
        v = run_config(spark, wl, "vdc")
        per_scratch = s_total / N_BATCHES
        per_vdc = v["update_s"] / max(len(v["batch_times"]), 1)
        rows.append(
            {
                "batch_size": bs,
                "vdc_per_batch_s": round(per_vdc, 3),
                "scratch_per_batch_s": round(per_scratch, 3),
                "ratio_vdc_over_scratch": round(per_vdc / per_scratch, 4),
            }
        )
        print(f"[fig10] bs={bs}: ratio={rows[-1]['ratio_vdc_over_scratch']}", flush=True)
    return emit("fig10_batch_size", pd.DataFrame(rows))


def main() -> None:
    run(get_spark("fig10"))


if __name__ == "__main__":
    main()
