"""Figure 8: PR and WCC under a tight memory budget — Det vs Prob drop rates.

Paper (LiveJournal, budgets 2.75 GB for PR, 2 GB for WCC): Det-Drop needs
a higher drop percentage than Prob-Drop to fit the same budget (100% vs
90% on PR; 90% vs 70% on WCC) and is correspondingly slower. We pick the
budget exactly at Det-Drop's ceiling — §5.1.1's d/(d+s) residue over the
droppable differences (iteration-0 bases are never droppable) — so Det
requires a 100% drop rate while Prob's Bloom filter fits with a lower
one, then measure both runtimes.
"""
import numpy as np
import pandas as pd

from repro.core.memory import BYTES_DIFF, BYTES_DROPPED_DET
from repro.graphs.generators import livejournal_like
from repro.harness.runner import run_config
from repro.harness.tables import SCALE, emit, envi, get_spark
from repro.harness.workloads import make_workload

N_BATCHES = envi("REPRO_FIG8_BATCHES", 3)
BLOOM_BYTES = 8 * 1024
SAVE = BYTES_DIFF - BYTES_DROPPED_DET  # det saves 8 of 20 bytes per drop

PAPER = {
    ("pr", "det"): (100, 369.0), ("pr", "prob"): (90, 268.0),
    ("wcc", "det"): (90, 11.9), ("wcc", "prob"): (70, 11.5),
}


def run(spark) -> pd.DataFrame:
    g = livejournal_like(scale=SCALE)
    rows = []
    for kind in ("wcc", "pr"):
        wl = make_workload(g, kind, n_batches=N_BATCHES, seed=8)
        full = run_config(spark, wl, "jod")
        probe = run_config(spark, wl, "det", p=1.0, policy="degree")
        n_d = full["n_d_diffs"]
        n_droppable = probe["n_dropped"]
        # Budget at Det-Drop's exact ceiling (full drop of the droppable set).
        budget = n_d * BYTES_DIFF - n_droppable * SAVE + 256
        # A 1%-fp Bloom filter costs ~1.2 bytes per (droppable) entry.
        bloom_bytes = int(1.2 * n_droppable) + 64
        for structure in ("det", "prob"):
            if structure == "det":
                f = 1.0
            else:
                f = (n_d * BYTES_DIFF + bloom_bytes - budget) / (
                    n_droppable * BYTES_DIFF
                )
                # drops are probabilistic per difference; 15% slack keeps
                # the realized footprint under budget
                f = min(max(f * 1.15, 0.0), 1.0)
            out = run_config(
                spark, wl, structure, p=f, policy="degree", budget_bytes=budget,
                bloom_capacity=max(n_droppable, 64),
            )
            pp, pt = PAPER[(kind, structure)]
            rows.append(
                {
                    "query": kind,
                    "structure": structure,
                    "required_p_pct": round(100 * f, 0),
                    "update_s": round(out["update_s"], 2),
                    "oom": out["oom"],
                    "budget_bytes": int(budget),
                    "paper_drop_pct": pp,
                    "paper_s": pt,
                }
            )
            print(f"[fig8] {kind}/{structure}: p={f:.2f} "
                  f"{out['update_s']:.2f}s oom={out['oom']}", flush=True)
    return emit("fig8_pr_wcc", pd.DataFrame(rows))


def main() -> None:
    run(get_spark("fig8"))


if __name__ == "__main__":
    main()
