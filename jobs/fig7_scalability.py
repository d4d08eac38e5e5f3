"""Figure 7: concurrent queries maintainable under a fixed memory budget.

Paper: 10 GB for differences; VDC supports the fewest queries, JOD
2.3–10× more, Det/Prob-Drop up to 20× more (Prob up to 1.5× over Det),
all still orders of magnitude faster than Scratch. For each system we
measure the per-query difference footprint at the base query count, then
use the §5 byte model to derive the maximum query count under the scaled
budget; Det/Prob additionally get the *lowest* drop probability that fits
(the paper's ideal-knob assumption), derived from the measured droppable
fraction. Runtimes are measured at the base count and at each system's
maximum supported count.
"""
import math

import numpy as np
import pandas as pd

from repro.core.memory import BYTES_DIFF, BYTES_DROPPED_DET
from repro.graphs.generators import ldbc_like, skitter_like
from repro.harness.runner import run_config
from repro.harness.tables import (
    N_BATCHES,
    N_QUERIES,
    SCALE,
    emit,
    envf,
    get_spark,
    scratch_time,
)
from repro.harness.workloads import make_workload

BUDGET = envf("REPRO_BUDGET_F7", 1.5e6)
BLOOM_BYTES = 16 * 1024  # fixed Prob-Drop structure at this scale
# det/prob at their scalability limit recompute heavily; bound the batches
from repro.harness.tables import envi  # noqa: E402

F7_BATCHES = envi("REPRO_FIG7_BATCHES", 8)


def _measure(spark, wl, system, **kw):
    out = run_config(spark, wl, system, **kw)
    return out


def _max_queries_det_prob(structure, d1, droppable_frac, budget):
    """Highest q (and the lowest drop fraction f) fitting the budget.

    Per query, dropping fraction f of the d1 differences costs
    det:  d1*((1-f)*20 + f*12)            (DroppedVT keeps the VT pair)
    prob: d1*(1-f)*20        (+ one fixed Bloom filter for the system)
    f is capped by the Degree policy's droppable fraction.
    """
    best_q, best_f = 0, 0.0
    for q in range(1, 100000):
        need = budget / q - (BLOOM_BYTES / q if structure == "prob" else 0)
        if structure == "det":
            # d1*(20 - 8f) <= need
            f = (BYTES_DIFF - need / d1) / (BYTES_DIFF - BYTES_DROPPED_DET)
        else:
            f = 1 - need / (d1 * BYTES_DIFF)
        f = max(0.0, f)
        if f > droppable_frac + 1e-9:
            break
        best_q, best_f = q, f
    return best_q, best_f


def run(spark) -> pd.DataFrame:
    rows = []
    workloads = [
        ("skitter/sssp", make_workload(skitter_like(scale=SCALE), "sssp",
                                       n_queries=N_QUERIES, n_batches=N_BATCHES, seed=7)),
        ("skitter/khop", make_workload(skitter_like(scale=SCALE), "khop",
                                       n_queries=N_QUERIES, n_batches=N_BATCHES, seed=7)),
        ("ldbc/rpq-q1", make_workload(ldbc_like(scale=SCALE), "rpq", template="q1",
                                      n_queries=N_QUERIES, n_batches=N_BATCHES, seed=7)),
    ]
    for wname, wl in workloads:
        scratch_total, _ = scratch_time(spark, wl, N_BATCHES)
        vdc = _measure(spark, wl, "vdc")
        jod = _measure(spark, wl, "jod")
        d1 = jod["n_d_diffs"] / wl.n_queries  # per-query D differences
        j1 = vdc["n_j_diffs"] / wl.n_queries
        # Degree-policy droppable fraction: diffs on vertices <= tau_max.
        drop_all = _measure(spark, wl, "det", p=1.0, policy="degree")
        droppable = drop_all["n_dropped"] / max(jod["n_d_diffs"], 1)

        q_vdc = int(BUDGET // (vdc["peak_bytes"] / wl.n_queries))
        q_jod = int(BUDGET // (jod["peak_bytes"] / wl.n_queries))
        rows.append({"workload": wname, "system": "scratch", "max_queries": 10**6,
                     "p": None, "update_s_at_base": round(scratch_total, 1)})
        rows.append({"workload": wname, "system": "vdc", "max_queries": q_vdc,
                     "p": None, "update_s_at_base": round(vdc["update_s"], 2)})
        rows.append({"workload": wname, "system": "jod", "max_queries": q_jod,
                     "p": None, "update_s_at_base": round(jod["update_s"], 2)})
        for structure in ("det", "prob"):
            q_max, f = _max_queries_det_prob(structure, d1, droppable, BUDGET)
            # measure runtime at base count with the derived drop level
            p_eff = min(1.0, f / max(droppable, 1e-9))
            meas = _measure(
                spark, wl, structure, p=p_eff, policy="degree",
                max_batches=F7_BATCHES,
            )
            rows.append(
                {
                    "workload": wname,
                    "system": structure,
                    "max_queries": q_max,
                    "p": round(p_eff, 2),
                    "update_s_at_base": round(meas["update_s"], 2),
                }
            )
        for r in rows[-5:]:
            print(f"[fig7] {r}", flush=True)
    df = pd.DataFrame(rows)
    return emit("fig7_scalability", df)


def main() -> None:
    run(get_spark("fig7"))


if __name__ == "__main__":
    main()
