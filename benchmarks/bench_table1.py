"""Bench for Table 1: SPSP maintenance — differential vs scratch per batch."""
import pytest

from repro.harness.runner import build_engine, run_config
from repro.harness.tables import scratch_time


@pytest.mark.benchmark(group="table1")
def test_dc_maintenance(benchmark, spark, sssp_wl):
    eng = build_engine(spark, sssp_wl, "vdc")

    def work():
        for b in sssp_wl.batches:
            eng.apply_batch(b)
        return eng.store.n_diffs()

    try:
        n = benchmark.pedantic(work, rounds=1, iterations=1)
        assert n > 0
    finally:
        eng.close()


@pytest.mark.benchmark(group="table1")
def test_scratch_rerun(benchmark, spark, sssp_wl):
    def work():
        out = run_config(spark, sssp_wl, "scratch", max_batches=2)
        return out["update_s"]

    assert benchmark.pedantic(work, rounds=1, iterations=1) > 0
