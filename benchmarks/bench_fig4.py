"""Bench for Fig. 4: per-system maintenance cost (scratch/vdc/jod)."""
import pytest

from repro.harness.runner import build_engine, run_config


@pytest.mark.benchmark(group="fig4")
@pytest.mark.parametrize("system", ["vdc", "jod"])
def test_differential_system(benchmark, spark, khop_wl, system):
    eng = build_engine(spark, khop_wl, system)

    def work():
        for b in khop_wl.batches:
            eng.apply_batch(b)
        return eng.memory_bytes()["total_bytes"]

    try:
        assert benchmark.pedantic(work, rounds=1, iterations=1) > 0
    finally:
        eng.close()


@pytest.mark.benchmark(group="fig4")
def test_scratch(benchmark, spark, khop_wl):
    def work():
        return run_config(spark, khop_wl, "scratch", max_batches=2)["update_s"]

    assert benchmark.pedantic(work, rounds=1, iterations=1) > 0
