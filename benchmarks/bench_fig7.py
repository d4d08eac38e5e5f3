"""Bench for Fig. 7: Det vs Prob dropping at the same drop level."""
import pytest

from repro.harness.runner import build_engine


@pytest.mark.benchmark(group="fig7")
@pytest.mark.parametrize("structure", ["det", "prob"])
def test_dropping_structures(benchmark, spark, khop_wl, structure):
    eng = build_engine(spark, khop_wl, structure, p=0.5, policy="degree")

    def work():
        for b in khop_wl.batches:
            eng.apply_batch(b)
        return eng.memory_bytes()["total_bytes"]

    try:
        assert benchmark.pedantic(work, rounds=1, iterations=1) > 0
    finally:
        eng.close()
