"""Bench for Fig. 10: batch-size sensitivity of differential maintenance."""
import pytest

from repro.harness.runner import build_engine
from repro.harness.workloads import make_workload


@pytest.mark.benchmark(group="fig10")
@pytest.mark.parametrize("batch_size", [1, 100])
def test_batch_size(benchmark, spark, skitter_graph, batch_size):
    wl = make_workload(
        skitter_graph, "khop", n_queries=3, n_batches=2, batch_size=batch_size, seed=24
    )
    eng = build_engine(spark, wl, "vdc")

    def work():
        for b in wl.batches:
            eng.apply_batch(b)
        return eng.store.n_diffs()

    try:
        benchmark.pedantic(work, rounds=1, iterations=1)
    finally:
        eng.close()
