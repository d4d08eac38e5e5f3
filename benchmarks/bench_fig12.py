"""Bench for Figs. 11/12: maintenance under deletion-heavy update streams."""
import pytest

from repro.harness.runner import build_engine
from repro.harness.workloads import make_workload


@pytest.mark.benchmark(group="fig12")
@pytest.mark.parametrize("delete_prob", [0.0, 0.5], ids=["inserts", "half-deletes"])
def test_deletion_mix(benchmark, spark, skitter_graph, delete_prob):
    wl = make_workload(
        skitter_graph, "sssp", n_queries=3, n_batches=4,
        delete_prob=delete_prob, seed=25,
    )
    eng = build_engine(spark, wl, "jod")

    def work():
        for b in wl.batches:
            eng.apply_batch(b)
        return eng.store.n_diffs()

    try:
        assert benchmark.pedantic(work, rounds=1, iterations=1) > 0
    finally:
        eng.close()
