"""Bench for Fig. 8: PR and WCC differential maintenance cost."""
import pytest

from repro.harness.runner import build_engine
from repro.harness.workloads import make_workload


@pytest.mark.benchmark(group="fig8")
@pytest.mark.parametrize("kind", ["wcc", "pr"])
def test_batch_computation_maintenance(benchmark, spark, skitter_graph, kind):
    wl = make_workload(skitter_graph, kind, n_batches=2, seed=23)
    eng = build_engine(spark, wl, "jod")

    def work():
        for b in wl.batches:
            eng.apply_batch(b)
        return eng.store.n_diffs()

    try:
        assert benchmark.pedantic(work, rounds=1, iterations=1) > 0
    finally:
        eng.close()
