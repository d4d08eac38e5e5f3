"""Bench for Fig. 5: VDC vs JOD at low/high average degree."""
import pytest

from repro.graphs.generators import GraphData, ldbc_like
from repro.harness.runner import build_engine
from repro.harness.workloads import make_workload


def _knows_wl(avg_deg):
    g = ldbc_like(scale=0.1, knows_avg_degree=avg_deg)
    knows = g.edges[g.edges["label"] == "knows"].reset_index(drop=True)
    gd = GraphData(name=f"knows{avg_deg}", edges=knows,
                   n_vertices=int(knows[["src", "dst"]].to_numpy().max()) + 1)
    return make_workload(gd, "khop", n_queries=3, n_batches=3, seed=22)


@pytest.mark.benchmark(group="fig5")
@pytest.mark.parametrize("system", ["vdc", "jod"])
@pytest.mark.parametrize("avg_deg", [None, 24], ids=["deg-base", "deg-24"])
def test_degree_sensitivity(benchmark, spark, system, avg_deg):
    wl = _knows_wl(avg_deg)
    eng = build_engine(spark, wl, system)

    def work():
        for b in wl.batches:
            eng.apply_batch(b)
        return eng.store.n_diffs()

    try:
        assert benchmark.pedantic(work, rounds=1, iterations=1) >= 0
    finally:
        eng.close()
