"""Benchmark-local fixtures: scaled-down workloads per experiment.

Each bench times the core measured operation of one paper table/figure at
a reduced scale (the full sweeps live in jobs/ and are recorded in
EXPERIMENTS.md). pytest-benchmark runs each once (``pedantic`` with one
round) because a maintenance pass mutates engine state — re-running it
would measure a different (already-converged) workload.
"""
import pytest

from repro.graphs.generators import skitter_like
from repro.harness.workloads import make_workload

BENCH_SCALE = 0.1
BENCH_BATCHES = 5
BENCH_QUERIES = 5


@pytest.fixture(scope="session")
def skitter_graph():
    return skitter_like(scale=BENCH_SCALE)


@pytest.fixture()
def sssp_wl(skitter_graph):
    return make_workload(
        skitter_graph, "sssp", n_queries=BENCH_QUERIES, n_batches=BENCH_BATCHES, seed=21
    )


@pytest.fixture()
def khop_wl(skitter_graph):
    return make_workload(
        skitter_graph, "khop", n_queries=BENCH_QUERIES, n_batches=BENCH_BATCHES, seed=21
    )


def run_batches(engine_or_fn, batches):
    for b in batches:
        engine_or_fn.apply_batch(b)
