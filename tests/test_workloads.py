"""Workload-builder tests (§6.1): query mixes and update translation."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import ldbc_like, skitter_like
from repro.harness.workloads import RPQ_TEMPLATES, make_workload
from repro.rpq.product import decode


@pytest.fixture(scope="module")
def skitter():
    return skitter_like(scale=0.2)


@pytest.fixture(scope="module")
def ldbc():
    return ldbc_like(scale=0.2)


class TestSsspWorkload:
    def test_build(self, skitter):
        wl = make_workload(skitter, "sssp", n_queries=5, n_batches=10)
        assert wl.n_queries == 5
        assert len(wl.batches) == 10
        assert len(wl.spec.targets) == 5
        assert wl.spec.kind == "sssp"

    def test_sources_exist(self, skitter):
        wl = make_workload(skitter, "sssp", n_queries=5, n_batches=2)
        srcs = set(wl.initial["src"])
        assert all(s in srcs for s in wl.spec.sources.values())

    def test_deterministic(self, skitter):
        a = make_workload(skitter, "sssp", n_queries=3, n_batches=5, seed=3)
        b = make_workload(skitter, "sssp", n_queries=3, n_batches=5, seed=3)
        assert a.spec.sources == b.spec.sources
        pd.testing.assert_frame_equal(a.initial, b.initial)


class TestKhopWorkload:
    def test_k_is_5_by_default(self, skitter):
        wl = make_workload(skitter, "khop", n_queries=2, n_batches=2)
        assert wl.spec.max_iters == 5


class TestWccWorkload:
    def test_symmetrized(self, skitter):
        wl = make_workload(skitter, "wcc", n_batches=2)
        fwd = set(zip(wl.initial["src"], wl.initial["dst"]))
        assert all((d, s) in fwd for s, d in fwd)

    def test_batches_mirrored(self, skitter):
        wl = make_workload(skitter, "wcc", n_batches=3)
        for b in wl.batches:
            assert len(b.changes) % 2 == 0


class TestPrWorkload:
    def test_single_query(self, skitter):
        wl = make_workload(skitter, "pr", n_batches=2)
        assert wl.n_queries == 1 and wl.spec.max_iters == 10


class TestRpqWorkload:
    @pytest.mark.parametrize("template", list(RPQ_TEMPLATES))
    def test_templates_build(self, ldbc, template):
        wl = make_workload(ldbc, "rpq", template=template, n_queries=3, n_batches=5)
        assert wl.automaton is not None
        assert wl.n_queries == 3

    def test_product_space(self, ldbc):
        wl = make_workload(ldbc, "rpq", template="q2", n_queries=3, n_batches=2)
        ns = wl.automaton.n_states
        v, q = decode(wl.initial["src"].to_numpy(), ns)
        assert (q < ns).all()

    def test_sources_start_state(self, ldbc):
        wl = make_workload(ldbc, "rpq", template="q1", n_queries=3, n_batches=2)
        ns = wl.automaton.n_states
        for s in wl.spec.sources.values():
            _, q = decode(s, ns)
            assert q == wl.automaton.start

    def test_irrelevant_updates_become_empty_batches(self, ldbc):
        wl = make_workload(ldbc, "rpq", template="q1", n_queries=2, n_batches=40)
        # knows-only automaton: batches on other labels translate to empty
        assert any(len(b.changes) == 0 for b in wl.batches)


class TestDeleteMixes:
    def test_delete_prob(self, skitter):
        wl = make_workload(skitter, "sssp", n_queries=2, n_batches=60, delete_prob=0.5)
        n_del = sum(b.n_deletes > 0 for b in wl.batches)
        assert 15 < n_del < 45
