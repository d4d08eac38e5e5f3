"""Landmark index tests (§6.6): pruning must never change SPSP answers."""
import numpy as np
import pandas as pd
import pytest

from repro.core.specs import INF, sssp_spec
from repro.core.static_ife import run_static
from repro.graphs.updates import Batch
from repro.landmark.index import (
    LandmarkIndex,
    make_prune_fn,
    run_landmark_experiment,
    top_degree_vertices,
)
from tests.helpers import edge_frame, random_batches, tiny_graph


class TestTopDegree:
    def test_picks_hubs(self):
        e = edge_frame([(0, 1, 1), (0, 2, 1), (0, 3, 1), (1, 2, 1)])
        assert top_degree_vertices(e, 1) == [0]

    def test_n_landmarks(self):
        e = tiny_graph(seed=0)
        assert len(top_degree_vertices(e, 3)) == 3


class TestLandmarkIndexMaintenance:
    def test_indices_match_static(self, spark):
        edges = tiny_graph(seed=1)
        lmarks = top_degree_vertices(edges, 3)
        idx = LandmarkIndex(spark, edges, lmarks)
        try:
            batches = random_batches(edges, 3, delete_prob=0.3, seed=2)
            cur = edges
            from repro.graphs.updates import apply_batch

            for b in batches:
                cur = apply_batch(cur, b)
                idx.apply_batch(b)
            spec = sssp_spec({i: l for i, l in enumerate(lmarks)})
            exp = run_static(spark, cur, spec).final
            got = idx.fwd.final_states()
            m = got.merge(exp, on=["qid", "v"], how="outer", suffixes=("_g", "_e"))
            assert not m.isna().any().any()
            assert (m["val_g"] == m["val_e"]).all()
        finally:
            idx.close()

    def test_reverse_index_is_reverse_distances(self, spark):
        edges = edge_frame([(0, 1, 2), (1, 2, 3)])
        idx = LandmarkIndex(spark, edges, [2])
        try:
            fwd, rev = idx.matrices(3)
            assert rev[0, 0] == 5.0 and rev[0, 1] == 3.0 and rev[0, 2] == 0.0
            assert fwd[0, 0] == INF  # 2 reaches nothing forward
        finally:
            idx.close()


class TestPruneBounds:
    def test_never_prunes_shortest_path(self, spark):
        """Pruned Bellman-Ford must return the same target distances."""
        edges = tiny_graph(18, 60, seed=3)
        verts = np.union1d(edges["src"].unique(), edges["dst"].unique())
        rng = np.random.default_rng(4)
        sources = {q: int(rng.choice(edges["src"].unique())) for q in range(5)}
        targets = {q: int(rng.choice(verts)) for q in range(5)}
        spec = sssp_spec(sources, targets=targets)
        plain = run_static(spark, edges, spec).final

        lmarks = top_degree_vertices(edges, 3)
        idx = LandmarkIndex(spark, edges, lmarks)
        try:
            n_v = int(verts.max()) + 1
            fwd, rev = idx.matrices(n_v)
            prune = make_prune_fn(fwd, rev, targets)
            prune.bind_sources(sources)
            pruned = run_static(spark, edges, spec, prune=prune).final
        finally:
            idx.close()

        for q in sources:
            d = targets[q]
            p_val = plain[(plain["qid"] == q) & (plain["v"] == d)]["val"]
            r_val = pruned[(pruned["qid"] == q) & (pruned["v"] == d)]["val"]
            p = float(p_val.iloc[0]) if len(p_val) else INF
            r = float(r_val.iloc[0]) if len(r_val) else INF
            assert p == r, f"query {q}: pruned {r} != plain {p}"

    def test_prune_reduces_explored_states(self, spark):
        edges = tiny_graph(18, 60, seed=5)
        sources = {0: int(edges["src"].iloc[0])}
        targets = {0: int(edges["dst"].iloc[1])}
        spec = sssp_spec(sources, targets=targets)
        plain = run_static(spark, edges, spec)
        lmarks = top_degree_vertices(edges, 3)
        idx = LandmarkIndex(spark, edges, lmarks)
        try:
            n_v = int(max(edges["src"].max(), edges["dst"].max())) + 1
            fwd, rev = idx.matrices(n_v)
            prune = make_prune_fn(fwd, rev, targets)
            prune.bind_sources(sources)
            pruned = run_static(spark, edges, spec, prune=prune)
        finally:
            idx.close()
        assert len(pruned.trace) <= len(plain.trace)


class TestEndToEnd:
    def test_experiment_runs_and_answers_agree(self, spark):
        edges = tiny_graph(16, 44, seed=6)
        batches = random_batches(edges, 2, seed=7)
        rng = np.random.default_rng(8)
        verts = np.union1d(edges["src"].unique(), edges["dst"].unique())
        sources = {q: int(rng.choice(edges["src"].unique())) for q in range(3)}
        targets = {q: int(rng.choice(verts)) for q in range(3)}
        res = run_landmark_experiment(
            spark, edges, batches, sources, targets, n_landmarks=2
        )
        assert res.scratch_s > 0 and res.landmark_s > 0
        assert len(res.scratch_batches) == len(res.landmark_batches) == 2
