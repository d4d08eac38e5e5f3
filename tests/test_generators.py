"""Graph generator tests: shape statistics the experiments depend on."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import (
    EDGE_COLUMNS,
    LDBC_LABELS,
    figure2_example,
    ldbc_like,
    livejournal_like,
    orkut_like,
    patents_like,
    skitter_like,
)

ALL_GENS = [skitter_like, livejournal_like, patents_like, orkut_like]


@pytest.mark.parametrize("gen", ALL_GENS)
class TestPowerlawGenerators:
    def test_columns(self, gen):
        g = gen(scale=0.05)
        assert list(g.edges.columns) == EDGE_COLUMNS

    def test_deterministic(self, gen):
        a, b = gen(scale=0.05), gen(scale=0.05)
        pd.testing.assert_frame_equal(a.edges, b.edges)

    def test_no_self_loops(self, gen):
        g = gen(scale=0.05)
        assert (g.edges["src"] != g.edges["dst"]).all()

    def test_no_duplicate_edges(self, gen):
        g = gen(scale=0.05)
        assert not g.edges.duplicated(subset=["src", "dst"]).any()

    def test_vertices_in_range(self, gen):
        g = gen(scale=0.05)
        assert g.edges["src"].max() < g.n_vertices
        assert g.edges["dst"].max() < g.n_vertices
        assert g.edges["src"].min() >= 0

    def test_weights_in_1_10(self, gen):
        g = gen(scale=0.05, weighted=True)
        assert g.edges["weight"].between(1, 10).all()

    def test_unweighted_all_ones(self, gen):
        g = gen(scale=0.05, weighted=False)
        assert (g.edges["weight"] == 1).all()

    def test_stats_shape(self, gen):
        s = gen(scale=0.05).stats()
        assert set(s) >= {"|E|", "|V|", "max_degree", "avg_degree", "avg_in_degree"}


class TestShapeStatistics:
    """The degree ordering the paper's JOD analysis relies on (§6.3)."""

    def test_avg_degree_ordering(self):
        avg = {
            g.name: g.stats()["avg_in_degree"]
            for g in [skitter_like(), livejournal_like(), patents_like(), orkut_like()]
        }
        assert avg["orkut_like"] > avg["skitter_like"]
        assert avg["orkut_like"] > avg["livejournal_like"]
        assert avg["patents_like"] < avg["skitter_like"]

    def test_power_law_hubs(self):
        g = skitter_like()
        s = g.stats()
        assert s["max_degree"] > 10 * s["avg_degree"]

    def test_patents_acyclic_orientation(self):
        g = patents_like()
        assert (g.edges["src"] > g.edges["dst"]).all()


class TestLdbcLike:
    def test_labels(self):
        g = ldbc_like(scale=0.2)
        assert set(g.edges["label"].unique()) <= set(LDBC_LABELS)
        assert set(g.labels) == set(LDBC_LABELS)

    def test_label_type_constraints(self):
        g = ldbc_like(scale=0.2)
        e = g.edges
        n_person = int(e[e["label"] == "knows"][["src", "dst"]].to_numpy().max()) + 1
        knows = e[e["label"] == "knows"]
        assert (knows[["src", "dst"]] < n_person).all().all()
        hc = e[e["label"] == "hasCreator"]
        assert (hc["src"] >= n_person).all() and (hc["dst"] < n_person).all()

    def test_reply_tree_points_backwards(self):
        g = ldbc_like(scale=0.2)
        r = g.edges[g.edges["label"] == "replyOf"]
        assert (r["src"] > r["dst"]).all()  # acyclic reply chains

    def test_densify_knows(self):
        base = ldbc_like(scale=0.2)
        dense = ldbc_like(scale=0.2, knows_avg_degree=20)
        nk = lambda g: (g.edges["label"] == "knows").sum()  # noqa: E731
        assert nk(dense) > 3 * nk(base)

    def test_deterministic(self):
        a, b = ldbc_like(scale=0.2), ldbc_like(scale=0.2)
        pd.testing.assert_frame_equal(a.edges, b.edges)


class TestFigure2:
    def test_edges(self):
        g0, b1, b2 = figure2_example()
        assert len(g0.edges) == 7
        assert g0.n_vertices == 5

    def test_batches_are_weight_updates(self):
        _, b1, b2 = figure2_example()
        assert [r[-1] for r in b1] == [-1, +1]
        assert b1[0][:2] == (0, 3) and b1[1][3] == 100
        assert b2[0][:2] == (1, 2) and b2[1][3] == 100

    def test_weights(self):
        g0, _, _ = figure2_example()
        w = g0.edges.set_index(["src", "dst"])["weight"]
        assert w[(0, 1)] == 30 and w[(0, 3)] == 20 and w[(3, 2)] == 20


class TestScaling:
    def test_edge_count_scales(self):
        small, big = skitter_like(scale=0.1), skitter_like(scale=0.5)
        assert 3 < len(big.edges) / len(small.edges) < 7

    def test_min_graph(self):
        g = patents_like(scale=0.001)
        assert len(g.edges) > 0
        assert (np.union1d(g.edges["src"], g.edges["dst"]) >= 0).all()
