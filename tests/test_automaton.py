"""RPQ automaton + product-graph substrate tests."""
import numpy as np
import pandas as pd
import pytest

from repro.rpq.automaton import q1, q2, q3
from repro.rpq.product import (
    accepting_vertices,
    decode,
    encode,
    product_edges,
    source_product_vertex,
)
from tests.helpers import edge_frame


class TestAutomata:
    def test_q1_shape(self):
        a = q1("knows")
        assert a.n_states == 1 and a.start == 0 and 0 in a.accepting
        assert a.transitions == ((0, "knows", 0),)

    def test_q2_shape(self):
        a = q2("likes", "replyOf")
        assert a.n_states == 2 and a.accepting == frozenset({1})
        assert (0, "likes", 1) in a.transitions and (1, "replyOf", 1) in a.transitions

    def test_q3_shape(self):
        a = q3("a", "b", "c", "d", "e")
        assert a.n_states == 6 and a.accepting == frozenset({5})
        assert len(a.transitions) == 5

    def test_labels(self):
        assert q2("x", "y").labels() == {"x", "y"}


class TestEncoding:
    def test_roundtrip(self):
        ns = 6
        v = np.array([0, 7, 123])
        q = np.array([0, 3, 5])
        pv = encode(v, q, ns)
        v2, q2_ = decode(pv, ns)
        assert (v2 == v).all() and (q2_ == q).all()

    def test_scalar(self):
        assert int(encode(10, 2, 3)) == 32

    def test_source_vertex(self):
        a = q2("x", "y")
        assert source_product_vertex(5, a) == 10  # 5*2 + 0


class TestProductEdges:
    def _labeled(self):
        df = pd.DataFrame(
            {
                "src": [0, 1, 2, 0],
                "dst": [1, 2, 3, 2],
                "label": ["x", "y", "y", "z"],
                "weight": [1, 1, 1, 1],
            }
        )
        return df

    def test_q2_product(self):
        a = q2("x", "y")
        pe = product_edges(self._labeled(), a)
        # x-edge 0->1 lifts state 0->1; y-edges lift 1->1; z-edge drops.
        assert len(pe) == 3
        srcs = set(zip(*decode(pe["src"].to_numpy(), 2)))
        assert (0, 0) in srcs  # data 0, state 0

    def test_unmatched_labels_drop(self):
        a = q1("x")
        pe = product_edges(self._labeled(), a)
        assert len(pe) == 1

    def test_mult_carried(self):
        a = q1("x")
        ch = self._labeled().assign(mult=[-1, 1, 1, 1])
        pe = product_edges(ch, a)
        assert "mult" in pe.columns and (pe["mult"] == -1).all()

    def test_self_loop_label_multiplies(self):
        # one data edge × two transitions on the same label -> two product edges
        a = q3("x", "x", "x", "x", "x")
        e = edge_frame([(0, 1, 1)]).assign(label="x")
        pe = product_edges(e, a)
        assert len(pe) == 5

    def test_accepting_vertices(self):
        a = q2("x", "y")
        pv = np.array([encode(3, 1, 2), encode(4, 0, 2), encode(3, 1, 2)])
        assert list(accepting_vertices(pv, a)) == [3]


class TestProductSemantics:
    def test_q3_path_reachability(self):
        # chain 0-x->1-y->2 under Q3-like 'x.y': product path exists end-to-end
        from repro.rpq.automaton import Automaton

        a = Automaton("xy", 3, 0, frozenset({2}), ((0, "x", 1), (1, "y", 2)))
        e = pd.DataFrame(
            {"src": [0, 1], "dst": [1, 2], "label": ["x", "y"], "weight": [1, 1]}
        )
        pe = product_edges(e, a)
        # (0,q0) -> (1,q1) -> (2,q2)
        assert len(pe) == 2
        s = source_product_vertex(0, a)
        hop1 = pe[pe["src"] == s]["dst"].iloc[0]
        hop2 = pe[pe["src"] == hop1]["dst"].iloc[0]
        assert accepting_vertices(np.array([hop2]), a).tolist() == [2]
