"""Update-stream tests: the 90/10 split, batching, delete mixes (§6.1, App. B)."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import skitter_like
from repro.graphs.updates import apply_batch, split_stream, to_batches
from tests.helpers import edge_frame


class TestSplitStream:
    def test_ratio(self):
        g = skitter_like(scale=0.2)
        init, stream = split_stream(g)
        assert abs(len(init) / len(g.edges) - 0.9) < 0.01
        assert len(init) + len(stream) == len(g.edges)

    def test_deterministic(self):
        g = skitter_like(scale=0.2)
        a0, a1 = split_stream(g)
        b0, b1 = split_stream(g)
        pd.testing.assert_frame_equal(a0, b0)
        pd.testing.assert_frame_equal(a1, b1)

    def test_is_shuffle(self):
        g = skitter_like(scale=0.2)
        init, _ = split_stream(g)
        assert not init.reset_index(drop=True).equals(g.edges.iloc[: len(init)])

    def test_custom_frac(self):
        g = skitter_like(scale=0.2)
        init, stream = split_stream(g, initial_frac=0.5)
        assert abs(len(init) - len(stream)) <= 1


class TestToBatches:
    def setup_method(self):
        g = skitter_like(scale=0.2)
        self.init, self.stream = split_stream(g)

    def test_insert_only(self):
        bs = to_batches(self.init, self.stream, n_batches=20)
        assert len(bs) == 20
        assert all(b.n_inserts == 1 and b.n_deletes == 0 for b in bs)

    def test_batch_size(self):
        bs = to_batches(self.init, self.stream, n_batches=5, batch_size=10)
        assert all(len(b.changes) == 10 for b in bs)

    def test_delete_prob(self):
        bs = to_batches(self.init, self.stream, n_batches=200, delete_prob=0.5)
        n_del = sum(b.n_deletes > 0 for b in bs)
        assert 60 < n_del < 140  # ~50% of 200

    def test_all_deletes(self):
        bs = to_batches(self.init, self.stream, n_batches=20, delete_prob=1.0)
        assert all(b.n_deletes == 1 for b in bs)

    def test_deletes_apply_cleanly(self):
        bs = to_batches(self.init, self.stream, n_batches=50, delete_prob=0.5)
        edges = self.init
        for b in bs:
            edges = apply_batch(edges, b)  # raises KeyError on a bad delete
        assert len(edges) == len(self.init) + sum(
            b.n_inserts - b.n_deletes for b in bs
        )


class TestApplyBatch:
    def test_insert(self):
        from repro.graphs.updates import Batch

        e = edge_frame([(0, 1, 5)])
        b = Batch(edge_frame([(1, 2, 3)]).assign(mult=1))
        out = apply_batch(e, b)
        assert len(out) == 2

    def test_delete(self):
        from repro.graphs.updates import Batch

        e = edge_frame([(0, 1, 5), (1, 2, 3)])
        b = Batch(edge_frame([(0, 1, 5)]).assign(mult=-1))
        out = apply_batch(e, b)
        assert len(out) == 1 and out.iloc[0]["src"] == 1

    def test_delete_absent_raises(self):
        from repro.graphs.updates import Batch

        e = edge_frame([(0, 1, 5)])
        b = Batch(edge_frame([(2, 3, 1)]).assign(mult=-1))
        with pytest.raises(KeyError):
            apply_batch(e, b)

    def test_weight_update_pair(self):
        from repro.graphs.updates import Batch

        e = edge_frame([(0, 1, 5)])
        ch = pd.concat(
            [edge_frame([(0, 1, 5)]).assign(mult=-1), edge_frame([(0, 1, 9)]).assign(mult=1)],
            ignore_index=True,
        )
        out = apply_batch(e, Batch(ch))
        assert len(out) == 1 and out.iloc[0]["weight"] == 9

    def test_duplicate_edge_delete_one(self):
        from repro.graphs.updates import Batch

        e = edge_frame([(0, 1, 5), (0, 1, 5)])
        b = Batch(edge_frame([(0, 1, 5)]).assign(mult=-1))
        out = apply_batch(e, b)
        assert len(out) == 1

    def test_pure_function(self):
        from repro.graphs.updates import Batch

        e = edge_frame([(0, 1, 5)])
        before = e.copy()
        apply_batch(e, Batch(edge_frame([(1, 2, 3)]).assign(mult=1)))
        pd.testing.assert_frame_equal(e, before)
