"""Dynamic-graph update streams: the paper's 90/10 split and batching.

§6.1: "For each dataset, we shuffle the edges, and split the dataset such
that 90% of the data is used as an initial graph, while the remaining 10%
models the dynamism"; default batch size 1; Appendix B mixes in delete
batches with a configurable probability (a delete batch removes edges
already present in the graph).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.graphs.generators import EDGE_COLUMNS, GraphData


@dataclass
class Batch:
    """One batch of edge changes: rows (src, dst, label, weight, mult)."""

    changes: pd.DataFrame  # columns EDGE_COLUMNS + ["mult"]

    @property
    def n_inserts(self) -> int:
        return int((self.changes["mult"] > 0).sum())

    @property
    def n_deletes(self) -> int:
        return int((self.changes["mult"] < 0).sum())


def split_stream(
    graph: GraphData, *, initial_frac: float = 0.9, seed: int = 7
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Shuffle edges and split into (initial_edges, stream_edges)."""
    g = np.random.default_rng(seed)
    perm = g.permutation(len(graph.edges))
    shuffled = graph.edges.iloc[perm].reset_index(drop=True)
    n_init = int(len(shuffled) * initial_frac)
    return shuffled.iloc[:n_init].copy(), shuffled.iloc[n_init:].copy()


def to_batches(
    initial: pd.DataFrame,
    stream: pd.DataFrame,
    *,
    n_batches: int,
    batch_size: int = 1,
    delete_prob: float = 0.0,
    seed: int = 8,
) -> list[Batch]:
    """Build ``n_batches`` update batches from the stream.

    With probability ``delete_prob`` a batch deletes ``batch_size`` edges
    that are currently present (sampled from the evolving live set);
    otherwise it inserts the next ``batch_size`` stream edges. A deleted
    edge is removed from the live set so it is never deleted twice.
    """
    g = np.random.default_rng(seed)
    live = initial.reset_index(drop=True).copy()
    batches: list[Batch] = []
    cursor = 0
    for _ in range(n_batches):
        if delete_prob > 0 and g.random() < delete_prob and len(live) > batch_size:
            idx = g.choice(len(live), size=batch_size, replace=False)
            rows = live.iloc[idx][EDGE_COLUMNS].copy()
            rows["mult"] = -1
            live = live.drop(live.index[idx]).reset_index(drop=True)
            batches.append(Batch(rows.reset_index(drop=True)))
        else:
            if cursor + batch_size > len(stream):
                # Stream exhausted: recycle deleted/unseen edges as inserts.
                cursor = 0
            rows = stream.iloc[cursor : cursor + batch_size][EDGE_COLUMNS].copy()
            cursor += batch_size
            rows["mult"] = 1
            live = pd.concat([live, rows[EDGE_COLUMNS]], ignore_index=True)
            batches.append(Batch(rows.reset_index(drop=True)))
    return batches


def apply_batch(edges: pd.DataFrame, batch: Batch) -> pd.DataFrame:
    """Return the edge list after applying ``batch`` (pure function).

    Inserts append rows; a delete removes one matching
    (src, dst, label, weight) row. Used by tests and by the engines'
    driver-side edge mirror.
    """
    out = edges.reset_index(drop=True)
    ins = batch.changes[batch.changes["mult"] > 0]
    dels = batch.changes[batch.changes["mult"] < 0]
    if len(dels):
        drop_idx: list[int] = []
        # Match each delete row to one live row not already being dropped.
        key_cols = ["src", "dst", "label", "weight"]
        grouped = out.groupby(key_cols).groups
        used: dict[tuple, int] = {}
        for row in dels.itertuples(index=False):
            key = (row.src, row.dst, row.label, row.weight)
            if key not in grouped:
                raise KeyError(f"delete of absent edge {key}")
            pos = used.get(key, 0)
            drop_idx.append(grouped[key][pos])
            used[key] = pos + 1
        out = out.drop(index=drop_idx)
    if len(ins):
        out = pd.concat([out, ins[EDGE_COLUMNS]], ignore_index=True)
    return out.reset_index(drop=True)
