"""Shared test fixtures/utilities: tiny deterministic graphs and gold checks."""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.graphs.generators import EDGE_COLUMNS

EDGE_DTYPES = {"src": np.int64, "dst": np.int64, "weight": np.int64}


def edge_frame(rows: list[tuple]) -> pd.DataFrame:
    """Rows of (src, dst, weight) -> canonical edge frame with label 'e'."""
    df = pd.DataFrame(rows, columns=["src", "dst", "weight"])
    df["label"] = "e"
    return df[EDGE_COLUMNS].astype(EDGE_DTYPES)


def tiny_graph(n: int = 14, m: int = 36, seed: int = 0, weighted: bool = True) -> pd.DataFrame:
    """A small random weighted digraph (deterministic in seed)."""
    g = np.random.default_rng(seed)
    src = g.integers(0, n, m * 2)
    dst = g.integers(0, n, m * 2)
    keep = src != dst
    df = pd.DataFrame({"src": src[keep], "dst": dst[keep]}).drop_duplicates().head(m)
    df["label"] = "e"
    df["weight"] = g.integers(1, 11, len(df)) if weighted else 1
    return df[EDGE_COLUMNS].astype(EDGE_DTYPES).reset_index(drop=True)


def random_batches(
    edges: pd.DataFrame, n_batches: int, *, delete_prob: float = 0.0,
    n_vertices: int = 14, seed: int = 1,
):
    """Random single-edge insert/delete batches against an evolving graph."""
    from repro.graphs.updates import Batch

    g = np.random.default_rng(seed)
    live = edges.copy()
    out = []
    for _ in range(n_batches):
        if delete_prob > 0 and g.random() < delete_prob and len(live) > 4:
            i = int(g.integers(0, len(live)))
            row = live.iloc[[i]].copy()
            row["mult"] = -1
            live = live.drop(live.index[i]).reset_index(drop=True)
            out.append(Batch(row.reset_index(drop=True)))
        else:
            while True:
                s, d = int(g.integers(0, n_vertices)), int(g.integers(0, n_vertices))
                if s != d:
                    break
            row = pd.DataFrame(
                [[s, d, "e", int(g.integers(1, 11))]], columns=EDGE_COLUMNS
            ).astype(EDGE_DTYPES)
            row["mult"] = 1
            live = pd.concat([live, row[EDGE_COLUMNS]], ignore_index=True)
            out.append(Batch(row))
    return out


def assert_states_match(got: pd.DataFrame, exp: pd.DataFrame, *, atol: float = 1e-6):
    """Compare two (qid, v, val) state frames exactly (outer join, no NaNs)."""
    m = got.merge(exp, on=["qid", "v"], how="outer", suffixes=("_got", "_exp"))
    missing = m[m["val_got"].isna() | m["val_exp"].isna()]
    assert not len(missing), f"key mismatch:\n{missing}"
    bad = m[(m["val_got"] - m["val_exp"]).abs() > atol]
    assert not len(bad), f"value mismatch:\n{bad}"
