"""The eager-merged difference index for D (§4.2, Appendix C).

The paper stores, per vertex, a list of ``(iteration, state)`` pairs sorted
by iteration — 1-D timestamps because the graph-version dimension is merged
eagerly, and positive multiplicities only because each vertex takes one
state per iteration (the negative half of each change is implied). The
state of v at iteration t is the value at the latest stored iteration
``i* <= t`` (binary search in the paper; a vectorized groupby here).

``DiffStore`` is that index, vectorized over (qid, v): a pandas frame with
columns ``qid, v, it, val``. It is driver-side state — the arrangement the
dataflow operators read — while the Join/aggregate work runs in Spark
(:mod:`repro.core.frontier`).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.specs import INF

COLS = ["qid", "v", "it", "val"]
_DTYPES = {"qid": np.int64, "v": np.int64, "it": np.int64, "val": np.float64}


def empty_frame() -> pd.DataFrame:
    return pd.DataFrame({c: pd.Series(dtype=t) for c, t in _DTYPES.items()})


def _as_frame(df: pd.DataFrame, cols: list[str]) -> pd.DataFrame:
    out = df[cols].copy()
    for c in cols:
        out[c] = out[c].astype(_DTYPES.get(c, np.float64))
    return out


class DiffStore:
    """Eager-merged, positive-only difference sets for the D collection."""

    def __init__(self, df: pd.DataFrame | None = None) -> None:
        self.df = _as_frame(df, COLS) if df is not None and len(df) else empty_frame()

    def copy(self) -> "DiffStore":
        return DiffStore(self.df)

    def __len__(self) -> int:
        return len(self.df)

    def n_diffs(self) -> int:
        return len(self.df)

    def per_qid_counts(self) -> pd.Series:
        return self.df.groupby("qid").size()

    def max_iter(self) -> int:
        return int(self.df["it"].max()) if len(self.df) else 0

    # ------------------------------------------------------------------ writes
    def set_rows(self, rows: pd.DataFrame) -> None:
        """Upsert rows keyed by (qid, v, it)."""
        if not len(rows):
            return
        rows = _as_frame(rows, COLS)
        merged = pd.concat([self.df, rows], ignore_index=True)
        self.df = merged.drop_duplicates(subset=["qid", "v", "it"], keep="last").reset_index(
            drop=True
        )

    def delete_rows(self, keys: pd.DataFrame) -> None:
        """Delete rows whose (qid, v, it) appears in ``keys``."""
        if not len(keys) or not len(self.df):
            return
        keys = _as_frame(keys, ["qid", "v", "it"]).drop_duplicates()
        m = self.df.merge(keys, on=["qid", "v", "it"], how="left", indicator=True)
        self.df = self.df[(m["_merge"] == "left_only").to_numpy()].reset_index(drop=True)

    # ------------------------------------------------------------------- reads
    def rows_for_keys(self, keys: pd.DataFrame) -> pd.DataFrame:
        """All stored rows for the given (qid, v) keys."""
        if not len(keys) or not len(self.df):
            return empty_frame()
        keys = _as_frame(keys, ["qid", "v"]).drop_duplicates()
        return self.df.merge(keys, on=["qid", "v"], how="inner")

    def latest_leq(self, keys: pd.DataFrame, t: int | None = None) -> pd.DataFrame:
        """State reassembly: latest stored iteration ``<= t`` per key.

        ``keys`` has columns (qid, v) and, when ``t`` is None, a per-row
        column ``t``. Returns one row per input key with columns
        ``qid, v, t, it, val``; keys with no stored row ``<= t`` get
        ``it = -1, val = +inf`` (unreachable).
        """
        keys = keys.copy()
        if t is not None:
            keys["t"] = np.int64(t)
        keys = _as_frame(keys, ["qid", "v"]).assign(t=keys["t"].astype(np.int64).to_numpy())
        keys = keys.drop_duplicates().reset_index(drop=True)
        if not len(keys):
            return keys.assign(it=pd.Series(dtype=np.int64), val=pd.Series(dtype=np.float64))
        m = keys.merge(self.df, on=["qid", "v"], how="left")
        m = m[(m["it"].isna()) | (m["it"] <= m["t"])]
        m = m.sort_values("it").groupby(["qid", "v", "t"], as_index=False).last()
        # Keys whose every stored row was > t vanish in the filter; restore.
        out = keys.merge(m, on=["qid", "v", "t"], how="left")
        out["it"] = out["it"].fillna(-1).astype(np.int64)
        out["val"] = out["val"].fillna(INF)
        return out[["qid", "v", "t", "it", "val"]]

    def snapshot_at(self, t: int) -> pd.DataFrame:
        """Full reassembly at iteration t: (qid, v, val) for reachable keys."""
        if not len(self.df):
            return empty_frame()[["qid", "v", "val"]]
        d = self.df[self.df["it"] <= t]
        if not len(d):
            return empty_frame()[["qid", "v", "val"]]
        d = d.sort_values("it").groupby(["qid", "v"], as_index=False).last()
        return d[["qid", "v", "val"]].reset_index(drop=True)

    def iters_after(self, keys: pd.DataFrame) -> pd.DataFrame:
        """Stored iterations strictly greater than each key's ``t``.

        ``keys``: columns (qid, v, t). Returns (qid, v, it) rows, it > t.
        Used by the upper-bound rule's conditions (i)/(ii) (§4.1).
        """
        if not len(keys) or not len(self.df):
            return empty_frame()[["qid", "v", "it"]]
        k = _as_frame(keys, ["qid", "v"]).assign(t=keys["t"].astype(np.int64).to_numpy())
        k = k.drop_duplicates()
        m = k.merge(self.df, on=["qid", "v"], how="inner")
        m = m[m["it"] > m["t"]]
        return m[["qid", "v", "it"]].drop_duplicates().reset_index(drop=True)

    def iters_of(self, keys: pd.DataFrame) -> pd.DataFrame:
        """All stored iterations for (qid, v) keys: columns (qid, v, it)."""
        return self.rows_for_keys(keys)[["qid", "v", "it"]].reset_index(drop=True)
