"""Deterministic synthetic graph generators standing in for the paper's datasets.

Each generator returns a :class:`GraphData` whose ``edges`` pandas frame has
columns ``src, dst, label, weight`` (int64, int64, str, int64). Weighted
variants draw integer weights uniformly from [1, 10] exactly as the paper
does for its SPSP experiments ("we created weighted versions ... by adding a
random integer weight between 1 and 10").

Scale: the paper's graphs are 1.7M-7.2M vertices; we generate ~1/1000-scale
graphs with matching shape statistics (see DESIGN.md §2). All generators are
deterministic in ``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

EDGE_COLUMNS = ["src", "dst", "label", "weight"]


@dataclass
class GraphData:
    """An edge list plus identifying metadata.

    ``edges`` is the full generated edge list *before* the 90/10
    initial/stream split (see :mod:`repro.graphs.updates`).
    """

    name: str
    edges: pd.DataFrame
    n_vertices: int
    directed: bool = True
    labels: tuple[str, ...] = field(default_factory=tuple)

    def stats(self) -> dict:
        """Degree statistics in the shape of the paper's Table 5."""
        out_deg = self.edges.groupby("src").size()
        in_deg = self.edges.groupby("dst").size()
        return {
            "name": self.name,
            "|E|": len(self.edges),
            "|V|": self.n_vertices,
            "max_degree": int(max(out_deg.max(), in_deg.max())),
            "avg_degree": round(len(self.edges) / self.n_vertices, 1),
            "avg_in_degree": round(float(in_deg.mean()), 1),
        }


def _dedupe(src: np.ndarray, dst: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Drop self loops and duplicate (src, dst) pairs, keeping first."""
    keep = src != dst
    src, dst = src[keep], dst[keep]
    key = src.astype(np.int64) * (dst.max() + 1 if len(dst) else 1) + dst
    _, idx = np.unique(key, return_index=True)
    idx.sort()
    return src[idx], dst[idx]


def _powerlaw_graph(
    name: str,
    *,
    n_vertices: int,
    n_edges: int,
    alpha: float,
    seed: int,
    weighted: bool,
    acyclic: bool = False,
) -> GraphData:
    """Power-law graph: both endpoints drawn from a Zipf(alpha) rank law.

    Zipf endpoints concentrate edges on low-rank hub vertices, giving the
    heavy-tailed degree distribution that the paper's degree-based dropping
    heuristic (Fig. 6b: "the degree distribution follows a power-law") and
    the JOD degree-sensitivity analysis rely on. ``acyclic`` orients every
    edge from the higher id to the lower, a citation-DAG shape (Patents).
    """
    g = np.random.default_rng(seed)
    ranks = np.arange(1, n_vertices + 1)
    w = 1.0 / ranks**alpha
    w /= w.sum()
    # Oversample: dedupe + self-loop removal loses some pairs.
    m = int(n_edges * 1.35) + 16
    src = g.choice(n_vertices, size=m, p=w)
    dst = g.choice(n_vertices, size=m, p=w)
    if acyclic:
        src, dst = np.maximum(src, dst), np.minimum(src, dst)
    src, dst = _dedupe(src, dst)
    src, dst = src[:n_edges], dst[:n_edges]
    edges = pd.DataFrame(
        {
            "src": src.astype(np.int64),
            "dst": dst.astype(np.int64),
            "label": "e",
            "weight": g.integers(1, 11, len(src)) if weighted else np.ones(len(src), np.int64),
        }
    )
    return GraphData(name=name, edges=edges, n_vertices=n_vertices, labels=("e",))


def skitter_like(*, scale: float = 1.0, weighted: bool = True, seed: int = 11) -> GraphData:
    """Internet-topology stand-in: strong hubs (paper max degree 35K @ 1.7M V)."""
    n_v = max(8, int(1700 * scale))
    return _powerlaw_graph(
        "skitter_like", n_vertices=n_v, n_edges=int(11000 * scale),
        alpha=0.75, seed=seed, weighted=weighted,
    )


def livejournal_like(*, scale: float = 1.0, weighted: bool = True, seed: int = 12) -> GraphData:
    """Social-network stand-in (paper: 4.8M V, 69M E, avg in-degree 14.2)."""
    n_v = max(8, int(4800 * scale))
    return _powerlaw_graph(
        "livejournal_like", n_vertices=n_v, n_edges=int(69000 * scale),
        alpha=0.6, seed=seed, weighted=weighted,
    )


def patents_like(*, scale: float = 1.0, weighted: bool = True, seed: int = 13) -> GraphData:
    """Citation-DAG stand-in: low degree, acyclic (paper avg degree 2.3)."""
    n_v = max(8, int(3800 * scale))
    return _powerlaw_graph(
        "patents_like", n_vertices=n_v, n_edges=int(16500 * scale),
        alpha=0.45, seed=seed, weighted=weighted, acyclic=True,
    )


def orkut_like(*, scale: float = 1.0, weighted: bool = True, seed: int = 14) -> GraphData:
    """Dense social-network stand-in: highest average degree of the four."""
    n_v = max(8, int(3000 * scale))
    return _powerlaw_graph(
        "orkut_like", n_vertices=n_v, n_edges=int(104000 * scale),
        alpha=0.55, seed=seed, weighted=weighted,
    )


LDBC_LABELS = ("knows", "replyOf", "likes", "hasCreator")


def ldbc_like(
    *, scale: float = 1.0, seed: int = 15, knows_avg_degree: float | None = None
) -> GraphData:
    """LDBC-SNB-like labeled graph for RPQ workloads.

    Vertices [0, n_person) are persons, [n_person, n_person + n_msg) are
    messages. Label structure mirrors LDBC SNB's recursive relationships:

    * ``knows``    person -> person (the recursive social edge; power-law)
    * ``replyOf``  message -> message (the recursive reply tree)
    * ``likes``    person -> message
    * ``hasCreator`` message -> person

    ``knows_avg_degree`` overrides the knows-subgraph average degree by
    adding uniform-random extra knows edges — this is exactly the paper's
    Fig. 5 densification ("we increase the average degree by adding random
    edges that connect vertices in this subgraph").
    """
    g = np.random.default_rng(seed)
    n_person = max(8, int(1800 * scale))
    n_msg = max(8, int(5400 * scale))
    frames = []

    # knows: zipf-attachment power law inside persons, avg degree ~4.7.
    n_knows = int(n_person * 4.7)
    ranks = np.arange(1, n_person + 1)
    w = 1.0 / ranks**0.6
    w /= w.sum()
    ks = g.choice(n_person, size=int(n_knows * 1.4) + 16, p=w)
    kd = g.choice(n_person, size=len(ks), p=w)
    ks, kd = _dedupe(ks, kd)
    ks, kd = ks[:n_knows], kd[:n_knows]
    if knows_avg_degree is not None and knows_avg_degree * n_person > len(ks):
        extra = int(knows_avg_degree * n_person) - len(ks)
        es = g.integers(0, n_person, int(extra * 1.3) + 16)
        ed = g.integers(0, n_person, len(es))
        es, ed = _dedupe(es, ed)
        ks = np.concatenate([ks, es[:extra]])
        kd = np.concatenate([kd, ed[:extra]])
    frames.append(pd.DataFrame({"src": ks, "dst": kd, "label": "knows"}))

    # replyOf: each non-root message replies to an earlier message (tree-ish).
    msg_ids = np.arange(n_msg) + n_person
    parents = (g.random(n_msg - 1) * np.arange(1, n_msg)).astype(np.int64) + n_person
    frames.append(
        pd.DataFrame({"src": msg_ids[1:], "dst": parents, "label": "replyOf"})
    )

    # likes: person -> message, skewed toward popular messages.
    n_likes = int(n_msg * 1.5)
    mw = 1.0 / np.arange(1, n_msg + 1) ** 0.7
    mw /= mw.sum()
    frames.append(
        pd.DataFrame(
            {
                "src": g.integers(0, n_person, n_likes),
                "dst": g.choice(msg_ids, size=n_likes, p=mw),
                "label": "likes",
            }
        )
    )

    # hasCreator: every message has exactly one creator.
    frames.append(
        pd.DataFrame(
            {
                "src": msg_ids,
                "dst": g.integers(0, n_person, n_msg),
                "label": "hasCreator",
            }
        )
    )

    edges = pd.concat(frames, ignore_index=True)
    edges["src"] = edges["src"].astype(np.int64)
    edges["dst"] = edges["dst"].astype(np.int64)
    edges["weight"] = np.int64(1)
    return GraphData(
        name="ldbc_like",
        edges=edges[EDGE_COLUMNS],
        n_vertices=n_person + n_msg,
        labels=LDBC_LABELS,
    )


# Vertex ids for the paper's running example (Figure 2): a..e -> 0..4.
FIG2_IDS = {"a": 0, "b": 1, "c": 2, "d": 3, "e": 4}


def figure2_example() -> tuple[GraphData, list, list]:
    """The paper's Figure 2 running example.

    Returns ``(G0, batch1, batch2)`` where the batches are the two updates:
    (a,d) reweighted 20 -> 100 in G1 and (b,c) reweighted 10 -> 100 in G2.
    Batches are lists of ``(src, dst, label, weight, +1/-1)``.
    """
    a, b, c, d, e = (FIG2_IDS[x] for x in "abcde")
    rows = [
        (a, b, "e", 30), (b, c, "e", 10), (c, d, "e", 10), (a, d, "e", 20),
        (d, e, "e", 10), (a, e, "e", 10), (d, c, "e", 20),
    ]
    edges = pd.DataFrame(rows, columns=EDGE_COLUMNS).astype(
        {"src": np.int64, "dst": np.int64, "weight": np.int64}
    )
    g0 = GraphData(name="figure2", edges=edges, n_vertices=5, labels=("e",))
    batch1 = [(a, d, "e", 20, -1), (a, d, "e", 100, +1)]
    batch2 = [(b, c, "e", 10, -1), (b, c, "e", 100, +1)]
    return g0, batch1, batch2
