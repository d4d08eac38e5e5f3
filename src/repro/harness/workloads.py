"""Workload construction: the paper's query/update mixes (§6.1.2).

A :class:`Workload` is everything a system configuration needs to run one
experiment: the engine-facing initial edge list, the translated update
batches, the query spec, and the degree table the Degree drop policy uses.

Translation per query kind:

* **sssp/spsp** — weighted edges as generated; random source (and target)
  vertices per query.
* **khop** — same graph; the message function ignores weights; K = 5.
* **wcc** — weakly connected components need the symmetrized edge set, so
  every edge (and every update) is mirrored.
* **pr** — directed edges as-is, one query.
* **rpq** — the data graph is lifted to the product graph of the chosen
  automaton template (:mod:`repro.rpq.product`); updates are lifted the
  same way (updates on labels the automaton ignores become empty batches,
  which the engines treat as no-ops on the difference sets).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core import specs
from repro.graphs.generators import GraphData
from repro.graphs.updates import Batch, split_stream, to_batches
from repro.rpq import automaton as auto
from repro.rpq import product

# LDBC labels for the paper's three templates (§6.1.2: Likes, Knows,
# ReplyOf, hasCreator over Q1=a*, Q2=a.b*, Q3=a.b.c.d.e).
RPQ_TEMPLATES = {
    "q1": lambda: auto.q1("knows"),
    "q2": lambda: auto.q2("likes", "replyOf"),
    "q3": lambda: auto.q3("knows", "likes", "replyOf", "replyOf", "hasCreator"),
}


@dataclass
class Workload:
    name: str
    kind: str
    spec: specs.QuerySpec
    initial: pd.DataFrame
    batches: list[Batch]
    degrees: pd.Series  # engine-vertex-space total degrees (Degree policy)
    automaton: auto.Automaton | None = None
    meta: dict = field(default_factory=dict)

    @property
    def n_queries(self) -> int:
        return len(self.spec.sources) if self.spec.sources else 1


def _degrees(edges: pd.DataFrame) -> pd.Series:
    return (
        edges.groupby("src").size().add(edges.groupby("dst").size(), fill_value=0)
    ).astype(np.float64)


def _symmetrize(edges: pd.DataFrame) -> pd.DataFrame:
    rev = edges.rename(columns={"src": "dst", "dst": "src"})[edges.columns]
    return pd.concat([edges, rev], ignore_index=True)


def _pick_sources(edges: pd.DataFrame, n: int, rng) -> list[int]:
    cand = edges["src"].unique()
    return [int(x) for x in rng.choice(cand, size=n, replace=len(cand) < n)]


def make_workload(
    graph: GraphData,
    kind: str,
    *,
    n_queries: int = 10,
    n_batches: int = 100,
    batch_size: int = 1,
    delete_prob: float = 0.0,
    k: int = 5,
    template: str = "q1",
    seed: int = 0,
) -> Workload:
    """Build one experiment workload from a generated graph."""
    rng = np.random.default_rng(seed)
    init, stream = split_stream(graph, seed=seed + 1)
    raw_batches = to_batches(
        init, stream, n_batches=n_batches, batch_size=batch_size,
        delete_prob=delete_prob, seed=seed + 2,
    )
    name = f"{graph.name}/{kind}"

    if kind in ("sssp", "spsp", "khop"):
        srcs = _pick_sources(init, n_queries, rng)
        verts = np.union1d(init["src"].unique(), init["dst"].unique())
        tgts = {q: int(rng.choice(verts)) for q in range(n_queries)}
        if kind == "khop":
            spec = specs.khop_spec(dict(enumerate(srcs)), k=k)
        else:
            spec = specs.sssp_spec(dict(enumerate(srcs)), targets=tgts)
        return Workload(name, kind, spec, init, raw_batches, _degrees(init))

    if kind == "wcc":
        sym_init = _symmetrize(init)
        sym_batches = [Batch(_symmetrize(b.changes)) for b in raw_batches]
        return Workload(name, kind, specs.wcc_spec(), sym_init, sym_batches, _degrees(sym_init))

    if kind == "pr":
        return Workload(name, kind, specs.pr_spec(), init, raw_batches, _degrees(init))

    if kind == "rpq":
        a = RPQ_TEMPLATES[template]()
        name = f"{graph.name}/rpq-{template}"
        pinit = product.product_edges(init, a)
        pbatches = [Batch(product.product_edges(b.changes, a)) for b in raw_batches]
        # Sources: data vertices with an outgoing edge labelled like the
        # automaton's start transitions (so queries are non-trivial).
        start_labels = {lbl for q, lbl, _ in a.transitions if q == a.start}
        cand = init[init["label"].isin(sorted(start_labels))]["src"].unique()
        if not len(cand):
            raise ValueError(f"no sources for template {template}")
        srcs = rng.choice(cand, size=n_queries, replace=len(cand) < n_queries)
        sources = {
            q: product.source_product_vertex(int(s), a) for q, s in enumerate(srcs)
        }
        return Workload(
            name, kind, specs.rpq_spec(sources), pinit, pbatches, _degrees(pinit),
            automaton=a,
        )

    raise ValueError(f"unknown workload kind {kind!r}")
