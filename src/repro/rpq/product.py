"""Product-graph construction for RPQ evaluation.

An RPQ over a labeled graph G and automaton A is reachability over the
product graph G × A whose vertices are (v, q) pairs and whose edges are
``((u, q) -> (v, q'))`` for every data edge ``u -[lbl]-> v`` and automaton
transition ``q -[lbl]-> q'``. We encode a product vertex as the integer
``v * n_states + q`` so the differential engines (which key state by int64
vertex ids) run unchanged on RPQs — the same Join/Min IFE dataflow.

Edge *changes* translate the same way: one data-edge insert/delete becomes
one product-edge insert/delete per matching transition, so differential
maintenance of the RPQ is differential maintenance of reachability on the
product graph.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.rpq.automaton import Automaton


def encode(v: np.ndarray | int, q: np.ndarray | int, n_states: int):
    """Encode product vertex (data vertex v, automaton state q) as int64."""
    return np.asarray(v, dtype=np.int64) * np.int64(n_states) + np.asarray(q, dtype=np.int64)


def decode(pv: np.ndarray | int, n_states: int):
    """Inverse of :func:`encode`: returns (v, q)."""
    pv = np.asarray(pv, dtype=np.int64)
    return pv // n_states, pv % n_states


def product_edges(edges: pd.DataFrame, automaton: Automaton) -> pd.DataFrame:
    """Join data edges with automaton transitions on the label.

    ``edges`` must have columns src, dst, label, weight (and optionally
    ``mult`` for update batches, which is carried through). Returns a frame
    with the same columns but product-encoded src/dst and label ``'p'``.
    """
    trans = pd.DataFrame(automaton.transitions, columns=["q_from", "label", "q_to"])
    joined = edges.merge(trans, on="label", how="inner")
    out = pd.DataFrame(
        {
            "src": encode(joined["src"].to_numpy(), joined["q_from"].to_numpy(), automaton.n_states),
            "dst": encode(joined["dst"].to_numpy(), joined["q_to"].to_numpy(), automaton.n_states),
            "label": "p",
            "weight": np.ones(len(joined), dtype=np.int64),
        }
    )
    if "mult" in joined.columns:
        out["mult"] = joined["mult"].to_numpy()
    return out


def source_product_vertex(source: int, automaton: Automaton) -> int:
    """The product vertex where an RPQ from ``source`` starts."""
    return int(encode(source, automaton.start, automaton.n_states))


def accepting_vertices(pv: np.ndarray, automaton: Automaton) -> np.ndarray:
    """Filter product vertices down to those in an accepting automaton state.

    Returns the *data* vertex ids reachable in an accepting state (the RPQ
    answer), deduplicated.
    """
    v, q = decode(np.asarray(pv, dtype=np.int64), automaton.n_states)
    mask = np.isin(q, np.fromiter(automaton.accepting, dtype=np.int64))
    return np.unique(v[mask])
