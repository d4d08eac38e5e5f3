"""NFAs for the paper's RPQ templates (§6.1.2).

The templates come from Bonifati et al.'s Wikidata query-log study, as used
in the paper:

* ``Q1 = a*``
* ``Q2 = a ∘ b*``
* ``Q3 = a ∘ b ∘ c ∘ d ∘ e``

RPQ evaluation is reachability on the product of the data graph and the
automaton, which is exactly the IFE dataflow over product vertices
``(v, q)`` (see :mod:`repro.rpq.product` and DESIGN.md §3).
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class Automaton:
    """An NFA with integer states. Transitions map (state, label) -> states."""

    name: str
    n_states: int
    start: int
    accepting: frozenset[int]
    transitions: tuple[tuple[int, str, int], ...]  # (from_state, label, to_state)

    def labels(self) -> set[str]:
        return {lbl for _, lbl, _ in self.transitions}


def q1(a: str) -> Automaton:
    """``a*`` — the start state is accepting and loops on ``a``."""
    return Automaton(
        name=f"Q1[{a}*]",
        n_states=1,
        start=0,
        accepting=frozenset({0}),
        transitions=((0, a, 0),),
    )


def q2(a: str, b: str) -> Automaton:
    """``a ∘ b*`` — one ``a`` step, then any number of ``b`` steps."""
    return Automaton(
        name=f"Q2[{a}.{b}*]",
        n_states=2,
        start=0,
        accepting=frozenset({1}),
        transitions=((0, a, 1), (1, b, 1)),
    )


def q3(a: str, b: str, c: str, d: str, e: str) -> Automaton:
    """``a ∘ b ∘ c ∘ d ∘ e`` — a fixed-length label chain."""
    labels = (a, b, c, d, e)
    trans = tuple((i, lbl, i + 1) for i, lbl in enumerate(labels))
    return Automaton(
        name="Q3[" + ".".join(labels) + "]",
        n_states=6,
        start=0,
        accepting=frozenset({5}),
        transitions=trans,
    )
