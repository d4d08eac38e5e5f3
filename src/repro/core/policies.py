"""Selecting the differences to drop (§5.2).

Two strategies, evaluated against each other in Fig. 6:

* ``RandomPolicy`` — drop each difference uniformly at random with
  probability p.
* ``DegreePolicy`` — the paper's degree heuristic (Fig. 3): drop if
  ``deg(v) < τ_min``; keep if ``deg(v) > τ_max``; otherwise drop with
  probability p. The paper sets τ_min = 2 and τ_max = the 80th degree
  percentile of the input graph, which are the defaults here.

Policies are deterministic in their seed and *stateless* across calls
except for the RNG stream, so a sweep over p is reproducible.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


class RandomPolicy:
    """Drop each difference independently with probability p."""

    name = "random"

    def __init__(self, p: float, seed: int = 0) -> None:
        if not (0.0 <= p <= 1.0):
            raise ValueError("p must be in [0, 1]")
        self.p = p
        self._rng = np.random.default_rng(seed)

    def drop_mask(self, rows: pd.DataFrame, degrees: pd.Series) -> np.ndarray:
        return self._rng.random(len(rows)) < self.p


class DegreePolicy:
    """Degree-based dropping (Fig. 3): spare the hubs, shed the leaves."""

    name = "degree"

    def __init__(
        self, p: float, degrees: pd.Series, *, tau_min: int = 2,
        tau_max_percentile: float = 80.0, seed: int = 0,
    ) -> None:
        if not (0.0 <= p <= 1.0):
            raise ValueError("p must be in [0, 1]")
        self.p = p
        self.tau_min = tau_min
        # τ_max fixed from the *initial* graph, as the paper does.
        self.tau_max = float(np.percentile(degrees.to_numpy(), tau_max_percentile))
        self._rng = np.random.default_rng(seed)

    def drop_mask(self, rows: pd.DataFrame, degrees: pd.Series) -> np.ndarray:
        deg = rows["v"].map(degrees).fillna(0.0).to_numpy()
        rand = self._rng.random(len(rows))
        drop = np.where(
            deg < self.tau_min, True, np.where(deg > self.tau_max, False, rand < self.p)
        )
        return drop
