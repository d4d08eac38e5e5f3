"""Drop-selection policy tests (§5.2, Fig. 3)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.policies import DegreePolicy, RandomPolicy


def _rows(vs):
    return pd.DataFrame({"qid": 0, "v": vs, "it": 1, "val": 1.0})


def _degrees():
    # power-law-ish: one hub, a few mid, many leaves
    return pd.Series(
        {0: 100.0, 1: 50.0, 2: 10.0, 3: 8.0, 4: 5.0, 5: 1.0, 6: 1.0, 7: 1.0, 8: 1.0, 9: 1.0}
    )


class TestRandomPolicy:
    def test_p_zero_drops_nothing(self):
        pol = RandomPolicy(0.0)
        assert not pol.drop_mask(_rows(range(10)), _degrees()).any()

    def test_p_one_drops_all(self):
        pol = RandomPolicy(1.0)
        assert pol.drop_mask(_rows(range(10)), _degrees()).all()

    def test_p_half_roughly_half(self):
        pol = RandomPolicy(0.5, seed=1)
        m = pol.drop_mask(_rows(range(10000)), _degrees())
        assert 0.45 < m.mean() < 0.55

    def test_invalid_p(self):
        with pytest.raises(ValueError):
            RandomPolicy(1.5)


class TestDegreePolicy:
    def test_low_degree_always_dropped(self):
        pol = DegreePolicy(0.0, _degrees(), tau_min=2)
        mask = pol.drop_mask(_rows([5, 6, 7]), _degrees())
        assert mask.all()  # degree 1 < τ_min

    def test_hub_never_dropped(self):
        pol = DegreePolicy(1.0, _degrees(), tau_max_percentile=80)
        mask = pol.drop_mask(_rows([0]), _degrees())
        assert not mask.any()  # hub degree above τ_max

    def test_mid_degree_uses_p(self):
        pol0 = DegreePolicy(0.0, _degrees())
        pol1 = DegreePolicy(1.0, _degrees())
        mid = _rows([2, 3, 4])
        assert not pol0.drop_mask(mid, _degrees()).any()
        assert pol1.drop_mask(mid, _degrees()).all()

    def test_tau_max_is_percentile(self):
        pol = DegreePolicy(0.5, _degrees(), tau_max_percentile=80)
        assert pol.tau_max == pytest.approx(np.percentile(_degrees().to_numpy(), 80))

    def test_unknown_vertex_degree_zero(self):
        pol = DegreePolicy(0.0, _degrees(), tau_min=2)
        assert pol.drop_mask(_rows([999]), _degrees()).all()

    def test_invalid_p(self):
        with pytest.raises(ValueError):
            DegreePolicy(-0.1, _degrees())
