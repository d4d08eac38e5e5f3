"""Byte-accounting model tests (§5.1.1)."""
import pytest

from repro.core import memory as M


class TestConstants:
    def test_diff_is_vt_plus_state(self):
        assert M.BYTES_DIFF == M.BYTES_VT + M.BYTES_STATE

    def test_dj_larger_than_d(self):
        assert M.BYTES_DJ > M.BYTES_DIFF

    def test_det_entry_is_vt(self):
        assert M.BYTES_DROPPED_DET == M.BYTES_VT


class TestDiffBytes:
    def test_d_only(self):
        assert M.diff_bytes(10) == 200

    def test_with_j(self):
        assert M.diff_bytes(10, 5) == 200 + 120


class TestCeiling:
    def test_det_drop_ceiling(self):
        # §5.1.1: even dropping 100% keeps d of every d+s bytes.
        assert M.det_drop_ceiling() == pytest.approx(8 / 20)


class TestBudget:
    def test_max_queries(self):
        assert M.max_queries_under_budget(100, 1000) == 10

    def test_fixed_overhead(self):
        assert M.max_queries_under_budget(100, 1000, fixed_bytes=250) == 7

    def test_zero_cost_unbounded(self):
        assert M.max_queries_under_budget(0, 1000) == 10**9
