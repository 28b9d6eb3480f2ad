"""Tests for the Section IV-D complexity model (repro.core.complexity)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import complexity as cx


class TestPc:
    def test_empty_batch_is_zero(self):
        assert cx.p_c(0, 0, 1000) == 0.0

    def test_delete_only(self):
        # Only deletions: p_c = m_d / |E|.
        assert cx.p_c(10, 0, 1000) == pytest.approx(0.01)

    def test_insert_only(self):
        # Only insertions: p_c = m_a / (|E| + m_a) (Category 3 switch prob).
        assert cx.p_c(0, 10, 1000) == pytest.approx(10 / 1010)

    def test_mixed(self):
        pc = cx.p_c(10, 10, 1000)
        assert pc == pytest.approx(0.01 + 0.99 * (10 / 1000))

    def test_monotone_in_deletes(self):
        assert cx.p_c(20, 10, 1000) > cx.p_c(10, 10, 1000)

    def test_monotone_in_inserts(self):
        assert cx.p_c(10, 20, 1000) > cx.p_c(10, 10, 1000)

    def test_bounded_by_one(self):
        assert cx.p_c(1000, 1000, 1000) <= 1.0

    def test_empty_graph(self):
        assert cx.p_c(0, 0, 0) == 0.0


class TestQSeries:
    def test_q1_matches_eq5(self):
        pc = 0.05
        q = cx.q_series(10, pc)
        assert q[0] == pytest.approx(1 - pc)  # Q(1) = 1 - p_c (Eq. 5)

    def test_monotone_decreasing(self):
        q = cx.q_series(50, 0.1)
        assert np.all(np.diff(q) <= 0)  # Eq. 9 derivation

    def test_bounded(self):
        q = cx.q_series(50, 0.1)
        assert np.all(q >= 0) and np.all(q <= 1)

    def test_lower_bound_geometric(self):
        # Eq. 11: Q(t) >= (1 - p_c)^t.
        pc = 0.2
        q = cx.q_series(30, pc)
        t = np.arange(1, 31)
        assert np.all(q >= (1 - pc) ** t - 1e-12)

    def test_pc_zero_all_ones(self):
        assert np.allclose(cx.q_series(20, 0.0), 1.0)


class TestEta:
    def test_zero_changes_zero_eta(self):
        assert cx.eta_expected(100, 1000, 0.0) == pytest.approx(0.0)
        assert cx.eta_lower(100, 1000, 0.0) == 0.0
        assert cx.eta_upper(100, 1000, 0.0) == 0.0

    def test_bounds_order(self):
        for pc in (0.001, 0.01, 0.1, 0.5):
            lo = cx.eta_lower(50, 1000, pc)
            mid = cx.eta_expected(50, 1000, pc)
            hi = cx.eta_upper(50, 1000, pc)
            assert lo - 1e-9 <= mid <= hi + 1e-9, (pc, lo, mid, hi)

    def test_eta_below_total_labels(self):
        assert cx.eta_expected(50, 1000, 0.3) <= 50 * 1000

    def test_eta_monotone_in_pc(self):
        assert cx.eta_expected(50, 1000, 0.2) > cx.eta_expected(50, 1000, 0.1)

    def test_full_churn_limit(self):
        # p_c = 1: every label needs an update.
        assert cx.eta_upper(50, 1000, 1.0) == pytest.approx(50 * 1000)


@given(
    pc=st.floats(0.0001, 0.9999),
    n_iters=st.integers(1, 200),
    n_v=st.integers(1, 10_000),
)
@settings(max_examples=100, deadline=None)
def test_bounds_sandwich_expectation(pc, n_iters, n_v):
    lo = cx.eta_lower(n_iters, n_v, pc)
    mid = cx.eta_expected(n_iters, n_v, pc)
    hi = cx.eta_upper(n_iters, n_v, pc)
    assert lo - 1e-6 <= mid <= hi + 1e-6
