"""Tests for the worker-reliability extension of the metric (Eqs 4–5)."""
import numpy as np
import pytest

from repro.core.quality import p_vector, quality


class TestReliabilityExtension:
    @pytest.mark.parametrize("k", [1, 2, 3])
    @pytest.mark.parametrize("seed", range(5))
    def test_degenerates_when_all_lambda_one(self, k, seed):
        """Eq 5 degenerates into Eq 3 when every reliability equals 1."""
        rng = np.random.default_rng(seed)
        m = 25
        ex = np.sort(rng.choice(m, size=6, replace=False))
        lam = np.ones(len(ex))
        np.testing.assert_allclose(
            p_vector(ex, m, k, reliability=lam), p_vector(ex, m, k)
        )

    def test_executed_slot_probability_is_lambda_over_m(self):
        """Executed subtask e has finishing probability λ_e/m."""
        m = 20
        ex = np.array([3, 10])
        lam = np.array([0.8, 0.5])
        p = p_vector(ex, m, 2, reliability=lam)
        assert p[3] == pytest.approx(0.8 / m)
        assert p[10] == pytest.approx(0.5 / m)

    def test_lower_reliability_lowers_interpolated_probability(self):
        m = 20
        ex = np.array([5, 12])
        p_hi = p_vector(ex, m, 2, reliability=np.array([1.0, 1.0]))
        p_lo = p_vector(ex, m, 2, reliability=np.array([0.5, 0.5]))
        unexec = [j for j in range(m) if j not in (5, 12)]
        assert all(p_lo[j] <= p_hi[j] + 1e-12 for j in unexec)
        assert any(p_lo[j] < p_hi[j] - 1e-9 for j in unexec)

    def test_empty_set_probability_zero(self):
        p = p_vector(np.array([], dtype=np.int64), 10, 2,
                     reliability=np.array([]))
        assert (p == 0).all()

    def test_probabilities_stay_nonnegative(self):
        """Clipping guards the λ-weighted form against negative p."""
        m = 10
        ex = np.array([0])
        p = p_vector(ex, m, 3, reliability=np.array([0.01]))
        assert (p >= 0).all()

    def test_quality_accepts_unsorted_exec_with_reliability(self):
        m, k = 15, 2
        q1 = quality([7, 2], m, k, reliability=np.array([0.9, 0.6]))
        q2 = quality([2, 7], m, k, reliability=np.array([0.6, 0.9]))
        assert q1 == pytest.approx(q2)

    @pytest.mark.parametrize("lam_val", [0.2, 0.5, 0.9])
    def test_quality_monotone_in_reliability(self, lam_val):
        m, k = 20, 2
        ex = [4, 9, 15]
        q_lo = quality(ex, m, k, reliability=np.full(3, lam_val))
        q_hi = quality(ex, m, k, reliability=np.full(3, 1.0))
        assert q_lo <= q_hi + 1e-12
