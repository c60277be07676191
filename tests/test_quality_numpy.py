"""Unit tests for the numpy reference quality metric (paper Section II-B)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.quality import (
    knn_distances,
    p_vector,
    partial_quality,
    quality,
    quality_from_p,
)


class TestPaperExamples:
    def test_fig2_error_ratio_example(self):
        """Sec II-B worked example: m=100, k=2, executed slots {2,4} 1-based;
        slot 1's 2-NN distances are 1 and 3 → ρ = (1+3)/(2·100) = 0.02."""
        p = p_vector(np.array([1, 3]), 100, 2)  # 0-based executed {1,3}
        assert p[0] == pytest.approx((1 - 0.02) / 100)

    def test_executed_subtask_probability_is_1_over_m(self):
        p = p_vector(np.array([1, 3]), 100, 2)
        assert p[1] == pytest.approx(1 / 100)
        assert p[3] == pytest.approx(1 / 100)

    @pytest.mark.parametrize("m", [3, 5, 8, 16, 50, 100])
    def test_all_executed_gives_log2_m(self, m):
        """q ranges up to log2(m) when every subtask is executed (Sec II-B)."""
        assert quality(range(m), m, 2) == pytest.approx(np.log2(m))

    @pytest.mark.parametrize("m", [3, 5, 8, 16, 50, 100])
    @pytest.mark.parametrize("k", [1, 2, 3])
    def test_none_executed_gives_zero(self, m, k):
        assert quality([], m, k) == 0.0

    @pytest.mark.parametrize("k", [1, 2, 3, 5])
    def test_footnote2_missing_neighbours_pad_with_m(self, k):
        """With a single executed slot and k>1, each missing neighbour
        contributes distance m."""
        m = 20
        p = p_vector(np.array([0]), m, k)
        # Slot 1: one real neighbour at distance 1, k−1 pads of m.
        expected_rho = (1 + (k - 1) * m) / (k * m)
        assert p[1] == pytest.approx((1 - expected_rho) / m)


class TestKnnDistances:
    def test_empty_executed_set(self):
        d, idx = knn_distances(np.array([], dtype=np.int64), 10, 3,
                               np.arange(10))
        assert (d == 10).all()
        assert (idx == -1).all()

    @pytest.mark.parametrize("k", [1, 2, 3, 4])
    def test_against_bruteforce(self, k):
        rng = np.random.default_rng(7)
        m = 30
        for _ in range(20):
            ne = rng.integers(1, 10)
            ex = np.sort(rng.choice(m, size=ne, replace=False))
            q = np.arange(m)
            d, idx = knn_distances(ex, m, k, q)
            for y in range(m):
                brute = np.sort(np.abs(ex - y))[:k]
                want = np.concatenate([brute, np.full(max(0, k - len(brute)), m)])
                np.testing.assert_array_equal(d[y], want)

    def test_tie_break_earlier_slot(self):
        """Equidistant neighbours resolve to the earlier executed slot."""
        d, idx = knn_distances(np.array([2, 6]), 10, 1, np.array([4]))
        assert d[0, 0] == 2
        assert idx[0, 0] == 0  # index of slot 2 in the executed array

    def test_distances_sorted_ascending(self):
        d, _ = knn_distances(np.array([0, 3, 9, 14]), 20, 3, np.arange(20))
        assert (np.diff(d, axis=1) >= 0).all()


class TestPartialQuality:
    def test_zero_at_zero(self):
        assert partial_quality(np.array([0.0]))[0] == 0.0

    def test_increasing_on_0_to_1_over_e(self):
        xs = np.linspace(1e-6, 1 / np.e, 100)
        g = partial_quality(xs)
        assert (np.diff(g) > 0).all()

    def test_matches_formula(self):
        p = np.array([0.1, 0.25, 0.5])
        np.testing.assert_allclose(partial_quality(p), -p * np.log2(p))


class TestMetricProperties:
    @pytest.mark.parametrize("seed", range(10))
    @pytest.mark.parametrize("k", [1, 2, 3])
    def test_non_decreasing(self, seed, k):
        """Lemma 7/2: adding an executed subtask never lowers quality."""
        rng = np.random.default_rng(seed)
        m = 25
        ex: set[int] = set()
        prev = quality(ex, m, k)
        for s in rng.permutation(m)[:12]:
            ex.add(int(s))
            cur = quality(ex, m, k)
            assert cur >= prev - 1e-12
            prev = cur

    @pytest.mark.parametrize("seed", range(10))
    @pytest.mark.parametrize("k", [1, 2, 3])
    def test_submodular_marginal_gains_decrease(self, seed, k):
        """Lemma 2: Δq(e | S) ≥ Δq(e | S ∪ {z}) for S ⊂ S∪{z} (equivalent
        diminishing-returns form of submodularity)."""
        rng = np.random.default_rng(seed + 100)
        m = 20
        slots = list(rng.permutation(m))
        S = {int(s) for s in slots[:4]}
        z, e = int(slots[4]), int(slots[5])
        gain_small = quality(S | {e}, m, k) - quality(S, m, k)
        gain_large = quality(S | {z, e}, m, k) - quality(S | {z}, m, k)
        assert gain_small >= gain_large - 1e-9

    @given(
        ex=st.sets(st.integers(0, 19), max_size=12),
        k=st.integers(1, 4),
    )
    @settings(max_examples=80, deadline=None)
    def test_quality_bounds_hypothesis(self, ex, k):
        m = 20
        q = quality(ex, m, k)
        assert -1e-12 <= q <= np.log2(m) + 1e-9

    @given(
        ex=st.sets(st.integers(0, 14), min_size=1, max_size=10),
        e=st.integers(0, 14),
        k=st.integers(1, 3),
    )
    @settings(max_examples=80, deadline=None)
    def test_monotone_hypothesis(self, ex, e, k):
        m = 15
        if e in ex:
            return
        assert quality(ex | {e}, m, k) >= quality(ex, m, k) - 1e-12

    def test_p_vector_range(self):
        p = p_vector(np.array([2, 7, 11]), 20, 3)
        assert (p >= 0).all()
        assert (p <= 1 / 20 + 1e-12).all()

    def test_quality_from_p_consistency(self):
        ex = np.array([1, 5, 9])
        m, k = 12, 2
        assert quality(ex, m, k) == pytest.approx(
            quality_from_p(p_vector(ex, m, k))
        )
