"""Tests for the Voronoi tree index and Approx* (Section III-C)."""
import numpy as np
import pytest

from repro.core.assignment import build_task_contexts, average_task_cost
from repro.core.greedy import solve_sqm_approx
from repro.core.quality import p_vector, quality_from_p
from repro.core.tree_index import VoronoiTreeIndex, solve_sqm_approx_star
from repro.workloads import gen_workload


def _index_with(m, k, exec_slots, costs=None):
    costs = np.ones(m) if costs is None else costs
    return VoronoiTreeIndex(m, k, costs, initial_exec=exec_slots)


class TestIndexState:
    @pytest.mark.parametrize("k", [1, 2, 3])
    @pytest.mark.parametrize("seed", range(5))
    def test_p_matches_reference(self, k, seed):
        rng = np.random.default_rng(seed)
        m = 30
        ex = sorted(rng.choice(m, size=6, replace=False).tolist())
        idx = _index_with(m, k, ex)
        np.testing.assert_allclose(idx.p, p_vector(np.array(ex), m, k))
        assert idx.q_cur == pytest.approx(
            quality_from_p(p_vector(np.array(ex), m, k))
        )

    def test_commit_updates_quality(self):
        idx = _index_with(20, 2, [3, 10])
        q0 = idx.q_cur
        idx.commit(15)
        assert idx.q_cur > q0
        assert idx.is_exec[15]

    def test_commit_twice_raises(self):
        idx = _index_with(10, 2, [3])
        with pytest.raises(ValueError):
            idx.commit(3)

    def test_m_too_small_raises(self):
        with pytest.raises(ValueError):
            VoronoiTreeIndex(2, 1, np.ones(2))

    @pytest.mark.parametrize("seed", range(5))
    def test_exact_heuristic_matches_full_recompute(self, seed):
        """Locality-based Δq must equal the full q(T∪{x}) − q(T) recompute."""
        rng = np.random.default_rng(seed)
        m, k = 40, 3
        ex = sorted(rng.choice(m, size=7, replace=False).tolist())
        costs = rng.uniform(1, 10, m)
        idx = _index_with(m, k, ex, costs)
        q0 = quality_from_p(p_vector(np.array(ex), m, k))
        for x in range(m):
            if x in ex:
                continue
            cand = idx.exact_heuristic(x)
            q1 = quality_from_p(p_vector(np.array(sorted(ex + [x])), m, k))
            assert cand.gain == pytest.approx(q1 - q0, abs=1e-9)
            assert cand.heuristic == pytest.approx((q1 - q0) / costs[x], abs=1e-9)


class TestUpperBounds:
    @pytest.mark.parametrize("seed", range(8))
    def test_node_ub_dominates_exact(self, seed):
        """Eq-6-derived node bounds must upper-bound every exact heuristic
        inside the node — soundness of best-first pruning."""
        rng = np.random.default_rng(seed + 3)
        m, k = 32, 2
        ex = sorted(rng.choice(m, size=5, replace=False).tolist())
        costs = rng.uniform(1, 5, m)
        idx = _index_with(m, k, ex, costs)
        for _ in range(10):
            l = int(rng.integers(0, m - 1))
            r = int(rng.integers(l, m))
            ub = idx._node_ub(l, r, rem_budget=np.inf)
            for x in range(l, r + 1):
                if idx.is_exec[x]:
                    continue
                h = idx.exact_heuristic(x).heuristic
                assert ub >= h - 1e-9, (l, r, x, ub, h)

    @pytest.mark.parametrize("seed", range(5))
    def test_window_superset_of_affected(self, seed):
        """The binary-search window must contain every slot whose k-NN set
        changes when a slot inside the segment is executed."""
        rng = np.random.default_rng(seed + 11)
        m, k = 40, 2
        ex = sorted(rng.choice(m, size=6, replace=False).tolist())
        idx = _index_with(m, k, ex)
        for x in range(m):
            if idx.is_exec[x]:
                continue
            lo, hi = idx._window(x, x)
            p_before = p_vector(np.array(ex), m, k)
            p_after = p_vector(np.array(sorted(ex + [x])), m, k)
            changed = np.nonzero(~np.isclose(p_before, p_after))[0]
            assert all(lo <= c <= hi for c in changed)


class TestBestCandidate:
    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("t_s", [2, 4, 8])
    def test_matches_exhaustive_argmax(self, seed, t_s):
        rng = np.random.default_rng(seed + 21)
        m, k = 36, 2
        ex = sorted(rng.choice(m, size=5, replace=False).tolist())
        costs = rng.uniform(1, 8, m)
        idx = _index_with(m, k, ex, costs)
        cand = idx.best_candidate(np.inf, t_s)
        # Exhaustive argmax on a fresh index (no cache interference).
        ref = _index_with(m, k, ex, costs)
        best_h = -np.inf
        for x in range(m):
            if ref.is_exec[x]:
                continue
            h = ref.exact_heuristic(x).heuristic
            best_h = max(best_h, h)
        assert cand.heuristic == pytest.approx(best_h, rel=1e-9)

    def test_no_affordable_candidates_returns_none(self):
        idx = _index_with(10, 2, [4], costs=np.full(10, 100.0))
        assert idx.best_candidate(1.0, 4) is None

    def test_budget_excludes_expensive_slots(self):
        costs = np.ones(12)
        costs[5] = 50.0
        idx = _index_with(12, 2, [0], costs)
        cand = idx.best_candidate(10.0, 4)
        assert cand.slot != 5

    def test_update_cost_invalidates_cache(self):
        idx = _index_with(16, 2, [2, 9], costs=np.ones(16))
        first = idx.best_candidate(np.inf, 4)
        idx.update_cost(first.slot, 1000.0)
        second = idx.best_candidate(np.inf, 4)
        assert second.slot != first.slot or second.heuristic < first.heuristic


class TestApproxStarSolver:
    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("dist", ["uniform", "gaussian", "zipf"])
    def test_equivalent_to_naive_approx(self, seed, dist):
        """Approx* must deliver the same greedy plan and quality as the
        no-index Algorithm 1."""
        wl = gen_workload(n_tasks=1, n_workers=150, m=24, dist=dist, seed=seed)
        ctx = build_task_contexts(wl)[0]
        b = 0.3 * average_task_cost([ctx])
        a = solve_sqm_approx(ctx, b, 2)
        s = solve_sqm_approx_star(ctx, b, 2)
        assert s.quality == pytest.approx(a.quality, rel=1e-9)
        assert s.exec_slots == a.exec_slots
        assert s.cost == pytest.approx(a.cost, rel=1e-9)

    @pytest.mark.parametrize("t_s", [2, 4, 8, 16])
    def test_t_s_does_not_change_result(self, t_s):
        wl = gen_workload(n_tasks=1, n_workers=200, m=30, seed=4)
        ctx = build_task_contexts(wl)[0]
        b = 0.25 * average_task_cost([ctx])
        base = solve_sqm_approx_star(ctx, b, 3, t_s=4)
        other = solve_sqm_approx_star(ctx, b, 3, t_s=t_s)
        assert other.quality == pytest.approx(base.quality, rel=1e-9)

    def test_budget_respected(self):
        wl = gen_workload(n_tasks=1, n_workers=200, m=40, seed=5)
        ctx = build_task_contexts(wl)[0]
        b = 0.2 * average_task_cost([ctx])
        s = solve_sqm_approx_star(ctx, b, 3)
        assert s.cost <= b + 1e-9

    def test_pruning_stats_populated(self):
        wl = gen_workload(n_tasks=1, n_workers=300, m=60, seed=6)
        ctx = build_task_contexts(wl)[0]
        b = 0.25 * average_task_cost([ctx])
        s = solve_sqm_approx_star(ctx, b, 3)
        assert 0.0 <= s.stats["pruned_frac"] <= 1.0
        assert s.stats["candidates_evaluated"] > 0
        assert s.stats["steps"] == len(s.exec_slots) or s.stats["steps"] >= 1

    def test_larger_m_prunes_more(self):
        """The paper's Fig 8(d) shape: pruning ratio grows with m."""
        fracs = []
        for m in (40, 120):
            wl = gen_workload(n_tasks=1, n_workers=400, m=m, seed=7)
            ctx = build_task_contexts(wl)[0]
            b = 0.25 * average_task_cost([ctx])
            fracs.append(solve_sqm_approx_star(ctx, b, 3).stats["pruned_frac"])
        assert fracs[1] > fracs[0]
