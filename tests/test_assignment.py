"""Tests for the worker/cost context (Section II cost model)."""
import numpy as np
import pytest

from repro.core.assignment import (
    average_task_cost,
    build_task_contexts,
    DEFAULT_TOP_R,
)
from repro.workloads import gen_workload


@pytest.fixture(scope="module")
def wl():
    return gen_workload(n_tasks=5, n_workers=200, m=30, seed=0)


@pytest.fixture(scope="module")
def ctxs(wl):
    return build_task_contexts(wl)


class TestTaskContext:
    def test_one_context_per_task(self, wl, ctxs):
        assert len(ctxs) == wl.n_tasks
        assert [c.task_id for c in ctxs] == list(range(wl.n_tasks))

    def test_costs_ascending_per_slot(self, ctxs):
        for ctx in ctxs:
            for j in range(ctx.m):
                c = ctx.slot_costs[j]
                assert (np.diff(c) >= -1e-12).all()

    def test_costs_are_euclidean_distances(self, wl, ctxs):
        """Paper cost model: travel cost = Euclidean distance from the task
        location to the assigned worker's position at that slot."""
        ctx = ctxs[0]
        w = wl.workers
        for j in range(ctx.m):
            for r in range(min(2, len(ctx.slot_workers[j]))):
                wid = ctx.worker_at_rank(j, r)
                row = w[(w.worker_id == wid) & (w.slot == j)].iloc[0]
                d = np.hypot(row.x - ctx.x, row.y - ctx.y)
                assert ctx.cost_at_rank(j, r) == pytest.approx(d)

    def test_rank0_is_nearest(self, wl, ctxs):
        ctx = ctxs[1]
        w = wl.workers
        for j in range(ctx.m):
            grp = w[w.slot == j]
            if grp.empty:
                assert len(ctx.slot_workers[j]) == 0
                continue
            d = np.hypot(grp.x - ctx.x, grp.y - ctx.y)
            assert ctx.cost_at_rank(j, 0) == pytest.approx(float(d.min()))

    def test_out_of_range_rank_is_inf_and_minus1(self, ctxs):
        ctx = ctxs[0]
        assert ctx.cost_at_rank(0, DEFAULT_TOP_R + 5) == np.inf
        assert ctx.worker_at_rank(0, DEFAULT_TOP_R + 5) == -1

    def test_top_r_truncation(self, wl):
        ctxs = build_task_contexts(wl, top_r=2)
        for ctx in ctxs:
            for j in range(ctx.m):
                assert len(ctx.slot_workers[j]) <= 2

    def test_empty_slot_handling(self):
        """Slots with no active worker must be unassignable."""
        wl = gen_workload(n_tasks=1, n_workers=3, m=50, seed=1)
        ctx = build_task_contexts(wl)[0]
        base = ctx.base_costs()
        # 3 workers × ≤5 active slots each can cover at most 15 slots.
        assert np.isinf(base).sum() >= 50 - 15
        assert set(ctx.assignable_slots()) == set(np.nonzero(np.isfinite(base))[0])

    def test_average_task_cost_positive(self, ctxs):
        assert average_task_cost(ctxs) > 0

    def test_average_task_cost_empty(self):
        assert average_task_cost([]) == 0.0
