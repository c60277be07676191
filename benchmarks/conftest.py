"""Shared instances for the benchmark suite (built once per session)."""
import pytest

from repro.core.assignment import average_task_cost, build_task_contexts
from repro.workloads import gen_workload


@pytest.fixture(scope="session")
def single_task_m200():
    """Default single-task efficiency instance: m=200, 1000 workers, 25 %."""
    wl = gen_workload(n_tasks=1, n_workers=1000, m=200, seed=0)
    ctx = build_task_contexts(wl)[0]
    budget = 0.25 * average_task_cost([ctx])
    return ctx, budget


@pytest.fixture(scope="session")
def multi_task_instance():
    """Default multi-task instance: |T|=12, m=60, 1500 workers, 25 %."""
    wl = gen_workload(n_tasks=12, n_workers=1500, m=60, seed=0)
    ctxs = build_task_contexts(wl)
    budget = 0.25 * average_task_cost(ctxs) * 12
    return wl, ctxs, budget
