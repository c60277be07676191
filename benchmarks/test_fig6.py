"""Fig 6 benchmarks: single-task quality solvers (OPT / Approx / Rand)."""
import pytest

from repro.core.assignment import average_task_cost, build_task_contexts
from repro.core.greedy import solve_sqm_approx, solve_sqm_opt, solve_sqm_rand
from repro.core.tree_index import solve_sqm_approx_star
from repro.workloads import gen_workload


@pytest.fixture(scope="module")
def small_instance():
    wl = gen_workload(n_tasks=1, n_workers=100, m=14, seed=0)
    ctx = build_task_contexts(wl)[0]
    return ctx, 0.25 * average_task_cost([ctx])


def test_fig6_opt_small(benchmark, small_instance):
    ctx, b = small_instance
    r = benchmark.pedantic(
        lambda: solve_sqm_opt(ctx, b, 3), rounds=1, iterations=1
    )
    assert r.quality > 0


def test_fig6_approx_small(benchmark, small_instance):
    ctx, b = small_instance
    r = benchmark(lambda: solve_sqm_approx(ctx, b, 3))
    assert r.quality > 0


def test_fig6_rand_small(benchmark, small_instance):
    ctx, b = small_instance
    r = benchmark(lambda: solve_sqm_rand(ctx, b, 3, seed=0))
    assert r.quality >= 0


def test_fig6_approx_star_m100(benchmark):
    wl = gen_workload(n_tasks=1, n_workers=400, m=100, seed=0)
    ctx = build_task_contexts(wl)[0]
    b = 0.25 * average_task_cost([ctx])
    r = benchmark.pedantic(
        lambda: solve_sqm_approx_star(ctx, b, 3), rounds=2, iterations=1
    )
    assert r.quality > 0
