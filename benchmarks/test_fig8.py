"""Fig 8 benchmarks: Approx vs Approx* single-task efficiency.

The paper's central efficiency claim — the tree-structured order-k Voronoi
index with best-first pruning dominates the plain greedy — is timed here at
m = 200 (default) and m = 300 (scaling point).
"""
import pytest

from repro.core.assignment import average_task_cost, build_task_contexts
from repro.core.greedy import solve_sqm_approx
from repro.core.tree_index import solve_sqm_approx_star
from repro.workloads import gen_workload


def test_fig8a_approx_m200(benchmark, single_task_m200):
    ctx, b = single_task_m200
    r = benchmark.pedantic(
        lambda: solve_sqm_approx(ctx, b, 3), rounds=1, iterations=1
    )
    assert r.quality > 0


def test_fig8a_approx_star_m200(benchmark, single_task_m200):
    ctx, b = single_task_m200
    r = benchmark.pedantic(
        lambda: solve_sqm_approx_star(ctx, b, 3), rounds=2, iterations=1
    )
    assert r.quality > 0


@pytest.fixture(scope="module")
def m300_instance():
    wl = gen_workload(n_tasks=1, n_workers=1000, m=300, seed=0)
    ctx = build_task_contexts(wl)[0]
    return ctx, 0.25 * average_task_cost([ctx])


def test_fig8a_approx_m300(benchmark, m300_instance):
    ctx, b = m300_instance
    benchmark.pedantic(lambda: solve_sqm_approx(ctx, b, 3),
                       rounds=1, iterations=1)


def test_fig8a_approx_star_m300(benchmark, m300_instance):
    ctx, b = m300_instance
    benchmark.pedantic(lambda: solve_sqm_approx_star(ctx, b, 3),
                       rounds=2, iterations=1)


@pytest.mark.parametrize("t_s", [2, 4, 16])
def test_fig8e_star_ts(benchmark, single_task_m200, t_s):
    ctx, b = single_task_m200
    benchmark.pedantic(lambda: solve_sqm_approx_star(ctx, b, 3, t_s=t_s),
                       rounds=1, iterations=1)


@pytest.mark.parametrize("k", [1, 3, 5])
def test_fig8g_star_k(benchmark, single_task_m200, k):
    ctx, b = single_task_m200
    benchmark.pedantic(lambda: solve_sqm_approx_star(ctx, b, k),
                       rounds=1, iterations=1)


@pytest.mark.parametrize("frac", [0.125, 0.25, 0.5])
def test_fig8h_star_budget(benchmark, frac):
    wl = gen_workload(n_tasks=1, n_workers=1000, m=200, seed=0)
    ctx = build_task_contexts(wl)[0]
    b = frac * average_task_cost([ctx])
    benchmark.pedantic(lambda: solve_sqm_approx_star(ctx, b, 3),
                       rounds=1, iterations=1)
