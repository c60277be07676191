"""Fig 9 benchmarks: multi-task MSQM/MMQM — serial vs Spark parallelization.

Uses the session SparkSession fixture from the repo-root conftest.
"""
import pytest

from repro.core.multi_greedy import solve_mmqm, solve_msqm_serial


def test_fig9a_serial(benchmark, multi_task_instance):
    _, ctxs, b = multi_task_instance
    r = benchmark.pedantic(
        lambda: solve_msqm_serial(ctxs, b, 3), rounds=1, iterations=1
    )
    assert r.q_sum > 0


def test_fig9a_group_parallel(benchmark, spark, multi_task_instance):
    from repro.sparkpar.group_parallel import solve_msqm_group_parallel

    wl, _, b = multi_task_instance
    r, _ = benchmark.pedantic(
        lambda: solve_msqm_group_parallel(spark, wl, b, 3),
        rounds=1, iterations=1,
    )
    assert r.q_sum > 0


def test_fig9a_task_parallel(benchmark, spark, multi_task_instance):
    from repro.sparkpar.task_parallel import solve_msqm_task_parallel

    wl, _, b = multi_task_instance
    r, _ = benchmark.pedantic(
        lambda: solve_msqm_task_parallel(spark, wl, b, 3),
        rounds=1, iterations=1,
    )
    assert r.q_sum > 0


@pytest.mark.parametrize("use_index", [False, True],
                         ids=["fig9g_mmqm_approx", "fig9g_mmqm_star"])
def test_fig9g_mmqm(benchmark, multi_task_instance, use_index):
    _, ctxs, b = multi_task_instance
    r = benchmark.pedantic(
        lambda: solve_mmqm(ctxs, b, 3, use_index=use_index),
        rounds=1, iterations=1,
    )
    assert r.q_min >= 0
