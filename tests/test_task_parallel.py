"""Tests for task-level parallelization on Spark (Section IV-A-2)."""
import pytest

from repro.core.assignment import average_task_cost, build_task_contexts
from repro.core.multi_greedy import solve_msqm_serial
from repro.core.quality import quality
from repro.sparkpar.task_parallel import solve_msqm_task_parallel
from repro.workloads import gen_workload


def _instance(n_tasks=6, n_workers=300, m=20, seed=0, dist="uniform"):
    wl = gen_workload(n_tasks=n_tasks, n_workers=n_workers, m=m, dist=dist,
                      seed=seed)
    ctxs = build_task_contexts(wl)
    b = 0.25 * average_task_cost(ctxs) * n_tasks
    return wl, ctxs, b


class TestTaskParallel:
    @pytest.mark.parametrize("seed", range(3))
    def test_budget_respected(self, spark, seed):
        wl, _, b = _instance(seed=seed)
        r, _ = solve_msqm_task_parallel(spark, wl, b, 3)
        assert r.total_cost <= b + 1e-6

    @pytest.mark.parametrize("seed", range(3))
    def test_no_double_worker_claims(self, spark, seed):
        wl, _, b = _instance(n_tasks=8, n_workers=80, m=12, seed=seed,
                             dist="gaussian")
        r, _ = solve_msqm_task_parallel(spark, wl, b, 3)
        claims = [
            (w, s)
            for a in r.assignments
            for s, w in zip(a.exec_slots, a.workers)
        ]
        assert len(claims) == len(set(claims))

    @pytest.mark.parametrize("seed", range(3))
    def test_quality_consistent_with_exec_sets(self, spark, seed):
        wl, _, b = _instance(seed=seed)
        r, _ = solve_msqm_task_parallel(spark, wl, b, 3)
        for a in r.assignments:
            assert a.quality == pytest.approx(
                quality(a.exec_slots, wl.m, 3), abs=1e-9
            )

    @pytest.mark.parametrize("seed", range(2))
    def test_deterministic_equivalence_ample_budget(self, spark, seed):
        """The paper's determinism claim: with no budget pressure the
        parallel plan equals the serial plan exactly."""
        wl, ctxs, _ = _instance(n_tasks=4, n_workers=400, m=12, seed=seed)
        b = 1e9  # everything affordable
        rs = solve_msqm_serial(ctxs, b, 3)
        rt, _ = solve_msqm_task_parallel(spark, wl, b, 3)
        ser = {a.task_id: sorted(a.exec_slots) for a in rs.assignments}
        par = {a.task_id: sorted(a.exec_slots) for a in rt.assignments}
        assert ser == par

    @pytest.mark.parametrize("seed", range(2))
    def test_near_serial_quality_tight_budget(self, spark, seed):
        """At budget exhaustion the paper admits small deviations; q_sum must
        stay within 2 % of serial."""
        wl, ctxs, b = _instance(seed=seed)
        rs = solve_msqm_serial(ctxs, b, 3)
        rt, _ = solve_msqm_task_parallel(spark, wl, b, 3)
        assert rt.q_sum >= 0.98 * rs.q_sum

    def test_tables_populated(self, spark):
        wl, _, b = _instance(n_tasks=6, n_workers=60, m=12, seed=1,
                             dist="poi")
        r, tables = solve_msqm_task_parallel(spark, wl, b, 3)
        assert tables["rounds"] >= 1
        assert not tables["heartbeat"].empty
        log = tables["logging"]
        assert (log.committed | (log.reason != "ok")).all()
        if r.conflicts:
            assert not tables["conflicting"].empty
            assert (tables["conflicting"].bumped_to_rank >= 2).all()

    def test_priority_flag_runs(self, spark):
        wl, _, b = _instance(n_tasks=4, seed=2)
        r1, _ = solve_msqm_task_parallel(spark, wl, b, 3, priority=True)
        r0, _ = solve_msqm_task_parallel(spark, wl, b, 3, priority=False)
        # Priority scheduling follows the greedy order; it should not lose.
        assert r1.q_sum >= r0.q_sum - 0.02 * abs(r0.q_sum)

    def test_chain_len_one_still_works(self, spark):
        wl, _, b = _instance(n_tasks=3, m=10, seed=3)
        r, tables = solve_msqm_task_parallel(spark, wl, b, 3, chain_len=1)
        assert r.steps > 0
        assert tables["rounds"] >= r.steps / 3

    def test_partitions_knob_accepted(self, spark):
        wl, _, b = _instance(n_tasks=4, m=10, seed=4)
        r, _ = solve_msqm_task_parallel(spark, wl, b, 3, num_partitions=2)
        assert len(r.assignments) == 4
