"""Tests for the Spark conflict graph (Fig 4 expansion + components)."""
import numpy as np
import pandas as pd
import pytest

from repro.sparkpar.conflict_graph import (
    build_groups,
    conflict_edges,
    connected_components,
    ranked_candidates,
)
from repro.workloads import Workload, gen_workload


def _toy_workload() -> Workload:
    """Fig 4-style scenario: τ2, τ3 share their nearest worker w1; τ1 is far
    away with its own worker w2."""
    tasks = pd.DataFrame(
        {"task_id": [0, 1, 2],
         "x": [900.0, 100.0, 120.0],
         "y": [900.0, 100.0, 100.0],
         "m": [4, 4, 4]}
    )
    workers = pd.DataFrame(
        {"worker_id": [0, 1],
         "slot": [0, 0],
         "x": [890.0, 110.0],
         "y": [890.0, 100.0]}
    )
    return Workload(tasks=tasks, workers=workers, m=4, domain=1000.0)


class TestRankedCandidates:
    def test_ranks_by_distance(self, spark):
        wl = gen_workload(n_tasks=3, n_workers=40, m=8, seed=0)
        r = ranked_candidates(spark, wl, top_r=3).toPandas()
        for (_t, _s), grp in r.groupby(["task_id", "slot"]):
            g = grp.sort_values("rnk")
            assert (g["dist"].diff().dropna() >= -1e-9).all()
            assert g["rnk"].tolist() == list(range(1, len(g) + 1))

    def test_top_r_enforced(self, spark):
        wl = gen_workload(n_tasks=2, n_workers=40, m=8, seed=1)
        r = ranked_candidates(spark, wl, top_r=2).toPandas()
        assert r.rnk.max() <= 2

    def test_distance_is_euclidean(self, spark):
        wl = _toy_workload()
        r = ranked_candidates(spark, wl).toPandas()
        row = r[(r.task_id == 0) & (r.worker_id == 0)].iloc[0]
        assert row.dist == pytest.approx(np.hypot(10, 10))


class TestConflictEdges:
    def test_fig4_shared_nearest_worker(self, spark):
        wl = _toy_workload()
        ranked = ranked_candidates(spark, wl)
        edges, bounds, _ = conflict_edges(spark, ranked, 3)
        assert (1, 2) in edges  # τ2–τ3 compete for w1
        # τ1's worker is remote; but after expansion τ2/τ3 may reach w0?
        # w0 is ~1100 away — within top_r they could see it, creating an
        # edge only if bounds expand that far; assert the direct edge at
        # minimum and that bounds grew for the conflicted pair.
        assert bounds[1] >= 2 and bounds[2] >= 2

    def test_no_workers_no_edges(self, spark):
        tasks = pd.DataFrame(
            {"task_id": [0, 1], "x": [0.0, 10.0], "y": [0.0, 10.0],
             "m": [4, 4]}
        )
        workers = pd.DataFrame(
            {"worker_id": pd.Series(dtype="int64"),
             "slot": pd.Series(dtype="int64"),
             "x": pd.Series(dtype="float64"),
             "y": pd.Series(dtype="float64")}
        )
        wl = Workload(tasks=tasks, workers=workers, m=4, domain=100.0)
        ranked = ranked_candidates(spark, wl)
        edges, _, _ = conflict_edges(spark, ranked, 2)
        assert edges == set()

    def test_far_apart_tasks_independent(self, spark):
        """Tasks in opposite corners with their own worker pools never
        conflict."""
        tasks = pd.DataFrame(
            {"task_id": [0, 1], "x": [0.0, 1000.0], "y": [0.0, 1000.0],
             "m": [2, 2]}
        )
        workers = pd.DataFrame(
            {"worker_id": [0, 1, 2, 3],
             "slot": [0, 0, 0, 0],
             "x": [5.0, 8.0, 995.0, 998.0],
             "y": [5.0, 8.0, 995.0, 998.0]}
        )
        wl = Workload(tasks=tasks, workers=workers, m=2, domain=1000.0)
        ranked = ranked_candidates(spark, wl, top_r=2)
        edges, _, _ = conflict_edges(spark, ranked, 2)
        assert edges == set()


class TestConnectedComponents:
    def test_no_edges_all_singletons(self):
        g = connected_components(4, set())
        assert g.group_id.nunique() == 4

    def test_chain_merges(self):
        g = connected_components(4, {(0, 1), (1, 2)})
        gid = g.set_index("task_id").group_id
        assert gid[0] == gid[1] == gid[2]
        assert gid[3] != gid[0]

    def test_two_components(self):
        g = connected_components(5, {(0, 1), (2, 3)})
        assert g.group_id.nunique() == 3

    def test_group_ids_dense(self):
        g = connected_components(6, {(0, 5)})
        assert set(g.group_id) == set(range(g.group_id.nunique()))


class TestBuildGroups:
    def test_toy_grouping(self, spark):
        wl = _toy_workload()
        groups, edges, stats = build_groups(spark, wl)
        gid = groups.set_index("task_id").group_id
        assert gid[1] == gid[2]
        assert stats["n_groups"] == groups.group_id.nunique()
        assert stats["n_edges"] == len(edges)

    def test_random_workload_covers_all_tasks(self, spark):
        wl = gen_workload(n_tasks=6, n_workers=100, m=10, seed=2)
        groups, _, stats = build_groups(spark, wl)
        assert sorted(groups.task_id) == list(range(6))
        assert stats["max_group"] <= 6
