"""The quality metric in Spark SQL, cross-checked three ways:
numpy reference == Catalyst result == DuckDB oracle (same SQL text)."""
import numpy as np
import pytest

from repro.core.quality import quality
from repro.core.quality_sql import quality_sql, subtasks_pdf, task_quality_df
from repro.oracle import assert_equivalent


CASES = [
    {"name": "mixed", "m": 10, "k": 2,
     "exec": {0: {1, 3}, 1: set(), 2: {0, 5, 9}}},
    {"name": "single-task-empty", "m": 8, "k": 3, "exec": {0: set()}},
    {"name": "all-executed", "m": 6, "k": 2, "exec": {0: set(range(6))}},
    {"name": "one-slot", "m": 12, "k": 3, "exec": {0: {5}}},
    {"name": "k1", "m": 15, "k": 1, "exec": {0: {2, 9}, 1: {14}}},
    {"name": "adjacent", "m": 9, "k": 2, "exec": {0: {3, 4, 5}}},
]


@pytest.mark.parametrize("case", CASES, ids=[c["name"] for c in CASES])
class TestSqlMetric:
    def test_matches_numpy_reference(self, spark, case):
        pdf = subtasks_pdf(case["exec"], case["m"])
        out = task_quality_df(spark, spark.createDataFrame(pdf),
                              case["k"], case["m"])
        got = {r.task_id: r.quality for r in out.collect()}
        for tid, ex in case["exec"].items():
            assert got[tid] == pytest.approx(
                quality(ex, case["m"], case["k"]), abs=1e-9
            )

    def test_matches_duckdb_oracle(self, spark, case):
        pdf = subtasks_pdf(case["exec"], case["m"])
        out = task_quality_df(spark, spark.createDataFrame(pdf),
                              case["k"], case["m"])
        assert_equivalent(out, quality_sql(case["k"], case["m"]),
                          subtasks=pdf)


class TestSqlMetricRandomized:
    @pytest.mark.parametrize("seed", range(5))
    def test_random_instances_all_three_ways(self, spark, seed):
        rng = np.random.default_rng(seed)
        m, k = int(rng.integers(6, 25)), int(rng.integers(1, 4))
        exec_sets = {
            t: set(rng.choice(m, size=rng.integers(0, m // 2),
                              replace=False).tolist())
            for t in range(4)
        }
        pdf = subtasks_pdf(exec_sets, m)
        out = task_quality_df(spark, spark.createDataFrame(pdf), k, m)
        got = {r.task_id: r.quality for r in out.collect()}
        for tid, ex in exec_sets.items():
            assert got[tid] == pytest.approx(quality(ex, m, k), abs=1e-9)
        assert_equivalent(out, quality_sql(k, m), subtasks=pdf)


class TestSubtasksPdf:
    def test_dense_relation(self):
        pdf = subtasks_pdf({0: {1}, 1: set()}, 5)
        assert len(pdf) == 10
        assert pdf.executed.sum() == 1

    def test_executed_flags_match(self):
        pdf = subtasks_pdf({3: {0, 4}}, 6)
        ex = pdf[pdf.executed].slot.tolist()
        assert sorted(ex) == [0, 4]
