"""Sanity tests for the provided TPC-H-lite generators and the oracle."""
import numpy as np
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_schema_and_determinism(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        cols = set(li.columns)
        assert {"l_orderkey", "l_quantity", "l_extendedprice"} <= cols
        a = li.count()
        b = synth_data.lineitem(spark, sf=0.001, seed=0).count()
        assert a == b == 6000

    def test_orders_keys_dense(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert o.o_orderkey.tolist() == list(range(1, len(o) + 1))

    def test_zipf_keys_skewed(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = z.k.value_counts()
        assert counts.iloc[0] > 3 * counts.median()

    def test_uniform_keys_cover_range(self, spark):
        u = synth_data.uniform_keys(spark, n=5000, n_keys=50).toPandas()
        assert u.k.min() >= 1 and u.k.max() <= 50


class TestOracle:
    def test_agg_query_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        out = li.groupBy("l_returnflag").count().withColumnRenamed(
            "count", "cnt"
        )
        assert_equivalent(
            out,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem "
            "GROUP BY l_returnflag",
            lineitem=li,
        )

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = (
            li.groupBy("l_returnflag").count()
            .withColumnRenamed("count", "cnt")
            .selectExpr("l_returnflag", "cnt + 1 AS cnt")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem "
                "GROUP BY l_returnflag",
                lineitem=li,
            )
