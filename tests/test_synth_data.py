"""Tests for the provided TPC-H-lite generators + DuckDB oracle plumbing.

The paper's evaluation runs on crowdsourcing relations, not TPC-H, but the
provided generators remain part of the library surface; exercise them and
the oracle contract here (they also serve as the canonical example of the
oracle workflow for Spark SQL aggregates).
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).cache()


class TestGenerators:
    def test_lineitem_rowcount_scales(self, spark):
        small = synth_data.lineitem(spark, sf=0.0005)
        assert small.count() == int(6_000_000 * 0.0005)

    def test_deterministic_in_seed(self, spark):
        a = synth_data.orders(spark, sf=0.0005, seed=7).toPandas()
        b = synth_data.orders(spark, sf=0.0005, seed=7).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=100, alpha=1.2).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_cover_domain(self, spark):
        df = synth_data.uniform_keys(spark, n=5_000, n_keys=50).toPandas()
        assert df["k"].nunique() == 50


class TestOracleContract:
    def test_aggregate_query_matches_duckdb(self, spark, li):
        q1 = (
            li.groupBy("l_returnflag")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.count("*").alias("n"),
            )
        )
        assert_equivalent(
            q1,
            """
            SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS n
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_join_query_matches_duckdb(self, spark, li, orders):
        q = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            q,
            """
            SELECT o_orderpriority, count(*) AS n
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=orders,
        )

    def test_oracle_catches_wrong_result(self, spark, li):
        wrong = li.groupBy("l_returnflag").agg(
            (F.sum("l_quantity") + 1).alias("sum_qty")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, sum(l_quantity) AS sum_qty "
                "FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )
