"""Tests for the provided TPC-H-lite generators + DuckDB oracle wiring.

These exercise the repo's standard correctness path: a Spark query and
the same SQL in DuckDB over identical inputs must agree row-for-row.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0).cache()


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders(spark, sf=0.002, seed=1).cache()


class TestGenerators:
    def test_lineitem_shape(self, li):
        assert li.count() == 12_000
        assert "l_orderkey" in li.columns and "l_shipdate" in li.columns

    def test_orders_keys_unique(self, orders_df):
        n = orders_df.count()
        assert orders_df.select("o_orderkey").distinct().count() == n

    def test_determinism(self, spark):
        a = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
        b = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
        assert a.equals(b)

    def test_part_prices_bounded(self, spark):
        p = synth_data.part(spark, sf=0.001)
        row = p.agg(F.min("p_retailprice").alias("a"), F.max("p_retailprice").alias("b")).first()
        assert 900 <= row.a and row.b < 1000.1


class TestOracleAgreement:
    def test_aggregation_matches_duckdb(self, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count("*").alias("cnt"),
                F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
            )
        )
        sql = (
            "SELECT l_returnflag, count(*) AS cnt, round(sum(l_quantity), 2) AS sum_qty "
            "FROM li GROUP BY l_returnflag"
        )
        assert_equivalent(got, sql, li=li)

    def test_join_matches_duckdb(self, li, orders_df):
        got = (
            li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
            .filter(F.col("o_orderstatus") == "O")
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        sql = (
            "SELECT o_orderpriority, count(*) AS cnt FROM li "
            "JOIN o ON li.l_orderkey = o.o_orderkey "
            "WHERE o_orderstatus = 'O' GROUP BY o_orderpriority"
        )
        assert_equivalent(got, sql, li=li, o=orders_df)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000, seed=3)
        top = df.groupBy("k").count().orderBy(F.desc("count")).first()
        assert top["count"] > 20_000 / 1000 * 5  # hot key way above uniform
