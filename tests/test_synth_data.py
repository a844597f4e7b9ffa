"""Tests for the provided TPC-H-lite generators (oracle plumbing checks)."""
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
    def test_lineitem_rows(self, li):
        assert li.count() == 6000

    def test_orders_keys_unique(self, orders):
        assert orders.select("o_orderkey").distinct().count() == orders.count()

    def test_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=0)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).limit(1).first()["count"]
        )
        assert top > 5000 / 100 * 3  # heavy head


class TestOracleJoins:
    def test_join_aggregate_equivalence(self, spark, li, orders):
        """A real shuffle join + aggregation against the DuckDB oracle."""
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(
                F.count("*").alias("n"),
                F.round(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2).alias("rev"),
            )
        )
        sql = """
            SELECT o_orderpriority, COUNT(*) AS n,
                   ROUND(SUM(l_extendedprice * (1 - l_discount)), 2) AS rev
            FROM li JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
        """
        assert_equivalent(got, sql, li=li, orders=orders)

    def test_filter_projection_equivalence(self, spark, li):
        got = (
            li.where(F.col("l_quantity") > 45)
            .groupBy("l_returnflag")
            .agg(F.count("*").alias("n"))
        )
        sql = "SELECT l_returnflag, COUNT(*) AS n FROM li WHERE l_quantity > 45 GROUP BY l_returnflag"
        assert_equivalent(got, sql, li=li)
