"""Smoke tests keeping the provided TPC-H-lite generators + DuckDB oracle
exercised on the standard Spark SQL path (shuffle joins enabled by the
session fixture's disabled broadcast threshold)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002).cache()


class TestTPCHLite:
    def test_aggregation(self, spark, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count("*").alias("n"),
                F.round(F.sum("l_quantity"), 4).alias("qty"),
            )
        )
        sql = """
            SELECT l_returnflag, COUNT(*) AS n, ROUND(SUM(l_quantity), 4) AS qty
            FROM li GROUP BY l_returnflag
        """
        assert_equivalent(got, sql, li=li)

    def test_shuffle_join(self, spark, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        sql = """
            SELECT o_orderpriority, COUNT(*) AS n
            FROM li JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
        """
        assert_equivalent(got, sql, li=li, orders=orders)

    def test_filtered_projection(self, spark, li):
        got = (
            li.filter(F.col("l_discount") > 0.05)
            .select("l_orderkey", "l_linenumber")
        )
        sql = "SELECT l_orderkey, l_linenumber FROM li WHERE l_discount > 0.05"
        assert_equivalent(got, sql, li=li)

    def test_generators_deterministic(self, spark):
        a = synth_data.part(spark, sf=0.001).toPandas()
        b = synth_data.part(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_customer_schema(self, spark):
        df = synth_data.customer(spark, sf=0.001)
        assert set(df.columns) == {"c_custkey", "c_nationkey", "c_acctbal", "c_mktsegment"}

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]["count"]
        )
        assert top > 5000 / 100 * 3  # heavy head
