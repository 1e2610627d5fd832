"""Smoke tests for the provided TPC-H-lite generators + DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001).cache()


class TestOracleSmoke:
    def test_aggregate_query(self, spark, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count("*").alias("cnt"),
                F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
            )
        )
        sql = """
        SELECT l_returnflag, count(*) AS cnt,
               round(sum(l_quantity), 2) AS sum_qty
        FROM li GROUP BY l_returnflag
        """
        assert_equivalent(got, sql, li=li)

    def test_join_query(self, spark, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        sql = """
        SELECT o_orderpriority, count(*) AS cnt
        FROM li JOIN ord ON li.l_orderkey = ord.o_orderkey
        GROUP BY o_orderpriority
        """
        assert_equivalent(got, sql, li=li, ord=orders)

    def test_generators_deterministic(self, spark):
        a = synth_data.customer(spark, sf=0.002).toPandas()
        b = synth_data.customer(spark, sf=0.002).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        top = df.k.value_counts().iloc[0]
        assert top > 5000 / 100 * 3  # hot key far above uniform share
