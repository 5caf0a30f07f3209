"""TPC-H-lite generator + DuckDB oracle smoke tests.

The climate experiments have their own substrate; these keep the provided
OLAP generators and the oracle harness honest (they also exercise the
shuffle-join path the conftest forces by disabling broadcast joins).
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    df = synth_data.lineitem(spark, sf=0.001).cache()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="module")
def orders_df(spark):
    df = synth_data.orders(spark, sf=0.001).cache()
    df.count()
    yield df
    df.unpersist()


class TestGenerators:
    def test_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005).toPandas()
        assert a.equals(b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=20000, n_keys=100, alpha=1.5)
        top = df.groupBy("k").count().orderBy(F.desc("count")).first()
        assert top["k"] == 1  # rank-1 key dominates under zipf

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=5000, n_keys=50)
        assert df.agg(F.max("k")).first()[0] <= 50


class TestOracleAgreement:
    def test_aggregation(self, spark, li):
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"),
            F.count(F.lit(1)).alias("cnt"),
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) qty, count(*) cnt "
            "FROM li GROUP BY 1",
            li=li,
        )

    def test_shuffle_join(self, spark, li, orders_df):
        got = (
            li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.sum("l_extendedprice").alias("rev"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, sum(l_extendedprice) rev FROM li "
            "JOIN o ON l_orderkey = o_orderkey GROUP BY 1",
            li=li,
            o=orders_df,
        )
