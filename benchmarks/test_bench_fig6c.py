"""T6c bench: sketch + matrix time at low vs high parallelism (N=200).

Two benchmark groups pin the endpoints of the Fig. 6c sweep; the full
partition sweep is produced by ``jobs/fig6c_partitions.py``.
"""
import pytest

from repro.core import query_spark, sketch_spark
from repro.data import climate

N, L, B = 200, 960, 120


@pytest.fixture(scope="module")
def panel():
    return climate.berkeley_like(N, L, seed=11)


def _run_once(spark, panel, parts):
    prev = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", str(parts))
    try:
        df = climate.long_df(spark, panel, partitions=parts)
        ss, ps = sketch_spark.sketch(df, B)
        ss, ps = ss.cache(), ps.cache()
        ss.count(), ps.count()
        query_spark.query_aligned(ss, ps, 0, L // B - 1).toPandas()
        ss.unpersist(), ps.unpersist()
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", prev)


@pytest.mark.benchmark(group="fig6c-partitions")
def test_bench_partitions_1(benchmark, spark, panel):
    benchmark.pedantic(lambda: _run_once(spark, panel, 1), rounds=2, iterations=1)


@pytest.mark.benchmark(group="fig6c-partitions")
def test_bench_partitions_16(benchmark, spark, panel):
    benchmark.pedantic(lambda: _run_once(spark, panel, 16), rounds=2, iterations=1)
