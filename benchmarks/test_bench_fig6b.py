"""T6b bench: disk-based query phase — Parquet read + matrix calc (N=200)."""
import pytest

from repro.core import query_spark, sketch_spark
from repro.data import climate
from repro.storage.sketch_store import SketchStore

N, L, B = 200, 960, 120


@pytest.fixture(scope="module")
def populated_store(spark, tmp_path_factory):
    df = climate.long_df(spark, climate.berkeley_like(N, L, seed=11))
    store = SketchStore(tmp_path_factory.mktemp("fig6b"))
    ss, ps = sketch_spark.sketch(df, B)
    store.write(ss, "series")
    store.write(ps, "pairs")
    return store


@pytest.mark.benchmark(group="fig6b-query")
def test_bench_store_read(benchmark, spark, populated_store):
    def run():
        s, _ = populated_store.read_timed(spark, "series")
        p, _ = populated_store.read_timed(spark, "pairs")
        s.unpersist(), p.unpersist()

    benchmark.pedantic(run, rounds=3, iterations=1)


@pytest.mark.benchmark(group="fig6b-query")
def test_bench_matrix_calc_from_disk(benchmark, spark, populated_store):
    ss, _ = populated_store.read_timed(spark, "series")
    ps, _ = populated_store.read_timed(spark, "pairs")

    benchmark.pedantic(
        lambda: query_spark.query_aligned(ss, ps, 0, L // B - 1).toPandas(),
        rounds=3,
        iterations=1,
    )
    ss.unpersist(), ps.unpersist()
