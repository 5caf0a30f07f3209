"""T6a bench: disk-based sketch phase — compute + Parquet write (N=200)."""
import pytest

from repro.core import sketch_spark
from repro.data import climate
from repro.storage.sketch_store import SketchStore

N, L, B = 200, 960, 120


@pytest.fixture(scope="module")
def berkeley_df(spark):
    df = climate.long_df(spark, climate.berkeley_like(N, L, seed=11)).cache()
    df.count()
    yield df
    df.unpersist()


@pytest.mark.benchmark(group="fig6a-sketch")
def test_bench_sketch_calc(benchmark, berkeley_df):
    def run():
        ss, ps = sketch_spark.sketch(berkeley_df, B)
        ss.cache().count(), ps.cache().count()
        ss.unpersist(), ps.unpersist()

    benchmark.pedantic(run, rounds=3, iterations=1)


@pytest.mark.benchmark(group="fig6a-sketch")
def test_bench_sketch_write(benchmark, berkeley_df, tmp_path_factory):
    ss, ps = sketch_spark.sketch(berkeley_df, B)
    ss, ps = ss.cache(), ps.cache()
    ss.count(), ps.count()
    store = SketchStore(tmp_path_factory.mktemp("fig6a"))

    def run():
        store.write(ss, "series")
        store.write(ps, "pairs")

    benchmark.pedantic(run, rounds=3, iterations=1)
    ss.unpersist(), ps.unpersist()
