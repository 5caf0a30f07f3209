"""T6d bench: sketch-store write at two basic window sizes + size shape.

Asserts Fig. 6d's claim — store size strictly decreases as B grows — and
benches the write path that produces it.
"""
import pytest

from repro.core import sketch_spark
from repro.data import climate
from repro.storage.sketch_store import SketchStore

N, L = 120, 1920


@pytest.fixture(scope="module")
def berkeley_df(spark):
    df = climate.long_df(spark, climate.berkeley_like(N, L, seed=11)).cache()
    df.count()
    yield df
    df.unpersist()


@pytest.mark.benchmark(group="fig6d-space")
@pytest.mark.parametrize("B", [60, 240])
def test_bench_store_write(benchmark, spark, berkeley_df, tmp_path_factory, B):
    store = SketchStore(tmp_path_factory.mktemp(f"fig6d-{B}"))
    ss, ps = sketch_spark.sketch(berkeley_df, B)
    ss, ps = ss.cache(), ps.cache()
    ss.count(), ps.count()

    def run():
        store.write(ss, "series")
        store.write(ps, "pairs")
        return store.size_bytes()

    size = benchmark.pedantic(run, rounds=2, iterations=1)
    assert size > 0
    ss.unpersist(), ps.unpersist()


def test_store_size_decreases_with_B(spark, berkeley_df, tmp_path_factory):
    sizes = []
    for B in (60, 120, 480):
        store = SketchStore(tmp_path_factory.mktemp(f"sz-{B}"))
        ss, ps = sketch_spark.sketch(berkeley_df, B)
        store.write(ss, "series")
        store.write(ps, "pairs")
        sizes.append(store.size_bytes())
    assert sizes[0] > sizes[1] > sizes[2]
