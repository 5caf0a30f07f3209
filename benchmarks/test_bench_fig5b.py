"""T5b bench: sketch time — TSUBASA stats vs naive-DFT competitor.

Two groups: the distributed pipeline at B=200 (shuffle-bound at bench
scale — times converge, see EXPERIMENTS.md) and the per-window sketch
kernels at the paper's N=157 (where the O(B²) DFT vs O(B) stats
asymmetry the figure measures is visible).
"""
import numpy as np
import pytest

from repro.approx import incremental as approx_inc
from repro.approx import sketch_spark as asketch
from repro.core import lemma2, sketch_spark
from repro.data import climate

B = 200
N75 = 150


def _force(df):
    df.cache().count()
    df.unpersist()


@pytest.mark.benchmark(group="fig5b-sketch")
def test_bench_tsubasa_sketch(benchmark, bench_df):
    def run():
        _force(sketch_spark.series_sketch(bench_df, B))
        _force(sketch_spark.pair_sketch(bench_df, B))

    benchmark.pedantic(run, rounds=3, iterations=1)


@pytest.mark.benchmark(group="fig5b-sketch")
def test_bench_dft75_sketch(benchmark, bench_df):
    def run():
        _force(asketch.series_sketch(bench_df, B))
        _force(asketch.pair_dist_sketch(bench_df, B, N75))

    benchmark.pedantic(run, rounds=3, iterations=1)


@pytest.mark.benchmark(group="fig5b-sketch")
def test_bench_dft100_sketch(benchmark, bench_df):
    def run():
        _force(asketch.series_sketch(bench_df, B))
        _force(asketch.pair_dist_sketch(bench_df, B, B))

    benchmark.pedantic(run, rounds=3, iterations=1)


@pytest.fixture(scope="module")
def kernel_window():
    panel = climate.ncea_like(157, 300, seed=7)
    return panel, lemma2.all_pairs(157)


@pytest.mark.benchmark(group="fig5b-kernel")
def test_bench_kernel_tsubasa_window(benchmark, kernel_window):
    """Per-window exact sketch: O(N·B) stats + O(N²·B) covariance."""
    panel, pairs = kernel_window
    benchmark.pedantic(
        lambda: lemma2.window_entry(panel, pairs), rounds=5, iterations=3
    )


@pytest.mark.benchmark(group="fig5b-kernel")
def test_bench_kernel_dft75_window(benchmark, kernel_window):
    """Per-window DFT sketch: O(N·B²) naive transform + O(N²·n) distances."""
    panel, pairs = kernel_window
    benchmark.pedantic(
        lambda: approx_inc.window_entry_approx(panel, pairs, 225),
        rounds=5,
        iterations=3,
    )
