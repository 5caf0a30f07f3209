"""T5c bench: query time from sketches vs raw-data baseline (B=50, qw=3000).

Two groups: `fig5c-kernel` measures the §3.3 asymmetry with identical
512-pair blocking at the paper's N=157 (O(qw/B·N²) recombination vs
O(qw·N²) raw scan — this is the comparison Fig. 5c reports); the
`fig5c-query` group times the distributed paths at bench scale, where
Spark's fixed overhead dominates the sketch query and codegen makes the
raw join artificially cheap — see EXPERIMENTS.md T5c for interpretation.
"""
import numpy as np
import pytest

from repro.approx import query_spark as aquery
from repro.approx import sketch_spark as asketch
from repro.baseline import direct
from repro.core import lemma1, lemma2, query_spark, sketch_spark
from repro.data import climate

B = 50
QW = 3000


@pytest.fixture(scope="module")
def fig5c_sketches(bench_df):
    ss = sketch_spark.series_sketch(bench_df, B).cache()
    ps = sketch_spark.pair_sketch(bench_df, B).cache()
    pda = asketch.pair_dist_sketch(bench_df, B, 37).cache()
    ss.count(), ps.count(), pda.count()
    yield ss, ps, pda
    for d in (ss, ps, pda):
        d.unpersist()


@pytest.mark.benchmark(group="fig5c-query")
def test_bench_tsubasa_query(benchmark, fig5c_sketches):
    ss, ps, _ = fig5c_sketches
    benchmark.pedantic(
        lambda: query_spark.query_aligned(ss, ps, 0, QW // B - 1).toPandas(),
        rounds=3,
        iterations=1,
    )


@pytest.mark.benchmark(group="fig5c-query")
def test_bench_dft_query(benchmark, fig5c_sketches):
    ss, _, pda = fig5c_sketches
    benchmark.pedantic(
        lambda: aquery.query_approx(ss, pda, 0, QW // B - 1).toPandas(),
        rounds=3,
        iterations=1,
    )


@pytest.mark.benchmark(group="fig5c-query")
def test_bench_baseline_query(benchmark, bench_df):
    benchmark.pedantic(
        lambda: direct.query_baseline(bench_df, 0, QW).toPandas(),
        rounds=3,
        iterations=1,
    )


@pytest.fixture(scope="module")
def kernel_setup():
    """Pre-computed sketches + raw panel at the paper's N=157, qw=3000."""
    panel = climate.ncea_like(157, QW, seed=7)
    pairs = lemma2.all_pairs(157)
    mu = np.stack([lemma1.window_stats(s, B)[1] for s in panel])
    sig = np.stack([lemma1.window_stats(s, B)[2] for s in panel])
    st = lemma2.init_state(panel, B)
    pc = np.stack([w.pc for w in st.windows], axis=1)
    ss = sig[pairs[:, 0]] * sig[pairs[:, 1]]
    c = np.divide(pc, ss, out=np.zeros_like(pc), where=ss > 0)
    return panel, pairs, mu, sig, c


@pytest.mark.benchmark(group="fig5c-kernel")
def test_bench_kernel_tsubasa_query(benchmark, kernel_setup):
    """Blocked Lemma-1 recombination — O(qw/B) work per pair."""
    panel, pairs, mu, sig, c = kernel_setup
    sizes = np.full(QW // B, float(B))

    def run():
        for s in range(0, len(pairs), 512):
            lemma1.combine_pairs(sizes, mu, sig, c[s : s + 512], pairs[s : s + 512])

    benchmark.pedantic(run, rounds=5, iterations=1)


@pytest.mark.benchmark(group="fig5c-kernel")
def test_bench_kernel_baseline_query(benchmark, kernel_setup):
    """Blocked Eq.-1 raw scan — O(qw) work per pair, same batching."""
    panel, pairs, _, _, _ = kernel_setup

    def run():
        for s in range(0, len(pairs), 512):
            p = pairs[s : s + 512]
            a, b = panel[p[:, 0]], panel[p[:, 1]]
            ac = a - a.mean(axis=1, keepdims=True)
            bc = b - b.mean(axis=1, keepdims=True)
            num = np.einsum("ij,ij->i", ac, bc)
            den = np.sqrt(
                np.einsum("ij,ij->i", ac, ac) * np.einsum("ij,ij->i", bc, bc)
            )
            np.divide(num, den, out=num, where=den > 0)

    benchmark.pedantic(run, rounds=5, iterations=1)
