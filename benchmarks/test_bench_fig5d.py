"""T5d bench: per-window network update — Lemma 2 vs DFT incremental.

Driver-side kernels (what each micro-batch pays); N=157 as in the paper.
"""
import numpy as np
import pytest

from repro.approx import incremental as approx_inc
from repro.core import lemma2
from repro.data import climate
from repro.experiments.fig5 import fig5d_correctness_check

N, B, NS = 157, 200, 15  # query window 3000


@pytest.fixture(scope="module")
def update_setup():
    panel = climate.ncea_like(N, B * (NS + 1), seed=7)
    pairs = lemma2.all_pairs(N)
    state = lemma2.init_state(panel[:, : B * NS], B)
    new_vals = panel[:, B * NS :]
    return state, new_vals, pairs


@pytest.mark.benchmark(group="fig5d-update")
def test_bench_tsubasa_update(benchmark, update_setup):
    state, new_vals, pairs = update_setup

    def run():
        entry = lemma2.window_entry(new_vals, pairs)
        # update mutates; rebuild a shallow copy of the deque each round
        st = lemma2.SlidingState(
            state.pairs, state.corr.copy(), state.sigma.copy(), list(state.windows)
        )
        lemma2.update(st, entry)

    benchmark.pedantic(run, rounds=5, iterations=1)


@pytest.mark.benchmark(group="fig5d-update")
def test_bench_dft_update_shared(benchmark, update_setup):
    state, new_vals, pairs = update_setup

    def run():
        entry = approx_inc.window_entry_approx(new_vals, pairs, 150)
        st = lemma2.SlidingState(
            state.pairs, state.corr.copy(), state.sigma.copy(), list(state.windows)
        )
        lemma2.update(st, entry)

    benchmark.pedantic(run, rounds=5, iterations=1)


@pytest.mark.benchmark(group="fig5d-update")
def test_bench_dft_update_per_pair(benchmark, update_setup):
    """The paper's accounting: DFT recomputed per pair (O(N²B²))."""
    state, new_vals, pairs = update_setup

    def run():
        entry = approx_inc.window_entry_approx(
            new_vals, pairs, 150, per_pair_dft=True
        )
        st = lemma2.SlidingState(
            state.pairs, state.corr.copy(), state.sigma.copy(), list(state.windows)
        )
        lemma2.update(st, entry)

    benchmark.pedantic(run, rounds=1, iterations=1)


def test_update_correctness_guard():
    """The benched path stays exact (incremental == from-scratch)."""
    assert fig5d_correctness_check() < 1e-8
