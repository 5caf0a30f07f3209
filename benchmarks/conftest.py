"""Benchmark fixtures: moderate-scale (SF≈0.1-equivalent) climate panels.

Each bench exercises the operation that distinguishes its table; the full
sweeps (all parameter values, printed tables) live in ``jobs/`` and their
output is recorded in EXPERIMENTS.md. Benchmarks pin one representative
configuration per table so the suite stays minutes, not hours.
"""
from __future__ import annotations

import numpy as np
import pytest

from repro.data import climate

N_BENCH = 60
L_BENCH = 3000


@pytest.fixture(scope="session")
def bench_panel() -> np.ndarray:
    return climate.ncea_like(N_BENCH, L_BENCH, seed=7)


@pytest.fixture(scope="session")
def bench_df(spark, bench_panel):
    df = climate.long_df(spark, bench_panel).cache()
    df.count()
    yield df
    df.unpersist()
