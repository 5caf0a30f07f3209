"""Shared fixtures: small climate panels and pre-built sketches.

Session scope keeps the JVM work bounded — the panels are tiny (N ≈ 10,
L ≈ 600) per the SF guidance for unit tests; benchmarks use larger data.
"""
from __future__ import annotations

import numpy as np
import pytest

from repro.data import climate

B_TEST = 50  # canonical basic window size used by the Spark test fixtures
N_TEST = 10
L_TEST = 600


@pytest.fixture(scope="session")
def panel() -> np.ndarray:
    """Deterministic NCEA-like panel, (10, 600)."""
    return climate.ncea_like(N_TEST, L_TEST, seed=3)


@pytest.fixture(scope="session")
def long_pdf(panel):
    """The panel in canonical long layout (pandas) — also the oracle input."""
    return climate.panel_to_long(panel)


@pytest.fixture(scope="session")
def df_raw(spark, panel):
    """The panel as a cached Spark long DataFrame."""
    df = climate.long_df(spark, panel).cache()
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="session")
def sketches(df_raw):
    """Exact sketches at B=B_TEST, cached."""
    from repro.core import sketch_spark

    ss, ps = sketch_spark.sketch(df_raw, B_TEST)
    ss, ps = ss.cache(), ps.cache()
    ss.count(), ps.count()
    yield ss, ps
    ss.unpersist(), ps.unpersist()
