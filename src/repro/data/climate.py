"""Synthetic climate substrates standing in for the paper's data sets.

The paper evaluates on two data sets we cannot download offline:

- **NCEA/NOAA** hourly station data: 157 series x ~8,760 points/year;
- **Berkeley Earth** gridded land temperature: 18,638 series x 3,652 points.

We synthesize *anomaly* time-series with the properties that matter for
TSUBASA's workload: spatial correlation (nearby grid nodes correlate
strongly, far ones weakly — so a threshold θ=0.75 yields a non-trivial
network), a seasonal cycle, temporal autocorrelation (AR(1) latent
factors), and i.i.d. measurement noise. Generation is deterministic in
``seed`` so the DuckDB oracle sees identical input.

Model: K latent AR(1) factors anchored at random grid centers; node i loads
on factor k with weight ``exp(-dist(i,k)/rho)``; the series is the weighted
factor mix plus a phase-shifted seasonal cycle plus noise, standardized per
node. Pairwise Pearson correlations then decay smoothly with distance,
spanning roughly [-0.2, 0.95] — the same regime the paper thresholds at.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def _latent_panel(
    n_nodes: int,
    n_points: int,
    *,
    n_factors: int,
    rho: float,
    season_period: float,
    season_weight: float,
    noise: float,
    seed: int,
) -> np.ndarray:
    g = np.random.default_rng(seed)
    # nodes and factor anchors on a unit square "grid"
    side = int(np.ceil(np.sqrt(n_nodes)))
    xy = np.stack(
        [np.repeat(np.arange(side), side)[:n_nodes], np.tile(np.arange(side), side)[:n_nodes]],
        axis=1,
    ).astype(np.float64) / max(side - 1, 1)
    anchors = g.random((n_factors, 2))
    dist = np.linalg.norm(xy[:, None, :] - anchors[None, :, :], axis=2)
    load = np.exp(-dist / rho)  # (N, K)
    load /= np.linalg.norm(load, axis=1, keepdims=True)

    # AR(1) factors, phi=0.8, unit marginal variance
    phi = 0.8
    eps = g.standard_normal((n_factors, n_points)) * np.sqrt(1 - phi**2)
    fac = np.empty((n_factors, n_points))
    fac[:, 0] = g.standard_normal(n_factors)
    for t in range(1, n_points):
        fac[:, t] = phi * fac[:, t - 1] + eps[:, t]

    t = np.arange(n_points)
    phase = 2 * np.pi * g.random(n_nodes)
    season = np.sin(2 * np.pi * t[None, :] / season_period + phase[:, None])

    v = load @ fac + season_weight * season + noise * g.standard_normal((n_nodes, n_points))
    v -= v.mean(axis=1, keepdims=True)
    v /= v.std(axis=1, keepdims=True)
    return v


def ncea_like(n_nodes: int = 157, n_points: int = 8760, *, seed: int = 7) -> np.ndarray:
    """NCEA-style station panel: (n_nodes, n_points) float64 anomalies.

    Defaults mirror the paper's 157 stations x 8,760 hourly points; tests
    and benchmarks pass smaller ``n_points`` to bound runtime.
    """
    return _latent_panel(
        n_nodes,
        n_points,
        n_factors=12,
        rho=0.35,
        season_period=365.25 * 24 / 12,  # sub-annual cycle at hourly resolution
        season_weight=0.6,
        noise=0.35,
        seed=seed,
    )


def berkeley_like(n_nodes: int = 2000, n_points: int = 3652, *, seed: int = 11) -> np.ndarray:
    """Berkeley-Earth-style gridded panel: (n_nodes, n_points) anomalies.

    The paper's scalability runs use subsets of the 18,638 land cells; our
    harness likewise subsets ``n_nodes``.
    """
    return _latent_panel(
        n_nodes,
        n_points,
        n_factors=16,
        rho=0.25,
        season_period=365.25,  # daily resolution, annual cycle
        season_weight=0.5,
        noise=0.4,
        seed=seed,
    )


def panel_to_long(panel: np.ndarray) -> pd.DataFrame:
    """(N, L) panel -> long pandas frame (sid, t, v) — the canonical layout."""
    n, L = panel.shape
    return pd.DataFrame(
        {
            "sid": np.repeat(np.arange(n, dtype=np.int32), L),
            "t": np.tile(np.arange(L, dtype=np.int64), n),
            "v": panel.reshape(-1),
        }
    )


def long_df(spark: SparkSession, panel: np.ndarray, *, partitions: int | None = None) -> DataFrame:
    """Spark long-format DataFrame (sid INT, t BIGINT, v DOUBLE) of a panel."""
    df = spark.createDataFrame(panel_to_long(panel))
    if partitions is not None:
        df = df.repartition(partitions, "sid")
    return df
