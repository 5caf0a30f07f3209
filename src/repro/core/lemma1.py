"""Lemma 1: exact Pearson correlation from basic-window statistics.

Given, for each basic window ``j`` of sizes ``B_j`` (arbitrary, possibly
unequal), the window means ``mu``, population stds ``sigma`` and the
pairwise window correlation ``c_j`` of two series, the query-window Pearson
correlation is recombined exactly — no pass over raw data.

We use the *weighted* delta form (see DESIGN.md §3.1): the overall mean of a
query window with unequal pieces is the B_j-weighted mean of window means,

    delta_xj = mu_xj - (sum_k B_k mu_xk) / T,     T = sum_j B_j

which reduces to the paper's unweighted form for equal windows and makes
arbitrary head/tail-partial windows exact.

    Corr(x, y) = sum_j B_j (sigma_xj sigma_yj c_j + delta_xj delta_yj)
                 / sqrt(sum_j B_j (sigma_xj^2 + delta_xj^2))
                 / sqrt(sum_j B_j (sigma_yj^2 + delta_yj^2))

All functions are vectorized numpy kernels; the Spark layer
(`core.query_spark`) expresses the same algebra in Catalyst aggregations.
"""
from __future__ import annotations

import numpy as np


def window_stats(x: np.ndarray, B: int) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Per-basic-window ``(sizes, means, population stds)`` of a 1-D series.

    The last window may be ragged (size < B) when ``len(x) % B != 0``.
    """
    x = np.asarray(x, dtype=np.float64)
    n = len(x)
    bounds = list(range(0, n, B)) + [n]
    sizes = np.diff(bounds).astype(np.int64)
    means = np.array([x[a:b].mean() for a, b in zip(bounds[:-1], bounds[1:])])
    stds = np.array([x[a:b].std() for a, b in zip(bounds[:-1], bounds[1:])])
    return sizes, means, stds


def window_pair_corr(x: np.ndarray, y: np.ndarray, B: int) -> np.ndarray:
    """Per-basic-window Pearson correlation ``c_j`` of two aligned series.

    Windows where either side is constant (sigma == 0) get ``c_j = 0``;
    Lemma 1 multiplies ``c_j`` by ``sigma_x sigma_y`` so the value is
    irrelevant there — 0 keeps the arithmetic NaN-free.
    """
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    n = len(x)
    out = []
    for a in range(0, n, B):
        b = min(a + B, n)
        xs, ys = x[a:b], y[a:b]
        sx, sy = xs.std(), ys.std()
        if sx == 0.0 or sy == 0.0:
            out.append(0.0)
        else:
            out.append(float(((xs - xs.mean()) * (ys - ys.mean())).mean() / (sx * sy)))
    return np.array(out)


def combine(
    sizes: np.ndarray,
    mu_x: np.ndarray,
    sig_x: np.ndarray,
    mu_y: np.ndarray,
    sig_y: np.ndarray,
    c: np.ndarray,
) -> float:
    """Exact query-window correlation from per-window stats (Lemma 1).

    ``sizes`` may be unequal (arbitrary query windows). Returns NaN when
    either series is constant over the whole query window.
    """
    B = np.asarray(sizes, dtype=np.float64)
    T = B.sum()
    dx = mu_x - (B * mu_x).sum() / T
    dy = mu_y - (B * mu_y).sum() / T
    num = (B * (sig_x * sig_y * c + dx * dy)).sum()
    den_x = (B * (sig_x**2 + dx**2)).sum()
    den_y = (B * (sig_y**2 + dy**2)).sum()
    if den_x <= 0.0 or den_y <= 0.0:
        return float("nan")
    return float(num / np.sqrt(den_x) / np.sqrt(den_y))


def combine_pairs(
    sizes: np.ndarray,
    mu: np.ndarray,
    sig: np.ndarray,
    c: np.ndarray,
    pairs: np.ndarray,
) -> np.ndarray:
    """Vectorized Lemma 1 over many pairs.

    ``mu``/``sig`` are (N, n_s) per-series window stats, ``c`` is
    (n_pairs, n_s) per-pair window correlations aligned with ``pairs``
    (n_pairs, 2) index rows. Returns (n_pairs,) correlations.
    """
    B = np.asarray(sizes, dtype=np.float64)[None, :]
    T = B.sum()
    delta = mu - (B * mu).sum(axis=1, keepdims=True) / T
    den = (B * (sig**2 + delta**2)).sum(axis=1)  # per series
    i, j = pairs[:, 0], pairs[:, 1]
    num = (B * (sig[i] * sig[j] * c + delta[i] * delta[j])).sum(axis=1)
    with np.errstate(invalid="ignore", divide="ignore"):
        return num / np.sqrt(den[i]) / np.sqrt(den[j])


def query_window_std(sizes: np.ndarray, mu: np.ndarray, sig: np.ndarray) -> float:
    """Population std of the whole query window from window stats.

    This is the identity proven inside Lemma 1:
    ``sigma_x = sqrt( (1/T) sum_j B_j (sigma_xj^2 + delta_xj^2) )``.
    """
    B = np.asarray(sizes, dtype=np.float64)
    T = B.sum()
    d = mu - (B * mu).sum() / T
    return float(np.sqrt((B * (sig**2 + d**2)).sum() / T))


def direct_corr(x: np.ndarray, y: np.ndarray) -> float:
    """Reference: direct Pearson correlation (Eq. 1) for tests/baseline."""
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    sx, sy = x.std(), y.std()
    if sx == 0.0 or sy == 0.0:
        return float("nan")
    return float(((x - x.mean()) * (y - y.mean())).mean() / (sx * sy))
