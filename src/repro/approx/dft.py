"""DFT-based correlation approximation kernels (§2.2, §3.2 / StatStream).

Pipeline per basic window:

1. *unit-normalize* the window: ``x̂ = (x - mean)/(std * sqrt(b))`` so that
   ``||x̂|| = 1`` and ``corr = 1 - d²(x̂, ŷ)/2`` (Eq. 3) holds exactly;
2. take the unitary DFT (Eq. 2, the 1/sqrt(k)-scaled transform) — computed
   **naively as an O(B²) matrix product**, matching the paper's costing
   (they never use an FFT; the O(B²) growth is what Figs. 5b/5d measure);
3. keep the first ``n`` non-DC coefficients (the DC coefficient of a
   normalized window is 0). Truncation only *drops* energy, so the
   approximate distance underestimates the true one — Eq. 4's
   no-false-negative property, asserted in tests;
4. per-pair squared distance ``d²`` of coefficient vectors.

With ``n = B`` (all coefficients) the approximation is exact (Parseval for
a unitary transform), reproducing the Fig. 5a convergence point.
"""
from __future__ import annotations

from functools import lru_cache

import numpy as np


@lru_cache(maxsize=32)
def dft_matrix(b: int) -> np.ndarray:
    """Unitary DFT matrix (Eq. 2), rows reordered so f=0 (DC) comes last.

    Row order ``f = 1, 2, …, b-1, 0``: "the first n coefficients" then never
    includes the (always-zero) DC term until n = b, and truncation is a pure
    prefix. Cached — building it is O(B²) but amortized across windows.
    """
    f = np.concatenate([np.arange(1, b), [0]])
    i = np.arange(b)
    return np.exp(-2j * np.pi * np.outer(f, i) / b) / np.sqrt(b)


def unit_normalize(v: np.ndarray) -> np.ndarray:
    """Unit-norm window normalization along the last axis.

    Constant windows map to the zero vector (their correlation contribution
    is zero through the sigma products in Lemma 1/Eq. 5).
    """
    v = np.asarray(v, dtype=np.float64)
    mu = v.mean(axis=-1, keepdims=True)
    sd = v.std(axis=-1, keepdims=True)
    scale = sd * np.sqrt(v.shape[-1])
    out = np.zeros_like(v)
    np.divide(v - mu, scale, out=out, where=scale > 0)
    return out


def window_coeffs(values: np.ndarray, n: int) -> np.ndarray:
    """First ``n`` DFT coefficients of unit-normalized windows.

    ``values`` is (..., b); returns complex (..., n). O(B²) per window by
    construction (naive transform, see module doc).
    """
    v = unit_normalize(values)
    b = v.shape[-1]
    n = min(n, b)
    W = dft_matrix(b)[:n]  # (n, b)
    return v @ W.T


def pair_d2(X: np.ndarray, Y: np.ndarray) -> float:
    """Squared Euclidean distance of two complex coefficient vectors."""
    d = X - Y
    return float(np.real(d @ np.conj(d)))


def all_pair_d2(C: np.ndarray, pairs: np.ndarray) -> np.ndarray:
    """Squared coefficient distances for all (i, j) pairs, vectorized.

    ``C`` is the (N, n) complex coefficient matrix of one basic window;
    uses ``|Xi - Xj|² = |Xi|² + |Xj|² - 2 Re<Xi, Xj>`` via one gram matmul.
    """
    sq = np.real(np.einsum("ij,ij->i", C, np.conj(C)))
    gram = np.real(C @ np.conj(C.T))
    i, j = pairs[:, 0], pairs[:, 1]
    d2 = sq[i] + sq[j] - 2.0 * gram[i, j]
    return np.maximum(d2, 0.0)


def per_pair_window_d2(
    values: np.ndarray, pairs: np.ndarray, n: int, *, per_pair_dft: bool = False
) -> np.ndarray:
    """d² of one basic window for every pair.

    ``per_pair_dft=True`` recomputes both series' DFTs inside the pair loop,
    reproducing the paper's O(B²·N²) sketch accounting (its stated
    O(L²N²) sketch complexity implies per-pair DFT recomputation in
    Algorithm 1); the default shares one DFT per series — a strictly
    stronger competitor. Both return identical values (tested).
    """
    if not per_pair_dft:
        return all_pair_d2(window_coeffs(values, n), pairs)
    out = np.empty(len(pairs))
    for k, (i, j) in enumerate(pairs):
        out[k] = pair_d2(window_coeffs(values[i], n), window_coeffs(values[j], n))
    return out


def corr_from_d2(d2: np.ndarray | float) -> np.ndarray | float:
    """Eq. 3: per-window approximate correlation ``ĉ = 1 - d²/2``."""
    return 1.0 - 0.5 * np.asarray(d2)


def edge_rule_d2_threshold(theta: float) -> float:
    """Eq. 4 pruning radius in d² form: edge iff ``d² ≤ 2(1-θ)``.

    (The paper states ``Dist ≤ sqrt(1-θ)``; with the unit-norm convention of
    Eq. 3 the exact equivalence ``corr ≥ θ ⇔ d² ≤ 2(1-θ)`` is what makes
    n = B coincide with the exact network — tested.)
    """
    return 2.0 * (1.0 - theta)
