"""Query-window combination of per-window DFT distances (Eq. 5 + StatStream).

Two ways to aggregate basic-window distances ``d_j`` into a query-window
correlation estimate:

- ``statstream_corr``: StatStream's assumption — basic windows share the
  query window's statistics — so the query distance is the *average* of
  window distances (Algorithm 4, the "stats ≈ w" branch).
- ``eq5_corr``: the paper's Eq. 5 — Lemma 1's recombination with the exact
  per-window correlation ``c_j`` replaced by ``ĉ_j = 1 - d_j²/2``. Exact
  when all coefficients are used (tested), robust to uncooperative series.

Both return correlations; ``Dist²`` is recoverable as ``2(1 - corr)``.
"""
from __future__ import annotations

import numpy as np

from repro.core import lemma1


def statstream_corr(d2: np.ndarray) -> float:
    """Average-of-window-correlations estimate (cooperative series)."""
    return float(np.mean(1.0 - 0.5 * np.asarray(d2)))


def eq5_corr(
    sizes: np.ndarray,
    mu_x: np.ndarray,
    sig_x: np.ndarray,
    mu_y: np.ndarray,
    sig_y: np.ndarray,
    d2: np.ndarray,
) -> float:
    """Eq. 5 combination — Lemma 1 with ``ĉ_j = 1 - d_j²/2``."""
    c_hat = 1.0 - 0.5 * np.asarray(d2, dtype=np.float64)
    return lemma1.combine(sizes, mu_x, sig_x, mu_y, sig_y, c_hat)


def eq5_corr_pairs(
    sizes: np.ndarray,
    mu: np.ndarray,
    sig: np.ndarray,
    d2: np.ndarray,
    pairs: np.ndarray,
) -> np.ndarray:
    """Vectorized Eq. 5 over pairs (same layout as lemma1.combine_pairs)."""
    return lemma1.combine_pairs(sizes, mu, sig, 1.0 - 0.5 * d2, pairs)
