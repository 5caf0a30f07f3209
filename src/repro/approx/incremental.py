"""Eq. 6: incremental update of the DFT-approximate correlation matrix.

Eq. 6 of the paper is Lemma 2 applied to the approximate per-window
correlations: maintain the same sliding state as the exact algorithm but
with the per-pair window product ``pc̃_j = sigma_xj sigma_yj ĉ_j`` where
``ĉ_j = 1 - d_j²/2`` comes from truncated DFT distances. The variance
(denominator) bookkeeping is identical to the exact case — only the
numerator's correlation products differ. When all coefficients are used the
update is exactly Lemma 2 (tested), mirroring the paper's "≈ becomes =
(when n = b)" remark.

The expensive step per update — and the entire point of Fig. 5d — is
computing the DFT of the newly arrived basic window(s): O(B²) per series
(or per pair in paper-accounting mode) versus TSUBASA's O(B) stats.
"""
from __future__ import annotations

import numpy as np

from repro.approx import dft
from repro.core import lemma2


def window_entry_approx(
    values: np.ndarray,
    pairs: np.ndarray,
    n_coeffs: int,
    *,
    per_pair_dft: bool = False,
) -> lemma2.WindowEntry:
    """Sketch one basic window the approximate way.

    Same per-series stats as the exact sketch, but the pair product uses the
    truncated-DFT distance estimate of the window correlation.
    """
    v = np.asarray(values, dtype=np.float64)
    mu = v.mean(axis=1)
    sig = v.std(axis=1)
    d2 = dft.per_pair_window_d2(v, pairs, n_coeffs, per_pair_dft=per_pair_dft)
    c_hat = 1.0 - 0.5 * d2
    pc = sig[pairs[:, 0]] * sig[pairs[:, 1]] * c_hat
    return lemma2.WindowEntry(v.shape[1], mu, sig, pc)


def init_state_approx(values: np.ndarray, B: int, n_coeffs: int) -> lemma2.SlidingState:
    """Initial approximate sliding state (Eq. 5 combination over windows)."""
    v = np.asarray(values, dtype=np.float64)
    pairs = lemma2.all_pairs(v.shape[0])
    entries = [
        window_entry_approx(v[:, a : min(a + B, v.shape[1])], pairs, n_coeffs)
        for a in range(0, v.shape[1], B)
    ]
    return lemma2._state_from_entries(pairs, entries)


# The update itself is shared machinery: lemma2.update on an approx entry.
update = lemma2.update
