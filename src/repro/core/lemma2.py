"""Lemma 2: incremental sliding-window update of pairwise correlation.

State for a query window covering basic windows ``w0..w0+n_s-1``:

- per series: query-window population std ``sigma`` (maintained), plus the
  deque of per-window ``(size, mu, sigma_j)`` stats;
- per pair: current correlation, plus per-window products
  ``pc_j = sigma_xj sigma_yj c_j``.

On arrival of a new basic window the window slides: drop window ``w0``,
append window ``w0+n_s``. Lemma 2 gives the new correlation from the old one
plus only the dropped/added window stats — O(1) per pair instead of O(n_s).

Derivation note (DESIGN.md §3, erratum 2): with the weighted overall mean
``X = sum B_k mu_k / T``, the mean shift is

    alpha_x = (B_new * delta_x,new - B_1 * delta_x,1) / T'

with ``T' = T - B_1 + B_new`` (the paper prints ``/T``; for the equal-B
special case used in all its experiments the two coincide). Using
``sum_{i in old} B_i delta_xi = 0`` (exact for the weighted mean), the
numerator and variance updates below follow; property tests assert
incremental == from-scratch Lemma 1 == direct Pearson on random data,
including unequal window sizes.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class WindowEntry:
    """Stats of one basic window for all series + all pairs."""

    size: int
    mu: np.ndarray  # (N,)
    sig: np.ndarray  # (N,)
    pc: np.ndarray  # (n_pairs,) sigma_x sigma_y c for this window


@dataclass
class SlidingState:
    """Mutable state of the incremental maintainer (vectorized over pairs).

    ``pairs`` is an (n_pairs, 2) int array of (i, j) with i < j; ``corr`` the
    current query-window correlations aligned with it; ``sigma`` the per-
    series query-window stds; ``windows`` the deque of ``n_s`` WindowEntry.
    """

    pairs: np.ndarray
    corr: np.ndarray
    sigma: np.ndarray
    windows: list[WindowEntry]

    @property
    def T(self) -> int:
        return sum(w.size for w in self.windows)


def all_pairs(n: int) -> np.ndarray:
    """(i, j) index pairs with i < j, row-major — canonical pair order."""
    i, j = np.triu_indices(n, k=1)
    return np.stack([i, j], axis=1)


def window_entry(values: np.ndarray, pairs: np.ndarray) -> WindowEntry:
    """Sketch one basic window: ``values`` is (N, b) for all N series.

    Computes per-series mean/std and the per-pair product
    ``pc = sigma_x sigma_y c`` directly as the mean of centered products —
    well-defined (0) even when a side is constant.
    """
    v = np.asarray(values, dtype=np.float64)
    mu = v.mean(axis=1)
    sig = v.std(axis=1)
    centered = v - mu[:, None]
    # pc_ij = mean_t(xc_i * xc_j) = cov_ij = sigma_i sigma_j c_ij
    cov = centered @ centered.T / v.shape[1]
    pc = cov[pairs[:, 0], pairs[:, 1]]
    return WindowEntry(v.shape[1], mu, sig, pc)


def init_state(values: np.ndarray, B: int) -> SlidingState:
    """Build initial state from raw (N, m) values with basic window size B.

    Equivalent to Algorithm 1 + Algorithm 2 (from-scratch Lemma 1); used to
    seed Algorithm 3 before incremental updates take over.
    """
    v = np.asarray(values, dtype=np.float64)
    n = v.shape[0]
    pairs = all_pairs(n)
    entries = [
        window_entry(v[:, a : min(a + B, v.shape[1])], pairs)
        for a in range(0, v.shape[1], B)
    ]
    return _state_from_entries(pairs, entries)


def _state_from_entries(pairs: np.ndarray, entries: list[WindowEntry]) -> SlidingState:
    sizes = np.array([w.size for w in entries], dtype=np.float64)
    T = sizes.sum()
    mu = np.stack([w.mu for w in entries], axis=1)  # (N, n_s)
    sig = np.stack([w.sig for w in entries], axis=1)
    pc = np.stack([w.pc for w in entries], axis=1)  # (n_pairs, n_s)
    delta = mu - (sizes[None, :] * mu).sum(axis=1, keepdims=True) / T
    den = (sizes[None, :] * (sig**2 + delta**2)).sum(axis=1)  # (N,)
    sigma = np.sqrt(den / T)
    i, j = pairs[:, 0], pairs[:, 1]
    num = (sizes[None, :] * (pc + delta[i] * delta[j])).sum(axis=1)
    with np.errstate(invalid="ignore", divide="ignore"):
        corr = num / np.sqrt(den[i]) / np.sqrt(den[j])
    return SlidingState(pairs, corr, sigma, list(entries))


def update(state: SlidingState, new: WindowEntry) -> SlidingState:
    """Slide the query window by one basic window, per Lemma 2 (in place).

    Drops ``state.windows[0]``, appends ``new``; updates ``corr`` and
    ``sigma`` in O(n_pairs) using only the dropped/added window stats and
    the old aggregates — never re-scanning the n_s interior windows.
    """
    old = state.windows[0]
    T = float(state.T)
    Tp = T - old.size + new.size
    sizes = np.array([w.size for w in state.windows], dtype=np.float64)
    mu = np.stack([w.mu for w in state.windows], axis=1)  # (N, n_s)
    xbar = (sizes[None, :] * mu).sum(axis=1) / T  # old overall mean (N,)

    d_old = old.mu - xbar
    d_new = new.mu - xbar
    alpha = (new.size * d_new - old.size * d_old) / Tp  # (N,)

    i, j = state.pairs[:, 0], state.pairs[:, 1]
    num_old = T * state.sigma[i] * state.sigma[j] * state.corr
    num_new = (
        num_old
        + new.size * (new.pc + d_new[i] * d_new[j])
        - old.size * (old.pc + d_old[i] * d_old[j])
        - Tp * alpha[i] * alpha[j]
    )
    den_new = (
        T * state.sigma**2
        + new.size * (new.sig**2 + d_new**2)
        - old.size * (old.sig**2 + d_old**2)
        - Tp * alpha**2
    )
    den_new = np.maximum(den_new, 0.0)  # clamp fp noise at sigma ~ 0
    with np.errstate(invalid="ignore", divide="ignore"):
        state.corr = num_new / np.sqrt(den_new[i]) / np.sqrt(den_new[j])
    state.sigma = np.sqrt(den_new / Tp)
    state.windows = state.windows[1:] + [new]
    return state
