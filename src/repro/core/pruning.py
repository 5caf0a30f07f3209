"""Correlation-inference pruning of the thresholded matrix (§3.5, Alg. 5).

Pearson correlations obey a triangle-like constraint: knowing ``c_xz`` and
``c_yz`` bounds ``c_xy`` (Eq. 7):

    c_xz c_yz - sqrt((1-c_xz²)(1-c_yz²)) <= c_xy
                                        <= c_xz c_yz + sqrt((1-c_xz²)(1-c_yz²))

Given one exactly-computed *anchor row* of the matrix, every remaining cell
of the **boolean** (|c| vs θ) network matrix whose bounds land entirely
inside or outside the threshold band is decided without computing its
correlation. Algorithm 5 iterates anchors until no undecided cells remain
(or a budget runs out), then computes the rest exactly.

Cell coding: 1 = edge (|c| ≥ θ), 0 = non-edge, -1 = undecided.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np


def bounds(c_xz: np.ndarray, c_yz: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Eq. 7 lower/upper bounds on c_xy from correlations with an anchor z."""
    c_xz = np.clip(np.asarray(c_xz, dtype=np.float64), -1.0, 1.0)
    c_yz = np.clip(np.asarray(c_yz, dtype=np.float64), -1.0, 1.0)
    prod = c_xz * c_yz
    rad = np.sqrt(np.maximum((1.0 - c_xz**2) * (1.0 - c_yz**2), 0.0))
    return prod - rad, prod + rad


def infer_from_anchor(c_anchor: np.ndarray, theta: float) -> np.ndarray:
    """Decide network cells from one anchor row (Alg. 5 lines 5–11).

    ``c_anchor[i] = c_{i,z}`` (with ``c_anchor[z] = 1``). Returns an (N, N)
    int8 matrix in {1, 0, -1}; the diagonal is 1.
    """
    n = len(c_anchor)
    L, U = bounds(c_anchor[:, None], c_anchor[None, :])
    out = np.full((n, n), -1, dtype=np.int8)
    out[(L >= theta) | (U <= -theta)] = 1
    out[(L >= -theta) & (U <= theta)] = 0
    np.fill_diagonal(out, 1)
    return out


@dataclass
class PruneResult:
    """Outcome of Algorithm 5."""

    matrix: np.ndarray  # (N, N) int8 boolean network, fully decided
    n_computed: int  # pairwise correlations computed exactly
    n_inferred: int  # off-diagonal cells decided by Eq. 7 alone
    anchors: list[int]


def prune_matrix(
    corr_row: Callable[[int], np.ndarray],
    n: int,
    theta: float,
    *,
    max_anchors: int | None = None,
) -> PruneResult:
    """Algorithm 5: build the boolean network with anchor-based inference.

    ``corr_row(z)`` returns the exact correlation row of series ``z``
    against all N series (the ComputeCorr oracle — Lemma 1 queries in the
    Spark layer, direct Pearson in tests). Anchors are taken in order
    0, 1, … as long as undecided cells remain; remaining undecided cells
    after the anchor budget are computed exactly row by row (Compute-Rest).
    """
    decided = np.full((n, n), -1, dtype=np.int8)
    np.fill_diagonal(decided, 1)
    known_rows: dict[int, np.ndarray] = {}
    anchors: list[int] = []
    budget = n if max_anchors is None else max_anchors

    for z in range(n):
        if len(anchors) >= budget or not (decided == -1).any():
            break
        row = corr_row(z)
        known_rows[z] = row
        anchors.append(z)
        # anchor's own row/column is now exact
        decided[z, :] = (np.abs(row) >= theta).astype(np.int8)
        decided[:, z] = decided[z, :]
        decided[z, z] = 1
        inferred = infer_from_anchor(row, theta)
        mask = (decided == -1) & (inferred != -1)
        decided[mask] = inferred[mask]

    n_inferred = int((decided != -1).sum() - n - 2 * (n - 1) * len(anchors))
    n_inferred = max(n_inferred, 0)

    # Compute-Rest: exact rows for anything still undecided.
    computed_rows = len(anchors)
    for i in range(n):
        if (decided[i] == -1).any():
            row = known_rows.get(i)
            if row is None:
                row = corr_row(i)
                computed_rows += 1
            undecided = decided[i] == -1
            decided[i, undecided] = (np.abs(row[undecided]) >= theta).astype(np.int8)
            decided[undecided, i] = decided[i, undecided]

    return PruneResult(decided, computed_rows * (n - 1), n_inferred, anchors)
