"""Climate network: thresholding, edge counts, similarity ratio (§2.1, §4.1).

A network is the boolean adjacency obtained by applying a correlation
threshold θ to the correlation matrix: edge iff |corr| handling follows the
paper, which thresholds the signed correlation (``c > θ``) for exact
networks and the DFT distance rule for approximate ones.

``similarity_ratio`` is D_p of §4.1: the fraction of identical off-diagonal
cells between two adjacency matrices.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def threshold_edges(corr_df: DataFrame, theta: float) -> DataFrame:
    """Edges (sid1, sid2, corr) with corr > θ — Algorithm 2 lines 6–7."""
    return corr_df.filter(F.col("corr") > theta)


def adjacency_from_corr(corr: np.ndarray, pairs: np.ndarray, n: int, theta: float) -> np.ndarray:
    """Boolean (n, n) adjacency from pair-aligned correlations (numpy)."""
    adj = np.zeros((n, n), dtype=bool)
    sel = corr > theta
    i, j = pairs[sel, 0], pairs[sel, 1]
    adj[i, j] = True
    adj[j, i] = True
    return adj


def edge_count(adj: np.ndarray) -> int:
    """Number of undirected edges in a boolean adjacency matrix."""
    return int(np.triu(adj, k=1).sum())


def similarity_ratio(a: np.ndarray, b: np.ndarray) -> float:
    """D_p(A, B): fraction of identical off-diagonal cells (§4.1).

    ``D_p = 2 * sum_{i<j} (1 - |a_ij - b_ij|) / (n (n - 1))``.
    """
    if a.shape != b.shape or a.shape[0] != a.shape[1]:
        raise ValueError("adjacency matrices must be square and same shape")
    n = a.shape[0]
    iu = np.triu_indices(n, k=1)
    same = (a[iu].astype(np.int8) == b[iu].astype(np.int8)).sum()
    return float(2.0 * same / (n * (n - 1)))


def pairs_to_matrix(pair_df: pd.DataFrame, n: int, col: str = "corr") -> np.ndarray:
    """Collected (sid1, sid2, col) pair rows -> symmetric (n, n) matrix."""
    m = np.full((n, n), np.nan)
    np.fill_diagonal(m, 1.0)
    i = pair_df["sid1"].to_numpy(dtype=int)
    j = pair_df["sid2"].to_numpy(dtype=int)
    v = pair_df[col].to_numpy(dtype=float)
    m[i, j] = v
    m[j, i] = v
    return m
