"""Algorithm 4 at query time on Spark: approximate network construction.

Converts the stored per-window distances to per-window correlation
estimates ``ĉ_j = 1 - d_j²/2`` (Eq. 3) and combines them over the query
window either by

- ``mode="eq5"`` — the paper's Eq. 5: Lemma 1's recombination with ``ĉ_j``
  in place of the exact ``c_j`` (no cooperativeness assumption), reusing
  the exact layer's Catalyst aggregation wholesale; or
- ``mode="avg"`` — StatStream's cooperative-series assumption: the plain
  average of window correlations (Algorithm 4's "stats ≈ w" branch).

Thresholding uses Eq. 4's rule, which with our unit-norm convention is
``corr ≥ θ`` on the estimate — a superset of the exact network (no false
negatives), the property Fig. 5a measures.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import query_spark


def _pair_pc_from_d2(pair_dist: DataFrame) -> DataFrame:
    """Rebuild the Lemma-1 pair product with the approximate correlation:
    ``pc̃ = sigma_x sigma_y (1 - d²/2)`` — the sigma product is stored in
    the sketch, so this is a pure projection (no join)."""
    return pair_dist.select(
        "sid1",
        "sid2",
        "wid",
        "b",
        (F.col("ss") * (1.0 - 0.5 * F.col("d2"))).alias("pc"),
    )


def query_approx(
    series_stats: DataFrame,
    pair_dist: DataFrame,
    wid_lo: int,
    wid_hi: int,
    *,
    mode: str = "eq5",
) -> DataFrame:
    """Approximate all-pair correlations on an aligned wid range.

    Returns ``(sid1, sid2, corr)`` — the Eq. 3/5 correlation estimate;
    ``Dist_n²`` is ``2(1 - corr)`` when needed for Eq. 4 thresholding.
    """
    s = query_spark.select_wids(series_stats, wid_lo, wid_hi)
    p = query_spark.select_wids(pair_dist, wid_lo, wid_hi)
    if mode == "eq5":
        return query_spark.correlation_matrix(s, _pair_pc_from_d2(p))
    if mode == "avg":
        return p.groupBy("sid1", "sid2").agg(
            F.avg(1.0 - 0.5 * F.col("d2")).alias("corr")
        )
    raise ValueError(f"unknown mode {mode!r}")
