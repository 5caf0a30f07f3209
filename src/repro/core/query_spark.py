"""Algorithm 2 / Lemma 1 at query time on Spark.

Lemma 1's numerator splits as

    num = Σ_j B_j·pc_j  +  Σ_j B_j·δ1_j·δ2_j

and the two terms have very different natural dataflows:

- the first is a **pure Catalyst aggregation** over the (large) pair sketch
  — no join at all, so the per-pair cost is a scan of n_s sketch rows,
  matching the paper's O(n_s·N²) query complexity rather than paying join
  machinery per sketch row;
- the second depends only on the (tiny, N×n_s) per-series window deltas:
  it is the B-weighted gram matrix of the delta vectors, computed in one
  vectorized ``applyInPandas`` block — the Spark analogue of the paper's
  workers combining per-series stats arrays into a correlation sub-matrix.

The remaining joins touch only N²-row (per-pair) and N-row (per-series)
relations. ``correlation_matrix`` accepts *pre-selected* sketch rows so the
arbitrary-window layer can union in partial-window stats under pseudo wids.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_GRAM_SCHEMA = "sid1 int, sid2 int, dd double"


def select_wids(sketch_df: DataFrame, wid_lo: int, wid_hi: int) -> DataFrame:
    """Sketch rows of basic windows ``wid_lo..wid_hi`` inclusive (Alg. 2 line 2)."""
    return sketch_df.filter((F.col("wid") >= wid_lo) & (F.col("wid") <= wid_hi))


def _delta_gram(pdf: pd.DataFrame) -> pd.DataFrame:
    """All-pair ``Σ_j B_j δ1_j δ2_j`` from per-series delta rows (one task)."""
    P = pdf.pivot(index="sid", columns="wid", values="delta")
    b = pdf.drop_duplicates("wid").set_index("wid")["b"]
    w = b.loc[P.columns].to_numpy(dtype=np.float64)
    D = P.to_numpy(dtype=np.float64)
    G = (D * w[None, :]) @ D.T
    sids = P.index.to_numpy()
    iu, ju = np.triu_indices(len(sids), k=1)
    return pd.DataFrame(
        {
            "sid1": sids[iu].astype("int32"),
            "sid2": sids[ju].astype("int32"),
            "dd": G[iu, ju],
        }
    )


def series_terms(series_stats: DataFrame) -> tuple[DataFrame, DataFrame]:
    """Per-series Lemma-1 terms from (already selected) sketch rows.

    Returns ``(gram, den)``: the pairwise delta gram (sid1, sid2, dd) and
    the per-series denominator Σ b(σ² + δ²) (sid, den).
    """
    totals = series_stats.groupBy("sid").agg(
        (F.sum(F.col("b") * F.col("mu")) / F.sum("b")).alias("xbar")
    )
    sd = (
        series_stats.join(totals, "sid")
        .withColumn("delta", F.col("mu") - F.col("xbar"))
        .select("sid", "wid", "b", "sigma", "delta")
    )
    den = sd.groupBy("sid").agg(
        F.sum(F.col("b") * (F.col("sigma") ** 2 + F.col("delta") ** 2)).alias("den")
    )
    gram = (
        sd.withColumn("g", F.lit(0))
        .groupBy("g")
        .applyInPandas(lambda pdf: _delta_gram(pdf), _GRAM_SCHEMA)
    )
    return gram, den


def correlation_matrix(series_stats: DataFrame, pair_stats: DataFrame) -> DataFrame:
    """Exact all-pair correlations from (already selected) sketch rows.

    ``pair_stats`` must carry ``(sid1, sid2, wid, b, pc)``; returns
    ``(sid1, sid2, corr)`` for every pair present in it. Lemma 1 in its
    weighted-delta form (DESIGN.md §3).
    """
    gram, den = series_terms(series_stats)
    pcs = pair_stats.groupBy("sid1", "sid2").agg(
        F.sum(F.col("b") * F.col("pc")).alias("num_pc")
    )
    den1 = den.select(F.col("sid").alias("sid1"), F.col("den").alias("den1"))
    den2 = den.select(F.col("sid").alias("sid2"), F.col("den").alias("den2"))
    return (
        pcs.join(gram, ["sid1", "sid2"])
        .join(den1, "sid1")
        .join(den2, "sid2")
        .select(
            "sid1",
            "sid2",
            # try_divide: a constant (den = 0) series has undefined
            # correlation -> NULL, matching SQL corr() semantics under
            # Spark 4's ANSI mode instead of DIVIDE_BY_ZERO.
            F.try_divide(
                F.col("num_pc") + F.col("dd"),
                F.sqrt(F.col("den1") * F.col("den2")),
            ).alias("corr"),
        )
    )


def query_aligned(
    series_stats: DataFrame,
    pair_stats: DataFrame,
    wid_lo: int,
    wid_hi: int,
) -> DataFrame:
    """Network-Construct-Histo correlation matrix on an aligned wid range."""
    return correlation_matrix(
        select_wids(series_stats, wid_lo, wid_hi),
        select_wids(pair_stats, wid_lo, wid_hi),
    )
