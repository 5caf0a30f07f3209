"""Arbitrary query windows on Spark (§3.1.1, the κ/χ construction).

A query window ``[start, end)`` that is not aligned to basic windows is
decomposed (``core.windows.decompose``) into a partial head, interior full
windows, and a partial tail. Interior stats come from the pre-computed
sketches; the two partial pieces are sketched **from raw data at query
time** with the same Algorithm-1 kernels, assigned pseudo window ids (−1,
−2) and unioned in. Lemma 1's weighted form then recombines the unequal
pieces exactly — this is the capability the basic-window baselines lack.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import query_spark, sketch_spark
from repro.core.windows import Piece, decompose

HEAD_WID = -1
TAIL_WID = -2


def _piece_stats(
    df_raw: DataFrame, piece: Piece, pseudo_wid: int
) -> tuple[DataFrame, DataFrame]:
    """Sketch one partial basic window from raw data under a pseudo wid."""
    sub = df_raw.filter((F.col("t") >= piece.start) & (F.col("t") < piece.end))
    # Window size = the piece length, so wid assignment inside the piece is
    # constant; shift t so the piece is its own window 0, then relabel.
    shifted = sub.withColumn("t", F.col("t") - F.lit(piece.start))
    s = sketch_spark.series_sketch(shifted, piece.size).withColumn(
        "wid", F.lit(pseudo_wid).cast("int")
    )
    p = sketch_spark.pair_sketch(shifted, piece.size).withColumn(
        "wid", F.lit(pseudo_wid).cast("int")
    )
    return s, p


def query_arbitrary(
    df_raw: DataFrame,
    series_stats: DataFrame,
    pair_stats: DataFrame,
    start: int,
    end: int,
    B: int,
) -> DataFrame:
    """Exact correlation matrix on an arbitrary ``[start, end)`` window.

    Touches raw data only for the (at most two) partial edge windows —
    O(B·N²) extra work per §3.3's generic-case analysis — and answers the
    interior from sketches.
    """
    d = decompose(start, end, B)
    s_parts, p_parts = [], []
    if len(d.interior) > 0:
        s_parts.append(
            query_spark.select_wids(series_stats, d.interior.start, d.interior.stop - 1)
        )
        p_parts.append(
            query_spark.select_wids(pair_stats, d.interior.start, d.interior.stop - 1)
        )
    for piece, pseudo in ((d.head, HEAD_WID), (d.tail, TAIL_WID)):
        if piece is not None:
            s, p = _piece_stats(df_raw, piece, pseudo)
            s_parts.append(s)
            p_parts.append(p)
    s_all = s_parts[0]
    for part in s_parts[1:]:
        s_all = s_all.unionByName(part)
    p_all = p_parts[0]
    for part in p_parts[1:]:
        p_all = p_all.unionByName(part)
    return query_spark.correlation_matrix(s_all, p_all)
