"""Algorithm 1 on Spark: one-pass basic-window sketching.

Input is the canonical long table ``(sid INT, t BIGINT, v DOUBLE)``. Two
sketch tables come out:

- ``series_sketch``: per (sid, wid) — window size ``b``, mean ``mu``,
  population std ``sigma``. A plain Catalyst ``groupBy`` aggregation.
- ``pair_sketch``: per (sid1 < sid2, wid) — ``pc = sigma_x sigma_y c_j``
  (the exact product Lemma 1 consumes). Computed with ``applyInPandas``
  grouped **by wid**: each task gets one window's N×b value matrix and
  emits all pairs via one vectorized covariance matmul. Partitioning by
  window is the Spark-native counterpart of the paper's pair-block
  partitioning (§3.4): every window's pair block is independent, the
  shuffle moves N·L raw values rather than N²·L pair-expanded ones, and
  Catalyst parallelizes the blocks across cores.

All sketching is a single pass over the data, O(L·N) for series stats and
O(L·N²) for pair products — matching §3.3's sketch complexity.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

SERIES_SKETCH_SCHEMA = "sid int, wid int, b int, mu double, sigma double"
PAIR_SKETCH_SCHEMA = "sid1 int, sid2 int, wid int, b int, pc double"


def with_wid(df: DataFrame, B: int) -> DataFrame:
    """Attach the basic-window id column ``wid = floor(t / B)``."""
    return df.withColumn("wid", F.floor(F.col("t") / F.lit(B)).cast("int"))


def series_sketch(df: DataFrame, B: int) -> DataFrame:
    """Per-series basic-window statistics — Algorithm 1 line 6.

    ``stddev_pop`` (population) matches the math of Lemma 1; the last
    window may be ragged and its true size is carried in ``b``.
    """
    return (
        with_wid(df, B)
        .groupBy("sid", "wid")
        .agg(
            F.count("v").cast("int").alias("b"),
            F.avg("v").alias("mu"),
            F.coalesce(F.stddev_pop("v"), F.lit(0.0)).alias("sigma"),
        )
    )


def _pair_block(pdf: pd.DataFrame) -> pd.DataFrame:
    """All-pair window products for one basic window (runs on executors)."""
    wid = int(pdf["wid"].iloc[0])
    pdf = pdf.sort_values(["sid", "t"])
    sids = pdf["sid"].unique()
    n = len(sids)
    if n < 2:
        return pd.DataFrame(columns=["sid1", "sid2", "wid", "b", "pc"]).astype(
            {"sid1": "int32", "sid2": "int32", "wid": "int32", "b": "int32",
             "pc": "float64"}
        )
    b = len(pdf) // n
    v = pdf["v"].to_numpy(dtype=np.float64).reshape(n, b)
    centered = v - v.mean(axis=1, keepdims=True)
    cov = centered @ centered.T / b  # pc_ij = sigma_i sigma_j c_ij
    iu, ju = np.triu_indices(n, k=1)
    return pd.DataFrame(
        {
            "sid1": sids[iu].astype("int32"),
            "sid2": sids[ju].astype("int32"),
            "wid": np.full(len(iu), wid, dtype="int32"),
            "b": np.full(len(iu), b, dtype="int32"),
            "pc": cov[iu, ju],
        }
    )


def pair_sketch(df: DataFrame, B: int) -> DataFrame:
    """Per-pair per-window products ``pc = sigma_x sigma_y c_j`` (Alg. 1 line 7).

    Requires aligned series (every sid present at every t of the window) —
    guaranteed by the synchronized-series assumption of §2.1.
    """
    return with_wid(df, B).groupBy("wid").applyInPandas(_pair_block, PAIR_SKETCH_SCHEMA)


def sketch(df: DataFrame, B: int) -> tuple[DataFrame, DataFrame]:
    """Full Algorithm 1: (series_sketch, pair_sketch) for basic window B."""
    return series_sketch(df, B), pair_sketch(df, B)
