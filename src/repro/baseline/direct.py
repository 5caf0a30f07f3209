"""The paper's baseline: Pearson's correlation from raw data at query time.

No sketches — every query scans the raw values of the window for every
pair (Eq. 1), which is the O(l*·N²) comparator of §3.3 and the "two orders
of magnitude" line in Figs. 5c. Implemented the Spark-native way the paper's
description implies: a self-join of the long table on timestamp so each
pair's raw sequences are co-located, then one Catalyst aggregation
computing the correlation from sufficient statistics (``corr`` aggregate).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def query_baseline(df_raw: DataFrame, start: int, end: int) -> DataFrame:
    """All-pair Pearson correlations on ``[start, end)`` from raw data.

    Self-join on ``t`` restricted to ``sid1 < sid2`` — the shuffle carries
    the full N(N-1)/2 × window-length pair expansion, which is exactly the
    cost the sketch-based query avoids.
    """
    w = df_raw.filter((F.col("t") >= start) & (F.col("t") < end))
    a = w.select(F.col("sid").alias("sid1"), "t", F.col("v").alias("v1"))
    b = w.select(F.col("sid").alias("sid2"), "t", F.col("v").alias("v2"))
    joined = a.join(b, "t").filter(F.col("sid1") < F.col("sid2"))
    return joined.groupBy("sid1", "sid2").agg(F.corr("v1", "v2").alias("corr"))


def panel_corr(panel: np.ndarray, start: int, end: int) -> np.ndarray:
    """Numpy reference: full correlation matrix of panel[:, start:end]."""
    return np.corrcoef(panel[:, start:end])
