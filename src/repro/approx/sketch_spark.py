"""DFT-approximation sketching on Spark (Algorithm 1 lines 8–10).

Same dataflow as the exact sketch (`core.sketch_spark`) — per-series stats
via Catalyst ``groupBy``, per-pair per-window values via ``applyInPandas``
grouped by wid — but the pair table stores the squared distance ``d2`` of
the first ``n`` DFT coefficients of the unit-normalized windows, computed
with the **naive O(B²) transform** the paper costs (`approx.dft`).

``per_pair_dft=True`` recomputes DFTs inside the pair loop (the paper's
O(L²N²) sketch accounting); the default shares one DFT per series per
window, a strictly stronger competitor — EXPERIMENTS.md reports both.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.approx import dft
from repro.core.sketch_spark import series_sketch, with_wid  # noqa: F401 (re-export)

PAIR_DIST_SCHEMA = "sid1 int, sid2 int, wid int, b int, ss double, d2 double"


def _make_pair_dist_block(n_coeffs: int, per_pair_dft: bool):
    def _block(pdf: pd.DataFrame) -> pd.DataFrame:
        wid = int(pdf["wid"].iloc[0])
        pdf = pdf.sort_values(["sid", "t"])
        sids = pdf["sid"].unique()
        n = len(sids)
        if n < 2:
            return pd.DataFrame(
                columns=["sid1", "sid2", "wid", "b", "ss", "d2"]
            ).astype(
                {"sid1": "int32", "sid2": "int32", "wid": "int32", "b": "int32",
                 "ss": "float64", "d2": "float64"}
            )
        b = len(pdf) // n
        v = pdf["v"].to_numpy(dtype=np.float64).reshape(n, b)
        iu, ju = np.triu_indices(n, k=1)
        pairs = np.stack([iu, ju], axis=1)
        d2 = dft.per_pair_window_d2(v, pairs, n_coeffs, per_pair_dft=per_pair_dft)
        # ss = sigma_x sigma_y, stored alongside d2 so Eq. 5's query needs
        # no join back to the series sketch (same O(1)-per-row space).
        sig = v.std(axis=1)
        return pd.DataFrame(
            {
                "sid1": sids[iu].astype("int32"),
                "sid2": sids[ju].astype("int32"),
                "wid": np.full(len(iu), wid, dtype="int32"),
                "b": np.full(len(iu), b, dtype="int32"),
                "ss": sig[iu] * sig[ju],
                "d2": d2,
            }
        )

    return _block


def pair_dist_sketch(
    df: DataFrame, B: int, n_coeffs: int, *, per_pair_dft: bool = False
) -> DataFrame:
    """Per-pair per-window truncated-DFT squared distances ``d2``."""
    return (
        with_wid(df, B)
        .groupBy("wid")
        .applyInPandas(_make_pair_dist_block(n_coeffs, per_pair_dft), PAIR_DIST_SCHEMA)
    )


def sketch_approx(
    df: DataFrame, B: int, n_coeffs: int, *, per_pair_dft: bool = False
) -> tuple[DataFrame, DataFrame]:
    """Full approximate sketch: (series_sketch, pair_dist_sketch)."""
    return (
        series_sketch(df, B),
        pair_dist_sketch(df, B, n_coeffs, per_pair_dft=per_pair_dft),
    )
