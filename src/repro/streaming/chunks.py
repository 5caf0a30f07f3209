"""Chunked arrival of real-time data for the Structured Streaming source.

The paper's real-time model (§3.1.2, Algorithm 3) ingests raw data "in
chunks of size B" — the algorithm waits until all B new points arrive.
We materialize that arrival process as a directory of Parquet files, one
file per basic window, each holding the long rows ``(sid, t, v)`` of that
window for all series. A Structured Streaming file source then replays the
directory (one micro-batch per trigger with ``maxFilesPerTrigger=1``, or
all-at-once with ``availableNow``).
"""
from __future__ import annotations

from pathlib import Path

import numpy as np
import pandas as pd
import pyarrow as pa
import pyarrow.parquet as pq

STREAM_SCHEMA = "sid INT, t BIGINT, v DOUBLE"


def write_chunks(
    panel: np.ndarray, B: int, out_dir: str | Path, *, t0: int = 0
) -> list[Path]:
    """Split ``panel[:, :]`` into B-sized chunk files named in arrival order.

    ``t0`` is the absolute timestamp of the panel's first column, so a
    warmup prefix can be materialized separately from the streamed suffix.
    Returns the written paths (lexicographic order == arrival order).
    """
    out = Path(out_dir)
    out.mkdir(parents=True, exist_ok=True)
    n, L = panel.shape
    paths = []
    for k, a in enumerate(range(0, L, B)):
        b = min(a + B, L)
        pdf = pd.DataFrame(
            {
                "sid": np.repeat(np.arange(n, dtype=np.int32), b - a),
                "t": np.tile(np.arange(t0 + a, t0 + b, dtype=np.int64), n),
                "v": panel[:, a:b].reshape(-1),
            }
        )
        p = out / f"chunk-{k:06d}.parquet"
        pq.write_table(pa.Table.from_pandas(pdf, preserve_index=False), p)
        paths.append(p)
    return paths
