"""Disk-based sketch store (§3.4). Paper: PostgreSQL; ours: Parquet.

The disk-based TSUBASA persists sketches at ingestion and reads them back
at query time. The container has no database server, so the store is a
Parquet directory tree — Spark's native durable columnar store — which
preserves the design point the paper measures: sketch *write* time vs
compute time (Fig. 6a), *read* time vs matrix-calculation time (Fig. 6b),
and on-disk size vs basic window size (Fig. 6d). Writes go through a
single output commit (the analogue of the paper's one database worker).

Layout under ``root/``:

    series/   — (sid, wid, b, mu, sigma)
    pairs/    — (sid1, sid2, wid, pc)       exact sketch
    dists/    — (sid1, sid2, wid, d2)       approximate sketch
"""
from __future__ import annotations

import os
import time
from dataclasses import dataclass
from pathlib import Path

from pyspark.sql import DataFrame, SparkSession


@dataclass
class WriteReport:
    """Timing + size of one sketch persistence run."""

    seconds: float
    bytes: int


def _dir_bytes(path: str | Path) -> int:
    total = 0
    for dirpath, _dirnames, filenames in os.walk(path):
        for f in filenames:
            total += os.path.getsize(os.path.join(dirpath, f))
    return total


class SketchStore:
    """Parquet-backed sketch persistence with timed write/read."""

    def __init__(self, root: str | Path):
        self.root = Path(root)

    def _path(self, table: str) -> str:
        return str(self.root / table)

    def write(self, df: DataFrame, table: str) -> WriteReport:
        """Persist one sketch table; returns wall time and bytes written."""
        t0 = time.perf_counter()
        df.write.mode("overwrite").parquet(self._path(table))
        dt = time.perf_counter() - t0
        return WriteReport(dt, _dir_bytes(self._path(table)))

    def read(self, spark: SparkSession, table: str) -> DataFrame:
        """Load one sketch table (lazy — reading cost is paid at action time)."""
        return spark.read.parquet(self._path(table))

    def read_timed(self, spark: SparkSession, table: str) -> tuple[DataFrame, float]:
        """Load and materialize a sketch table, returning (cached df, seconds)."""
        t0 = time.perf_counter()
        df = spark.read.parquet(self._path(table)).cache()
        df.count()
        return df, time.perf_counter() - t0

    def size_bytes(self, table: str | None = None) -> int:
        """On-disk size of one table, or of the whole store (Fig. 6d)."""
        return _dir_bytes(self._path(table) if table else self.root)
