"""Shared measurement helpers for the figure-table harnesses.

Each ``run_*`` function in `fig5`/`fig6` executes one sweep of the paper's
evaluation and returns rows as ``list[dict]`` — the jobs print them, the
benchmarks assert on them, EXPERIMENTS.md records them next to the paper's
curves. Timings are wall-clock around materializing Spark actions; Spark's
lazy evaluation means "sketch time" is measured by forcing the sketch
DataFrames (cache + count), mirroring how the paper's sketch phase runs to
completion before queries.
"""
from __future__ import annotations

import time
from contextlib import contextmanager

from pyspark.sql import DataFrame


@contextmanager
def timer():
    """``with timer() as t: ...; t()`` -> elapsed seconds."""
    t0 = time.perf_counter()
    yield lambda: time.perf_counter() - t0


def materialize(df: DataFrame) -> tuple[DataFrame, float]:
    """Force a DataFrame's computation; return (cached df, seconds)."""
    t0 = time.perf_counter()
    out = df.cache()
    out.count()
    return out, time.perf_counter() - t0


def collect_timed(df: DataFrame):
    """Collect to pandas with timing; returns (pdf, seconds)."""
    t0 = time.perf_counter()
    pdf = df.toPandas()
    return pdf, time.perf_counter() - t0


def print_table(title: str, rows: list[dict]) -> None:
    """Render rows as a fixed-width table on stdout (job output format)."""
    print(f"\n== {title} ==")
    if not rows:
        print("(no rows)")
        return
    cols = list(rows[0].keys())
    widths = {
        c: max(len(c), *(len(_fmt(r[c])) for r in rows)) for c in cols
    }
    print("  ".join(c.ljust(widths[c]) for c in cols))
    for r in rows:
        print("  ".join(_fmt(r[c]).ljust(widths[c]) for c in cols))


def _fmt(v) -> str:
    if isinstance(v, float):
        return f"{v:.4f}"
    return str(v)
