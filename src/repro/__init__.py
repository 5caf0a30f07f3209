"""TSUBASA (SIGMOD 2022) reproduction on PySpark.

Subpackages:

- ``repro.core``      — the paper's contribution: basic-window sketches,
  exact Lemma-1 recombination, Lemma-2 incremental updates, networks,
  correlation-inference pruning.
- ``repro.approx``    — the StatStream-style DFT approximation competitor.
- ``repro.baseline``  — raw-data Pearson baseline.
- ``repro.data``      — synthetic climate substrates (NCEA / Berkeley-like).
- ``repro.storage``   — disk-based (Parquet) sketch store.
- ``repro.streaming`` — Structured Streaming real-time maintenance.
"""

__all__ = ["core", "approx", "baseline", "data", "storage", "streaming"]
