"""Algorithm 3 on Structured Streaming: real-time network maintenance.

The query ``w = ("now", m)`` keeps the correlation matrix of the last
``m = n_s · B`` observed points. Dataflow:

- a **file-source stream** replays basic-window chunk files
  (`streaming.chunks`);
- ``foreachBatch`` receives each micro-batch, buffers rows until a full
  basic window (all N series × B timestamps) is complete, sketches it with
  the shared window kernel, and
- applies **Lemma 2** to slide the maintained state — O(N²) work per
  arrived window, never rescanning the m-point history.

The maintained state (per-pair correlation + per-window stats deque) lives
in the driver: for climate-network N (157 … a few thousand) it is a small
dense matrix, which is exactly the paper's in-memory real-time setting.
The per-window sketching itself is the same vectorized kernel the batch
layer distributes; ``sketch_stream.py`` shows the fully-distributed
incremental-aggregation variant for the per-series stats.

``mode="approx"`` maintains the DFT-approximate matrix instead (Eq. 6),
paying the O(B²)-per-series (or per-pair) DFT cost each update — the
Fig. 5d comparison.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.approx import incremental as approx_inc
from repro.core import lemma2
from repro.streaming.chunks import STREAM_SCHEMA


@dataclass
class UpdateRecord:
    """Per-arrived-window bookkeeping for the benchmarks."""

    wid: int
    seconds: float


@dataclass
class RealtimeNetwork:
    """Algorithm 3 driver state: seeds on warmup, slides per Lemma 2/Eq. 6."""

    n_series: int
    B: int
    n_windows: int  # n_s — query window is n_s basic windows
    mode: str = "exact"  # or "approx"
    n_coeffs: int | None = None  # approx mode: DFT coefficients kept
    per_pair_dft: bool = False  # approx mode: paper-accounting DFT cost

    state: lemma2.SlidingState | None = None
    pending: dict[int, pd.DataFrame] = field(default_factory=dict)
    next_t: int = 0  # next timestamp expected to complete
    updates: list[UpdateRecord] = field(default_factory=list)

    def _entry(self, values: np.ndarray, pairs: np.ndarray) -> lemma2.WindowEntry:
        if self.mode == "exact":
            return lemma2.window_entry(values, pairs)
        return approx_inc.window_entry_approx(
            values, pairs, self.n_coeffs or self.B, per_pair_dft=self.per_pair_dft
        )

    def ingest_rows(self, rows: pd.DataFrame) -> None:
        """Buffer arriving (sid, t, v) rows; fold each completed basic window.

        Handles batches that split or merge basic windows arbitrarily —
        Algorithm 3's "wait until all B new data points arrive".
        """
        if len(rows) == 0:
            return
        rows = rows.copy()
        rows["wid"] = rows["t"] // self.B
        for wid, grp in rows.groupby("wid"):
            buf = self.pending.get(wid)
            self.pending[wid] = pd.concat([buf, grp]) if buf is not None else grp
        self._drain()

    def _drain(self) -> None:
        expect = self.n_series * self.B
        while True:
            wid = self.next_t // self.B
            buf = self.pending.get(wid)
            if buf is None or len(buf) < expect:
                return
            buf = buf.sort_values(["sid", "t"])
            values = buf["v"].to_numpy(np.float64).reshape(self.n_series, self.B)
            del self.pending[wid]
            self.next_t += self.B
            self._fold(wid, values)

    def _fold(self, wid: int, values: np.ndarray) -> None:
        t0 = time.perf_counter()
        pairs = (
            self.state.pairs if self.state is not None else lemma2.all_pairs(self.n_series)
        )
        entry = self._entry(values, pairs)
        if self.state is None:
            self.state = lemma2.SlidingState(
                pairs, np.full(len(pairs), np.nan), np.zeros(self.n_series), [entry]
            )
        elif len(self.state.windows) < self.n_windows:
            self.state = lemma2._state_from_entries(
                pairs, self.state.windows + [entry]
            )
        else:
            lemma2.update(self.state, entry)  # the O(1)-per-pair slide
        self.updates.append(UpdateRecord(wid, time.perf_counter() - t0))

    @property
    def warm(self) -> bool:
        """True once the full n_s-window query window has been observed."""
        return self.state is not None and len(self.state.windows) == self.n_windows

    def correlations(self) -> pd.DataFrame:
        """Current matrix as (sid1, sid2, corr) rows."""
        if self.state is None:
            return pd.DataFrame(columns=["sid1", "sid2", "corr"])
        if len(self.state.windows) < self.n_windows:
            st = lemma2._state_from_entries(self.state.pairs, self.state.windows)
        else:
            st = self.state
        return pd.DataFrame(
            {
                "sid1": st.pairs[:, 0],
                "sid2": st.pairs[:, 1],
                "corr": st.corr,
            }
        )

    def edges(self, theta: float) -> pd.DataFrame:
        """Current network edges (corr > θ)."""
        c = self.correlations()
        return c[c["corr"] > theta].reset_index(drop=True)


def run_file_stream(
    spark: SparkSession,
    chunk_dir: str,
    net: RealtimeNetwork,
    *,
    available_now: bool = True,
    max_files_per_trigger: int = 1,
) -> None:
    """Drive a RealtimeNetwork from a chunk directory via a file stream.

    ``availableNow`` drains everything currently in the directory and stops
    — the deterministic mode tests and benchmarks use. The foreachBatch
    sink hands each micro-batch's rows to ``net.ingest_rows``.
    """
    stream = (
        spark.readStream.schema(STREAM_SCHEMA)
        .option("maxFilesPerTrigger", max_files_per_trigger)
        .parquet(chunk_dir)
    )

    def on_batch(batch_df: DataFrame, _batch_id: int) -> None:
        net.ingest_rows(batch_df.toPandas())

    writer = stream.writeStream.foreachBatch(on_batch)
    if available_now:
        q = writer.trigger(availableNow=True).start()
        q.awaitTermination()
    else:  # pragma: no cover - interactive mode
        writer.start()
