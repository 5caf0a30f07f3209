"""Streaming sketch maintenance via incremental windowed aggregation.

The distributed-dataflow counterpart of Algorithm 1 for real-time data:
per-series basic-window statistics are maintained by Structured Streaming's
**stateful windowed aggregation** — ``groupBy(sid, wid)`` over the stream
with sufficient statistics (count, Σv, Σv²). Each micro-batch folds only
the rows it observed into the state store; a basic window split across
micro-batches still converges to the exact (b, mu, sigma) sketch once its
last row arrives. The sink runs in *complete* mode into an in-memory table
(the memory sink replaces the table per batch, so the final table is the
final aggregation state — deterministic regardless of batch boundaries),
which then feeds the same Lemma-1 query layer as the batch path.

This demonstrates sketch maintenance with state beyond driver structures
(the running sums live in the Spark state store keyed by (sid, wid)); the
pairwise ``pc``/network maintenance for interactive N lives in
`streaming.realtime`.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.streaming import StreamingQuery

from repro.streaming.chunks import STREAM_SCHEMA


def start_series_sketch_stream(
    spark: SparkSession,
    chunk_dir: str,
    B: int,
    *,
    query_name: str = "series_sketch_stream",
    available_now: bool = True,
    max_files_per_trigger: int = 1,
) -> StreamingQuery:
    """Maintain per-(sid, wid) sufficient statistics over the chunk stream."""
    stream = (
        spark.readStream.schema(STREAM_SCHEMA)
        .option("maxFilesPerTrigger", max_files_per_trigger)
        .parquet(chunk_dir)
    )
    agg = (
        stream.withColumn("wid", F.floor(F.col("t") / F.lit(B)).cast("int"))
        .groupBy("sid", "wid")
        .agg(
            F.count("v").cast("int").alias("b"),
            F.sum("v").alias("s1"),
            F.sum(F.col("v") * F.col("v")).alias("s2"),
        )
    )
    return (
        agg.writeStream.outputMode("complete")
        .format("memory")
        .queryName(query_name)
        .trigger(availableNow=available_now)
        .start()
    )


def finalize_series_sketch(
    spark: SparkSession, query_name: str = "series_sketch_stream"
) -> DataFrame:
    """Convert the sink's sufficient statistics to the (b, mu, sigma) layout
    of `core.sketch_spark.series_sketch`."""
    rows = spark.table(query_name)
    mu = F.col("s1") / F.col("b")
    var = F.greatest(F.col("s2") / F.col("b") - mu * mu, F.lit(0.0))
    return rows.select(
        "sid", "wid", "b", mu.alias("mu"), F.sqrt(var).alias("sigma")
    )
