"""Parallel + disk-based experiments of §4.3 (Figures 6a–6d as tables).

The paper runs Go workers + PostgreSQL on 64 cores over Berkeley Earth
subsets (B=120, query window 960, 75% DFT coefficients). Our substitution:
Spark tasks + a Parquet sketch store on 16 cores over the Berkeley-like
synthetic substrate, same B/qw/coefficient parameters, N swept over
laptop-scale subsets. Shapes compared, not absolute seconds.
"""
from __future__ import annotations

from pathlib import Path

from pyspark.sql import SparkSession

from repro.approx import query_spark as aquery
from repro.approx import sketch_spark as asketch
from repro.core import query_spark, sketch_spark
from repro.data import climate
from repro.experiments.harness import collect_timed, materialize
from repro.storage.sketch_store import SketchStore

B_DEFAULT = 120
QW_DEFAULT = 960
COEFF_FRAC = 0.75


def _warmup(spark: SparkSession, seed: int = 0) -> None:
    """Untimed mini-round so JVM/Arrow warmup doesn't land on the first row."""
    panel = climate.berkeley_like(20, 240, seed=seed)
    df, _ = materialize(climate.long_df(spark, panel))
    ss, _ = materialize(sketch_spark.series_sketch(df, B_DEFAULT))
    ps, _ = materialize(sketch_spark.pair_sketch(df, B_DEFAULT))
    query_spark.query_aligned(ss, ps, 0, 1).toPandas()
    for d in (df, ss, ps):
        d.unpersist()


def run_fig6a(
    spark: SparkSession,
    store_root: str | Path,
    *,
    series_counts: tuple[int, ...] = (50, 100, 200, 400),
    length: int = QW_DEFAULT,
    B: int = B_DEFAULT,
    seed: int = 11,
) -> list[dict]:
    """Sketch-time breakdown (compute vs store write) vs N (Fig. 6a)."""
    _warmup(spark)
    rows = []
    for n in series_counts:
        panel = climate.berkeley_like(n, length, seed=seed)
        df, _ = materialize(climate.long_df(spark, panel))
        store = SketchStore(Path(store_root) / f"fig6a-n{n}")

        ss, t_c1 = materialize(sketch_spark.series_sketch(df, B))
        ps, t_c2 = materialize(sketch_spark.pair_sketch(df, B))
        w1 = store.write(ss, "series")
        w2 = store.write(ps, "pairs")

        n_coeffs = max(1, int(COEFF_FRAC * B))
        pda, t_a = materialize(asketch.pair_dist_sketch(df, B, n_coeffs))
        w3 = store.write(pda, "dists")

        rows.append(
            {
                "n_series": n,
                "tsubasa_calc_s": t_c1 + t_c2,
                "tsubasa_write_s": w1.seconds + w2.seconds,
                "tsubasa_total_s": t_c1 + t_c2 + w1.seconds + w2.seconds,
                "dft_calc_s": t_c1 + t_a,
                "dft_write_s": w1.seconds + w3.seconds,
                "dft_total_s": t_c1 + t_a + w1.seconds + w3.seconds,
            }
        )
        for d in (df, ss, ps, pda):
            d.unpersist()
    return rows


def run_fig6b(
    spark: SparkSession,
    store_root: str | Path,
    *,
    series_counts: tuple[int, ...] = (50, 100, 200, 400),
    length: int = QW_DEFAULT,
    B: int = B_DEFAULT,
    seed: int = 11,
) -> list[dict]:
    """Query-time breakdown (store read vs matrix calc) vs N (Fig. 6b).

    Requires the stores written by ``run_fig6a`` under the same root.
    """
    n_windows = QW_DEFAULT // B
    rows = []
    for n in series_counts:
        store = SketchStore(Path(store_root) / f"fig6a-n{n}")
        ss, t_r1 = store.read_timed(spark, "series")
        ps, t_r2 = store.read_timed(spark, "pairs")
        _, t_m = collect_timed(query_spark.query_aligned(ss, ps, 0, n_windows - 1))

        pda, t_r3 = store.read_timed(spark, "dists")
        _, t_ma = collect_timed(aquery.query_approx(ss, pda, 0, n_windows - 1))

        rows.append(
            {
                "n_series": n,
                "tsubasa_read_s": t_r1 + t_r2,
                "tsubasa_matrix_s": t_m,
                "tsubasa_total_s": t_r1 + t_r2 + t_m,
                "dft_read_s": t_r1 + t_r3,
                "dft_matrix_s": t_ma,
                "dft_total_s": t_r1 + t_r3 + t_ma,
            }
        )
        for d in (ss, ps, pda):
            d.unpersist()
    return rows


def run_fig6c(
    spark: SparkSession,
    *,
    n_series: int = 400,
    length: int = 2400,
    B: int = B_DEFAULT,
    partition_counts: tuple[int, ...] = (1, 2, 4, 8, 16),
    seed: int = 11,
) -> list[dict]:
    """Impact of parallelism on sketch and matrix time (Fig. 6c).

    The paper sweeps worker counts on one machine; the Spark analogue is
    the number of shuffle/input partitions available to the same plan
    (tasks are the workers). ``spark.sql.shuffle.partitions`` is a runtime
    conf, restored afterwards.
    """
    panel = climate.berkeley_like(n_series, length, seed=seed)
    n_windows = length // B
    _warmup(spark)
    prev = spark.conf.get("spark.sql.shuffle.partitions")
    rows = []
    try:
        for parts in partition_counts:
            spark.conf.set("spark.sql.shuffle.partitions", str(parts))
            df, _ = materialize(climate.long_df(spark, panel, partitions=parts))
            ss, t_s1 = materialize(sketch_spark.series_sketch(df, B))
            ps, t_s2 = materialize(sketch_spark.pair_sketch(df, B))
            _, t_q = collect_timed(
                query_spark.query_aligned(ss, ps, 0, n_windows - 1)
            )
            rows.append(
                {
                    "partitions": parts,
                    "sketch_s": t_s1 + t_s2,
                    "matrix_s": t_q,
                }
            )
            for d in (df, ss, ps):
                d.unpersist()
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", prev)
    return rows


def run_fig6d(
    spark: SparkSession,
    store_root: str | Path,
    *,
    n_series: int = 200,
    length: int = 3600,
    basic_windows: tuple[int, ...] = (60, 120, 240, 480),
    seed: int = 11,
) -> list[dict]:
    """Sketch-store size on disk vs basic window size (Fig. 6d).

    Both algorithms store the same per-window row volume, so a single
    sweep per algorithm family; size decreases as B grows (fewer windows).
    """
    panel = climate.berkeley_like(n_series, length, seed=seed)
    df, _ = materialize(climate.long_df(spark, panel))
    n_coeffs_frac = COEFF_FRAC
    rows = []
    for B in basic_windows:
        store = SketchStore(Path(store_root) / f"fig6d-b{B}")
        ss, ps = sketch_spark.sketch(df, B)
        store.write(ss, "series")
        store.write(ps, "pairs")
        tsubasa_bytes = store.size_bytes("series") + store.size_bytes("pairs")
        pda = asketch.pair_dist_sketch(df, B, max(1, int(n_coeffs_frac * B)))
        store.write(pda, "dists")
        dft_bytes = store.size_bytes("series") + store.size_bytes("dists")
        rows.append(
            {
                "B": B,
                "n_windows": length // B,
                "tsubasa_store_mb": tsubasa_bytes / 1e6,
                "dft_store_mb": dft_bytes / 1e6,
            }
        )
    df.unpersist()
    return rows
