"""Algorithm-1 Spark sketching tests, oracle-checked against DuckDB."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core import lemma1, sketch_spark
from repro.oracle import assert_equivalent
from tests.conftest import B_TEST, L_TEST, N_TEST


class TestWithWid:
    def test_wid_assignment(self, spark, df_raw):
        got = sketch_spark.with_wid(df_raw, 50).filter(F.col("sid") == 0)
        pdf = got.select("t", "wid").toPandas()
        assert (pdf["wid"] == pdf["t"] // 50).all()


class TestSeriesSketch:
    def test_against_duckdb(self, spark, df_raw, long_pdf):
        """Window stats == DuckDB group-by aggregation (the oracle check)."""
        got = sketch_spark.series_sketch(df_raw, B_TEST)
        assert_equivalent(
            got,
            f"""
            SELECT sid,
                   CAST(t // {B_TEST} AS INT) AS wid,  -- // floors; / would round
                   CAST(count(*) AS INT) AS b,
                   avg(v) AS mu,
                   stddev_pop(v) AS sigma
            FROM vals GROUP BY 1, 2
            """,
            vals=long_pdf,
        )

    def test_row_count(self, df_raw):
        got = sketch_spark.series_sketch(df_raw, B_TEST)
        assert got.count() == N_TEST * (L_TEST // B_TEST)

    def test_ragged_final_window(self, spark, panel):
        """L=130, B=50 -> windows of size 50, 50, 30 carried in b."""
        from repro.data import climate

        df = climate.long_df(spark, panel[:, :130])
        got = sketch_spark.series_sketch(df, 50).filter(F.col("sid") == 0)
        sizes = {r.wid: r.b for r in got.collect()}
        assert sizes == {0: 50, 1: 50, 2: 30}

    def test_matches_numpy_kernel(self, df_raw, panel):
        ss = sketch_spark.series_sketch(df_raw, B_TEST).toPandas()
        for sid in range(3):
            _, mu, sig = lemma1.window_stats(panel[sid], B_TEST)
            sub = ss[ss.sid == sid].sort_values("wid")
            np.testing.assert_allclose(sub["mu"], mu, atol=1e-10)
            np.testing.assert_allclose(sub["sigma"], sig, atol=1e-10)


class TestPairSketch:
    def test_matches_numpy_kernel(self, sketches, panel):
        """pc == sigma_x sigma_y c_j for every pair and window."""
        _, ps = sketches
        pdf = ps.toPandas()
        assert len(pdf) == (N_TEST * (N_TEST - 1) // 2) * (L_TEST // B_TEST)
        for _, r in pdf.sample(80, random_state=0).iterrows():
            a, b = B_TEST * int(r.wid), B_TEST * (int(r.wid) + 1)
            x, y = panel[int(r.sid1), a:b], panel[int(r.sid2), a:b]
            expect = x.std() * y.std() * np.corrcoef(x, y)[0, 1]
            assert r.pc == pytest.approx(expect, abs=1e-10)

    def test_sid_ordering(self, sketches):
        _, ps = sketches
        assert ps.filter(F.col("sid1") >= F.col("sid2")).count() == 0

    def test_against_duckdb_covariance(self, spark, sketches, long_pdf):
        """pc is the per-window population covariance — oracle-checked."""
        _, ps = sketches
        assert_equivalent(
            ps,
            f"""
            SELECT a.sid AS sid1, b.sid AS sid2,
                   CAST(a.t // {B_TEST} AS INT) AS wid,
                   CAST(count(*) AS INT) AS b,
                   covar_pop(a.v, b.v) AS pc
            FROM vals a JOIN vals b ON a.t = b.t AND a.sid < b.sid
            GROUP BY 1, 2, 3
            """,
            vals=long_pdf,
        )

    def test_single_series_window_emits_nothing(self, spark):
        import pandas as pd

        df = spark.createDataFrame(
            pd.DataFrame({"sid": [0] * 10, "t": range(10), "v": np.random.rand(10)})
        )
        assert sketch_spark.pair_sketch(df, 5).count() == 0
