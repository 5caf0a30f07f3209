"""Raw-data baseline tests (Eq. 1 at query time)."""
import numpy as np
import pytest

from repro.baseline import direct
from repro.oracle import assert_equivalent


class TestQueryBaseline:
    @pytest.mark.parametrize("start,end", [(0, 600), (100, 500), (137, 583), (0, 50)])
    def test_against_duckdb(self, spark, df_raw, long_pdf, start, end):
        got = direct.query_baseline(df_raw, start, end)
        assert_equivalent(
            got,
            f"""
            SELECT a.sid AS sid1, b.sid AS sid2, corr(a.v, b.v) AS corr
            FROM vals a JOIN vals b ON a.t = b.t AND a.sid < b.sid
            WHERE a.t >= {start} AND a.t < {end}
            GROUP BY 1, 2
            """,
            vals=long_pdf,
        )

    def test_agrees_with_sketch_query(self, df_raw, sketches, panel):
        """Baseline and TSUBASA produce the same matrix (only slower)."""
        from repro.core import query_spark

        bl = direct.query_baseline(df_raw, 100, 500).toPandas()
        ts = query_spark.query_aligned(*sketches, 2, 9).toPandas()
        merged = bl.merge(ts, on=["sid1", "sid2"], suffixes=("_b", "_t"))
        assert len(merged) == len(bl)
        assert (abs(merged["corr_b"] - merged["corr_t"]) < 1e-9).all()


class TestPanelCorr:
    def test_matches_corrcoef(self, panel):
        got = direct.panel_corr(panel, 100, 500)
        np.testing.assert_allclose(got, np.corrcoef(panel[:, 100:500]), atol=1e-12)
