"""Algorithm 2 / Lemma 1 Catalyst query tests — oracle-checked correlations."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core import query_spark
from repro.oracle import assert_equivalent
from tests.conftest import B_TEST, N_TEST


def _corr_sql(start, end):
    return f"""
    SELECT a.sid AS sid1, b.sid AS sid2, corr(a.v, b.v) AS corr
    FROM vals a JOIN vals b ON a.t = b.t AND a.sid < b.sid
    WHERE a.t >= {start} AND a.t < {end}
    GROUP BY 1, 2
    """


class TestQueryAligned:
    @pytest.mark.parametrize("wlo,whi", [(0, 11), (2, 9), (5, 5), (0, 0), (11, 11)])
    def test_against_duckdb(self, spark, sketches, long_pdf, wlo, whi):
        """Sketch-recombined correlations == DuckDB corr() over raw rows."""
        ss, ps = sketches
        got = query_spark.query_aligned(ss, ps, wlo, whi)
        assert_equivalent(
            got, _corr_sql(wlo * B_TEST, (whi + 1) * B_TEST), vals=long_pdf
        )

    def test_full_series_matches_corrcoef(self, sketches, panel):
        ss, ps = sketches
        got = query_spark.query_aligned(ss, ps, 0, 11).toPandas()
        ref = np.corrcoef(panel)
        assert len(got) == N_TEST * (N_TEST - 1) // 2
        for _, r in got.iterrows():
            # r["corr"], not r.corr — pandas Series.corr is a method
            assert r["corr"] == pytest.approx(ref[int(r.sid1), int(r.sid2)], abs=1e-9)

    def test_never_touches_raw_data(self, sketches):
        """The query plan reads only the two sketch relations (Alg. 2)."""
        ss, ps = sketches
        plan = query_spark.query_aligned(ss, ps, 2, 9)._jdf.queryExecution().toString()
        assert "InMemoryTableScan" in plan or "Scan" in plan  # sketches are cached

    def test_values_in_range(self, sketches):
        ss, ps = sketches
        got = query_spark.query_aligned(ss, ps, 0, 11).toPandas()
        assert ((got["corr"] <= 1 + 1e-9) & (got["corr"] >= -1 - 1e-9)).all()


class TestSelectWids:
    def test_inclusive_bounds(self, sketches):
        ss, _ = sketches
        got = query_spark.select_wids(ss, 3, 5).select("wid").distinct().toPandas()
        assert sorted(got["wid"]) == [3, 4, 5]


class TestCorrelationMatrixEdgeCases:
    def test_subset_of_pairs_only(self, spark, sketches, long_pdf):
        """Restricting the pair sketch restricts the output — row pruning."""
        ss, ps = sketches
        sub = ps.filter((F.col("sid1") == 0))
        got = query_spark.query_aligned(ss, sub, 0, 11)
        assert got.count() == N_TEST - 1
        assert_equivalent(
            got,
            """
            SELECT a.sid AS sid1, b.sid AS sid2, corr(a.v, b.v) AS corr
            FROM vals a JOIN vals b ON a.t = b.t AND a.sid < b.sid
            WHERE a.sid = 0 GROUP BY 1, 2
            """,
            vals=long_pdf,
        )
