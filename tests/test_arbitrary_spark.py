"""Arbitrary query window tests (§3.1.1) — the capability baselines lack."""
import pytest

from repro.core import arbitrary_spark
from repro.oracle import assert_equivalent
from tests.conftest import B_TEST


def _corr_sql(start, end):
    return f"""
    SELECT a.sid AS sid1, b.sid AS sid2, corr(a.v, b.v) AS corr
    FROM vals a JOIN vals b ON a.t = b.t AND a.sid < b.sid
    WHERE a.t >= {start} AND a.t < {end}
    GROUP BY 1, 2
    """


class TestQueryArbitrary:
    @pytest.mark.parametrize(
        "start,end",
        [
            (137, 583),  # both partials + interior
            (100, 583),  # aligned head, partial tail
            (137, 550),  # partial head, aligned tail
            (100, 550),  # fully aligned (degenerates to Alg. 2)
            (110, 140),  # inside one basic window
            (40, 60),    # two adjacent partials, no interior
            (0, 600),    # whole series
            (599, 600),  # single point window (corr undefined -> NULL row)
        ],
    )
    def test_exact_on_any_window(self, spark, df_raw, sketches, long_pdf, start, end):
        """Lemma-1 weighted recombination == DuckDB corr() on [start, end)."""
        ss, ps = sketches
        got = arbitrary_spark.query_arbitrary(df_raw, ss, ps, start, end, B_TEST)
        assert_equivalent(got, _corr_sql(start, end), vals=long_pdf)

    def test_raw_access_restricted_to_partials(self, df_raw, sketches):
        """Only the head/tail pieces are sketched at query time: the unioned
        stats rows contain exactly interior wids plus the two pseudo wids."""
        ss, ps = sketches
        from repro.core import query_spark, sketch_spark
        from repro.core.windows import decompose

        d = decompose(137, 583, B_TEST)
        s_head, _ = arbitrary_spark._piece_stats(df_raw, d.head, arbitrary_spark.HEAD_WID)
        assert s_head.select("wid").distinct().collect()[0].wid == -1
        assert s_head.count() == df_raw.select("sid").distinct().count()

    def test_matches_aligned_path_when_aligned(self, df_raw, sketches):
        from repro.core import query_spark

        ss, ps = sketches
        via_arb = arbitrary_spark.query_arbitrary(
            df_raw, ss, ps, 100, 550, B_TEST
        ).toPandas()
        via_aligned = query_spark.query_aligned(ss, ps, 2, 10).toPandas()
        merged = via_arb.merge(via_aligned, on=["sid1", "sid2"], suffixes=("_a", "_b"))
        assert (abs(merged["corr_a"] - merged["corr_b"]) < 1e-12).all()
