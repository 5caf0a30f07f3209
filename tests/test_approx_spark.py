"""DFT-approximation Spark tests (Algorithm 4 / Eq. 5 on the cluster)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.approx import query_spark as aquery
from repro.approx import sketch_spark as asketch
from repro.core import query_spark
from repro.oracle import assert_equivalent
from tests.conftest import B_TEST, N_TEST


@pytest.fixture(scope="module")
def approx_sketches(df_raw):
    """Approximate sketches with ALL coefficients (n = B) — exact regime."""
    ss, pd_ = asketch.sketch_approx(df_raw, B_TEST, B_TEST)
    ss, pd_ = ss.cache(), pd_.cache()
    ss.count(), pd_.count()
    yield ss, pd_
    ss.unpersist(), pd_.unpersist()


@pytest.fixture(scope="module")
def approx_sketches_n10(df_raw):
    """Truncated sketches (n = 10 of B = 50) — genuine approximation."""
    ss, pd_ = asketch.sketch_approx(df_raw, B_TEST, 10)
    ss, pd_ = ss.cache(), pd_.cache()
    ss.count(), pd_.count()
    yield ss, pd_
    ss.unpersist(), pd_.unpersist()


class TestPairDistSketch:
    def test_schema_and_counts(self, approx_sketches):
        _, pd_ = approx_sketches
        assert dict(pd_.dtypes) == {
            "sid1": "int", "sid2": "int", "wid": "int", "b": "int",
            "ss": "double", "d2": "double"
        }
        assert pd_.count() == (N_TEST * (N_TEST - 1) // 2) * 12

    def test_d2_nonnegative(self, approx_sketches_n10):
        _, pd_ = approx_sketches_n10
        assert pd_.filter(F.col("d2") < 0).count() == 0

    def test_full_coeff_d2_encodes_window_corr(self, approx_sketches, sketches, panel):
        """1 - d²/2 == exact window correlation when n = B (Eq. 3)."""
        _, pd_ = approx_sketches
        rows = pd_.filter((F.col("sid1") == 0) & (F.col("sid2") == 1)).toPandas()
        for _, r in rows.iterrows():
            a, b = B_TEST * int(r.wid), B_TEST * (int(r.wid) + 1)
            c = np.corrcoef(panel[0, a:b], panel[1, a:b])[0, 1]
            assert 1 - r.d2 / 2 == pytest.approx(c, abs=1e-9)

    def test_per_pair_dft_mode_same_values(self, spark, df_raw):
        shared = asketch.pair_dist_sketch(df_raw, B_TEST, 10).toPandas()
        perpair = asketch.pair_dist_sketch(
            df_raw, B_TEST, 10, per_pair_dft=True
        ).toPandas()
        m = shared.merge(perpair, on=["sid1", "sid2", "wid"], suffixes=("_s", "_p"))
        assert len(m) == len(shared)
        np.testing.assert_allclose(m["d2_s"], m["d2_p"], atol=1e-10)


class TestQueryApprox:
    def test_all_coeffs_equals_exact_oracle(self, spark, approx_sketches, long_pdf):
        """Algorithm 4 with n = B reproduces the exact matrix (DuckDB check)."""
        ss, pd_ = approx_sketches
        got = aquery.query_approx(ss, pd_, 2, 9)
        assert_equivalent(
            got,
            f"""
            SELECT a.sid AS sid1, b.sid AS sid2, corr(a.v, b.v) AS corr
            FROM vals a JOIN vals b ON a.t = b.t AND a.sid < b.sid
            WHERE a.t >= {2 * B_TEST} AND a.t < {10 * B_TEST}
            GROUP BY 1, 2
            """,
            vals=long_pdf,
        )

    def test_truncated_no_false_negatives(self, approx_sketches_n10, sketches):
        """Eq. 4: approx corr >= exact corr pairwise — superset networks."""
        ss_a, pd_a = approx_sketches_n10
        approx = aquery.query_approx(ss_a, pd_a, 0, 11).toPandas()
        exact = query_spark.query_aligned(*sketches, 0, 11).toPandas()
        m = approx.merge(exact, on=["sid1", "sid2"], suffixes=("_a", "_e"))
        assert (m["corr_a"] >= m["corr_e"] - 1e-9).all()

    def test_avg_mode_runs_and_bounds(self, approx_sketches_n10):
        ss, pd_ = approx_sketches_n10
        got = aquery.query_approx(ss, pd_, 0, 11, mode="avg").toPandas()
        assert len(got) == N_TEST * (N_TEST - 1) // 2
        assert (got["corr"] <= 1 + 1e-9).all()

    def test_unknown_mode_raises(self, approx_sketches_n10):
        ss, pd_ = approx_sketches_n10
        with pytest.raises(ValueError):
            aquery.query_approx(ss, pd_, 0, 11, mode="bogus")

    def test_edge_count_decreases_with_more_coeffs(self, spark, df_raw, sketches):
        """Fig. 5a's monotone shape at test scale: more coeffs, fewer
        (false-positive) edges, converging to the exact count."""
        theta = 0.6
        exact = query_spark.query_aligned(*sketches, 0, 11).toPandas()
        exact_edges = (exact["corr"] > theta).sum()
        counts = []
        for n in (5, 25, B_TEST):
            ss, pd_ = asketch.sketch_approx(df_raw, B_TEST, n)
            ap = aquery.query_approx(ss, pd_, 0, 11).toPandas()
            counts.append((ap["corr"] > theta).sum())
        assert counts[-1] == exact_edges
        assert counts[0] >= counts[1] >= counts[2]
