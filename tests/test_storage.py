"""Disk-based sketch store tests (§3.4 substitution: Parquet for PostgreSQL)."""
import numpy as np
import pytest

from repro.core import query_spark, sketch_spark
from repro.data import climate
from repro.storage.sketch_store import SketchStore


class TestRoundTrip:
    def test_write_read_preserves_sketches(self, spark, sketches, tmp_path):
        ss, ps = sketches
        store = SketchStore(tmp_path)
        rep_s = store.write(ss, "series")
        rep_p = store.write(ps, "pairs")
        assert rep_s.seconds > 0 and rep_p.bytes > 0
        back_s = store.read(spark, "series")
        back_p = store.read(spark, "pairs")
        assert back_s.count() == ss.count()
        assert back_p.count() == ps.count()
        a = ss.toPandas().sort_values(["sid", "wid"]).reset_index(drop=True)
        b = back_s.toPandas().sort_values(["sid", "wid"]).reset_index(drop=True)
        np.testing.assert_allclose(a["mu"], b["mu"])
        np.testing.assert_allclose(a["sigma"], b["sigma"])

    def test_query_from_disk_is_exact(self, spark, sketches, panel, tmp_path):
        """End-to-end disk-based TSUBASA: write, read, query, verify."""
        ss, ps = sketches
        store = SketchStore(tmp_path)
        store.write(ss, "series")
        store.write(ps, "pairs")
        s2, t_read = store.read_timed(spark, "series")
        p2, _ = store.read_timed(spark, "pairs")
        assert t_read >= 0
        got = query_spark.query_aligned(s2, p2, 2, 9).toPandas()
        ref = np.corrcoef(panel[:, 100:500])
        for _, r in got.iterrows():
            assert r["corr"] == pytest.approx(ref[int(r.sid1), int(r.sid2)], abs=1e-9)

    def test_overwrite_mode(self, spark, sketches, tmp_path):
        ss, _ = sketches
        store = SketchStore(tmp_path)
        store.write(ss, "series")
        store.write(ss, "series")  # second write must not fail or duplicate
        assert store.read(spark, "series").count() == ss.count()


class TestSpaceOverhead:
    def test_size_decreases_with_basic_window(self, spark, tmp_path):
        """Fig. 6d's shape: bigger B => fewer windows => smaller store."""
        panel = climate.ncea_like(12, 480, seed=5)
        df = climate.long_df(spark, panel)
        sizes = []
        for B in (20, 60, 240):
            store = SketchStore(tmp_path / f"b{B}")
            ss, ps = sketch_spark.sketch(df, B)
            store.write(ss, "series")
            store.write(ps, "pairs")
            sizes.append(store.size_bytes())
        assert sizes[0] > sizes[1] > sizes[2]

    def test_size_of_missing_table_is_zero(self, tmp_path):
        assert SketchStore(tmp_path).size_bytes("nope") == 0
