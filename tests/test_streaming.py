"""Structured Streaming real-time maintenance tests (Algorithm 3, §3.1.2)."""
import numpy as np
import pandas as pd
import pytest

from repro.data import climate
from repro.streaming import chunks, realtime, sketch_stream

N, B, NS = 8, 40, 5  # 8 series, window=40, query window = 5 windows = 200 pts


@pytest.fixture(scope="module")
def stream_panel():
    return climate.ncea_like(N, B * (NS + 6), seed=13)  # 6 slides after warmup


class TestChunks:
    def test_chunk_files_partition_timeline(self, stream_panel, tmp_path):
        paths = chunks.write_chunks(stream_panel[:, : B * 3], B, tmp_path)
        assert len(paths) == 3
        total = sum(len(pd.read_parquet(p)) for p in paths)
        assert total == N * B * 3

    def test_t0_offset(self, stream_panel, tmp_path):
        paths = chunks.write_chunks(stream_panel[:, :B], B, tmp_path, t0=1000)
        pdf = pd.read_parquet(paths[0])
        assert pdf["t"].min() == 1000 and pdf["t"].max() == 1000 + B - 1


class TestRealtimeNetworkUnit:
    """Driver-side Algorithm 3 logic, no streaming engine involved."""

    def test_warmup_then_slide_exact(self, stream_panel):
        net = realtime.RealtimeNetwork(N, B, NS)
        pdf = climate.panel_to_long(stream_panel)
        for a in range(0, B * (NS + 6), B):
            net.ingest_rows(pdf[(pdf.t >= a) & (pdf.t < a + B)])
        assert net.warm
        lo = B * 6
        ref = np.corrcoef(stream_panel[:, lo : lo + B * NS])
        got = net.correlations()
        for _, r in got.iterrows():
            assert r["corr"] == pytest.approx(
                ref[int(r.sid1), int(r.sid2)], abs=1e-8
            )

    def test_out_of_order_and_split_batches(self, stream_panel):
        """Rows arriving in odd batch boundaries still fold correctly."""
        net = realtime.RealtimeNetwork(N, B, NS)
        pdf = climate.panel_to_long(stream_panel[:, : B * NS])
        shuffled = pdf.sample(frac=1.0, random_state=0)  # arbitrary arrival order
        for i in range(0, len(shuffled), 977):  # ragged batch sizes
            net.ingest_rows(shuffled.iloc[i : i + 977])
        assert net.warm
        ref = np.corrcoef(stream_panel[:, : B * NS])
        for _, r in net.correlations().iterrows():
            assert r["corr"] == pytest.approx(ref[int(r.sid1), int(r.sid2)], abs=1e-8)

    def test_not_warm_before_ns_windows(self, stream_panel):
        net = realtime.RealtimeNetwork(N, B, NS)
        pdf = climate.panel_to_long(stream_panel[:, : B * 2])
        net.ingest_rows(pdf)
        assert not net.warm
        assert len(net.correlations()) == N * (N - 1) // 2  # partial matrix exists

    def test_update_records_per_window(self, stream_panel):
        net = realtime.RealtimeNetwork(N, B, NS)
        net.ingest_rows(climate.panel_to_long(stream_panel[:, : B * 3]))
        assert [u.wid for u in net.updates] == [0, 1, 2]
        assert all(u.seconds >= 0 for u in net.updates)

    def test_edges_threshold(self, stream_panel):
        net = realtime.RealtimeNetwork(N, B, NS)
        net.ingest_rows(climate.panel_to_long(stream_panel[:, : B * NS]))
        e = net.edges(0.5)
        assert (e["corr"] > 0.5).all()

    def test_approx_mode_full_coeffs_matches_exact(self, stream_panel):
        exact = realtime.RealtimeNetwork(N, B, NS)
        approx = realtime.RealtimeNetwork(N, B, NS, mode="approx", n_coeffs=B)
        pdf = climate.panel_to_long(stream_panel)
        exact.ingest_rows(pdf)
        approx.ingest_rows(pdf)
        np.testing.assert_allclose(
            approx.correlations()["corr"], exact.correlations()["corr"], atol=1e-8
        )

    def test_approx_mode_truncated_no_false_negatives(self, stream_panel):
        exact = realtime.RealtimeNetwork(N, B, NS)
        approx = realtime.RealtimeNetwork(N, B, NS, mode="approx", n_coeffs=8)
        pdf = climate.panel_to_long(stream_panel)
        exact.ingest_rows(pdf)
        approx.ingest_rows(pdf)
        diff = approx.correlations()["corr"] - exact.correlations()["corr"]
        assert (diff >= -1e-9).all()


class TestFileStreamEndToEnd:
    def test_stream_drains_and_matrix_is_exact(self, spark, stream_panel, tmp_path):
        """Full Algorithm 3: file source -> foreachBatch -> Lemma 2 slides.

        Oracle: DuckDB corr() over the trailing n_s·B points of the stream.
        """
        import duckdb

        chunk_dir = tmp_path / "chunks"
        chunks.write_chunks(stream_panel, B, chunk_dir)
        net = realtime.RealtimeNetwork(N, B, NS)
        realtime.run_file_stream(
            spark, str(chunk_dir), net, max_files_per_trigger=2
        )
        assert net.warm
        L = stream_panel.shape[1]
        lo = L - B * NS
        pdf = climate.panel_to_long(stream_panel)
        con = duckdb.connect()
        con.register("vals", pdf)
        ref = con.execute(
            f"""SELECT a.sid sid1, b.sid sid2, corr(a.v, b.v) c
                FROM vals a JOIN vals b ON a.t = b.t AND a.sid < b.sid
                WHERE a.t >= {lo} GROUP BY 1, 2 ORDER BY 1, 2"""
        ).fetchdf()
        con.close()
        got = net.correlations().sort_values(["sid1", "sid2"]).reset_index(drop=True)
        np.testing.assert_allclose(got["corr"], ref["c"], atol=1e-8)
        # one fold per chunk file arrived
        assert len(net.updates) == L // B


class TestSketchStream:
    def test_streaming_agg_matches_batch_sketch(self, spark, stream_panel, tmp_path):
        """Incremental windowed aggregation == batch Algorithm 1 stats."""
        from repro.core import sketch_spark

        chunk_dir = tmp_path / "chunks2"
        chunks.write_chunks(stream_panel[:, : B * NS], B, chunk_dir)
        q = sketch_stream.start_series_sketch_stream(
            spark, str(chunk_dir), B, query_name="t_sketch_stream"
        )
        q.awaitTermination()
        got = (
            sketch_stream.finalize_series_sketch(spark, "t_sketch_stream")
            .toPandas()
            .sort_values(["sid", "wid"])
            .reset_index(drop=True)
        )
        ref = (
            sketch_spark.series_sketch(
                climate.long_df(spark, stream_panel[:, : B * NS]), B
            )
            .toPandas()
            .sort_values(["sid", "wid"])
            .reset_index(drop=True)
        )
        assert len(got) == len(ref)
        np.testing.assert_allclose(got["mu"], ref["mu"], atol=1e-9)
        np.testing.assert_allclose(got["sigma"], ref["sigma"], atol=1e-9)
        np.testing.assert_array_equal(got["b"], ref["b"])
