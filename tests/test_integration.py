"""End-to-end integration: the full TSUBASA pipeline at NCEA-like scale-down.

Historic path: raw -> sketch -> disk store -> Lemma-1 query -> network.
Real-time path: warmup network -> streamed chunks -> Lemma-2 slides.
Accuracy path: DFT competitor vs exact network (Fig. 5a logic end-to-end).
Pruning path: Algorithm 5 over the Spark-computed anchor rows.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.approx import query_spark as aquery
from repro.approx import sketch_spark as asketch
from repro.core import network, pruning, query_spark, sketch_spark
from repro.data import climate
from repro.storage.sketch_store import SketchStore
from repro.streaming import chunks, realtime

N, L, B = 24, 720, 60
THETA = 0.7


@pytest.fixture(scope="module")
def big_panel():
    return climate.ncea_like(N, L, seed=21)


@pytest.fixture(scope="module")
def big_df(spark, big_panel):
    df = climate.long_df(spark, big_panel).cache()
    df.count()
    yield df
    df.unpersist()


class TestHistoricPipeline:
    def test_sketch_store_query_network(self, spark, big_df, big_panel, tmp_path):
        ss, ps = sketch_spark.sketch(big_df, B)
        store = SketchStore(tmp_path / "store")
        store.write(ss, "series")
        store.write(ps, "pairs")
        s2 = store.read(spark, "series")
        p2 = store.read(spark, "pairs")
        corr = query_spark.query_aligned(s2, p2, 2, 9).toPandas()
        ref = np.corrcoef(big_panel[:, 2 * B : 10 * B])
        pairs = corr[["sid1", "sid2"]].to_numpy()
        got_adj = network.adjacency_from_corr(
            corr["corr"].to_numpy(), pairs, N, THETA
        )
        iu = np.triu_indices(N, 1)
        ref_adj = np.zeros((N, N), dtype=bool)
        ref_adj[iu] = ref[iu] > THETA
        ref_adj |= ref_adj.T
        assert network.similarity_ratio(got_adj, ref_adj) == pytest.approx(1.0)

    def test_partition_sweep_consistent(self, spark, big_df, big_panel):
        """§3.4: results identical at any parallelism (Fig. 6c's soundness)."""
        ref = None
        for parts in (1, 4):
            df = big_df.repartition(parts)
            ss, ps = sketch_spark.sketch(df, B)
            got = (
                query_spark.query_aligned(ss, ps, 0, 11)
                .toPandas()
                .sort_values(["sid1", "sid2"])
                .reset_index(drop=True)
            )
            if ref is None:
                ref = got
            else:
                np.testing.assert_allclose(got["corr"], ref["corr"], atol=1e-12)


class TestAccuracyPipeline:
    def test_fig5a_logic(self, spark, big_df, big_panel):
        """Edges decrease and D_p increases with n; exact at n = B."""
        exact = query_spark.query_aligned(*sketch_spark.sketch(big_df, B), 0, 11)
        e_pdf = exact.toPandas()
        pairs = e_pdf[["sid1", "sid2"]].to_numpy()
        adj_exact = network.adjacency_from_corr(
            e_pdf["corr"].to_numpy(), pairs, N, THETA
        )
        edges, dps = [], []
        for n in (6, 20, B):
            ss, pd_ = asketch.sketch_approx(big_df, B, n)
            ap = aquery.query_approx(ss, pd_, 0, 11).toPandas()
            adj = network.adjacency_from_corr(
                ap["corr"].to_numpy(), ap[["sid1", "sid2"]].to_numpy(), N, THETA
            )
            edges.append(network.edge_count(adj))
            dps.append(network.similarity_ratio(adj, adj_exact))
        assert edges[0] >= edges[1] >= edges[2] == network.edge_count(adj_exact)
        assert dps[-1] == pytest.approx(1.0)
        assert dps[0] <= dps[1] + 1e-9 <= dps[2] + 2e-9

    def test_no_false_negatives_network(self, spark, big_df):
        exact = query_spark.query_aligned(*sketch_spark.sketch(big_df, B), 0, 11)
        ss, pd_ = asketch.sketch_approx(big_df, B, 10)
        ap = aquery.query_approx(ss, pd_, 0, 11)
        e = network.threshold_edges(exact, THETA).select("sid1", "sid2")
        a = network.threshold_edges(ap, THETA).select("sid1", "sid2")
        assert e.exceptAll(a).count() == 0  # every exact edge survives


class TestRealtimePipeline:
    def test_histo_seed_plus_stream_slides(self, spark, big_panel, tmp_path):
        """Warm up on the first 6 windows, stream 6 more, verify the tail."""
        ns = 6
        warm = big_panel[:, : B * ns]
        rest = big_panel[:, B * ns :]
        net = realtime.RealtimeNetwork(N, B, ns)
        net.ingest_rows(climate.panel_to_long(warm))
        assert net.warm
        chunk_dir = tmp_path / "rt"
        chunks.write_chunks(rest, B, chunk_dir, t0=B * ns)
        realtime.run_file_stream(spark, str(chunk_dir), net)
        lo = big_panel.shape[1] - B * ns
        ref = np.corrcoef(big_panel[:, lo:])
        for _, r in net.correlations().iterrows():
            assert r["corr"] == pytest.approx(ref[int(r.sid1), int(r.sid2)], abs=1e-8)


class TestPruningPipeline:
    def test_algorithm5_over_spark_rows(self, spark, big_df, big_panel):
        """Anchor rows computed by the Spark query layer feed Algorithm 5."""
        ss, ps = sketch_spark.sketch(big_df, B)
        ss, ps = ss.cache(), ps.cache()
        full = query_spark.query_aligned(ss, ps, 0, 11).toPandas()
        cm = network.pairs_to_matrix(full, N)

        def corr_row(z):
            rows = query_spark.query_aligned(
                ss,
                ps.filter((F.col("sid1") == z) | (F.col("sid2") == z)),
                0,
                11,
            ).toPandas()
            out = np.ones(N)
            for _, r in rows.iterrows():
                other = int(r.sid2) if int(r.sid1) == z else int(r.sid1)
                out[other] = r["corr"]
            return out

        res = pruning.prune_matrix(corr_row, N, THETA, max_anchors=2)
        truth = (np.abs(cm) >= THETA).astype(np.int8)
        np.testing.assert_array_equal(res.matrix, truth)
        ss.unpersist(), ps.unpersist()
