"""Network measures: thresholding, edge count, similarity ratio D_p (§4.1)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import network


class TestSimilarityRatio:
    def test_paper_worked_example(self):
        """The 3-node example in §4.1 has D_p = 2/3."""
        A = np.array([[1, 1, 0], [1, 1, 1], [0, 1, 1]], dtype=bool)
        B = np.array([[1, 0, 0], [0, 1, 1], [0, 1, 1]], dtype=bool)
        assert network.similarity_ratio(A, B) == pytest.approx(2 / 3)

    def test_identical_networks(self):
        a = np.random.default_rng(0).random((6, 6)) > 0.5
        a = a | a.T
        assert network.similarity_ratio(a, a) == pytest.approx(1.0)

    def test_complement_networks(self):
        n = 5
        a = np.zeros((n, n), dtype=bool)
        b = np.ones((n, n), dtype=bool)
        assert network.similarity_ratio(a, b) == pytest.approx(0.0)

    def test_rejects_shape_mismatch(self):
        with pytest.raises(ValueError):
            network.similarity_ratio(np.zeros((3, 3)), np.zeros((4, 4)))


class TestAdjacency:
    def test_from_pair_corr(self):
        pairs = np.array([[0, 1], [0, 2], [1, 2]])
        corr = np.array([0.9, 0.2, 0.8])
        adj = network.adjacency_from_corr(corr, pairs, 3, 0.75)
        assert adj[0, 1] and adj[1, 0] and adj[1, 2]
        assert not adj[0, 2]
        assert network.edge_count(adj) == 2

    def test_nan_correlations_are_not_edges(self):
        pairs = np.array([[0, 1]])
        adj = network.adjacency_from_corr(np.array([np.nan]), pairs, 2, 0.5)
        assert network.edge_count(adj) == 0


class TestPairsToMatrix:
    def test_roundtrip(self):
        pdf = pd.DataFrame({"sid1": [0, 0, 1], "sid2": [1, 2, 2], "corr": [0.5, -0.25, 0.75]})
        m = network.pairs_to_matrix(pdf, 3)
        assert m[0, 1] == 0.5 and m[1, 0] == 0.5
        assert m[2, 1] == 0.75
        assert m[0, 0] == 1.0


class TestThresholdEdges:
    def test_spark_threshold(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"sid1": [0, 0, 1], "sid2": [1, 2, 2], "corr": [0.9, 0.3, 0.76]})
        )
        got = network.threshold_edges(df, 0.75).toPandas()
        assert sorted(zip(got.sid1, got.sid2)) == [(0, 1), (1, 2)]
