"""Synthetic climate substrate tests (data fidelity for the experiments)."""
import numpy as np
import pytest

from repro.data import climate


class TestGenerators:
    def test_ncea_shape_and_standardization(self):
        p = climate.ncea_like(20, 500, seed=1)
        assert p.shape == (20, 500)
        np.testing.assert_allclose(p.mean(axis=1), 0.0, atol=1e-9)
        np.testing.assert_allclose(p.std(axis=1), 1.0, atol=1e-9)

    def test_deterministic_in_seed(self):
        a = climate.ncea_like(8, 200, seed=5)
        b = climate.ncea_like(8, 200, seed=5)
        np.testing.assert_array_equal(a, b)
        c = climate.ncea_like(8, 200, seed=6)
        assert not np.array_equal(a, c)

    def test_berkeley_defaults(self):
        p = climate.berkeley_like(30, 365)
        assert p.shape == (30, 365)

    def test_correlation_spread_supports_thresholding(self):
        """θ=0.75 must yield a non-trivial, non-complete network (§4.1)."""
        p = climate.ncea_like(40, 2000, seed=7)
        cm = np.corrcoef(p)
        iu = np.triu_indices(40, 1)
        frac = (cm[iu] > 0.75).mean()
        assert 0.01 < frac < 0.7

    def test_temporal_autocorrelation_present(self):
        """AR(1) factors leave lag-1 autocorrelation in the series."""
        p = climate.ncea_like(10, 2000, seed=2)
        ac = np.mean([np.corrcoef(s[:-1], s[1:])[0, 1] for s in p])
        assert ac > 0.3


class TestLongLayout:
    def test_panel_to_long_roundtrip(self):
        p = climate.ncea_like(5, 40, seed=3)
        pdf = climate.panel_to_long(p)
        assert len(pdf) == 200
        back = pdf.pivot(index="sid", columns="t", values="v").to_numpy()
        np.testing.assert_allclose(back, p)

    def test_long_df_schema(self, spark):
        p = climate.ncea_like(3, 20, seed=4)
        df = climate.long_df(spark, p)
        assert dict(df.dtypes) == {"sid": "int", "t": "bigint", "v": "double"}
        assert df.count() == 60

    def test_long_df_partitions(self, spark):
        p = climate.ncea_like(4, 30, seed=5)
        df = climate.long_df(spark, p, partitions=3)
        assert df.rdd.getNumPartitions() == 3
