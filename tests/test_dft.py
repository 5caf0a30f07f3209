"""DFT approximation kernel tests (Eq. 2–4 properties)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.approx import dft
from repro.core import lemma1


class TestDftMatrix:
    @pytest.mark.parametrize("b", [2, 5, 16, 50])
    def test_unitary(self, b):
        W = dft.dft_matrix(b)
        np.testing.assert_allclose(W @ np.conj(W.T), np.eye(b), atol=1e-10)

    def test_dc_row_is_last(self):
        W = dft.dft_matrix(8)
        np.testing.assert_allclose(W[-1], np.full(8, 1 / np.sqrt(8)), atol=1e-12)

    def test_matches_numpy_fft(self):
        """Naive O(B²) transform agrees with FFT (rows reordered, scaled)."""
        x = np.random.default_rng(0).standard_normal(32)
        ours = dft.dft_matrix(32) @ x
        ref = np.fft.fft(x) / np.sqrt(32)
        np.testing.assert_allclose(ours[:-1], ref[1:], atol=1e-10)
        np.testing.assert_allclose(ours[-1], ref[0], atol=1e-10)


class TestUnitNormalize:
    def test_unit_norm_zero_mean(self):
        v = np.random.default_rng(1).standard_normal(40)
        u = dft.unit_normalize(v)
        assert np.linalg.norm(u) == pytest.approx(1.0)
        assert u.sum() == pytest.approx(0.0, abs=1e-12)

    def test_constant_maps_to_zero(self):
        assert np.allclose(dft.unit_normalize(np.full(10, 3.0)), 0.0)

    def test_batched(self):
        v = np.random.default_rng(2).standard_normal((5, 20))
        u = dft.unit_normalize(v)
        np.testing.assert_allclose(np.linalg.norm(u, axis=1), 1.0)


class TestEq3Exactness:
    @pytest.mark.parametrize("b", [10, 25, 64])
    def test_all_coeffs_distance_gives_exact_corr(self, b):
        """Eq. 3 with full coefficients: 1 - d²/2 == Pearson (Parseval)."""
        g = np.random.default_rng(b)
        x = g.standard_normal(b)
        y = 0.5 * x + g.standard_normal(b)
        d2 = dft.pair_d2(dft.window_coeffs(x, b), dft.window_coeffs(y, b))
        assert 1 - d2 / 2 == pytest.approx(lemma1.direct_corr(x, y), abs=1e-10)

    @settings(max_examples=40, deadline=None)
    @given(seed=st.integers(0, 2**16), b=st.integers(3, 40))
    def test_property_exact_at_full_coeffs(self, seed, b):
        g = np.random.default_rng(seed)
        x, y = g.standard_normal(b), g.standard_normal(b)
        d2 = dft.pair_d2(dft.window_coeffs(x, b), dft.window_coeffs(y, b))
        assert 1 - d2 / 2 == pytest.approx(lemma1.direct_corr(x, y), abs=1e-8)


class TestTruncation:
    def test_d2_monotone_in_n(self):
        """More coefficients -> larger (more exact) distance. Eq. 4's basis."""
        g = np.random.default_rng(5)
        x, y = g.standard_normal(50), g.standard_normal(50)
        d2s = [
            dft.pair_d2(dft.window_coeffs(x, n), dft.window_coeffs(y, n))
            for n in (5, 10, 20, 35, 50)
        ]
        assert all(a <= b + 1e-12 for a, b in zip(d2s, d2s[1:]))

    def test_no_false_negatives(self):
        """Eq. 4: truncated d² underestimates => corr estimate overestimates."""
        g = np.random.default_rng(6)
        for _ in range(20):
            x, y = g.standard_normal(40), g.standard_normal(40)
            exact = lemma1.direct_corr(x, y)
            for n in (5, 10, 20):
                d2 = dft.pair_d2(dft.window_coeffs(x, n), dft.window_coeffs(y, n))
                assert 1 - d2 / 2 >= exact - 1e-10

    def test_edge_rule_radius(self):
        assert dft.edge_rule_d2_threshold(0.75) == pytest.approx(0.5)
        assert dft.edge_rule_d2_threshold(1.0) == pytest.approx(0.0)


class TestAllPairD2:
    def test_matches_scalar(self):
        g = np.random.default_rng(7)
        v = g.standard_normal((6, 30))
        pairs = np.stack(np.triu_indices(6, 1), axis=1)
        C = dft.window_coeffs(v, 12)
        got = dft.all_pair_d2(C, pairs)
        for k, (i, j) in enumerate(pairs):
            assert got[k] == pytest.approx(dft.pair_d2(C[i], C[j]), abs=1e-10)

    def test_per_pair_dft_mode_identical(self):
        """Paper-accounting mode returns the same values, just slower."""
        g = np.random.default_rng(8)
        v = g.standard_normal((5, 24))
        pairs = np.stack(np.triu_indices(5, 1), axis=1)
        shared = dft.per_pair_window_d2(v, pairs, 10, per_pair_dft=False)
        perpair = dft.per_pair_window_d2(v, pairs, 10, per_pair_dft=True)
        np.testing.assert_allclose(shared, perpair, atol=1e-10)

    def test_nonnegative(self):
        v = np.random.default_rng(9).standard_normal((4, 16))
        pairs = np.stack(np.triu_indices(4, 1), axis=1)
        assert (dft.per_pair_window_d2(v, pairs, 8) >= 0).all()


class TestCorrFromD2:
    def test_scalar_and_array(self):
        assert dft.corr_from_d2(0.0) == pytest.approx(1.0)
        np.testing.assert_allclose(
            dft.corr_from_d2(np.array([0.0, 2.0, 4.0])), [1.0, 0.0, -1.0]
        )
