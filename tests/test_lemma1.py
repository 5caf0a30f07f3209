"""Lemma 1 kernel tests: exactness of the basic-window recombination."""
import numpy as np
import pytest
from hypothesis import assume, given, settings
from hypothesis import strategies as st
from hypothesis.extra import numpy as hnp

from repro.core import lemma1


def _corr_pair(seed, m, mix=0.5):
    g = np.random.default_rng(seed)
    y = g.standard_normal(m)
    x = mix * y + g.standard_normal(m)
    return x, y


class TestWindowStats:
    @pytest.mark.parametrize("m,B", [(100, 10), (100, 7), (99, 100), (1, 1), (250, 50)])
    def test_matches_numpy_per_window(self, m, B):
        x = np.random.default_rng(1).standard_normal(m)
        sizes, mu, sig = lemma1.window_stats(x, B)
        assert sizes.sum() == m
        off = 0
        for s, a, d in zip(sizes, mu, sig):
            seg = x[off : off + s]
            assert a == pytest.approx(seg.mean())
            assert d == pytest.approx(seg.std())
            off += s

    def test_ragged_last_window(self):
        sizes, _, _ = lemma1.window_stats(np.ones(103), 25)
        assert list(sizes) == [25, 25, 25, 25, 3]

    def test_constant_series_zero_std(self):
        _, mu, sig = lemma1.window_stats(np.full(60, 4.2), 20)
        assert np.allclose(mu, 4.2) and np.allclose(sig, 0.0)


class TestWindowPairCorr:
    @pytest.mark.parametrize("B", [5, 13, 50, 100])
    def test_matches_numpy_corrcoef(self, B):
        x, y = _corr_pair(2, 100)
        c = lemma1.window_pair_corr(x, y, B)
        for j, a in enumerate(range(0, 100, B)):
            b = min(a + B, 100)
            assert c[j] == pytest.approx(np.corrcoef(x[a:b], y[a:b])[0, 1])

    def test_constant_window_yields_zero(self):
        x = np.ones(20)
        y = np.arange(20.0)
        assert lemma1.window_pair_corr(x, y, 10).tolist() == [0.0, 0.0]


class TestCombine:
    @pytest.mark.parametrize("m", [60, 100, 257, 1000])
    @pytest.mark.parametrize("B", [10, 23, 50])
    def test_exact_vs_direct(self, m, B):
        x, y = _corr_pair(m * B, m)
        got = lemma1.combine(
            *lemma1.window_stats(x, B)[:1],
            lemma1.window_stats(x, B)[1],
            lemma1.window_stats(x, B)[2],
            lemma1.window_stats(y, B)[1],
            lemma1.window_stats(y, B)[2],
            lemma1.window_pair_corr(x, y, B),
        )
        assert got == pytest.approx(lemma1.direct_corr(x, y), abs=1e-12)

    def test_unequal_window_sizes_exact(self):
        """The weighted-delta form is exact for arbitrary piece sizes."""
        g = np.random.default_rng(9)
        sizes = np.array([17, 50, 50, 50, 31])
        x = g.standard_normal(sizes.sum())
        y = 0.6 * x + g.standard_normal(sizes.sum())
        bounds = np.concatenate([[0], np.cumsum(sizes)])
        mu_x = np.array([x[a:b].mean() for a, b in zip(bounds[:-1], bounds[1:])])
        sig_x = np.array([x[a:b].std() for a, b in zip(bounds[:-1], bounds[1:])])
        mu_y = np.array([y[a:b].mean() for a, b in zip(bounds[:-1], bounds[1:])])
        sig_y = np.array([y[a:b].std() for a, b in zip(bounds[:-1], bounds[1:])])
        c = np.array(
            [np.corrcoef(x[a:b], y[a:b])[0, 1] for a, b in zip(bounds[:-1], bounds[1:])]
        )
        got = lemma1.combine(sizes, mu_x, sig_x, mu_y, sig_y, c)
        assert got == pytest.approx(lemma1.direct_corr(x, y), abs=1e-12)

    def test_single_window_degenerates_to_window_corr(self):
        x, y = _corr_pair(5, 40)
        got = lemma1.combine(
            np.array([40]),
            np.array([x.mean()]),
            np.array([x.std()]),
            np.array([y.mean()]),
            np.array([y.std()]),
            np.array([np.corrcoef(x, y)[0, 1]]),
        )
        assert got == pytest.approx(lemma1.direct_corr(x, y))

    def test_constant_series_is_nan(self):
        x = np.ones(100)
        y = np.random.default_rng(0).standard_normal(100)
        got = lemma1.combine(
            *lemma1.window_stats(x, 25)[:1],
            lemma1.window_stats(x, 25)[1],
            lemma1.window_stats(x, 25)[2],
            lemma1.window_stats(y, 25)[1],
            lemma1.window_stats(y, 25)[2],
            lemma1.window_pair_corr(x, y, 25),
        )
        assert np.isnan(got)

    @settings(max_examples=60, deadline=None)
    @given(
        data=hnp.arrays(
            np.float64,
            st.integers(20, 300),
            elements=st.floats(-1e3, 1e3, allow_nan=False),
        ),
        B=st.integers(2, 64),
        seed=st.integers(0, 2**16),
    )
    def test_property_exact_on_arbitrary_data(self, data, B, seed):
        """Lemma 1 == Eq. 1 on adversarial data, any B, ragged windows."""
        g = np.random.default_rng(seed)
        x = data
        # near-constant series are a separate, deterministic test case
        # (test_constant_series_is_nan) — degenerate float cancellation
        # makes NaN-vs-garbage comparisons meaningless here.
        assume(x.std() > 1e-6 * (np.abs(x).max() + 1.0))
        y = data * 0.3 + g.standard_normal(len(data))
        ref = lemma1.direct_corr(x, y)
        got = lemma1.combine(
            *lemma1.window_stats(x, B)[:1],
            lemma1.window_stats(x, B)[1],
            lemma1.window_stats(x, B)[2],
            lemma1.window_stats(y, B)[1],
            lemma1.window_stats(y, B)[2],
            lemma1.window_pair_corr(x, y, B),
        )
        if np.isnan(ref):
            assert np.isnan(got)
        else:
            assert got == pytest.approx(ref, abs=1e-8)


class TestCombinePairs:
    def test_matches_scalar_combine(self):
        g = np.random.default_rng(4)
        N, m, B = 6, 200, 40
        panel = g.standard_normal((N, m))
        sizes, _, _ = lemma1.window_stats(panel[0], B)
        mu = np.stack([lemma1.window_stats(p, B)[1] for p in panel])
        sig = np.stack([lemma1.window_stats(p, B)[2] for p in panel])
        iu, ju = np.triu_indices(N, 1)
        pairs = np.stack([iu, ju], axis=1)
        c = np.stack(
            [lemma1.window_pair_corr(panel[i], panel[j], B) for i, j in pairs]
        )
        got = lemma1.combine_pairs(sizes, mu, sig, c, pairs)
        ref = np.corrcoef(panel)[iu, ju]
        np.testing.assert_allclose(got, ref, atol=1e-12)


class TestQueryWindowStd:
    @pytest.mark.parametrize("B", [10, 33, 100])
    def test_matches_numpy(self, B):
        x = np.random.default_rng(5).standard_normal(321)
        sizes, mu, sig = lemma1.window_stats(x, B)
        assert lemma1.query_window_std(sizes, mu, sig) == pytest.approx(x.std())


class TestDirectCorr:
    def test_perfect_correlation(self):
        x = np.arange(50.0)
        assert lemma1.direct_corr(x, 3 * x + 1) == pytest.approx(1.0)
        assert lemma1.direct_corr(x, -x) == pytest.approx(-1.0)

    def test_constant_is_nan(self):
        assert np.isnan(lemma1.direct_corr(np.ones(10), np.arange(10.0)))
