"""Eq. 5 / Eq. 6 combination tests: approximate query & incremental update."""
import numpy as np
import pytest

from repro.approx import combine, dft, incremental
from repro.core import lemma1, lemma2


def _pair(seed, m):
    g = np.random.default_rng(seed)
    y = g.standard_normal(m)
    x = 0.6 * y + g.standard_normal(m)
    return x, y


def _window_d2(x, y, B, n):
    out = []
    for a in range(0, len(x), B):
        b = min(a + B, len(x))
        out.append(
            dft.pair_d2(dft.window_coeffs(x[a:b], n), dft.window_coeffs(y[a:b], n))
        )
    return np.array(out)


class TestEq5:
    @pytest.mark.parametrize("B", [20, 50])
    def test_exact_when_all_coeffs(self, B):
        """Eq. 5 'the ≈ becomes =' when n = B (paper §3.2.1)."""
        x, y = _pair(0, 200)
        sizes, mu_x, sig_x = lemma1.window_stats(x, B)
        _, mu_y, sig_y = lemma1.window_stats(y, B)
        d2 = _window_d2(x, y, B, B)
        got = combine.eq5_corr(sizes, mu_x, sig_x, mu_y, sig_y, d2)
        assert got == pytest.approx(lemma1.direct_corr(x, y), abs=1e-9)

    @pytest.mark.parametrize("n", [5, 10, 15])
    def test_truncated_overestimates(self, n):
        """No false negatives propagate through the Eq. 5 combination.

        Each window's ĉ_j >= c_j; the combination is monotone in c_j (the
        sigma products are nonnegative), so the estimate upper-bounds the
        exact correlation.
        """
        x, y = _pair(1, 200)
        B = 20
        sizes, mu_x, sig_x = lemma1.window_stats(x, B)
        _, mu_y, sig_y = lemma1.window_stats(y, B)
        d2 = _window_d2(x, y, B, n)
        got = combine.eq5_corr(sizes, mu_x, sig_x, mu_y, sig_y, d2)
        assert got >= lemma1.direct_corr(x, y) - 1e-9

    def test_accuracy_improves_with_n(self):
        x, y = _pair(2, 300)
        B = 30
        sizes, mu_x, sig_x = lemma1.window_stats(x, B)
        _, mu_y, sig_y = lemma1.window_stats(y, B)
        exact = lemma1.direct_corr(x, y)
        errs = [
            abs(
                combine.eq5_corr(sizes, mu_x, sig_x, mu_y, sig_y, _window_d2(x, y, B, n))
                - exact
            )
            for n in (3, 10, 20, 30)
        ]
        assert errs[-1] < 1e-9
        assert errs[0] >= errs[-1]


class TestStatStream:
    def test_average_of_window_corrs(self):
        d2 = np.array([0.2, 0.6, 1.0])
        assert combine.statstream_corr(d2) == pytest.approx(1 - 0.3)

    def test_differs_from_eq5_on_uncooperative_series(self):
        """Window means drifting (uncooperative) break the averaging model."""
        g = np.random.default_rng(3)
        m, B = 200, 20
        drift = np.repeat(np.arange(m // B) * 3.0, B)
        x = g.standard_normal(m) + drift
        y = g.standard_normal(m) + drift
        sizes, mu_x, sig_x = lemma1.window_stats(x, B)
        _, mu_y, sig_y = lemma1.window_stats(y, B)
        d2 = _window_d2(x, y, B, B)
        exact = lemma1.direct_corr(x, y)
        eq5 = combine.eq5_corr(sizes, mu_x, sig_x, mu_y, sig_y, d2)
        avg = combine.statstream_corr(d2)
        assert eq5 == pytest.approx(exact, abs=1e-9)  # Eq. 5 handles drift
        assert abs(avg - exact) > 0.1  # averaging does not


class TestEq6Incremental:
    @pytest.mark.parametrize("n_coeffs,tol", [(None, 1e-8)])
    def test_exact_coeffs_update_equals_lemma2(self, n_coeffs, tol):
        """Eq. 6 'approx becomes = when n = b': approx state slides == exact."""
        B, ns = 25, 5
        g = np.random.default_rng(4)
        panel = g.standard_normal((6, B * (ns + 4)))
        exact_state = lemma2.init_state(panel[:, : B * ns], B)
        approx_state = incremental.init_state_approx(panel[:, : B * ns], B, B)
        np.testing.assert_allclose(approx_state.corr, exact_state.corr, atol=1e-9)
        for s in range(4):
            w = panel[:, B * (ns + s) : B * (ns + s + 1)]
            lemma2.update(exact_state, lemma2.window_entry(w, exact_state.pairs))
            incremental.update(
                approx_state,
                incremental.window_entry_approx(w, approx_state.pairs, B),
            )
            np.testing.assert_allclose(approx_state.corr, exact_state.corr, atol=tol)

    def test_truncated_update_tracks_eq5_from_scratch(self):
        """Incremental Eq. 6 == Eq. 5 recomputed from scratch, any n."""
        B, ns, n = 20, 4, 6
        g = np.random.default_rng(5)
        panel = g.standard_normal((5, B * (ns + 3)))
        state = incremental.init_state_approx(panel[:, : B * ns], B, n)
        pairs = state.pairs
        for s in range(3):
            w = panel[:, B * (ns + s) : B * (ns + s + 1)]
            incremental.update(
                state, incremental.window_entry_approx(w, pairs, n)
            )
            lo, hi = B * (s + 1), B * (ns + s + 1)
            scratch = incremental.init_state_approx(panel[:, lo:hi], B, n)
            np.testing.assert_allclose(state.corr, scratch.corr, atol=1e-8)

    def test_window_entry_approx_sigma_exact(self):
        """Only the correlation product is approximate — stats stay exact."""
        g = np.random.default_rng(6)
        v = g.standard_normal((4, 30))
        pairs = lemma2.all_pairs(4)
        e = incremental.window_entry_approx(v, pairs, 5)
        np.testing.assert_allclose(e.mu, v.mean(axis=1))
        np.testing.assert_allclose(e.sig, v.std(axis=1))

    def test_per_pair_dft_entry_identical(self):
        g = np.random.default_rng(7)
        v = g.standard_normal((4, 16))
        pairs = lemma2.all_pairs(4)
        a = incremental.window_entry_approx(v, pairs, 8, per_pair_dft=False)
        b = incremental.window_entry_approx(v, pairs, 8, per_pair_dft=True)
        np.testing.assert_allclose(a.pc, b.pc, atol=1e-10)
