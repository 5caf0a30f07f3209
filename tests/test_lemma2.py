"""Lemma 2 tests: incremental sliding-window update == from-scratch."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import lemma1, lemma2


def _panel(seed, n, m):
    g = np.random.default_rng(seed)
    panel = g.standard_normal((n, m))
    panel[1] += 0.7 * panel[0]  # make at least one strong correlation
    return panel


class TestAllPairs:
    def test_count_and_order(self):
        p = lemma2.all_pairs(4)
        assert p.tolist() == [[0, 1], [0, 2], [0, 3], [1, 2], [1, 3], [2, 3]]

    @pytest.mark.parametrize("n", [2, 3, 10, 157])
    def test_count(self, n):
        assert len(lemma2.all_pairs(n)) == n * (n - 1) // 2


class TestWindowEntry:
    def test_stats_match_numpy(self):
        panel = _panel(0, 5, 30)
        pairs = lemma2.all_pairs(5)
        e = lemma2.window_entry(panel, pairs)
        assert e.size == 30
        np.testing.assert_allclose(e.mu, panel.mean(axis=1))
        np.testing.assert_allclose(e.sig, panel.std(axis=1))

    def test_pc_is_sigma_sigma_corr(self):
        panel = _panel(1, 4, 25)
        pairs = lemma2.all_pairs(4)
        e = lemma2.window_entry(panel, pairs)
        for k, (i, j) in enumerate(pairs):
            expect = (
                panel[i].std() * panel[j].std() * np.corrcoef(panel[i], panel[j])[0, 1]
            )
            assert e.pc[k] == pytest.approx(expect)

    def test_constant_series_pc_zero(self):
        panel = np.vstack([np.ones(20), np.arange(20.0)])
        e = lemma2.window_entry(panel, lemma2.all_pairs(2))
        assert e.pc[0] == pytest.approx(0.0)


class TestInitState:
    @pytest.mark.parametrize("B", [20, 50])
    def test_init_equals_direct(self, B):
        panel = _panel(2, 6, 300)
        st_ = lemma2.init_state(panel, B)
        for k, (i, j) in enumerate(st_.pairs):
            assert st_.corr[k] == pytest.approx(
                lemma1.direct_corr(panel[i], panel[j]), abs=1e-10
            )

    def test_sigma_equals_query_window_std(self):
        panel = _panel(3, 5, 200)
        st_ = lemma2.init_state(panel, 40)
        np.testing.assert_allclose(st_.sigma, panel.std(axis=1), atol=1e-12)

    def test_T(self):
        st_ = lemma2.init_state(_panel(4, 3, 120), 50)  # ragged: 50+50+20
        assert st_.T == 120
        assert [w.size for w in st_.windows] == [50, 50, 20]


class TestUpdate:
    @pytest.mark.parametrize("B,ns,slides", [(25, 4, 6), (50, 6, 4), (10, 10, 10)])
    def test_slide_equals_from_scratch(self, B, ns, slides):
        panel = _panel(5, 7, B * (ns + slides))
        st_ = lemma2.init_state(panel[:, : B * ns], B)
        for s in range(slides):
            new = lemma2.window_entry(
                panel[:, B * (ns + s) : B * (ns + s + 1)], st_.pairs
            )
            lemma2.update(st_, new)
            lo, hi = B * (s + 1), B * (ns + s + 1)
            for k, (i, j) in enumerate(st_.pairs):
                assert st_.corr[k] == pytest.approx(
                    lemma1.direct_corr(panel[i, lo:hi], panel[j, lo:hi]), abs=1e-8
                ), f"slide {s} pair {(i, j)}"

    def test_sigma_maintained(self):
        B, ns = 30, 5
        panel = _panel(6, 4, B * (ns + 3))
        st_ = lemma2.init_state(panel[:, : B * ns], B)
        for s in range(3):
            lemma2.update(
                st_,
                lemma2.window_entry(panel[:, B * (ns + s) : B * (ns + s + 1)], st_.pairs),
            )
            lo, hi = B * (s + 1), B * (ns + s + 1)
            np.testing.assert_allclose(
                st_.sigma, panel[:, lo:hi].std(axis=1), atol=1e-10
            )

    def test_unequal_window_sizes(self):
        """The T' correction (DESIGN §3 erratum 2) — unequal drop/add sizes."""
        panel = _panel(7, 5, 260)
        pairs = lemma2.all_pairs(5)
        sizes = [30, 50, 50, 50]
        entries, off = [], 0
        for b in sizes:
            entries.append(lemma2.window_entry(panel[:, off : off + b], pairs))
            off += b
        st_ = lemma2._state_from_entries(pairs, entries)
        new = lemma2.window_entry(panel[:, off : off + 45], pairs)
        lemma2.update(st_, new)
        for k, (i, j) in enumerate(pairs):
            assert st_.corr[k] == pytest.approx(
                lemma1.direct_corr(panel[i, 30 : off + 45], panel[j, 30 : off + 45]),
                abs=1e-9,
            )

    def test_windows_deque_rotates(self):
        panel = _panel(8, 3, 150)
        st_ = lemma2.init_state(panel[:, :100], 50)
        new = lemma2.window_entry(panel[:, 100:150], st_.pairs)
        lemma2.update(st_, new)
        assert st_.windows[-1] is new and len(st_.windows) == 2

    @settings(max_examples=40, deadline=None)
    @given(
        seed=st.integers(0, 2**16),
        n=st.integers(2, 6),
        B=st.integers(5, 40),
        ns=st.integers(2, 6),
    )
    def test_property_one_slide(self, seed, n, B, ns):
        panel = np.random.default_rng(seed).standard_normal((n, B * (ns + 1)))
        st_ = lemma2.init_state(panel[:, : B * ns], B)
        lemma2.update(st_, lemma2.window_entry(panel[:, B * ns :], st_.pairs))
        for k, (i, j) in enumerate(st_.pairs):
            ref = lemma1.direct_corr(panel[i, B:], panel[j, B:])
            assert st_.corr[k] == pytest.approx(ref, abs=1e-8)

    def test_long_slide_sequence_stays_stable(self):
        """Numerical drift over 50 incremental updates stays < 1e-7."""
        B, ns = 20, 8
        panel = _panel(9, 4, B * (ns + 50))
        st_ = lemma2.init_state(panel[:, : B * ns], B)
        for s in range(50):
            lemma2.update(
                st_,
                lemma2.window_entry(panel[:, B * (ns + s) : B * (ns + s + 1)], st_.pairs),
            )
        lo, hi = B * 50, B * (ns + 50)
        for k, (i, j) in enumerate(st_.pairs):
            assert st_.corr[k] == pytest.approx(
                lemma1.direct_corr(panel[i, lo:hi], panel[j, lo:hi]), abs=1e-7
            )
