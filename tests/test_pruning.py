"""Correlation-inference pruning tests (§3.5, Eq. 7, Algorithm 5)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import pruning


def _random_corr_panel(seed, n, m=300):
    g = np.random.default_rng(seed)
    base = g.standard_normal((3, m))
    mix = g.random((n, 3))
    panel = mix @ base + 0.5 * g.standard_normal((n, m))
    return panel, np.corrcoef(panel)


class TestBounds:
    @settings(max_examples=100, deadline=None)
    @given(seed=st.integers(0, 2**16))
    def test_eq7_bounds_contain_true_corr(self, seed):
        """Eq. 7 is a sound interval for any real data — the PSD constraint."""
        panel, cm = _random_corr_panel(seed, 3, 120)
        L, U = pruning.bounds(cm[0, 2], cm[1, 2])
        assert L - 1e-9 <= cm[0, 1] <= U + 1e-9

    def test_tight_when_anchor_perfectly_correlated(self):
        L, U = pruning.bounds(1.0, 0.8)
        assert L == pytest.approx(0.8) and U == pytest.approx(0.8)

    def test_vacuous_when_anchor_uninformative(self):
        L, U = pruning.bounds(0.0, 0.0)
        assert L == pytest.approx(-1.0) and U == pytest.approx(1.0)

    def test_symmetric(self):
        L1, U1 = pruning.bounds(0.6, -0.3)
        L2, U2 = pruning.bounds(-0.3, 0.6)
        assert L1 == pytest.approx(L2) and U1 == pytest.approx(U2)

    def test_clips_out_of_range_inputs(self):
        L, U = pruning.bounds(1.0000001, 0.5)
        assert np.isfinite(L) and np.isfinite(U)


class TestInferFromAnchor:
    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("theta", [0.5, 0.75, 0.9])
    def test_decisions_are_sound(self, seed, theta):
        """Whenever a cell is decided, it matches the exact |c| >= θ truth."""
        _, cm = _random_corr_panel(seed, 12)
        dec = pruning.infer_from_anchor(cm[0], theta)
        truth = (np.abs(cm) >= theta).astype(np.int8)
        decided = dec != -1
        assert (dec[decided] == truth[decided]).all()

    def test_high_theta_decides_more_nonedges(self):
        _, cm = _random_corr_panel(3, 15)
        undec_lo = (pruning.infer_from_anchor(cm[0], 0.6) == -1).sum()
        undec_hi = (pruning.infer_from_anchor(cm[0], 0.95) == -1).sum()
        assert undec_hi <= undec_lo

    def test_diagonal_is_edge(self):
        _, cm = _random_corr_panel(4, 6)
        assert (np.diag(pruning.infer_from_anchor(cm[0], 0.75)) == 1).all()


class TestPruneMatrix:
    @pytest.mark.parametrize("seed", range(5))
    @pytest.mark.parametrize("theta", [0.6, 0.8])
    def test_matches_exact_network(self, seed, theta):
        _, cm = _random_corr_panel(seed, 14)
        res = pruning.prune_matrix(lambda z: cm[z], 14, theta)
        truth = (np.abs(cm) >= theta).astype(np.int8)
        np.testing.assert_array_equal(res.matrix, truth)
        assert (res.matrix != -1).all()

    def test_anchor_budget_falls_back_to_compute_rest(self):
        _, cm = _random_corr_panel(9, 14)
        res = pruning.prune_matrix(lambda z: cm[z], 14, 0.75, max_anchors=1)
        truth = (np.abs(cm) >= 0.75).astype(np.int8)
        np.testing.assert_array_equal(res.matrix, truth)
        assert res.anchors == [0]

    def test_infers_some_cells_on_structured_data(self):
        """With strongly clustered series, Eq. 7 decides cells for free."""
        g = np.random.default_rng(11)
        base = g.standard_normal(400)
        panel = np.vstack(
            [base + 0.05 * g.standard_normal(400) for _ in range(8)]
            + [g.standard_normal(400) for _ in range(4)]
        )
        cm = np.corrcoef(panel)
        res = pruning.prune_matrix(lambda z: cm[z], 12, 0.75, max_anchors=3)
        assert res.n_inferred > 0
        truth = (np.abs(cm) >= 0.75).astype(np.int8)
        np.testing.assert_array_equal(res.matrix, truth)

    def test_counts_accounting(self):
        _, cm = _random_corr_panel(13, 10)
        res = pruning.prune_matrix(lambda z: cm[z], 10, 0.7)
        assert res.n_computed >= (len(res.anchors)) * 9
        assert res.n_inferred >= 0
