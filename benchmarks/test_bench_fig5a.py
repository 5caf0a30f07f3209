"""T5a bench: approximate vs exact network construction (accuracy table).

Times the two network-construction paths at the Fig. 5a operating point
(B=200, θ=0.75) and asserts the accuracy invariants the figure shows:
edges(approx) >= edges(exact), equality at n = B, D_p -> 1.
"""
import pytest

from repro.experiments.fig5 import run_fig5a

B = 200
THETA = 0.75


@pytest.fixture(scope="module")
def fig5a_rows(spark):
    return run_fig5a(
        spark, n_series=40, length=2000, B=B, theta=THETA, coeff_counts=(50, 200)
    )


def test_bench_fig5a_sweep(benchmark, spark):
    rows = benchmark.pedantic(
        run_fig5a,
        kwargs=dict(
            spark=spark, n_series=40, length=2000, B=B, theta=THETA,
            coeff_counts=(50,),
        ),
        rounds=1,
        iterations=1,
    )
    assert len(rows) == 1


class TestFig5aShape:
    def test_no_false_negatives_in_edge_counts(self, fig5a_rows):
        for r in fig5a_rows:
            assert r["edges_dft"] >= r["edges_exact"]

    def test_exact_at_all_coeffs(self, fig5a_rows):
        last = fig5a_rows[-1]  # n = B = 200
        assert last["edges_dft"] == last["edges_exact"]
        assert last["similarity_ratio"] == pytest.approx(1.0)

    def test_similarity_monotone(self, fig5a_rows):
        sims = [r["similarity_ratio"] for r in fig5a_rows]
        assert sims[0] <= sims[-1] + 1e-12
