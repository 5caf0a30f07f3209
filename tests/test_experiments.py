"""Structural tests for the figure-table harnesses (fast, Spark-free)."""
import numpy as np
import pytest

from repro.experiments import harness
from repro.experiments.fig5 import (
    fig5d_correctness_check,
    run_fig5b_kernel,
    run_fig5c_kernel,
    run_fig5d,
)


class TestHarness:
    def test_timer(self):
        with harness.timer() as t:
            pass
        assert t() >= 0.0

    def test_print_table(self, capsys):
        harness.print_table("demo", [{"a": 1, "b": 0.51234567}, {"a": 22, "b": 3.0}])
        out = capsys.readouterr().out
        assert "demo" in out and "0.5123" in out and "22" in out

    def test_print_empty_table(self, capsys):
        harness.print_table("empty", [])
        assert "(no rows)" in capsys.readouterr().out


class TestFig5dHarness:
    def test_rows_and_positivity(self):
        rows = run_fig5d(
            n_series=12, query_window=200, basic_windows=(20, 50), n_updates=2
        )
        assert [r["B"] for r in rows] == [20, 50]
        for r in rows:
            assert r["tsubasa_update_s"] > 0 and r["dft_update_s"] > 0

    def test_incremental_path_is_exact(self):
        assert fig5d_correctness_check(B=40, n_series=10) < 1e-8


class TestKernelTables:
    def test_fig5b_kernel_structure(self):
        rows = run_fig5b_kernel(n_series=20, basic_windows=(20, 40), reps=2)
        assert len(rows) == 2
        for r in rows:
            assert r["dft75_sketch_window_s"] > 0
            assert r["dft_vs_tsubasa_x"] > 0

    def test_fig5c_kernel_structure_and_shape(self):
        rows = run_fig5c_kernel(
            n_series=24, B=20, query_windows=(100, 400), reps=2
        )
        assert [r["query_window"] for r in rows] == [100, 400]
        # the sketch side never does MORE work than the raw-data side
        for r in rows:
            assert r["baseline_vs_tsubasa_x"] > 0.5
