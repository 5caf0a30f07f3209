"""T5a (Fig. 5a): network accuracy vs number of DFT coefficients.

Usage: ``python jobs/fig5a_accuracy.py [n_series] [length]``
"""
import sys

from _common import get_spark

from repro.experiments.fig5 import run_fig5a
from repro.experiments.harness import print_table


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 60
    length = int(sys.argv[2]) if len(sys.argv) > 2 else 3000
    spark = get_spark("fig5a")
    rows = run_fig5a(spark, n_series=n, length=length)
    print_table("T5a — accuracy vs #DFT coefficients (B=200, theta=0.75)", rows)
    spark.stop()


if __name__ == "__main__":
    main()
