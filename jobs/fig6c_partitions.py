"""T6c (Fig. 6c): impact of the number of partitions on sketch/matrix time.

Usage: ``python jobs/fig6c_partitions.py [n_series]``
"""
import sys

from _common import get_spark

from repro.experiments.fig6 import run_fig6c
from repro.experiments.harness import print_table


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 200
    spark = get_spark("fig6c")
    rows = run_fig6c(spark, n_series=n)
    print_table(f"T6c — impact of #partitions (N={n}, B=120, qw=2400)", rows)
    spark.stop()


if __name__ == "__main__":
    main()
