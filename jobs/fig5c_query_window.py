"""T5c (Fig. 5c): query time vs query window size (TSUBASA / DFT / baseline).

Usage: ``python jobs/fig5c_query_window.py [n_series] [length]``
"""
import sys

from _common import get_spark

from repro.experiments.fig5 import run_fig5c, run_fig5c_kernel
from repro.experiments.harness import print_table


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 600
    length = int(sys.argv[2]) if len(sys.argv) > 2 else 12000
    # kernel table first, before the JVM exists (see fig5b_basic_window)
    print_table(
        "T5c-kernel — query compute vs qw (single core, N=157, B=50)",
        run_fig5c_kernel(),
    )
    spark = get_spark("fig5c")
    rows = run_fig5c(spark, n_series=n, length=length)
    print_table("T5c — distributed query time vs query window size (B=50)", rows)
    spark.stop()


if __name__ == "__main__":
    main()
