"""T5b (Fig. 5b): sketch + query time vs basic window size.

Usage: ``python jobs/fig5b_basic_window.py [n_series] [length]``
"""
import sys

from _common import get_spark

from repro.experiments.fig5 import run_fig5b, run_fig5b_kernel
from repro.experiments.harness import print_table


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 300
    length = int(sys.argv[2]) if len(sys.argv) > 2 else 6000
    # kernel table first, before the JVM exists — its background GC/compile
    # threads pollute single-core timings otherwise
    print_table(
        "T5b-kernel — per-basic-window sketch compute vs B (single core, N=157)",
        run_fig5b_kernel(),
    )
    spark = get_spark("fig5b")
    rows = run_fig5b(spark, n_series=n, length=length)
    print_table("T5b — distributed sketch/query time vs basic window size (qw=3000)", rows)
    spark.stop()


if __name__ == "__main__":
    main()
