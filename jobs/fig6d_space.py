"""T6d (Fig. 6d): sketch store size on disk vs basic window size.

Usage: ``python jobs/fig6d_space.py [store_root]``
"""
import sys
import tempfile

from _common import get_spark

from repro.experiments.fig6 import run_fig6d
from repro.experiments.harness import print_table


def main() -> None:
    root = sys.argv[1] if len(sys.argv) > 1 else tempfile.mkdtemp(prefix="tsubasa6d-")
    spark = get_spark("fig6d")
    rows = run_fig6d(spark, root)
    print_table("T6d — sketch store size vs basic window size (N=200)", rows)
    spark.stop()


if __name__ == "__main__":
    main()
