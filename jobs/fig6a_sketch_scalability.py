"""T6a (Fig. 6a): parallel sketch time breakdown (calc vs write) vs N.

Usage: ``python jobs/fig6a_sketch_scalability.py [store_root]``
"""
import sys
import tempfile

from _common import get_spark

from repro.experiments.fig6 import run_fig6a
from repro.experiments.harness import print_table


def main() -> None:
    root = sys.argv[1] if len(sys.argv) > 1 else tempfile.mkdtemp(prefix="tsubasa6a-")
    spark = get_spark("fig6a")
    rows = run_fig6a(spark, root)
    print_table("T6a — sketch time breakdown vs N (B=120, qw=960)", rows)
    print(f"(sketch stores left under {root} for fig6b)")
    spark.stop()


if __name__ == "__main__":
    main()
