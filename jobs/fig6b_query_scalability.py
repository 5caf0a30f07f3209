"""T6b (Fig. 6b): parallel query time breakdown (read vs matrix calc) vs N.

Reads the stores written by fig6a (pass the same root), or writes fresh
ones first when the root is new.

Usage: ``python jobs/fig6b_query_scalability.py [store_root]``
"""
import sys
import tempfile
from pathlib import Path

from _common import get_spark

from repro.experiments.fig6 import run_fig6a, run_fig6b
from repro.experiments.harness import print_table


def main() -> None:
    root = sys.argv[1] if len(sys.argv) > 1 else tempfile.mkdtemp(prefix="tsubasa6b-")
    spark = get_spark("fig6b")
    if not (Path(root) / "fig6a-n50").exists():
        run_fig6a(spark, root)  # populate stores
    rows = run_fig6b(spark, root)
    print_table("T6b — query time breakdown vs N (B=120, qw=960)", rows)
    spark.stop()


if __name__ == "__main__":
    main()
