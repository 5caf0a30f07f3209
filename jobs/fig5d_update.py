"""T5d (Fig. 5d): real-time network update time per new basic window vs B.

Driver-side in-memory experiment (no cluster needed) — the same kernels
the Structured Streaming path invokes per micro-batch.

Usage: ``python jobs/fig5d_update.py [n_series] [--per-pair-dft]``
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/src")

from repro.experiments.fig5 import run_fig5d  # noqa: E402
from repro.experiments.harness import print_table  # noqa: E402


def main() -> None:
    args = [a for a in sys.argv[1:] if not a.startswith("--")]
    n = int(args[0]) if args else 157
    per_pair = "--per-pair-dft" in sys.argv
    # per-pair DFT is O(N²B²) per update by design — cap the sweep so the
    # demonstration stays minutes even at the paper's accounting.
    bs = (50, 100, 200) if per_pair else (50, 100, 200, 300, 600)
    rows = run_fig5d(n_series=n, per_pair_dft=per_pair, basic_windows=bs)
    label = "per-pair DFT (paper accounting)" if per_pair else "shared DFT"
    print_table(f"T5d — update time per new basic window (qw=3000, {label})", rows)


if __name__ == "__main__":
    main()
