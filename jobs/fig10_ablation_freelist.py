"""T10 (Figure 10): deferred free-list ablation, bulk evict m=4096

spark-submit / python entrypoint; prints the reproduction table for
EXPERIMENTS.md. All scales are overridable (DESIGN.md tabulates the
paper-vs-here scale substitutions).
"""
import argparse

from repro.experiments import fig10_ablation_freelist
from repro.harness.tables import format_table


def main(argv=None):
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=16384)
    ap.add_argument("--m", type=int, default=4096)
    ap.add_argument("--rounds", type=int, default=40)
    ns = ap.parse_args(argv)
    header, rows = fig10_ablation_freelist(**vars(ns))
    print(format_table(header, rows))


if __name__ == "__main__":
    main()
