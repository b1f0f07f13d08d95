"""T14 (Figure 14): throughput vs d, single ops (m=1)

spark-submit / python entrypoint; prints the reproduction table for
EXPERIMENTS.md. All scales are overridable (DESIGN.md tabulates the
paper-vs-here scale substitutions).
"""
import argparse

from repro.experiments import fig14_throughput_ooo_single
from repro.harness.tables import format_table


def main(argv=None):
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=16384)
    ap.add_argument("--total-items", type=int, default=8192)
    ap.add_argument("--reps", type=int, default=3)
    ns = ap.parse_args(argv)
    header, rows = fig14_throughput_ooo_single(**vars(ns))
    print(format_table(header, rows))


if __name__ == "__main__":
    main()
