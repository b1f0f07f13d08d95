"""T9 (Figure 9): latency of bulk insert, out-of-order d=1024

spark-submit / python entrypoint; prints the reproduction table for
EXPERIMENTS.md. All scales are overridable (DESIGN.md tabulates the
paper-vs-here scale substitutions).
"""
import argparse

from repro.experiments import fig09_latency_ooo_insert
from repro.harness.tables import format_table


def main(argv=None):
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=16384)
    ap.add_argument("--m", type=int, default=1024)
    ap.add_argument("--d", type=int, default=1024)
    ap.add_argument("--rounds", type=int, default=50)
    ns = ap.parse_args(argv)
    header, rows = fig09_latency_ooo_insert(**vars(ns))
    print(format_table(header, rows))


if __name__ == "__main__":
    main()
