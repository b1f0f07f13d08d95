"""T7 (Figure 7): latency of bulk evict, in-order data

spark-submit / python entrypoint; prints the reproduction table for
EXPERIMENTS.md. All scales are overridable (DESIGN.md tabulates the
paper-vs-here scale substitutions).
"""
import argparse

from repro.experiments import fig07_latency_bulk_evict
from repro.harness.tables import format_table


def main(argv=None):
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=16384)
    ap.add_argument("--m", type=int, default=1024)
    ap.add_argument("--rounds", type=int, default=50)
    ns = ap.parse_args(argv)
    header, rows = fig07_latency_bulk_evict(**vars(ns))
    print(format_table(header, rows))


if __name__ == "__main__":
    main()
