"""T16 (Figures 15+16): Citi-Bike-like real-data run

spark-submit / python entrypoint; prints the reproduction table for
EXPERIMENTS.md. All scales are overridable (DESIGN.md tabulates the
paper-vs-here scale substitutions).
"""
import argparse

from repro.experiments import fig16_citibike
from repro.harness.tables import format_table


def main(argv=None):
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n-events", type=int, default=20000)
    ap.add_argument("--window-seconds", type=float, default=14400.0)
    ap.add_argument("--reps", type=int, default=3)
    ns = ap.parse_args(argv)
    header, rows = fig16_citibike(**vars(ns))
    print(format_table(header, rows))


if __name__ == "__main__":
    main()
