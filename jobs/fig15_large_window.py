"""T15 (§7.3): window-size scaling study (1B-window analog)

spark-submit / python entrypoint; prints the reproduction table for
EXPERIMENTS.md. All scales are overridable (DESIGN.md tabulates the
paper-vs-here scale substitutions).
"""
import argparse

from repro.experiments import fig15_large_window
from repro.harness.tables import format_table


def main(argv=None):
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n-small", type=int, default=16384)
    ap.add_argument("--n-large", type=int, default=262144)
    ap.add_argument("--m", type=int, default=1024)
    ap.add_argument("--rounds", type=int, default=30)
    ns = ap.parse_args(argv)
    header, rows = fig15_large_window(**vars(ns))
    print(format_table(header, rows))


if __name__ == "__main__":
    main()
