"""T17 (Figure 17): end-to-end system comparison on Spark.

FiBA stateful operator (applyInPandas micro-batch driver with pickled
per-key trees) vs the host system's native recompute windowing, at
window n = 8192 and varying micro-batch bulk size m — the Spark
substitution for the paper's FiBA-in-Flink vs Flink experiment
(DESIGN.md §3).

spark-submit entrypoint; creates its own local SparkSession when run
directly (tests instead pass the shared ``spark`` fixture to
``repro.experiments.fig17_spark_system``).
"""
import argparse

from pyspark.sql import SparkSession

from repro.experiments import fig17_spark_system
from repro.harness.tables import format_table


def main(argv=None):
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n", type=int, default=8192)
    ap.add_argument("--ms", type=int, nargs="+", default=[256, 1024, 2048])
    ap.add_argument("--n-keys", type=int, default=4)
    ap.add_argument("--batches", type=int, default=6)
    ns = ap.parse_args(argv)
    spark = (
        SparkSession.builder.appName("fig17_spark_system")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.shuffle.partitions", "8")
        .getOrCreate()
    )
    try:
        header, rows = fig17_spark_system(
            spark, n=ns.n, ms=tuple(ns.ms), n_keys=ns.n_keys, batches=ns.batches
        )
        print(format_table(header, rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
