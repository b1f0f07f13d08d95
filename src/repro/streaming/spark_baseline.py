"""Host-system windowing baseline for the Figure 17 experiment.

The paper benchmarks FiBA inside Apache Flink against Flink's built-in
window aggregation; our host system is Spark, so the baseline is the
native recompute path: per trigger, buffer all events, filter to the
trailing window and re-aggregate with Spark SQL (Catalyst) from
scratch. This plays exactly the role Flink's built-in operator plays —
the non-incremental system path the FiBA operator is compared against
(substitution documented in DESIGN.md §3).

Only invertible-free semantics are assumed (works for any monoid via
SQL aggregate; we use ``sum``/``max`` in the experiments).
"""
from __future__ import annotations

from typing import Dict

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


_SQL_AGG = {
    "sum": F.sum,
    "max": F.max,
    "mean": F.avg,
}


class RecomputeBaseline:
    """Per-trigger full window recompute over buffered events."""

    def __init__(
        self,
        spark: SparkSession,
        *,
        agg: str = "sum",
        window: float,
        key_col: str = "k",
        ts_col: str = "ts",
        val_col: str = "v",
    ):
        if agg not in _SQL_AGG:
            raise KeyError(f"unsupported SQL aggregate {agg!r}")
        self.spark = spark
        self.agg = agg
        self.window = float(window)
        self.key_col = key_col
        self.ts_col = ts_col
        self.val_col = val_col
        self._buffer: pd.DataFrame | None = None

    def process_batch(self, batch: DataFrame) -> pd.DataFrame:
        """Append the micro-batch, then recompute every key's window."""
        pdf = batch.toPandas()
        self._buffer = (
            pdf if self._buffer is None else pd.concat([self._buffer, pdf])
        )
        buf = self.spark.createDataFrame(self._buffer)
        hi = buf.groupBy(self.key_col).agg(
            F.max(self.ts_col).alias("win_end")
        )
        joined = buf.join(hi, on=self.key_col)
        in_win = joined.where(
            (F.col(self.ts_col) > F.col("win_end") - F.lit(self.window))
            & (F.col(self.ts_col) <= F.col("win_end"))
        )
        out = (
            in_win.groupBy(self.key_col, "win_end")
            .agg(
                _SQL_AGG[self.agg](self.val_col).alias("agg"),
                F.count(F.lit(1)).alias("n"),
            )
            .toPandas()
        )
        # Trim the buffer so it does not grow beyond the union of windows
        # (the system still pays the per-trigger recompute, which is the
        # point of the baseline).
        max_ts = self._buffer[self.ts_col].max()
        self._buffer = self._buffer[
            self._buffer[self.ts_col] > max_ts - 2 * self.window
        ]
        return out
