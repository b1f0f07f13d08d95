"""Per-key sliding-window aggregation as a DataFrame transformation.

The paper's data structure is per-key mutable window state — a physical
operator, not a planner rule — so the Spark integration follows the
``applyInPandas`` extension point (DESIGN.md §1 "Layering note"): one
FiBA tree per key inside a grouped-map UDF. §6 of the paper sketches
the same partitioning design ("keep disjoint state, a separate tree for
each key") for fission-style parallelism; Spark's shuffle provides
exactly that key partitioning here.

``sliding_aggregate`` is the batch entry point: it processes each key's
events in arrival order as one bulk insert, slides the window to the
youngest event, and emits one row per key with the window aggregate —
semantically ``agg(v for events with ts in (max_ts - W, max_ts])``,
which the tests cross-check against DuckDB SQL via ``repro.oracle``.
"""
from __future__ import annotations

from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import (
    DoubleType,
    LongType,
    StructField,
    StructType,
)

from ..core.fiba import FibaTree
from ..core.monoids import get as get_monoid


def output_schema(key_field: StructField) -> StructType:
    """Output schema: key, window bounds, lowered aggregate, count."""
    return StructType(
        [
            key_field,
            StructField("win_start", DoubleType(), False),
            StructField("win_end", DoubleType(), False),
            StructField("agg", DoubleType(), True),
            StructField("n", LongType(), False),
        ]
    )


def sliding_aggregate(
    events: DataFrame,
    *,
    monoid: str = "sum",
    window: float,
    key_col: str = "k",
    ts_col: str = "ts",
    val_col: str = "v",
    min_arity: int = 4,
) -> DataFrame:
    """Aggregate the trailing ``window`` of each key's event stream.

    Events may arrive out of order in ``ts``; each key's partition is
    bulk-inserted into a FiBA tree, the window is slid with one
    ``bulk_evict``, and the lowered aggregate is emitted. The monoid
    must lower to a float (sum/geomean/mean/max) to fit the schema.
    """
    key_field = events.schema[key_col]
    schema = output_schema(key_field)
    mname = monoid
    W = float(window)

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        M = get_monoid(mname)
        tree = FibaTree(M, min_arity=min_arity)
        ts = pdf[ts_col].to_numpy(dtype=float)
        vs = pdf[val_col].to_numpy(dtype=float)
        tree.bulk_insert(zip(ts.tolist(), vs.tolist()))
        hi = tree.youngest()
        tree.bulk_evict(hi - W)
        return pd.DataFrame(
            {
                key_col: [pdf[key_col].iloc[0]],
                "win_start": [hi - W],
                "win_end": [hi],
                "agg": [float(tree.query_lowered())],
                "n": [len(tree)],
            }
        )

    return events.groupBy(key_col).applyInPandas(fn, schema)
