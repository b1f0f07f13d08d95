"""Stateful streaming operators: FiBA trees as per-key stream state.

Two drivers implement the repro target ("Structured Streaming stateful
operator maintaining the aggregation tree per window, bulk
evictions/insertions via flatMapGroupsWithState"):

* ``stateful_sliding_aggregate`` — the true Structured Streaming
  operator using PySpark's ``applyInPandasWithState`` (the Python
  flatMapGroupsWithState): per key, the FiBA tree is pickled into the
  state store, each micro-batch is applied with one ``bulk_insert``,
  and the window slides with one ``bulk_evict``. Exercised by the
  rate-source integration test.
* ``MicroBatchDriver`` — the same operator semantics in micro-batch
  replay form with explicit state passing (one ``applyInPandas`` round
  per batch, per-key pickled tree state carried between rounds on the
  driver). Deterministic and oracle-checkable; also the measured
  "FiBA operator" side of the Figure 17 system experiment.
"""
from __future__ import annotations

import pickle
from typing import Any, Dict, Iterator, List, Optional, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import (
    BinaryType,
    DoubleType,
    LongType,
    StructField,
    StructType,
)

from ..core.fiba import FibaTree
from ..core.monoids import get as get_monoid

STATE_SCHEMA = StructType([StructField("tree", BinaryType(), True)])


def _out_schema(key_field: StructField) -> StructType:
    return StructType(
        [
            key_field,
            StructField("win_end", DoubleType(), False),
            StructField("agg", DoubleType(), True),
            StructField("n", LongType(), False),
        ]
    )


def stateful_sliding_aggregate(
    events: DataFrame,
    *,
    monoid: str = "sum",
    window: float,
    key_col: str = "k",
    ts_col: str = "ts",
    val_col: str = "v",
    min_arity: int = 4,
) -> DataFrame:
    """Streaming DataFrame -> DataFrame via applyInPandasWithState.

    Each trigger: unpickle the key's tree from the state store, apply
    the micro-batch as one bulk insert, slide the window to the
    youngest timestamp seen for the key, emit (key, win_end, agg, n),
    and pickle the tree back. No watermark bound is required — FiBA
    handles arbitrary out-of-order distance (§2 of the paper).
    """
    from pyspark.sql.streaming.state import GroupState, GroupStateTimeout

    key_field = events.schema[key_col]
    schema = _out_schema(key_field)
    mname, W, mu = monoid, float(window), min_arity

    def fn(
        key: Tuple[Any, ...], pdfs: Iterator[pd.DataFrame], state: GroupState
    ) -> Iterator[pd.DataFrame]:
        if state.exists:
            tree: FibaTree = pickle.loads(state.get[0])
        else:
            tree = FibaTree(get_monoid(mname), min_arity=mu)
        for pdf in pdfs:
            pairs = list(
                zip(
                    pdf[ts_col].astype(float).tolist(),
                    pdf[val_col].astype(float).tolist(),
                )
            )
            tree.bulk_insert(pairs)
        hi = tree.youngest()
        if hi is not None:
            tree.bulk_evict(hi - W)
        state.update((pickle.dumps(tree),))
        yield pd.DataFrame(
            {
                key_col: [key[0]],
                "win_end": [float(hi) if hi is not None else 0.0],
                "agg": [float(tree.query_lowered())],
                "n": [len(tree)],
            }
        )

    return events.groupBy(key_col).applyInPandasWithState(
        fn, schema, STATE_SCHEMA, "update", GroupStateTimeout.NoTimeout
    )


class MicroBatchDriver:
    """Micro-batch replay of the stateful operator with explicit state.

    Equivalent semantics to ``stateful_sliding_aggregate`` but runnable
    on plain (non-streaming) DataFrames: per batch, each key group runs
    in ``applyInPandas`` on the executors with its pickled tree shipped
    in via a broadcast map; updated state comes back in a binary output
    column and is collected into the driver-side dict. This is the
    mechanism flatMapGroupsWithState uses internally, with the state
    store replaced by a driver dict (DESIGN.md §1).
    """

    def __init__(
        self,
        spark: SparkSession,
        *,
        monoid: str = "sum",
        window: float,
        key_col: str = "k",
        ts_col: str = "ts",
        val_col: str = "v",
        min_arity: int = 4,
    ):
        self.spark = spark
        self.monoid = monoid
        self.window = float(window)
        self.key_col = key_col
        self.ts_col = ts_col
        self.val_col = val_col
        self.min_arity = min_arity
        self.state: Dict[Any, bytes] = {}

    def process_batch(self, batch: DataFrame) -> pd.DataFrame:
        """Run one micro-batch; returns the emitted rows as pandas."""
        key_field = batch.schema[self.key_col]
        schema = StructType(
            list(_out_schema(key_field).fields)
            + [StructField("state", BinaryType(), True)]
        )
        mname, W, mu = self.monoid, self.window, self.min_arity
        key_col, ts_col, val_col = self.key_col, self.ts_col, self.val_col
        state_bc = self.spark.sparkContext.broadcast(self.state)

        def fn(pdf: pd.DataFrame) -> pd.DataFrame:
            key = pdf[key_col].iloc[0]
            blob = state_bc.value.get(key)
            if blob is None:
                tree = FibaTree(get_monoid(mname), min_arity=mu)
            else:
                tree = pickle.loads(blob)
            pairs = list(
                zip(
                    pdf[ts_col].astype(float).tolist(),
                    pdf[val_col].astype(float).tolist(),
                )
            )
            tree.bulk_insert(pairs)
            hi = tree.youngest()
            tree.bulk_evict(hi - W)
            return pd.DataFrame(
                {
                    key_col: [key],
                    "win_end": [float(hi)],
                    "agg": [float(tree.query_lowered())],
                    "n": [len(tree)],
                    "state": [pickle.dumps(tree)],
                }
            )

        out = batch.groupBy(key_col).applyInPandas(fn, schema).toPandas()
        state_bc.unpersist()
        for _, row in out.iterrows():
            self.state[row[key_col]] = row["state"]
        return out.drop(columns=["state"])
