"""Stateful streaming operators: cross-batch state, streaming smoke.

``MicroBatchDriver`` (FiBA trees as per-key micro-batch state) is
checked against the host recompute baseline and the naive reference
across batches, including out-of-order arrivals that straddle batch
boundaries; ``stateful_sliding_aggregate`` (applyInPandasWithState) is
exercised end-to-end on a real rate-source stream.
"""
import time

import numpy as np
import pandas as pd
import pytest

from repro.core import NaiveSwag, get_monoid
from repro.streaming import (
    MicroBatchDriver,
    RecomputeBaseline,
    stateful_sliding_aggregate,
)

WINDOW = 200.0


def _batched_events(n=1600, n_keys=4, batches=4, seed=0):
    rng = np.random.default_rng(seed)
    pdf = pd.DataFrame(
        {
            "k": rng.integers(0, n_keys, n),
            "ts": np.round(rng.random(n) * 1000, 3),  # arrival != time order
            "v": np.round(rng.random(n) * 10, 2),
        }
    )
    size = n // batches
    return [pdf.iloc[i * size : (i + 1) * size] for i in range(batches)]


def test_microbatch_driver_matches_recompute_baseline(spark):
    drv = MicroBatchDriver(spark, monoid="sum", window=WINDOW)
    base = RecomputeBaseline(spark, agg="sum", window=WINDOW)
    for chunk in _batched_events():
        o1 = (
            drv.process_batch(spark.createDataFrame(chunk))
            .sort_values("k")
            .reset_index(drop=True)
        )
        o2 = (
            base.process_batch(spark.createDataFrame(chunk))
            .sort_values("k")
            .reset_index(drop=True)
        )
        assert np.allclose(o1["agg"], o2["agg"])
        assert (o1["n"].to_numpy() == o2["n"].to_numpy()).all()
        assert np.allclose(o1["win_end"], o2["win_end"])


def test_microbatch_driver_matches_naive_per_key(spark):
    """Cross-batch state: pure-python replay of the same semantics."""
    chunks = _batched_events(n=1200, n_keys=3, batches=3, seed=7)
    drv = MicroBatchDriver(spark, monoid="sum", window=WINDOW)
    refs = {}
    for chunk in chunks:
        out = drv.process_batch(spark.createDataFrame(chunk))
        for k, grp in chunk.groupby("k"):
            ref = refs.setdefault(k, NaiveSwag(get_monoid("sum")))
            ref.bulk_insert(list(zip(grp["ts"], grp["v"])))
            ref.bulk_evict(ref.youngest() - WINDOW)
        for _, row in out.iterrows():
            ref = refs[row["k"]]
            assert abs(ref.query() - row["agg"]) < 1e-6
            assert len(ref) == row["n"]


def test_microbatch_state_persists_and_evolves(spark):
    drv = MicroBatchDriver(spark, monoid="sum", window=10.0)
    b1 = pd.DataFrame({"k": [0, 0], "ts": [1.0, 2.0], "v": [1.0, 1.0]})
    b2 = pd.DataFrame({"k": [0], "ts": [3.0], "v": [5.0]})
    b3 = pd.DataFrame({"k": [0], "ts": [20.0], "v": [7.0]})  # evicts all old
    o1 = drv.process_batch(spark.createDataFrame(b1))
    assert o1["agg"].iloc[0] == 2.0 and o1["n"].iloc[0] == 2
    o2 = drv.process_batch(spark.createDataFrame(b2))
    assert o2["agg"].iloc[0] == 7.0 and o2["n"].iloc[0] == 3
    o3 = drv.process_batch(spark.createDataFrame(b3))
    assert o3["agg"].iloc[0] == 7.0 and o3["n"].iloc[0] == 1


def test_microbatch_late_arrivals_across_batches(spark):
    """Out-of-order events older than a previous batch still enter the
    window at their correct position (no watermark bound, §2)."""
    drv = MicroBatchDriver(spark, monoid="sum", window=100.0)
    b1 = pd.DataFrame({"k": [0], "ts": [50.0], "v": [1.0]})
    b2 = pd.DataFrame({"k": [0], "ts": [10.0], "v": [2.0]})  # late arrival
    drv.process_batch(spark.createDataFrame(b1))
    o2 = drv.process_batch(spark.createDataFrame(b2))
    assert o2["agg"].iloc[0] == 3.0 and o2["n"].iloc[0] == 2


def test_rate_source_stream_smoke(spark, tmp_path):
    """True Structured Streaming run of the stateful operator."""
    events = (
        spark.readStream.format("rate")
        .option("rowsPerSecond", 500)
        .load()
        .selectExpr(
            "CAST(value % 4 AS BIGINT) AS k",
            "CAST(value AS DOUBLE) AS ts",
            "CAST(value % 10 AS DOUBLE) AS v",
        )
    )
    out = stateful_sliding_aggregate(events, monoid="sum", window=50.0)
    q = (
        out.writeStream.outputMode("update")
        .format("memory")
        .queryName("swag_smoke")
        .option("checkpointLocation", str(tmp_path / "ckpt"))
        .trigger(processingTime="1 second")
        .start()
    )
    try:
        # A rate source is unbounded, so processAllAvailable() would
        # never return: poll the memory sink until all keys reported.
        deadline = time.time() + 90
        rows = []
        while time.time() < deadline:
            rows = spark.sql("SELECT * FROM swag_smoke").collect()
            if len({r["k"] for r in rows}) >= 4:
                break
            time.sleep(2)
    finally:
        q.stop()
    assert rows, "stream produced no output"
    by_key = {}
    for r in rows:  # keep the latest emission per key
        by_key[r["k"]] = r
    for k, r in by_key.items():
        # keys are value%4 with ts=value: window (ts-50, ts] holds
        # ceil(50/4)-ish entries of constant v = k%10... v = value%10
        assert r["n"] >= 1
        assert r["win_end"] % 4 == k
    assert len(by_key) == 4
