"""Spark batch operator vs the DuckDB oracle.

Every query-result check goes through ``repro.oracle.assert_equivalent``
so a wrong tree aggregate, broken grouping, or bad window filter is
caught as a wrong *result*, not just a successful run. Inputs cover
key-value streams (uniform and zipfian) and TPC-H-lite lineitem.
"""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.streaming import sliding_aggregate

WINDOW = 100.0

_ORACLE_SQL = """
    WITH hi AS (
        SELECT k, max(ts) AS win_end FROM ev GROUP BY k
    )
    SELECT ev.k AS k,
           any_value(hi.win_end) - {w} AS win_start,
           any_value(hi.win_end) AS win_end,
           {agg} AS agg,
           count(DISTINCT ev.ts) AS n  -- colliding timestamps combine (§3.1)
    FROM ev JOIN hi ON ev.k = hi.k
    WHERE ev.ts > hi.win_end - {w} AND ev.ts <= hi.win_end
    GROUP BY ev.k
"""


def _events_pdf(n=3000, n_keys=7, seed=0, ooo=True):
    rng = np.random.default_rng(seed)
    ts = np.round(rng.random(n) * 1000, 3) if ooo else np.sort(
        np.round(rng.random(n) * 1000, 3)
    )
    return pd.DataFrame(
        {
            "k": rng.integers(0, n_keys, n),
            "ts": ts,
            "v": np.round(rng.random(n) * 10, 2),
        }
    )


@pytest.mark.parametrize("ooo", [False, True], ids=["in_order", "ooo"])
def test_sum_window_matches_duckdb(spark, ooo):
    pdf = _events_pdf(ooo=ooo)
    events = spark.createDataFrame(pdf)
    out = sliding_aggregate(events, monoid="sum", window=WINDOW)
    assert_equivalent(
        out, _ORACLE_SQL.format(w=WINDOW, agg="sum(ev.v)"), ev=pdf
    )


def test_max_window_matches_duckdb(spark):
    pdf = _events_pdf(seed=3)
    events = spark.createDataFrame(pdf)
    out = sliding_aggregate(events, monoid="max", window=WINDOW)
    assert_equivalent(
        out, _ORACLE_SQL.format(w=WINDOW, agg="max(ev.v)"), ev=pdf
    )


def test_mean_window_matches_duckdb(spark):
    pdf = _events_pdf(seed=4)
    events = spark.createDataFrame(pdf)
    out = sliding_aggregate(events, monoid="mean", window=WINDOW)
    assert_equivalent(
        out, _ORACLE_SQL.format(w=WINDOW, agg="avg(ev.v)"), ev=pdf
    )


def test_geomean_window_matches_duckdb(spark):
    pdf = _events_pdf(seed=5)
    pdf["v"] = pdf["v"] + 0.5  # keep values positive for the geomean
    events = spark.createDataFrame(pdf)
    out = sliding_aggregate(events, monoid="geomean", window=WINDOW)
    assert_equivalent(
        out,
        _ORACLE_SQL.format(
            w=WINDOW, agg="exp(avg(ln(abs(ev.v) + 0.000000000001)))"
        ),
        ev=pdf,
    )


def test_duplicate_timestamps_combine(spark):
    pdf = pd.DataFrame(
        {
            "k": [1, 1, 1, 1],
            "ts": [10.0, 10.0, 20.0, 30.0],
            "v": [1.0, 2.0, 3.0, 4.0],
        }
    )
    events = spark.createDataFrame(pdf)
    out = sliding_aggregate(events, monoid="sum", window=100.0)
    row = out.collect()[0]
    assert row["agg"] == 10.0
    assert row["n"] == 3  # colliding timestamps merge into one entry


def test_lineitem_price_window_per_returnflag(spark):
    """TPC-H-lite: trailing-90-day sum of extended price per returnflag."""
    li = synth_data.lineitem(spark, sf=0.001).toPandas()
    pdf = pd.DataFrame(
        {
            "k": li["l_returnflag"],
            "ts": li["l_shipdate"].astype("int64") / 86_400e9,  # days
            "v": li["l_extendedprice"],
        }
    )
    events = spark.createDataFrame(pdf)
    out = sliding_aggregate(events, monoid="sum", window=90.0)
    assert_equivalent(
        out, _ORACLE_SQL.format(w=90.0, agg="sum(ev.v)"), ev=pdf
    )


def test_zipf_keys_skewed_partitions(spark):
    kv = synth_data.zipf_keys(spark, n=4000, n_keys=50, seed=9).toPandas()
    pdf = pd.DataFrame(
        {
            "k": kv["k"],
            "ts": np.arange(len(kv), dtype=float),
            "v": kv["v"].round(6),
        }
    )
    events = spark.createDataFrame(pdf)
    out = sliding_aggregate(events, monoid="sum", window=500.0)
    assert_equivalent(
        out, _ORACLE_SQL.format(w=500.0, agg="sum(ev.v)"), ev=pdf
    )
