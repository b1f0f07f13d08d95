"""Provided TPC-H-lite generators: determinism and schema sanity."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.0005, seed=1).toPandas()
    b = synth_data.lineitem(spark, sf=0.0005, seed=1).toPandas()
    assert a.equals(b)
    assert {"l_orderkey", "l_extendedprice", "l_shipdate"} <= set(a.columns)


def test_orders_keys_are_contiguous(spark):
    o = synth_data.orders(spark, sf=0.001).toPandas()
    assert o["o_orderkey"].tolist() == list(range(1, len(o) + 1))


def test_scale_factor_scales_rows(spark):
    small = synth_data.customer(spark, sf=0.001).count()
    large = synth_data.customer(spark, sf=0.002).count()
    assert large == 2 * small


def test_oracle_join_on_synth_tables(spark):
    """The DuckDB oracle catches result differences on a real join."""
    li = synth_data.lineitem(spark, sf=0.0005)
    o = synth_data.orders(spark, sf=0.0005)
    li.createOrReplaceTempView("li_v")
    o.createOrReplaceTempView("o_v")
    got = spark.sql(
        """
        SELECT o_orderpriority AS pri,
               round(sum(l_extendedprice), 2) AS revenue
        FROM li_v JOIN o_v ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority AS pri,
               round(sum(l_extendedprice), 2) AS revenue
        FROM li JOIN o ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        o=o,
    )
