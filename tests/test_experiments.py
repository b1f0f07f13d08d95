"""Experiment drivers at tiny scale: structure and expected orderings.

Each figure's driver must run end-to-end and, where the paper's result
is robust even at tiny scale (native bulk evict beats loop emulation by
~m/log m), the measured ordering is asserted — a smoke-level check that
the reproduction measures what it claims to.
"""
import pytest

from repro import experiments as ex

TINY = dict(n=512, m=64, rounds=6, monoids=("sum",))


def _by_alg(rows, col=1):
    return {r[col]: r for r in rows}


def test_fig07_structure_and_ordering():
    header, rows = ex.fig07_latency_bulk_evict(**TINY)
    assert len(rows) == len(ex.ALGORITHMS)
    d = _by_alg(rows)
    # native bulk evict must beat the m-step loop emulation on medians
    assert d["b_fiba4"][4] < d["nb_fiba4"][4]
    assert d["b_fiba8"][4] < d["nb_fiba8"][4]


def test_fig08_structure():
    header, rows = ex.fig08_latency_bulk_insert(**TINY)
    assert len(rows) == len(ex.ALGORITHMS)
    assert all(r[2] == 6 for r in rows)  # one timed bulk insert per round


def test_fig09_ooo_only_algorithms():
    header, rows = ex.fig09_latency_ooo_insert(n=512, m=64, d=64, rounds=6,
                                               monoids=("sum",))
    names = {r[1] for r in rows}
    assert names == set(ex.OOO_ALGORITHMS)


def test_fig10_variants():
    header, rows = ex.fig10_ablation_freelist(n=512, m=128, rounds=6,
                                              monoids=("sum",))
    names = {r[1] for r in rows}
    assert names == {"b_fiba4_fl", "b_fiba4_nofl"}


def test_fig11_throughput_rows():
    header, rows = ex.fig11_throughput_evict(
        n=512, ms=(8, 64), total_items=512, monoids=("sum",), reps=1
    )
    assert len(rows) == 2 * len(ex.ALGORITHMS)
    assert all(r[4] > 0 for r in rows)


def test_fig12_bulk_insert_throughput_rows():
    header, rows = ex.fig12_throughput_evict_insert(
        n=512, ms=(64,), total_items=512, monoids=("sum",), reps=1
    )
    d = _by_alg(rows)
    assert d["b_fiba4"][4] > d["nb_fiba4"][4], (
        "native bulk ops must outrun loop emulation"
    )


def test_fig13_ooo_bulk_throughput():
    header, rows = ex.fig13_throughput_ooo_bulk(
        n=512, m=64, ds=(0, 64), total_items=256, monoids=("sum",), reps=1
    )
    assert {r[1] for r in rows} == set(ex.OOO_ALGORITHMS)


def test_fig14_single_op_throughput():
    header, rows = ex.fig14_throughput_ooo_single(
        n=512, ds=(0, 64), total_items=256, monoids=("sum",), reps=1
    )
    assert len(rows) == 2 * len(ex.OOO_ALGORITHMS)


def test_fig15_ratios():
    header, rows = ex.fig15_large_window(
        n_small=256, n_large=1024, m=32, rounds=6
    )
    assert len(rows) == 2
    small, large = rows
    assert small[4] == 1.0  # tput ratio of the small window to itself
    assert large[0] == 1024


def test_fig16_citibike_rows():
    header, rows = ex.fig16_citibike(
        n_events=800, window_seconds=1200.0, monoids=("sum",), reps=1
    )
    assert rows[0][1] == "profile"
    algo_rows = rows[1:]
    assert {r[1] for r in algo_rows} == set(ex.OOO_ALGORITHMS)
    assert all(r[4] > 0 for r in algo_rows)
