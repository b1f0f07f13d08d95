"""Harness: replay mapping, latency stats, throughput accounting, tables."""
import pytest

from repro import algorithms
from repro.core import get_monoid
from repro.harness.latency import LatencyStats, measure_latency
from repro.harness.replay import apply_op, replay
from repro.harness.tables import format_table
from repro.harness.throughput import count_items, measure_throughput
from repro.workloads.streams import evict_insert_rounds


def test_apply_op_unknown_kind():
    a = algorithms.make("b_fiba4", get_monoid("sum"))
    with pytest.raises(ValueError, match="unknown op kind"):
        apply_op(a, ("frobnicate",))


def test_replay_applies_everything():
    a = algorithms.make("b_fiba4", get_monoid("sum"))
    replay(a, [("insert", 1.0, 2.0), ("insert", 2.0, 3.0), ("bulk_evict", 1.0)])
    assert a.query() == 3.0


def test_latency_stats_from_samples():
    st = LatencyStats.from_ns([1000, 2000, 3000, 4000])
    assert st.count == 4
    assert st.mean_us == 2.5
    assert st.median_us == 2.5
    assert st.max_us == 4.0
    assert st.p999_us <= st.p99999_us <= st.max_us


def test_measure_latency_times_selected_kind_only():
    a = algorithms.make("b_fiba4", get_monoid("sum"))
    prefill, ops = evict_insert_rounds(64, 8, 0, 5)
    replay(a, prefill)
    st = measure_latency(a, ops, ("bulk_evict",))
    assert st.count == 5  # one bulk evict per round
    assert st.mean_us > 0


def test_count_items_counts_inserts():
    _, ops = evict_insert_rounds(32, 4, 0, 3, insert_mode="bulk")
    assert count_items(ops) == 12
    _, ops = evict_insert_rounds(32, 4, 0, 3, insert_mode="single")
    assert count_items(ops) == 12


def test_measure_throughput_runs_reps():
    M = get_monoid("sum")
    prefill, ops = evict_insert_rounds(64, 8, 0, 4)
    r = measure_throughput(
        lambda: algorithms.make("b_fiba4", M), prefill, ops, reps=2
    )
    assert r.items == 32
    assert 0 < r.min_tput <= r.mean_tput <= r.max_tput


def test_format_table_alignment_and_types():
    out = format_table(
        ("name", "value"), [("a", 1234.5), ("long-name", 0.123456)]
    )
    lines = out.splitlines()
    assert lines[0].startswith("name")
    assert "1,234" in out or "1,235" in out
    assert "0.123" in out
    assert len(lines) == 4
