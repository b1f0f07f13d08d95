"""Workload generators: schedule well-formedness and stream profiles."""
import numpy as np
import pytest

from repro.core import NaiveSwag, get_monoid
from repro.harness.replay import replay
from repro.workloads.streams import (
    citibike_like,
    evict_insert_rounds,
    prefill_in_order,
)


def test_prefill_is_in_order():
    ops = prefill_in_order(100)
    ts = [op[1] for op in ops]
    assert ts == sorted(ts) and len(ops) == 100
    assert all(op[0] == "insert" for op in ops)


@pytest.mark.parametrize("evict_mode", ["bulk", "single"])
@pytest.mark.parametrize("insert_mode", ["bulk", "single"])
def test_rounds_preserve_window_size(evict_mode, insert_mode):
    n, m, rounds = 128, 16, 12
    prefill, ops = evict_insert_rounds(
        n, m, 0, rounds, evict_mode=evict_mode, insert_mode=insert_mode
    )
    a = NaiveSwag(get_monoid("sum"))
    replay(a, prefill)
    assert len(a) == n
    replay(a, ops)
    assert len(a) == n, "each round must evict m and insert m"


def test_rounds_ooo_distance_respected():
    n, m, d = 256, 16, 64
    prefill, ops = evict_insert_rounds(
        n, m, d, 8, evict_mode="bulk", insert_mode="bulk", seed=1
    )
    a = NaiveSwag(get_monoid("sum"))
    replay(a, prefill)
    for op in ops:
        if op[0] == "bulk_insert":
            batch_lo = min(t for t, _ in op[1])
            times = a.times
            # the earliest bulk entry lands within the youngest d entries
            younger = sum(1 for t in times if t > batch_lo)
            assert 0 < younger <= d
        replay(a, [op])


def test_rounds_reject_d_larger_than_n():
    with pytest.raises(ValueError):
        evict_insert_rounds(16, 4, 32, 1)


def test_rounds_op_counts():
    n, m, rounds = 64, 8, 5
    _, ops = evict_insert_rounds(n, m, 0, rounds, evict_mode="single",
                                 insert_mode="single")
    kinds = [op[0] for op in ops]
    assert kinds.count("evict") == rounds * m
    assert kinds.count("insert") == rounds * m
    assert kinds.count("query") == rounds


def test_citibike_profile_shape():
    """Qualitative Fig 15 shape: broad n, small-median m with a tail,
    tiny-median d with a heavy tail."""
    cb = citibike_like(6000, seed=0, window_seconds=3600.0)
    assert len(cb.event_times) == len(cb.values) == 6000
    mpos = cb.m_series[cb.m_series > 0]
    assert len(mpos) > 100, "watermark advances must trigger evictions"
    assert np.median(mpos) <= 4, "most bulk evicts are small"
    assert cb.m_series.max() >= 20, "bursts must produce large bulks"
    assert np.median(cb.d_series) == 0, "most insertions are near-in-order"
    assert cb.d_series.max() > 100, "delays must produce a heavy d tail"
    assert cb.n_series.max() > 3 * max(1, int(np.median(cb.n_series)) // 3)


def test_citibike_deterministic_in_seed():
    a = citibike_like(500, seed=42)
    b = citibike_like(500, seed=42)
    assert np.array_equal(a.event_times, b.event_times)
    assert np.array_equal(a.values, b.values)


def test_citibike_profile_matches_replay():
    """The generator's m/n bookkeeping must match an actual replay."""
    cb = citibike_like(1200, seed=3, window_seconds=1200.0)
    ref = NaiveSwag(get_monoid("sum"))
    cur_max = -np.inf
    for i, (t, v) in enumerate(zip(cb.event_times, cb.values)):
        before = len(ref)
        ref.insert(t, v)
        if t > cur_max:
            cur_max = t
            ref.bulk_evict(t - cb.window_seconds)
        # n_series counts in-window entries after insert + watermark slide
        assert len(ref) == cb.n_series[i], i


def test_citibike_ops_roundtrip():
    cb = citibike_like(400, seed=5, window_seconds=600.0)
    ops = cb.to_ops()
    kinds = {op[0] for op in ops}
    assert kinds == {"insert", "bulk_evict", "query"}
    a = NaiveSwag(get_monoid("sum"))
    replay(a, ops)
    assert len(a) == cb.n_series[-1]
