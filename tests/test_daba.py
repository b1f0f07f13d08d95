"""DABA-Lite: oracle equivalence plus the worst-case O(1) work bound."""
import random

import pytest

from repro.baselines.daba import _STEPS_PER_OP, DabaLite
from repro.core import NaiveSwag, get_monoid


@pytest.mark.parametrize("mname", ["sum", "concat", "max"])
@pytest.mark.parametrize("seed", [0, 1, 2])
def test_random_stream_vs_naive(mname, seed):
    M = get_monoid(mname)
    a, ref = DabaLite(M), NaiveSwag(M)
    random.seed(seed)
    t = 0
    for _ in range(2500):
        if random.random() < 0.55 or len(ref) == 0:
            t += 1
            v = random.randint(0, 9)
            a.insert(t, v)
            ref.insert(t, v)
        else:
            a.evict()
            ref.evict()
        assert a.query() == ref.query()
        assert len(a) == len(ref)


def test_worst_case_constant_work():
    """No operation may perform more than _STEPS_PER_OP+1 combines —
    the worst-case O(1) guarantee that distinguishes daba_lite from
    twostacks_lite in the paper's latency violins."""
    M = get_monoid("sum")
    a = DabaLite(M)
    random.seed(9)
    t = 0
    max_work = 0
    for _ in range(20000):
        before = a.combine_count
        if random.random() < 0.5 or len(a) == 0:
            t += 1
            a.insert(t, 1)
        else:
            a.evict()
        max_work = max(max_work, a.combine_count - before)
    assert max_work <= _STEPS_PER_OP + 1, max_work


def test_burst_insert_then_drain():
    """Bursty pattern: large insert burst, then full drain — the
    pacing invariant must hold throughout (asserted inside evict)."""
    M = get_monoid("concat")
    a, ref = DabaLite(M), NaiveSwag(M)
    for rounds in range(5):
        base = rounds * 1000
        for i in range(300):
            a.insert(base + i, str(i))
            ref.insert(base + i, str(i))
        for _ in range(300):
            a.evict()
            ref.evict()
            assert a.query() == ref.query()
    assert len(a) == 0


def test_rejects_out_of_order():
    a = DabaLite(get_monoid("sum"))
    a.insert(10, 1)
    with pytest.raises(ValueError, match="in-order"):
        a.insert(5, 1)


def test_evict_interleaved_mid_rotation():
    """Evictions landing during an active rotation must be skipped by
    the installed front (the fp hand-off)."""
    M = get_monoid("concat")
    a, ref = DabaLite(M), NaiveSwag(M)
    for i in range(64):
        a.insert(i, str(i))
        ref.insert(i, str(i))
        if i % 3 == 0 and len(ref) > 1:
            a.evict()
            ref.evict()
        assert a.query() == ref.query()


def test_bulk_emulation_loops():
    a = DabaLite(get_monoid("sum"))
    a.bulk_insert([(i, 1) for i in range(20)])
    a.bulk_evict(9)
    assert a.query() == 10.0
