"""TwoStacks-Lite: oracle equivalence and its stated limitations."""
import random

import pytest

from repro.baselines.twostacks import TwoStacksLite
from repro.core import NaiveSwag, get_monoid


@pytest.mark.parametrize("mname", ["sum", "concat", "max"])
def test_random_stream_vs_naive(mname):
    M = get_monoid(mname)
    a, ref = TwoStacksLite(M), NaiveSwag(M)
    random.seed(5)
    t = 0
    for _ in range(3000):
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


def test_rejects_out_of_order():
    a = TwoStacksLite(get_monoid("sum"))
    a.insert(10, 1)
    with pytest.raises(ValueError, match="in-order"):
        a.insert(5, 1)


def test_flip_preserves_time_order():
    """After a flip the front aggregate must still be time-ordered."""
    M = get_monoid("concat")
    a = TwoStacksLite(M)
    for i in range(6):
        a.insert(i, str(i))
    a.evict()  # forces the flip
    assert a.query() == tuple(str(i) for i in range(1, 6))


def test_bulk_emulation_loops():
    M = get_monoid("sum")
    a = TwoStacksLite(M)
    a.bulk_insert([(i, 1) for i in range(10)])
    a.bulk_evict(4)
    assert a.query() == 5.0
    assert a.oldest() == 5 and a.youngest() == 9


def test_empty_behavior():
    a = TwoStacksLite(get_monoid("sum"))
    assert a.query() == 0.0
    a.evict()
    assert len(a) == 0


def test_drain_and_refill():
    M = get_monoid("concat")
    a, ref = TwoStacksLite(M), NaiveSwag(M)
    for i in range(40):
        a.insert(i, str(i))
        ref.insert(i, str(i))
    for _ in range(40):
        a.evict()
        ref.evict()
        assert a.query() == ref.query()
    for i in range(40, 60):
        a.insert(i, str(i))
        ref.insert(i, str(i))
        assert a.query() == ref.query()
