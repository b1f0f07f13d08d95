"""AMTA: oracle equivalence, native bulk evict, stated limitations."""
import random

import pytest

from repro.baselines.amta import Amta
from repro.core import NaiveSwag, get_monoid


@pytest.mark.parametrize("mname", ["sum", "concat", "max"])
def test_random_stream_with_bulk_evicts(mname):
    M = get_monoid(mname)
    a, ref = Amta(M), NaiveSwag(M)
    random.seed(11)
    t = 0
    for _ in range(2500):
        r = random.random()
        if r < 0.5 or len(ref) == 0:
            t += random.randint(1, 3)
            v = random.randint(0, 9)
            a.insert(t, v)
            ref.insert(t, v)
        elif r < 0.75:
            a.evict()
            ref.evict()
        else:
            ts = ref.times
            cut = random.choice(ts[: min(len(ts), 40)])
            if random.random() < 0.3:
                cut += 0.5
            a.bulk_evict(cut)
            ref.bulk_evict(cut)
        assert a.query() == ref.query()
        assert len(a) == len(ref)


def test_bulk_evict_every_boundary():
    n = 64
    for cut in range(n):
        M = get_monoid("concat")
        a = Amta(M)
        for i in range(n):
            a.insert(i, str(i))
        a.bulk_evict(cut)
        assert a.query() == tuple(str(i) for i in range(cut + 1, n))
        assert len(a) == n - cut - 1


def test_bulk_evict_all_and_none():
    a = Amta(get_monoid("sum"))
    for i in range(33):
        a.insert(i, 1)
    a.bulk_evict(-1)
    assert len(a) == 33
    a.bulk_evict(100)
    assert len(a) == 0 and a.query() == 0.0


def test_rejects_out_of_order():
    a = Amta(get_monoid("sum"))
    a.insert(10, 1)
    with pytest.raises(ValueError, match="in-order"):
        a.insert(5, 1)


def test_forest_sizes_are_binary_counter():
    """After 2^k in-order inserts the forest is a single perfect tree."""
    a = Amta(get_monoid("sum"))
    for i in range(64):
        a.insert(i, 1)
    assert [tr.size for tr in a._forest] == [64]
    a.insert(64, 1)
    assert [tr.size for tr in a._forest] == [64, 1]


def test_query_cache_invalidation():
    a = Amta(get_monoid("sum"))
    a.insert(1, 5)
    assert a.query() == 5.0
    a.insert(2, 7)
    assert a.query() == 12.0
    a.evict()
    assert a.query() == 7.0
