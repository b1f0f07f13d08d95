"""Directed FiBA tests: construction, query kinds, small scenarios."""
import pytest

from repro.core import FibaTree, get_monoid
from repro.core.debug import check_invariants


def test_min_arity_validation():
    with pytest.raises(ValueError):
        FibaTree(get_monoid("sum"), min_arity=1)


def test_empty_tree():
    t = FibaTree(get_monoid("sum"))
    assert t.query() == 0.0
    assert t.is_empty()
    assert t.oldest() is None and t.youngest() is None
    assert len(t) == 0
    t.evict()  # no-op
    t.bulk_evict(100)  # no-op
    check_invariants(t)


def test_single_entry_roundtrip():
    t = FibaTree(get_monoid("sum"))
    t.insert(5, 7)
    assert t.query() == 7.0
    assert t.oldest() == 5 == t.youngest()
    t.evict()
    assert t.is_empty() and t.query() == 0.0
    check_invariants(t)


def test_collision_combines_in_order():
    t = FibaTree(get_monoid("concat"))
    t.insert(1, "w")
    t.insert(1, "i")
    assert t.query() == ("w", "i")
    assert len(t) == 1
    check_invariants(t)


def test_collision_at_internal_node():
    """A timestamp equal to a promoted separator combines in place."""
    t = FibaTree(get_monoid("concat"), min_arity=2)
    for i in range(10):
        t.insert(i, str(i))
    check_invariants(t)
    assert not t.root.is_leaf()
    sep = t.root.times[0]  # an internal entry
    t.insert(sep, "X")
    check_invariants(t)
    expect = tuple(
        (str(i), "X") if i == sep else (str(i),) for i in range(10)
    )
    assert t.query() == tuple(x for tup in expect for x in tup)


def test_query_is_timestamp_ordered_concat():
    t = FibaTree(get_monoid("concat"), min_arity=2)
    order = [5, 1, 9, 3, 7, 2, 8, 0, 6, 4]
    for i in order:
        t.insert(i, str(i))
        check_invariants(t)
    assert t.query() == tuple(str(i) for i in range(10))


def test_items_inorder_and_len():
    t = FibaTree(get_monoid("sum"), min_arity=2)
    for i in [4, 2, 7, 1]:
        t.insert(i, i)
    assert [ts for ts, _ in t.items()] == [1, 2, 4, 7]
    assert len(t) == 4


def test_query_lowered_geomean():
    t = FibaTree(get_monoid("geomean"))
    t.bulk_insert([(1, 2.0), (2, 8.0)])
    assert abs(t.query_lowered() - 4.0) < 1e-9


@pytest.mark.parametrize("mu", [2, 3, 4, 8])
def test_growth_and_full_drain(mu):
    t = FibaTree(get_monoid("sum"), min_arity=mu)
    n = 6 * mu * mu
    for i in range(n):
        t.insert(i, 1)
    check_invariants(t)
    assert t.query() == float(n)
    for _ in range(n):
        t.evict()
    check_invariants(t)
    assert t.is_empty() and t.query() == 0.0


def test_evict_to_empty_then_reuse():
    t = FibaTree(get_monoid("sum"), min_arity=2)
    for i in range(50):
        t.insert(i, 1)
    t.bulk_evict(49)
    assert t.is_empty()
    check_invariants(t)
    for i in range(50, 80):
        t.insert(i, 2)
    check_invariants(t)
    assert t.query() == 60.0


def test_pool_reuse_after_bulk_evict():
    t = FibaTree(get_monoid("sum"), min_arity=2, pool_enabled=True)
    for i in range(200):
        t.insert(i, 1)
    t.bulk_evict(150)
    assert len(t.pool) > 0, "bulk evict should defer nodes to the free list"
    before = len(t.pool)
    for i in range(200, 260):
        t.insert(i, 1)
    check_invariants(t)
    assert len(t.pool) < before + 60, "allocation should pop the free list"


def test_nofl_pool_keeps_nothing():
    t = FibaTree(get_monoid("sum"), min_arity=2, pool_enabled=False)
    for i in range(200):
        t.insert(i, 1)
    t.bulk_evict(150)
    assert len(t.pool) == 0
    check_invariants(t)
