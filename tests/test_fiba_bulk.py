"""Directed tests for the bulk algorithms (§4, §5) and their pieces."""
import random

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import FibaTree, NaiveSwag, get_monoid
from repro.core.debug import check_invariants


def build_tree(mu=2, n=64, mname="concat"):
    t = FibaTree(get_monoid(mname), min_arity=mu)
    for i in range(n):
        t.insert(float(i), str(i))
    return t


# --- bulk evict -------------------------------------------------------


@pytest.mark.parametrize("mu", [2, 3, 4])
def test_bulk_evict_every_boundary(mu):
    """Evict at every timestamp of a fixed tree: exercises exact-match
    stops, straddle descents, moves, merges, and root shrinks."""
    n = 80
    for cut in range(n):
        t = build_tree(mu=mu, n=n)
        t.bulk_evict(float(cut))
        check_invariants(t)
        assert t.query() == tuple(str(i) for i in range(cut + 1, n))


@pytest.mark.parametrize("mu", [2, 4])
def test_bulk_evict_between_timestamps(mu):
    n = 60
    for cut in range(0, n - 1, 7):
        t = build_tree(mu=mu, n=n)
        t.bulk_evict(cut + 0.5)  # strictly between entries
        check_invariants(t)
        assert t.query() == tuple(str(i) for i in range(cut + 1, n))


def test_bulk_evict_all_and_none():
    t = build_tree(n=50)
    t.bulk_evict(-1.0)  # before everything: no-op
    check_invariants(t)
    assert len(t) == 50
    t.bulk_evict(1e9)  # after everything: O(1) clear
    check_invariants(t)
    assert t.is_empty()


def test_bulk_evict_on_leaf_root():
    t = FibaTree(get_monoid("sum"), min_arity=4)
    t.bulk_insert([(1, 1), (2, 2), (3, 3)])
    t.bulk_evict(2)
    check_invariants(t)
    assert t.query() == 3.0


def test_bulk_evict_repeated_slides():
    """Sliding a time window forward repeatedly (watermark pattern)."""
    M = get_monoid("sum")
    t = FibaTree(M, min_arity=4)
    ref = NaiveSwag(M)
    for i in range(500):
        t.insert(float(i), 1)
        ref.insert(float(i), 1)
        if i >= 100:
            t.bulk_evict(i - 100.0)
            ref.bulk_evict(i - 100.0)
        if i % 37 == 0:
            check_invariants(t)
        assert t.query() == ref.query()


def test_deferred_free_list_rides_children():
    """alloc() pops a node and pushes its children (§6 protocol)."""
    t = build_tree(mu=2, n=256, mname="sum")
    t.bulk_evict(200.0)
    pool = t.pool
    assert len(pool) > 0
    sizes = [len(pool)]
    nd = pool.alloc()
    sizes.append(len(pool))
    assert nd.times == [] and nd.children == [] and not nd.freed
    # popping may push the popped node's children: size can grow
    assert sizes[1] >= sizes[0] - 1


# --- bulk insert ------------------------------------------------------


@pytest.mark.parametrize("mu", [2, 3, 4, 8])
def test_chunk_sizes_claim1(mu):
    """Claim 1: p = (μ+1)·k + b with μ <= b <= 2μ, for every p > 2μ."""
    t = FibaTree(get_monoid("sum"), min_arity=mu)
    for p in range(2 * mu + 1, 12 * mu):
        sizes = t._chunk_sizes(p)
        assert sum(sizes) == p
        assert all(s == mu + 1 for s in sizes[:-1])
        assert mu <= sizes[-1] <= 2 * mu


@pytest.mark.parametrize("mu", [2, 4])
@pytest.mark.parametrize("m", [1, 5, 33, 200])
def test_bulk_insert_into_empty(mu, m):
    t = FibaTree(get_monoid("concat"), min_arity=mu)
    t.bulk_insert([(float(i), str(i)) for i in range(m)])
    check_invariants(t)
    assert t.query() == tuple(str(i) for i in range(m))


def test_bulk_insert_unsorted_with_duplicates():
    t = FibaTree(get_monoid("concat"), min_arity=2)
    t.bulk_insert([(2.0, "b"), (1.0, "a"), (2.0, "B"), (3.0, "c")])
    check_invariants(t)
    assert t.query() == ("a", "b", "B", "c")
    assert len(t) == 3


def test_bulk_insert_collides_with_existing_everywhere():
    """Re-inserting every existing timestamp combines all in place."""
    n = 40
    t = build_tree(mu=2, n=n)
    t.bulk_insert([(float(i), "+") for i in range(n)])
    check_invariants(t)
    expect = tuple(x for i in range(n) for x in (str(i), "+"))
    assert t.query() == expect
    assert len(t) == n


@pytest.mark.parametrize("mu", [2, 4])
def test_bulk_insert_interleaved_with_window(mu):
    """Bulk keys interspersed among existing keys (Brown-Tarjan case)."""
    t = FibaTree(get_monoid("sum"), min_arity=mu)
    ref = NaiveSwag(get_monoid("sum"))
    evens = [(float(i), 1) for i in range(0, 200, 2)]
    odds = [(float(i), 1) for i in range(1, 200, 2)]
    t.bulk_insert(evens)
    ref.bulk_insert(evens)
    t.bulk_insert(odds)
    ref.bulk_insert(odds)
    check_invariants(t)
    assert t.query() == ref.query() == 200.0


def test_bulk_insert_far_past_and_future():
    t = build_tree(mu=2, n=32)
    t.bulk_insert([(-5.0, "past"), (100.0, "future")])
    check_invariants(t)
    assert t.oldest() == -5.0 and t.youngest() == 100.0


@pytest.mark.parametrize("mu", [2, 3])
def test_huge_bulk_grows_multiple_levels(mu):
    t = FibaTree(get_monoid("sum"), min_arity=mu)
    t.bulk_insert([(float(i), 1) for i in range(1500)])
    check_invariants(t)
    assert t.query() == 1500.0
    assert not t.root.is_leaf()


@given(
    batches=st.lists(
        st.lists(
            st.tuples(
                st.integers(min_value=0, max_value=300),
                st.integers(min_value=0, max_value=9),
            ),
            max_size=40,
        ),
        min_size=1,
        max_size=6,
    )
)
@settings(max_examples=40, deadline=None)
def test_bulk_insert_hypothesis_vs_naive(batches):
    M = get_monoid("sum")
    t = FibaTree(M, min_arity=2)
    ref = NaiveSwag(M)
    for batch in batches:
        fbatch = [(float(ts), v) for ts, v in batch]
        t.bulk_insert(fbatch)
        ref.bulk_insert(sorted(fbatch))
        assert t.query() == ref.query()
    check_invariants(t)


@given(
    n=st.integers(min_value=1, max_value=120),
    cuts=st.lists(st.integers(min_value=-5, max_value=130), max_size=5),
)
@settings(max_examples=40, deadline=None)
def test_bulk_evict_hypothesis_vs_naive(n, cuts):
    M = get_monoid("sum")
    t = FibaTree(M, min_arity=3)
    ref = NaiveSwag(M)
    items = [(float(i), 1) for i in range(n)]
    t.bulk_insert(items)
    ref.bulk_insert(items)
    for c in cuts:
        t.bulk_evict(float(c))
        ref.bulk_evict(float(c))
        assert t.query() == ref.query()
        assert len(t) == len(ref)
    check_invariants(t)


def test_bulk_then_single_ops_mix():
    """Bulk structure must remain a fully functional FiBA tree."""
    random.seed(3)
    M = get_monoid("concat")
    t = FibaTree(M, min_arity=2)
    ref = NaiveSwag(M)
    t.bulk_insert([(float(i), str(i)) for i in range(100)])
    ref.bulk_insert([(float(i), str(i)) for i in range(100)])
    t.bulk_evict(30.0)
    ref.bulk_evict(30.0)
    for i in range(50):
        tt = round(random.uniform(31, 200), 3)
        t.insert(tt, "s")
        ref.insert(tt, "s")
        t.evict()
        ref.evict()
        check_invariants(t)
        assert t.query() == ref.query()
