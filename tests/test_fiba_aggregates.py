"""Directed tests of §3.2 internals: aggregate kinds, fingers, search."""
import pytest

from repro.core import FibaTree, get_monoid
from repro.core.debug import check_invariants


def grown_tree(mu=2, n=100, mname="concat"):
    t = FibaTree(get_monoid(mname), min_arity=mu)
    for i in range(n):
        t.insert(float(i), str(i))
    return t


def test_query_reads_only_fingers_and_root():
    """query() must be computable from exactly three stored aggregates
    (left finger ⊗ root ⊗ right finger) — the O(1) guarantee."""
    t = grown_tree()
    M = t.monoid
    expected = M.combine(
        M.combine(t.left_finger.agg, t.root.agg), t.right_finger.agg
    )
    assert t.query() == expected


def test_fingers_are_extreme_leaves():
    t = grown_tree(n=200)
    assert t.left_finger.is_leaf() and t.right_finger.is_leaf()
    assert t.left_finger.times[0] == t.oldest() == 0.0
    assert t.right_finger.times[-1] == t.youngest() == 199.0


def test_spine_flags_partition_the_tree():
    t = grown_tree(n=300, mu=2)
    seen_left = seen_right = 0
    stack = [t.root]
    while stack:
        y = stack.pop()
        assert not (y.left_spine and y.right_spine)
        seen_left += y.left_spine
        seen_right += y.right_spine
        stack.extend(y.children)
    # both spines have exactly one node per non-root level
    depth = 0
    y = t.root
    while not y.is_leaf():
        y = y.children[0]
        depth += 1
    assert seen_left == depth and seen_right == depth


def test_root_stores_inner_aggregate_excluding_spines():
    """The root's stored aggregate must exclude both spine subtrees."""
    t = grown_tree(n=100, mname="concat")
    root = t.root
    full = t.query()
    # combining the three parts must equal the full window, and the
    # root part alone must be a strict infix of it
    assert len(root.agg) < len(full)
    assert t.left_finger.agg + root.agg + t.right_finger.agg == full


def test_in_order_insert_touches_only_right_finger_agg():
    """Amortized-O(1) evidence: an in-order insert that does not split
    leaves every stored aggregate untouched except the right finger's."""
    t = grown_tree(n=100, mu=4, mname="sum")
    # make sure next insert will not split: finger has room
    while len(t.right_finger.times) >= t.max_entries:
        t.insert(float(1000 + len(t)), 0.0)
    before = {}
    stack = [t.root]
    while stack:
        y = stack.pop()
        before[id(y)] = y.agg
        stack.extend(y.children)
    rf = t.right_finger
    t.insert(99999.0, 5.0)
    stack = [t.root]
    while stack:
        y = stack.pop()
        if y is rf:
            assert y.agg != before[id(y)]
        else:
            assert y.agg == before[id(y)], "non-finger aggregate touched"
        stack.extend(y.children)


def test_climb_locate_from_right_finger_in_order():
    t = grown_tree(n=100, mu=2)
    node, j, exact = t._climb_locate(t.right_finger, 1000.0)
    assert node is t.right_finger and not exact
    assert j == len(node.times)


def test_climb_locate_finds_exact_internal():
    t = grown_tree(n=100, mu=2)
    sep = t.root.times[0]
    node, j, exact = t._climb_locate(t.right_finger, sep)
    assert exact and node.times[j] == sep


def test_climb_locate_far_left():
    t = grown_tree(n=100, mu=2)
    node, j, exact = t._climb_locate(t.right_finger, -5.0)
    assert node is t.left_finger and j == 0 and not exact


@pytest.mark.parametrize("mu", [2, 3, 4])
def test_arity_bounds_after_heavy_mixed_use(mu):
    t = FibaTree(get_monoid("sum"), min_arity=mu)
    for i in range(300):
        t.insert(float(i), 1.0)
    t.bulk_evict(120.0)
    t.bulk_insert([(float(i) + 0.5, 1.0) for i in range(121, 250)])
    check_invariants(t)
    stack = [t.root]
    while stack:
        y = stack.pop()
        if y is not t.root:
            assert mu <= y.arity <= 2 * mu
        stack.extend(y.children)


def test_move_batch_scenario_fig18():
    """Bulk evict that underflows a boundary node whose neighbor has
    surplus: repaired by moving entries through the ancestor."""
    t = grown_tree(n=64, mu=2, mname="concat")
    # pick a cut one entry into a leaf beyond the finger so the leaf
    # underflows and borrows from its right neighbor
    cut = 8.0
    t.bulk_evict(cut)
    check_invariants(t)
    assert t.query() == tuple(str(i) for i in range(9, 64))


def test_merge_non_sibling_scenario_fig19():
    """Cut placed so the remnant must merge with a non-sibling."""
    for cut in (14.0, 30.0, 46.0):
        t = grown_tree(n=64, mu=2, mname="concat")
        t.bulk_evict(cut)
        check_invariants(t)
        assert t.query() == tuple(str(i) for i in range(int(cut) + 1, 64))


def test_make_child_root_scenario_fig20():
    """Evicting almost everything shrinks the tree from the top."""
    t = grown_tree(n=256, mu=2, mname="sum")
    t.bulk_evict(253.0)
    check_invariants(t)
    assert len(t) == 2 and t.query() == 254.0 + 255.0
