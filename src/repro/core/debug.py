"""From-scratch FiBA invariant checker (test/debug only).

``check_invariants(tree)`` re-derives *every* invariant of §3.2 — height,
order, arity, spine flags, fingers, and all four kinds of
location-sensitive partial aggregates — without trusting any cached
state, and raises ``AssertionError`` with a description on violation.
Property tests call it after every operation, which is how the
reproduction earns confidence in the balancing and aggregate-repair
code. Use exact monoids (sum over ints, concat, bloom, max) with it:
aggregate equality is checked with ``==``.
"""
from __future__ import annotations

from typing import Any, Dict

from .fiba import FibaTree
from .node import Node


def check_invariants(tree: FibaTree) -> None:
    root = tree.root
    mu = tree.min_arity
    M = tree.monoid
    assert root.parent is None, "root must have no parent"
    assert not root.freed, "root is freed"

    # --- height, order, arity, parent pointers ------------------------
    leaf_depths = set()
    prev_time: list = []  # mutable holder for the last seen time

    def walk(y: Node, lo, hi, depth: int) -> None:
        assert not y.freed, "freed node reachable"
        assert len(y.vals) == len(y.times), "times/vals length mismatch"
        if y.children:
            assert len(y.children) == len(y.times) + 1, (
                f"internal node with {len(y.children)} children, "
                f"{len(y.times)} entries"
            )
        if y is not root:
            assert mu <= y.arity <= 2 * mu, (
                f"arity {y.arity} outside [{mu}, {2 * mu}]"
            )
        else:
            assert y.arity <= 2 * mu, f"root arity {y.arity} > {2 * mu}"
            if not y.is_leaf():
                assert y.arity >= 2, "internal root must have >= 2 children"
        for i, t in enumerate(y.times):
            if i > 0:
                assert y.times[i - 1] < t, "node times not strictly increasing"
            assert lo is None or t > lo, "order invariant (lower) violated"
            assert hi is None or t < hi, "order invariant (upper) violated"
        if y.is_leaf():
            leaf_depths.add(depth)
            for t in y.times:
                if prev_time:
                    assert prev_time[0] < t, "global time order violated"
                    prev_time[0] = t
                else:
                    prev_time.append(t)
            return
        for i, c in enumerate(y.children):
            assert c.parent is y, "child parent pointer wrong"
            c_lo = y.times[i - 1] if i > 0 else lo
            c_hi = y.times[i] if i < len(y.times) else hi
            walk(c, c_lo, c_hi, depth + 1)
            if i < len(y.times):
                t = y.times[i]
                if prev_time:
                    assert prev_time[0] < t, "global time order violated"
                    prev_time[0] = t
                else:
                    prev_time.append(t)

    walk(root, None, None, 0)
    assert len(leaf_depths) <= 1, f"leaves at different depths: {leaf_depths}"

    # --- spine flags and fingers --------------------------------------
    expect_left, expect_right = set(), set()
    if not root.is_leaf():
        y = root.children[0]
        while True:
            expect_left.add(id(y))
            if y.is_leaf():
                assert tree.left_finger is y, "left finger wrong"
                break
            y = y.children[0]
        y = root.children[-1]
        while True:
            expect_right.add(id(y))
            if y.is_leaf():
                assert tree.right_finger is y, "right finger wrong"
                break
            y = y.children[-1]
    else:
        assert tree.left_finger is root and tree.right_finger is root, (
            "fingers must point at a leaf root"
        )

    def check_flags(y: Node) -> None:
        assert y.left_spine == (id(y) in expect_left), f"left flag wrong on {y!r}"
        assert y.right_spine == (id(y) in expect_right), f"right flag wrong on {y!r}"
        for c in y.children:
            check_flags(c)

    assert not root.left_spine and not root.right_spine, "root must not be flagged"
    for c in root.children:
        check_flags(c)

    # --- aggregates (all four kinds, from scratch) --------------------
    up_memo: Dict[int, Any] = {}

    def up(y: Node) -> Any:
        if id(y) in up_memo:
            return up_memo[id(y)]
        if y.is_leaf():
            acc = M.identity
            for v in y.vals:
                acc = M.combine(acc, v)
        else:
            acc = up(y.children[0])
            for i in range(len(y.times)):
                acc = M.combine(acc, y.vals[i])
                acc = M.combine(acc, up(y.children[i + 1]))
        up_memo[id(y)] = acc
        return acc

    def inner(y: Node) -> Any:
        acc = M.identity
        if y.is_leaf():
            for v in y.vals:
                acc = M.combine(acc, v)
            return acc
        k = len(y.times)
        for i in range(k):
            acc = M.combine(acc, y.vals[i])
            if i < k - 1:
                acc = M.combine(acc, up(y.children[i + 1]))
        return acc

    assert root.agg == inner(root), "root inner aggregate wrong"

    def check_left(y: Node, parent_part: Any) -> None:
        expected = inner(y)
        if not y.is_leaf():
            expected = M.combine(expected, up(y.children[-1]))
        expected = M.combine(expected, parent_part)
        assert y.agg == expected, f"left aggregate wrong at {y!r}"
        if not y.is_leaf():
            check_left(y.children[0], expected)

    def check_right(y: Node, parent_part: Any) -> None:
        expected = inner(y)
        if not y.is_leaf():
            expected = M.combine(up(y.children[0]), expected)
        expected = M.combine(parent_part, expected)
        assert y.agg == expected, f"right aggregate wrong at {y!r}"
        if not y.is_leaf():
            check_right(y.children[-1], expected)

    def check_up(y: Node) -> None:
        assert y.agg == up(y), f"up aggregate wrong at {y!r}"
        for c in y.children:
            check_up(c)

    if not root.is_leaf():
        check_left(root.children[0], M.identity)
        check_right(root.children[-1], M.identity)
        # interior children of root store up aggregates
        for c in root.children[1:-1]:
            check_up(c)
        # interior (non-first/last) children of spine nodes store up aggs
        def check_spine_interior(y: Node, left: bool) -> None:
            if y.is_leaf():
                return
            inner_children = y.children[1:] if left else y.children[:-1]
            for c in inner_children:
                check_up(c)
            check_spine_interior(y.children[0] if left else y.children[-1], left)

        check_spine_interior(root.children[0], True)
        check_spine_interior(root.children[-1], False)
