"""AMTA baseline (Villalba, Berral, Carrera — TPDS 2019 [29]).

The Amortized Monoid Tree Aggregator: in-order sliding-window
aggregation with amortized O(1) insert/evict and — its distinguishing
feature in the paper's evaluation — native bulk eviction in O(log n),
but *no* bulk insertion and no out-of-order support.

This reimplementation realizes the same complexity class as a
binomial-counter forest of perfect aggregation trees ordered
oldest→youngest (DESIGN.md §2):

* ``insert`` appends a leaf tree and merges equal-sized neighbors like
  incrementing a binary counter — amortized O(1);
* ``bulk_evict(t)`` drops whole trees from the old end and splits the
  one straddling tree along the boundary, keeping the right-side
  subtrees — O(log n);
* ``query`` folds the O(log n) tree roots in time order, with the fold
  cached between structural changes.
"""
from __future__ import annotations

from typing import Any, Iterable, List, Optional, Tuple

from ..core.monoids import Monoid


class _TreeNode:
    """Perfect aggregation subtree: leaves hold window entries."""

    __slots__ = ("size", "tmin", "tmax", "agg", "left", "right")

    def __init__(self, size, tmin, tmax, agg, left=None, right=None):
        self.size = size
        self.tmin = tmin
        self.tmax = tmax
        self.agg = agg
        self.left = left
        self.right = right


class Amta:
    """In-order SWAG with native O(log n) bulk evict."""

    def __init__(self, monoid: Monoid):
        self.monoid = monoid
        self._forest: List[_TreeNode] = []  # oldest..youngest
        self._n = 0
        self._cached_query: Optional[Any] = None

    def __len__(self) -> int:
        return self._n

    def oldest(self):
        return self._forest[0].tmin if self._forest else None

    def youngest(self):
        return self._forest[-1].tmax if self._forest else None

    def insert(self, t, v) -> None:
        if self._forest and not (t > self._forest[-1].tmax):
            raise ValueError("amta requires in-order timestamps")
        M = self.monoid
        self._forest.append(_TreeNode(1, t, t, M.lift(v)))
        # Binary-counter merge: combine equal-sized youngest trees.
        while (
            len(self._forest) >= 2
            and self._forest[-1].size == self._forest[-2].size
        ):
            r = self._forest.pop()
            l = self._forest.pop()
            self._forest.append(
                _TreeNode(
                    l.size + r.size, l.tmin, r.tmax,
                    M.combine(l.agg, r.agg), l, r,
                )
            )
        self._n += 1
        self._cached_query = None

    def evict(self) -> None:
        """Single evict of the oldest entry (= bulk evict at its time)."""
        if self._forest:
            self.bulk_evict(self._forest[0].tmin)

    def bulk_evict(self, t) -> None:
        """Drop every entry with timestamp <= t in O(log n)."""
        dropped = 0
        while self._forest and self._forest[0].tmax <= t:
            dropped += self._forest[0].size
            self._forest.pop(0)
        if self._forest and self._forest[0].tmin <= t:
            head = self._forest.pop(0)
            pieces: List[_TreeNode] = []
            node = head
            while node.left is not None:
                if node.left.tmax <= t:
                    dropped += node.left.size
                    node = node.right
                else:
                    pieces.append(node.right)
                    node = node.left
            # node is a leaf straddling candidate
            if node.tmax <= t:
                dropped += node.size
            else:
                pieces.append(node)
            # pieces were collected youngest-side-first along the descent;
            # reversed they are oldest..youngest.
            self._forest[:0] = reversed(pieces)
        self._n -= dropped
        self._cached_query = None

    def bulk_insert(self, items: Iterable[Tuple[Any, Any]]) -> None:
        """Loop emulation: AMTA has no native bulk insert (the paper's
        stated gap that FiBA's bulkInsert closes)."""
        for t, v in items:
            self.insert(t, v)

    def query(self) -> Any:
        if self._cached_query is None:
            M = self.monoid
            acc = M.identity
            for tr in self._forest:
                acc = M.combine(acc, tr.agg)
            self._cached_query = acc
        return self._cached_query

    def query_lowered(self) -> Any:
        return self.monoid.lower(self.query())
