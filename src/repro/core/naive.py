"""Reference sliding-window aggregator (the abstract data type of §3.1).

``NaiveSwag`` keeps the window as a sorted list of (timestamp, value)
pairs and recomputes ``query()`` by folding left-to-right. It is the
from-scratch "brute force" implementation the paper's problem statement
mentions: obviously correct, asymptotically terrible. Every other
algorithm in this repo is property-tested against it.

It implements the exact ADT semantics:

* ``query()`` — ordered monoidal combination of all window values;
* ``bulk_evict(t)`` — drop every entry with timestamp <= t;
* ``bulk_insert(items)`` — temporal interleave; colliding timestamps
  combine as ``v_pre ⊗ v_in`` (window value first, §3.1).
"""
from __future__ import annotations

import bisect
from typing import Any, Iterable, List, Tuple

from .monoids import Monoid


class NaiveSwag:
    """Sorted-list window; O(n) query, O(n) per structural op."""

    def __init__(self, monoid: Monoid):
        self.monoid = monoid
        self._times: List[Any] = []
        self._vals: List[Any] = []  # lifted values

    def __len__(self) -> int:
        return len(self._times)

    @property
    def times(self) -> List[Any]:
        return list(self._times)

    def oldest(self):
        return self._times[0]

    def youngest(self):
        return self._times[-1]

    def insert(self, t, v) -> None:
        """Single insert of a raw value at timestamp ``t``."""
        lifted = self.monoid.lift(v)
        i = bisect.bisect_left(self._times, t)
        if i < len(self._times) and self._times[i] == t:
            self._vals[i] = self.monoid.combine(self._vals[i], lifted)
        else:
            self._times.insert(i, t)
            self._vals.insert(i, lifted)

    def evict(self) -> None:
        """Single evict of the oldest entry (no-op on empty window)."""
        if self._times:
            self._times.pop(0)
            self._vals.pop(0)

    def bulk_evict(self, t) -> None:
        i = bisect.bisect_right(self._times, t)
        del self._times[:i]
        del self._vals[:i]

    def bulk_insert(self, items: Iterable[Tuple[Any, Any]]) -> None:
        for t, v in items:
            self.insert(t, v)

    def query(self) -> Any:
        acc = self.monoid.identity
        for v in self._vals:
            acc = self.monoid.combine(acc, v)
        return acc

    def query_lowered(self) -> Any:
        return self.monoid.lower(self.query())
