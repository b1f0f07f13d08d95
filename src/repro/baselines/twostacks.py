"""TwoStacks-Lite baseline (Tangwongsan et al., VLDBJ 2021 [23]).

In-order-only sliding-window aggregation with amortized O(1) single
insert/evict and O(1) query. The window is split into a *front* stack
(older entries, each cached with the suffix aggregate down to the
oldest... i.e. the aggregate of itself and everything younger within
the front) and a *back* list with one running aggregate. When the front
empties, the back is flipped into a new front in O(|back|) — the
amortized cost source, visible as latency spikes at high percentiles in
the paper's Figures 7-8.

No out-of-order support (insert asserts monotone timestamps) and no
native bulk operations — exactly the limitations the paper tabulates
for this baseline; the harness emulates bulks with loops.
"""
from __future__ import annotations

from collections import deque
from typing import Any, Iterable, List, Tuple

from ..core.monoids import Monoid


class TwoStacksLite:
    """Amortized-O(1) in-order SWAG; the paper's ``twostacks_lite``."""

    def __init__(self, monoid: Monoid):
        self.monoid = monoid
        # front: parallel val/agg lists, oldest at the END (pop() = evict);
        # _faggs[i] aggregates _fvals[i:] *in time order* (older..younger
        # = end..i), i.e. each entry combined before all entries younger
        # than it, so _faggs[-1] covers the whole front.
        self._fvals: List[Any] = []
        self._faggs: List[Any] = []
        self._bvals: List[Any] = []
        self._bagg: Any = monoid.identity
        self._times: deque = deque()  # oldest..youngest, for time queries

    def __len__(self) -> int:
        return len(self._times)

    def oldest(self):
        return self._times[0] if self._times else None

    def youngest(self):
        return self._times[-1] if self._times else None

    def insert(self, t, v) -> None:
        if self._times and not (t > self._times[-1]):
            raise ValueError("twostacks_lite requires in-order timestamps")
        lifted = self.monoid.lift(v)
        self._bvals.append(lifted)
        self._bagg = self.monoid.combine(self._bagg, lifted)
        self._times.append(t)

    def _flip(self) -> None:
        M = self.monoid
        acc = M.identity
        for v in reversed(self._bvals):  # youngest first
            acc = M.combine(v, acc)  # v is older than everything in acc
            self._fvals.append(v)
            self._faggs.append(acc)
        self._bvals = []
        self._bagg = M.identity

    def evict(self) -> None:
        if not self._times:
            return
        if not self._fvals:
            self._flip()
        self._fvals.pop()
        self._faggs.pop()
        self._times.popleft()

    def bulk_evict(self, t) -> None:
        """Loop emulation: no native bulk evict in this algorithm."""
        while self._times and self._times[0] <= t:
            self.evict()

    def bulk_insert(self, items: Iterable[Tuple[Any, Any]]) -> None:
        """Loop emulation: no native bulk insert in this algorithm."""
        for t, v in items:
            self.insert(t, v)

    def query(self) -> Any:
        front = self._faggs[-1] if self._faggs else self.monoid.identity
        return self.monoid.combine(front, self._bagg)

    def query_lowered(self) -> Any:
        return self.monoid.lower(self.query())
