"""DABA-Lite baseline: in-order SWAG with worst-case O(1) operations.

The paper's ``daba_lite`` [23] performs single insert and evict in
*worst-case* constant time — its role in the evaluation is the tightest
latency distribution (no flip spikes) among the in-order algorithms.
This module reimplements that guarantee as a de-amortized two-stacks
scheme (see DESIGN.md §2): instead of flipping the back into the front
all at once, a *rotation* rebuilds the front suffix-aggregate array
incrementally, at most ``_STEPS_PER_OP`` aggregation steps per
operation, and always finishes before the old front can run out.

States:

* idle: front segment F (suffix aggregates, consumed by ``fp``) + live
  back B with one running aggregate; M is empty. Window = F_rem ++ B.
* rotating: snapshot S = F_rem-at-trigger ++ M (M = the frozen back);
  the new suffix array over S is built youngest-to-oldest, a constant
  number of steps per op. Queries stay O(1) on the still-valid old
  structures: agg(F_rem) ⊗ agg(M) ⊗ agg(B_new).
* a finished rotation immediately restarts while data remains, so an
  idle structure always has M = B = ∅ and the snapshot size s stays
  within 3× the evictions the old front can still serve — three steps
  per op therefore finish within the front's lifetime (asserted).

Correctness is oracle-tested; the constant-work bound is asserted in
``tests/test_daba.py`` via the ``combine_count`` instrumentation.
"""
from __future__ import annotations

from collections import deque
from typing import Any, Iterable, List, Optional, Tuple

from ..core.monoids import Monoid

_STEPS_PER_OP = 3


class _Seg:
    """Front segment: values + suffix aggregates, stored youngest-first.

    ``vals_rev[j]``/``aggs_rev[j]`` describe the element at logical
    (oldest-first) index ``size-1-j``; ``aggs_rev[j]`` aggregates that
    element combined (in time order) with everything younger in the
    segment. ``fp`` counts elements evicted from the logical front.
    """

    __slots__ = ("vals_rev", "aggs_rev", "fp")

    def __init__(self, vals_rev: List[Any], aggs_rev: List[Any], fp: int = 0):
        self.vals_rev = vals_rev
        self.aggs_rev = aggs_rev
        self.fp = fp

    @property
    def size(self) -> int:
        return len(self.vals_rev)

    def remaining(self) -> int:
        return len(self.vals_rev) - self.fp

    def val(self, i: int) -> Any:
        """Value at logical oldest-first index ``i``."""
        return self.vals_rev[len(self.vals_rev) - 1 - i]

    def front_agg(self, identity: Any) -> Any:
        if self.fp >= len(self.aggs_rev):
            return identity
        return self.aggs_rev[len(self.aggs_rev) - 1 - self.fp]


class DabaLite:
    """Worst-case O(1) in-order SWAG; the paper's ``daba_lite`` role."""

    def __init__(self, monoid: Monoid):
        self.monoid = monoid
        self._front = _Seg([], [])
        self._mid: List[Any] = []  # frozen back; non-empty only mid-rotation
        self._mid_agg: Any = monoid.identity
        self._back: List[Any] = []
        self._back_agg: Any = monoid.identity
        self._rot_active = False
        self._rot_idx = 0  # next logical snapshot index to build (downward)
        self._rot_src: Optional[_Seg] = None  # snapshot front part; its fp
        # counts evictions that hit the snapshot while rotating
        self._rot_nv: List[Any] = []
        self._rot_na: List[Any] = []
        self._times: deque = deque()
        self.combine_count = 0  # instrumentation for the O(1) bound test

    def __len__(self) -> int:
        return len(self._times)

    def oldest(self):
        return self._times[0] if self._times else None

    def youngest(self):
        return self._times[-1] if self._times else None

    # -- rotation machinery -------------------------------------------

    def _start_rotation(self) -> None:
        if not self._back and not self._mid and self._front.remaining() == 0:
            return
        remaining_rev = self._front.vals_rev[: self._front.remaining()]
        self._rot_src = _Seg(remaining_rev, [])
        self._mid = self._back
        self._mid_agg = self._back_agg
        self._back = []
        self._back_agg = self.monoid.identity
        self._rot_idx = len(remaining_rev) + len(self._mid) - 1
        self._rot_nv = []
        self._rot_na = []
        self._rot_active = True

    def _src_val(self, i: int) -> Any:
        src = self._rot_src
        if i < src.size:
            return src.val(i)
        return self._mid[i - src.size]

    def _steps(self, budget: int = _STEPS_PER_OP) -> None:
        M = self.monoid
        while self._rot_active and budget > 0:
            if self._rot_idx < 0:
                # Complete: install (skipping snapshot elements already
                # evicted), then restart immediately if data accumulated.
                self._front = _Seg(self._rot_nv, self._rot_na, fp=self._rot_src.fp)
                self._mid = []
                self._mid_agg = M.identity
                self._rot_active = False
                self._rot_src = None
                if self._back:
                    self._start_rotation()
                continue
            v = self._src_val(self._rot_idx)
            if self._rot_nv:
                agg = M.combine(v, self._rot_na[-1])
                self.combine_count += 1
            else:
                agg = v
            self._rot_nv.append(v)
            self._rot_na.append(agg)
            self._rot_idx -= 1
            budget -= 1

    # -- ADT operations ------------------------------------------------

    def insert(self, t, v) -> None:
        if self._times and not (t > self._times[-1]):
            raise ValueError("daba_lite requires in-order timestamps")
        self._steps()
        lifted = self.monoid.lift(v)
        self._back.append(lifted)
        self._back_agg = self.monoid.combine(self._back_agg, lifted)
        self.combine_count += 1
        self._times.append(t)
        if not self._rot_active:
            self._start_rotation()

    def evict(self) -> None:
        if not self._times:
            return
        self._steps()
        self._times.popleft()
        assert self._front.remaining() > 0, "DABA pacing invariant violated"
        self._front.fp += 1
        if self._rot_active:
            self._rot_src.fp += 1
            assert self._rot_src.fp <= self._rot_src.size, (
                "eviction ran past the rotation snapshot's front part"
            )

    def bulk_evict(self, t) -> None:
        """Loop emulation (no native bulk evict in this algorithm)."""
        while self._times and self._times[0] <= t:
            self.evict()

    def bulk_insert(self, items: Iterable[Tuple[Any, Any]]) -> None:
        """Loop emulation (no native bulk insert in this algorithm)."""
        for t, v in items:
            self.insert(t, v)

    def query(self) -> Any:
        M = self.monoid
        acc = self._front.front_agg(M.identity)
        acc = M.combine(acc, self._mid_agg)
        return M.combine(acc, self._back_agg)

    def query_lowered(self) -> Any:
        return self.monoid.lower(self.query())
