"""Aggregation monoids (§3.1 of the paper).

A monoid is ``(S, combine, identity)`` with associative ``combine``.
Sliding-window aggregation algorithms in this repo are written against
this interface and must work for *any* monoid — in particular
non-commutative and non-invertible ones, which is what distinguishes the
general algorithms (FiBA) from subtraction tricks.

The paper's experiments use three monoids spanning a cost spectrum:
``sum`` (fast), ``geomean`` (medium, a lifted monoid), and ``bloom``
(slow, a Bloom-filter OR). We add ``max``, ``mean``, ``concat`` (non-commutative) and ``first``/``last``
for test coverage.

``lift`` maps a raw stream value into the monoid's carrier set and
``lower`` maps an aggregate back to a user-facing result; ``combine``
must never mutate its arguments (partial aggregates are shared between
tree nodes).
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Any, Callable, Tuple


@dataclass(frozen=True)
class Monoid:
    """An aggregation monoid with lift/lower adapters.

    Attributes:
        name: short identifier used in tables and CLI flags.
        identity: the neutral element (in the *lifted* carrier set).
        combine: associative binary operator on the carrier set.
        lift: raw value -> carrier element.
        lower: carrier element -> user-facing result.
        commutative: advisory flag (used only by tests to pick
            adversarial monoids; algorithms must not rely on it).
    """

    name: str
    identity: Any
    combine: Callable[[Any, Any], Any]
    lift: Callable[[Any], Any]
    lower: Callable[[Any], Any]
    commutative: bool = True

    def fold(self, values) -> Any:
        """Reference fold, in order: lift every value and combine left-to-right."""
        acc = self.identity
        for v in values:
            acc = self.combine(acc, self.lift(v))
        return acc

    def __reduce__(self):
        # Monoids carry closures, which do not pickle; reconstruct by
        # name instead so trees/operators can ship to Spark executors.
        return (get, (self.name,))


def _sum() -> Monoid:
    return Monoid("sum", 0.0, lambda a, b: a + b, float, float)


def _max() -> Monoid:
    return Monoid(
        "max", -math.inf, lambda a, b: a if a >= b else b, float, float
    )


def _geomean() -> Monoid:
    """Geometric mean, lifted to the monoid (sum of logs, count).

    Matches the paper's "medium cost" operator: combine is cheap but the
    carrier is a tuple, and lower applies ``exp``.
    """

    def combine(a: Tuple[float, int], b: Tuple[float, int]) -> Tuple[float, int]:
        return (a[0] + b[0], a[1] + b[1])

    def lift(v: Any) -> Tuple[float, int]:
        return (math.log(abs(float(v)) + 1e-12), 1)

    def lower(a: Tuple[float, int]) -> float:
        return math.exp(a[0] / a[1]) if a[1] else 1.0

    return Monoid("geomean", (0.0, 0), combine, lift, lower)


def _mean() -> Monoid:
    def combine(a, b):
        return (a[0] + b[0], a[1] + b[1])

    return Monoid(
        "mean",
        (0.0, 0),
        combine,
        lambda v: (float(v), 1),
        lambda a: a[0] / a[1] if a[1] else 0.0,
    )


_BLOOM_BITS = 1024
_BLOOM_K = 3


def _bloom() -> Monoid:
    """Bloom filter as a monoid: fixed-size bitset, combine = OR.

    The paper's "slow" operator. A Python int is the bitset, so combine
    is a single big-int OR — slow relative to float addition, exactly
    the cost-spectrum role it plays in the paper.
    """

    def lift(v: Any) -> int:
        h = hash(v)
        bits = 0
        for i in range(_BLOOM_K):
            # Cheap double-hashing; positions must be deterministic.
            pos = (h + i * 0x9E3779B97F4A7C15) % _BLOOM_BITS
            bits |= 1 << pos
        return bits

    return Monoid("bloom", 0, lambda a, b: a | b, lift, lambda a: a)


def _concat() -> Monoid:
    """Tuple concatenation — non-commutative, catches ordering bugs.

    Any tree aggregation that combines partial aggregates in the wrong
    order produces a different tuple, so oracle tests with this monoid
    verify the *in-timestamp-order* guarantee of query().
    """
    return Monoid(
        "concat",
        (),
        lambda a, b: a + b,
        lambda v: (v,),
        lambda a: a,
        commutative=False,
    )


def _first() -> Monoid:
    _NONE = object()

    def combine(a, b):
        return a if a is not _NONE else b

    return Monoid("first", _NONE, combine, lambda v: v, lambda a: None if a is _NONE else a, commutative=False)


def _last() -> Monoid:
    _NONE = object()

    def combine(a, b):
        return b if b is not _NONE else a

    return Monoid("last", _NONE, combine, lambda v: v, lambda a: None if a is _NONE else a, commutative=False)


MONOIDS = {
    m.name: m
    for m in (_sum(), _max(), _geomean(), _mean(), _bloom(), _concat(), _first(), _last())
}

#: The three monoids the paper benchmarks (Figures 7-14): fast/medium/slow.
PAPER_MONOIDS = ("sum", "geomean", "bloom")


def get(name: str) -> Monoid:
    """Look up a monoid by name, raising a helpful error for typos."""
    try:
        return MONOIDS[name]
    except KeyError:
        raise KeyError(f"unknown monoid {name!r}; available: {sorted(MONOIDS)}")
