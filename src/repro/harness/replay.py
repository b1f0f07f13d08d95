"""Schedule replay: apply a workload op schedule to an algorithm.

The single place that maps schedule ops onto the uniform algorithm ADT,
shared by the latency and throughput harnesses and by tests.
"""
from __future__ import annotations

from typing import Any, Iterable, List, Tuple


def apply_op(alg: Any, op: Tuple[Any, ...]) -> None:
    """Apply one schedule op to an algorithm instance."""
    kind = op[0]
    if kind == "insert":
        alg.insert(op[1], op[2])
    elif kind == "evict":
        alg.evict()
    elif kind == "bulk_insert":
        alg.bulk_insert(op[1])
    elif kind == "bulk_evict":
        alg.bulk_evict(op[1])
    elif kind == "query":
        alg.query()
    else:
        raise ValueError(f"unknown op kind {kind!r}")


def replay(alg: Any, ops: Iterable[Tuple[Any, ...]]) -> None:
    """Replay a whole schedule (untimed helper)."""
    for op in ops:
        apply_op(alg, op)
