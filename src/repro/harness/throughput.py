"""Whole-run throughput measurement (§7.2 methodology).

Throughput = (stream items processed) / (wall time of the whole run),
including every insert, evict and query in the schedule — the paper's
gross-results view. Runs are repeated ``reps`` times on fresh algorithm
instances; we report mean and the min/max spread (the paper's error
bars over five runs).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Any, Callable, Iterable, List, Sequence, Tuple

from .replay import replay


@dataclass
class ThroughputResult:
    items: int
    mean_tput: float  # items per second, mean over reps
    min_tput: float
    max_tput: float


def count_items(ops: Sequence[Tuple[Any, ...]]) -> int:
    """Stream items in a schedule = entries inserted (the paper's unit)."""
    n = 0
    for op in ops:
        if op[0] == "insert":
            n += 1
        elif op[0] == "bulk_insert":
            n += len(op[1])
    return n


def measure_throughput(
    make_alg: Callable[[], Any],
    prefill: Sequence[Tuple[Any, ...]],
    ops: Sequence[Tuple[Any, ...]],
    *,
    reps: int = 3,
) -> ThroughputResult:
    """Prefill untimed, then time the main schedule, ``reps`` times."""
    items = count_items(ops)
    rates: List[float] = []
    for _ in range(reps):
        alg = make_alg()
        replay(alg, prefill)
        t0 = time.perf_counter()
        replay(alg, ops)
        dt = time.perf_counter() - t0
        rates.append(items / dt if dt > 0 else float("inf"))
    return ThroughputResult(
        items=items,
        mean_tput=sum(rates) / len(rates),
        min_tput=min(rates),
        max_tput=max(rates),
    )
