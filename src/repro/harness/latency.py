"""Per-operation latency measurement (§7.1 methodology).

The paper times each individual insert/evict and plots the distribution
as a violin with mean, median, p99.9 and p99.999 markers. We record the
wall-clock nanoseconds of every op of a *selected kind* during a
schedule replay and report the same statistics in a table row.

With the scaled-down repetition counts of a CPython run the extreme
percentiles degrade towards the max; that is fine for the reproduction
target (relative ordering of algorithms), and EXPERIMENTS.md reports
which percentiles are saturated.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Any, Iterable, List, Sequence, Tuple

import numpy as np

from .replay import apply_op


@dataclass
class LatencyStats:
    """Distribution summary of per-op latencies, in microseconds."""

    count: int
    mean_us: float
    median_us: float
    p999_us: float
    p99999_us: float
    max_us: float

    @staticmethod
    def from_ns(samples_ns: Sequence[int]) -> "LatencyStats":
        a = np.asarray(samples_ns, dtype=np.float64) / 1e3
        return LatencyStats(
            count=len(a),
            mean_us=float(a.mean()),
            median_us=float(np.percentile(a, 50)),
            p999_us=float(np.percentile(a, 99.9)),
            p99999_us=float(np.percentile(a, 99.999)),
            max_us=float(a.max()),
        )


def measure_latency(
    alg: Any,
    ops: Iterable[Tuple[Any, ...]],
    timed_kinds: Tuple[str, ...],
) -> LatencyStats:
    """Replay ``ops``; time only ops whose kind is in ``timed_kinds``.

    For loop-emulating algorithms (nb_fiba, twostacks, daba) a single
    ``bulk_evict``/``bulk_insert`` schedule op *is* the whole loop, so
    the measured latency is the full m-element emulation — matching how
    the paper charges loop emulation against native bulk support.
    """
    samples: List[int] = []
    clock = time.perf_counter_ns
    for op in ops:
        if op[0] in timed_kinds:
            t0 = clock()
            apply_op(alg, op)
            samples.append(clock() - t0)
        else:
            apply_op(alg, op)
    return LatencyStats.from_ns(samples)
