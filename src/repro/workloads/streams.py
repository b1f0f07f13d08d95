"""Workload generators for the paper's evaluation (§7).

All experiment drivers consume a pre-generated *operation schedule* — a
list of ops ``("bulk_evict", t)``, ``("bulk_insert", [(t, v), ...])``,
``("insert", t, v)``, ``("evict",)``, ``("query",)`` — so that workload
generation (which needs a sorted window model) stays outside any timed
region, and the same schedule replays against every algorithm.

Generators:

* ``evict_insert_rounds`` — the controlled n/m/d loops behind Figures
  7-9 and 11-14: prefill an n-entry in-order window, then rounds of
  "evict the oldest m, insert m new (in-order at d=0, or spread over
  the youngest d entries for out-of-order), query".
* ``citibike_like`` — the Figures 15-16 substitution (DESIGN.md §3): a
  bursty diurnal arrival process with heavy-tailed out-of-order
  displacement, yielding the same qualitative n/m/d histograms as the
  NYC Citi Bike 2018 data.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any, List, Tuple

import numpy as np

Op = Tuple[Any, ...]


def prefill_in_order(n: int, *, start: float = 0.0) -> List[Op]:
    """Schedule that fills a window with n in-order single inserts."""
    return [("insert", start + float(i), float(i % 101)) for i in range(n)]


def evict_insert_rounds(
    n: int,
    m: int,
    d: int,
    rounds: int,
    *,
    evict_mode: str = "bulk",
    insert_mode: str = "single",
    seed: int = 0,
) -> Tuple[List[Op], List[Op]]:
    """The §7 controlled loop: returns (prefill_ops, round_ops).

    Each round evicts the oldest ``m`` entries (one ``bulk_evict`` op,
    or ``m`` single ``evict`` ops), inserts ``m`` new entries (in-order
    for ``d == 0``; spread over the youngest ``d`` window entries
    otherwise, so the earliest new entry has out-of-order distance ~d),
    and queries. Loop-vs-native bulk emulation is the *algorithm
    wrapper's* concern; ``evict_mode``/``insert_mode`` only control the
    op granularity so the harness can time exactly the op kind each
    figure measures.
    """
    if m > n:
        raise ValueError(f"bulk size m={m} cannot exceed window size n={n}")
    if d > 0 and d > n - m:
        # the eviction of m precedes the insertion, so only n-m entries
        # remain to measure the out-of-order distance against
        raise ValueError(f"ooo distance d={d} cannot exceed n-m={n - m}")
    rng = np.random.default_rng(seed)
    win = [float(i) for i in range(n)]
    ops: List[Op] = []
    next_t = float(n)
    for _ in range(rounds):
        if evict_mode == "bulk":
            ops.append(("bulk_evict", win[m - 1]))
        else:
            ops.extend(("evict",) for _ in range(m))
        del win[:m]
        if d == 0:
            batch = [(next_t + i, float(i % 101)) for i in range(m)]
            next_t += m
        else:
            lo = win[-d]
            hi = win[-1]
            ts = np.sort(lo + (hi - lo) * rng.random(m))
            batch = [(float(t), float(i % 101)) for i, t in enumerate(ts)]
        if insert_mode == "bulk":
            ops.append(("bulk_insert", batch))
        else:
            ops.extend(("insert", t, v) for t, v in batch)
        if d == 0:
            win.extend(t for t, _ in batch)
        else:
            win = sorted(win + [t for t, _ in batch])
        ops.append(("query",))
    return prefill_in_order(n), ops


@dataclass
class CitiBikeLike:
    """Synthetic bursty out-of-order stream + its n/m/d profile.

    ``event_times``/``values`` are in *arrival* order (what the stream
    operator sees); ``n_series``, ``m_series``, ``d_series`` give, per
    arrival, the instantaneous window size, the eviction bulk size that
    the arrival triggered, and its out-of-order distance — the three
    histograms of the paper's Figure 15.
    """

    event_times: np.ndarray
    values: np.ndarray
    window_seconds: float
    n_series: np.ndarray
    m_series: np.ndarray
    d_series: np.ndarray

    def to_ops(self) -> List[Op]:
        """Arrival-order schedule: ooo insert + watermark bulk evict."""
        ops: List[Op] = []
        cur_max = -np.inf
        for t, v in zip(self.event_times, self.values):
            ops.append(("insert", float(t), float(v)))
            if t > cur_max:
                cur_max = t
                ops.append(("bulk_evict", float(t - self.window_seconds)))
            ops.append(("query",))
        return ops


class _Fenwick:
    """Fenwick tree over ranks, for counting younger in-window entries."""

    def __init__(self, n: int):
        self.n = n
        self.a = [0] * (n + 1)

    def add(self, i: int, delta: int) -> None:
        i += 1
        while i <= self.n:
            self.a[i] += delta
            i += i & (-i)

    def prefix(self, i: int) -> int:
        # sum of [0, i)
        s = 0
        while i > 0:
            s += self.a[i]
            i -= i & (-i)
        return s


def citibike_like(
    n_events: int = 20_000,
    *,
    seed: int = 0,
    window_seconds: float = 86_400.0,
    base_rate_per_min: float = 4.0,
    burst_prob: float = 0.02,
    burst_multiplier: float = 25.0,
    ooo_prob: float = 0.12,
    ooo_scale_seconds: float = 3_000.0,
    ooo_tail_alpha: float = 1.1,
) -> CitiBikeLike:
    """Generate the Citi-Bike-like stream (dataset substitution, Fig 15).

    Arrivals: per-minute Poisson counts with a diurnal sinusoid and
    random burst minutes (burst_multiplier×), then uniform jitter within
    the minute — matching the broad window-size spread and bulk-evict
    tail of the real data. Out-of-orderness: a fraction ``ooo_prob`` of
    records is delayed by a Pareto(α≈1.1)-tailed delay, so most
    insertions have tiny d but hundreds reach d in the tens of
    thousands, as in the paper's right histogram.
    """
    rng = np.random.default_rng(seed)
    minutes = max(8, int(np.ceil(n_events / base_rate_per_min / 1.5)))
    tgrid = np.arange(minutes)
    diurnal = 1.0 + 0.8 * np.sin(2 * np.pi * tgrid / 1440.0)
    burst = np.where(rng.random(minutes) < burst_prob, burst_multiplier, 1.0)
    lam = base_rate_per_min * diurnal * burst
    counts = rng.poisson(lam)
    event_times = np.concatenate(
        [
            (60.0 * minute) + 60.0 * np.sort(rng.random(c))
            for minute, c in enumerate(counts)
            if c > 0
        ]
    )[:n_events]
    n_events = len(event_times)
    delays = np.zeros(n_events)
    mask = rng.random(n_events) < ooo_prob
    n_ooo = int(mask.sum())
    # Pareto tail: scale * (1/U^(1/alpha) - 1) has P(D > x) ~ x^-alpha.
    u = rng.random(n_ooo)
    delays[mask] = ooo_scale_seconds * (u ** (-1.0 / ooo_tail_alpha) - 1.0)
    arrival_times = event_times + delays
    order = np.argsort(arrival_times, kind="stable")
    ev = event_times[order]
    vals = np.round(rng.random(n_events) * 100.0, 2)

    # n/m/d profile of the run (Fig 15), computed with a Fenwick tree
    # over event-time ranks: d = #window entries younger than the new
    # one; m = #entries evicted by the watermark advance; n = window size.
    import heapq

    ranks = np.argsort(np.argsort(ev, kind="stable"), kind="stable")
    sorted_ev = np.sort(ev)
    fen = _Fenwick(n_events)  # in-window entries by event-time rank
    n_series = np.zeros(n_events, dtype=np.int64)
    m_series = np.zeros(n_events, dtype=np.int64)
    d_series = np.zeros(n_events, dtype=np.int64)
    heap: List[int] = []  # in-window ranks, oldest event first
    in_window = 0
    cur_max = -np.inf
    for i in range(n_events):
        r = int(ranks[i])
        d_series[i] = in_window - fen.prefix(r)  # younger in-window entries
        fen.add(r, 1)
        heapq.heappush(heap, r)
        in_window += 1
        if ev[i] > cur_max:
            cur_max = ev[i]
            thr = cur_max - window_seconds
            m = 0
            # evict exactly what a replayed bulk_evict(thr) would drop
            while heap and sorted_ev[heap[0]] <= thr:
                rr = heapq.heappop(heap)
                fen.add(rr, -1)
                in_window -= 1
                m += 1
            m_series[i] = m
        n_series[i] = in_window
    return CitiBikeLike(
        event_times=ev,
        values=vals,
        window_seconds=window_seconds,
        n_series=n_series,
        m_series=m_series,
        d_series=d_series,
    )
