"""Experiment drivers, one per evaluation figure ("table") of §7.

Each ``fig*`` function runs the corresponding experiment and returns
``(header, rows)`` ready for ``repro.harness.tables.format_table``;
``jobs/fig*.py`` are thin CLI wrappers and ``benchmarks/`` run reduced
scales of the same functions. Scales default to the CPython-feasible
sizes documented in DESIGN.md §3 (paper: n = 2^22 in C++; here n = 2^14
with every knob overridable).
"""
from __future__ import annotations

import time
from typing import Any, Dict, Iterable, List, Sequence, Tuple

import numpy as np

from .algorithms import ALGORITHMS, IN_ORDER_ONLY, OOO_ALGORITHMS, make
from .core.fiba import FibaTree
from .core.monoids import PAPER_MONOIDS, get as get_monoid
from .harness.latency import LatencyStats, measure_latency
from .harness.replay import replay
from .harness.throughput import measure_throughput
from .workloads.streams import citibike_like, evict_insert_rounds

Header = Sequence[str]
Rows = List[Sequence[Any]]

_LAT_HEADER = (
    "monoid", "algorithm", "ops", "mean_us", "median_us", "p99.9_us", "p99.999_us"
)
_TPUT_HEADER = ("monoid", "algorithm", "param", "items", "tput_items_s", "spread")


def _lat_row(mon: str, alg: str, st: LatencyStats) -> Sequence[Any]:
    return (mon, alg, st.count, st.mean_us, st.median_us, st.p999_us, st.p99999_us)


# ---------------------------------------------------------------------------
# T7 / Figure 7: latency of bulk evict, in-order
# ---------------------------------------------------------------------------

def fig07_latency_bulk_evict(
    n: int = 2**14,
    m: int = 1024,
    rounds: int = 50,
    monoids: Sequence[str] = PAPER_MONOIDS,
    algs: Sequence[str] = tuple(ALGORITHMS),
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """Loop: bulkEvict oldest m; m single in-order inserts; query.
    Timed op: the bulk evict only (loop-emulated for non-bulk algs)."""
    rows: Rows = []
    for mon in monoids:
        prefill, ops = evict_insert_rounds(
            n, m, 0, rounds, evict_mode="bulk", insert_mode="single", seed=seed
        )
        for alg in algs:
            a = make(alg, get_monoid(mon))
            replay(a, prefill)
            st = measure_latency(a, ops, ("bulk_evict",))
            rows.append(_lat_row(mon, alg, st))
    return _LAT_HEADER, rows


# ---------------------------------------------------------------------------
# T8 / Figure 8: latency of bulk insert, in-order
# ---------------------------------------------------------------------------

def fig08_latency_bulk_insert(
    n: int = 2**14,
    m: int = 1024,
    rounds: int = 50,
    monoids: Sequence[str] = PAPER_MONOIDS,
    algs: Sequence[str] = tuple(ALGORITHMS),
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """Loop: bulkEvict oldest m; bulkInsert m in-order; query.
    Timed op: the bulk insert only."""
    rows: Rows = []
    for mon in monoids:
        prefill, ops = evict_insert_rounds(
            n, m, 0, rounds, evict_mode="bulk", insert_mode="bulk", seed=seed
        )
        for alg in algs:
            a = make(alg, get_monoid(mon))
            replay(a, prefill)
            st = measure_latency(a, ops, ("bulk_insert",))
            rows.append(_lat_row(mon, alg, st))
    return _LAT_HEADER, rows


# ---------------------------------------------------------------------------
# T9 / Figure 9: latency of bulk insert, out-of-order (d = m)
# ---------------------------------------------------------------------------

def fig09_latency_ooo_insert(
    n: int = 2**14,
    m: int = 1024,
    d: int = 1024,
    rounds: int = 50,
    monoids: Sequence[str] = PAPER_MONOIDS,
    algs: Sequence[str] = OOO_ALGORITHMS,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """As T8 but each bulk lands at out-of-order distance d; only the
    out-of-order-capable algorithms participate (the paper elides
    amta/twostacks/daba here)."""
    rows: Rows = []
    for mon in monoids:
        prefill, ops = evict_insert_rounds(
            n, m, d, rounds, evict_mode="bulk", insert_mode="bulk", seed=seed
        )
        for alg in algs:
            a = make(alg, get_monoid(mon))
            replay(a, prefill)
            st = measure_latency(a, ops, ("bulk_insert",))
            rows.append(_lat_row(mon, alg, st))
    return _LAT_HEADER, rows


# ---------------------------------------------------------------------------
# T10 / Figure 10: memory-management ablation (deferred free list)
# ---------------------------------------------------------------------------

def fig10_ablation_freelist(
    n: int = 2**14,
    m: int = 4096,
    rounds: int = 40,
    monoids: Sequence[str] = PAPER_MONOIDS,
    min_arity: int = 4,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """b_fiba4 bulk evict with the deferred free list on (``fl``) vs off
    (``nofl``, eager reclamation via CPython refcounting). The paper's
    allocator axis (mimalloc/libc) has no CPython analog; DESIGN.md §3."""
    rows: Rows = []
    for mon in monoids:
        prefill, ops = evict_insert_rounds(
            n, m, 0, rounds, evict_mode="bulk", insert_mode="single", seed=seed
        )
        for variant, pool in (("fl", True), ("nofl", False)):
            a = FibaTree(get_monoid(mon), min_arity=min_arity, pool_enabled=pool)
            replay(a, prefill)
            st = measure_latency(a, ops, ("bulk_evict",))
            rows.append(_lat_row(mon, f"b_fiba{min_arity}_{variant}", st))
    return _LAT_HEADER, rows


# ---------------------------------------------------------------------------
# T11 / Figure 11: throughput, bulk evict only, varying m
# ---------------------------------------------------------------------------

def fig11_throughput_evict(
    n: int = 2**14,
    ms: Sequence[int] = (1, 4, 16, 64, 256, 1024, 4096),
    total_items: int = 2**14,
    monoids: Sequence[str] = PAPER_MONOIDS,
    algs: Sequence[str] = tuple(ALGORITHMS),
    reps: int = 3,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """Loop: one bulkEvict of the oldest m, m single inserts, query;
    throughput over the whole run, per bulk size m."""
    ms = tuple(m for m in ms if m <= n)  # infeasible sweep points skipped
    rows: Rows = []
    for mon in monoids:
        for m in ms:
            rounds = max(1, total_items // m)
            prefill, ops = evict_insert_rounds(
                n, m, 0, rounds, evict_mode="bulk", insert_mode="single", seed=seed
            )
            for alg in algs:
                M = get_monoid(mon)
                r = measure_throughput(
                    lambda alg=alg, M=M: make(alg, M), prefill, ops, reps=reps
                )
                rows.append(
                    (mon, alg, f"m={m}", r.items, r.mean_tput,
                     f"{r.min_tput:,.0f}..{r.max_tput:,.0f}")
                )
    return _TPUT_HEADER, rows


# ---------------------------------------------------------------------------
# T12 / Figure 12: throughput, bulk evict + bulk insert, varying m
# ---------------------------------------------------------------------------

def fig12_throughput_evict_insert(
    n: int = 2**14,
    ms: Sequence[int] = (1, 4, 16, 64, 256, 1024, 4096),
    total_items: int = 2**14,
    monoids: Sequence[str] = PAPER_MONOIDS,
    algs: Sequence[str] = tuple(ALGORITHMS),
    reps: int = 3,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    ms = tuple(m for m in ms if m <= n)  # infeasible sweep points skipped
    rows: Rows = []
    for mon in monoids:
        for m in ms:
            rounds = max(1, total_items // m)
            prefill, ops = evict_insert_rounds(
                n, m, 0, rounds, evict_mode="bulk", insert_mode="bulk", seed=seed
            )
            for alg in algs:
                M = get_monoid(mon)
                r = measure_throughput(
                    lambda alg=alg, M=M: make(alg, M), prefill, ops, reps=reps
                )
                rows.append(
                    (mon, alg, f"m={m}", r.items, r.mean_tput,
                     f"{r.min_tput:,.0f}..{r.max_tput:,.0f}")
                )
    return _TPUT_HEADER, rows


# ---------------------------------------------------------------------------
# T13 / Figure 13: throughput vs out-of-order distance d (bulk ops)
# ---------------------------------------------------------------------------

def fig13_throughput_ooo_bulk(
    n: int = 2**14,
    m: int = 1024,
    ds: Sequence[int] = (0, 64, 256, 1024, 4096),
    total_items: int = 2**14,
    monoids: Sequence[str] = PAPER_MONOIDS,
    algs: Sequence[str] = OOO_ALGORITHMS,
    reps: int = 3,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    ds = tuple(d for d in ds if d <= n - m)  # infeasible points skipped
    rows: Rows = []
    for mon in monoids:
        for d in ds:
            rounds = max(1, total_items // m)
            prefill, ops = evict_insert_rounds(
                n, m, d, rounds, evict_mode="bulk", insert_mode="bulk", seed=seed
            )
            for alg in algs:
                M = get_monoid(mon)
                r = measure_throughput(
                    lambda alg=alg, M=M: make(alg, M), prefill, ops, reps=reps
                )
                rows.append(
                    (mon, alg, f"d={d}", r.items, r.mean_tput,
                     f"{r.min_tput:,.0f}..{r.max_tput:,.0f}")
                )
    return _TPUT_HEADER, rows


# ---------------------------------------------------------------------------
# T14 / Figure 14: throughput vs d with single ops (m = 1)
# ---------------------------------------------------------------------------

def fig14_throughput_ooo_single(
    n: int = 2**14,
    ds: Sequence[int] = (0, 64, 256, 1024, 4096),
    total_items: int = 2**13,
    monoids: Sequence[str] = PAPER_MONOIDS,
    algs: Sequence[str] = OOO_ALGORITHMS,
    reps: int = 3,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    ds = tuple(d for d in ds if d <= n - 1)  # infeasible points skipped
    rows: Rows = []
    for mon in monoids:
        for d in ds:
            prefill, ops = evict_insert_rounds(
                n, 1, d, total_items, evict_mode="single", insert_mode="single",
                seed=seed,
            )
            for alg in algs:
                M = get_monoid(mon)
                r = measure_throughput(
                    lambda alg=alg, M=M: make(alg, M), prefill, ops, reps=reps
                )
                rows.append(
                    (mon, alg, f"d={d}", r.items, r.mean_tput,
                     f"{r.min_tput:,.0f}..{r.max_tput:,.0f}")
                )
    return _TPUT_HEADER, rows


# ---------------------------------------------------------------------------
# T15 / §7.3: window-size scaling (the paper's 1-billion study, scaled)
# ---------------------------------------------------------------------------

def fig15_large_window(
    n_small: int = 2**14,
    n_large: int = 2**18,
    m: int = 1024,
    rounds: int = 30,
    monoid: str = "geomean",
    alg_arity: int = 4,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """b_fiba4/geomean at a small vs large window; reports throughput
    and bulk-evict latency percentiles plus large/small ratios — the
    §7.3 comparison (paper: 4M vs 1B; here 2^14 vs 2^18, DESIGN.md §3)."""
    header = (
        "window_n", "tput_items_s", "median_us", "p99.999_us",
        "tput_ratio", "median_ratio", "p99.999_ratio",
    )
    stats: Dict[int, Tuple[float, LatencyStats]] = {}
    M = get_monoid(monoid)
    for n in (n_small, n_large):
        prefill, ops = evict_insert_rounds(
            n, m, 0, rounds, evict_mode="bulk", insert_mode="single", seed=seed
        )
        a = FibaTree(M, min_arity=alg_arity)
        replay(a, prefill)
        t0 = time.perf_counter()
        st = measure_latency(a, ops, ("bulk_evict",))
        dt = time.perf_counter() - t0
        items = sum(1 for op in ops if op[0] == "insert")
        stats[n] = (items / dt, st)
    small_tput, small_st = stats[n_small]
    rows: Rows = []
    for n in (n_small, n_large):
        tput, st = stats[n]
        rows.append(
            (
                n, tput, st.median_us, st.p99999_us,
                tput / small_tput,
                st.median_us / small_st.median_us,
                st.p99999_us / small_st.p99999_us,
            )
        )
    return header, rows


# ---------------------------------------------------------------------------
# T16 / Figures 15+16: Citi-Bike-like real-data run
# ---------------------------------------------------------------------------

def fig16_citibike(
    n_events: int = 20_000,
    window_seconds: float = 14_400.0,
    monoids: Sequence[str] = ("sum", "geomean"),
    algs: Sequence[str] = OOO_ALGORITHMS,
    reps: int = 3,
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """Replays the synthetic Citi-Bike-like stream (ooo inserts + bulk
    evicts at every watermark advance) and reports both the n/m/d
    profile (Fig 15) and per-algorithm throughput (Fig 16)."""
    cb = citibike_like(n_events, seed=seed, window_seconds=window_seconds)
    ops = cb.to_ops()
    header = ("monoid", "algorithm", "param", "items", "tput_items_s", "spread")
    rows: Rows = []
    mpos = cb.m_series[cb.m_series > 0]
    profile = (
        f"n_med={int(np.median(cb.n_series))} n_max={int(cb.n_series.max())} "
        f"m_med={int(np.median(mpos)) if len(mpos) else 0} "
        f"m_max={int(cb.m_series.max())} "
        f"d_med={int(np.median(cb.d_series))} d_max={int(cb.d_series.max())}"
    )
    rows.append(("-", "profile", profile, len(cb.event_times), 0.0, "-"))
    for mon in monoids:
        for alg in algs:
            M = get_monoid(mon)
            r = measure_throughput(
                lambda alg=alg, M=M: make(alg, M), [], ops, reps=reps
            )
            rows.append(
                (mon, alg, f"W={window_seconds:g}s", r.items, r.mean_tput,
                 f"{r.min_tput:,.0f}..{r.max_tput:,.0f}")
            )
    return header, rows


# ---------------------------------------------------------------------------
# T17 / Figure 17: end-to-end system comparison (Spark host)
# ---------------------------------------------------------------------------

def fig17_spark_system(
    spark,
    n: int = 8192,
    ms: Sequence[int] = (256, 1024, 2048),
    n_keys: int = 4,
    batches: int = 6,
    agg: str = "sum",
    seed: int = 0,
) -> Tuple[Header, Rows]:
    """FiBA stateful operator vs the host system's native recompute
    windowing, per micro-batch bulk size m (paper Figure 17: FiBA in
    Flink vs Flink's built-in windows at n = 8192). Timestamps advance
    one unit per event and the time window spans n units, so each
    m-event micro-batch evicts ~m old entries per key."""
    import pandas as pd

    from .streaming.spark_baseline import RecomputeBaseline
    from .streaming.stateful import MicroBatchDriver

    header = ("system", "param", "events", "tput_events_s", "per_batch_ms")
    rows: Rows = []
    rng = np.random.default_rng(seed)
    for m in ms:
        prefill = pd.DataFrame(
            {
                "k": np.repeat(np.arange(n_keys), n),
                "ts": np.tile(np.arange(n, dtype=float), n_keys),
                "v": np.round(rng.random(n * n_keys) * 10, 2),
            }
        )
        batch_pdfs = []
        for b in range(batches):
            lo = n + b * m
            batch_pdfs.append(
                pd.DataFrame(
                    {
                        "k": np.repeat(np.arange(n_keys), m),
                        "ts": np.tile(np.arange(lo, lo + m, dtype=float), n_keys),
                        "v": np.round(rng.random(m * n_keys) * 10, 2),
                    }
                )
            )
        for system in ("fiba_operator", "spark_recompute"):
            if system == "fiba_operator":
                drv: Any = MicroBatchDriver(spark, monoid=agg, window=float(n))
            else:
                drv = RecomputeBaseline(spark, agg=agg, window=float(n))
            drv.process_batch(spark.createDataFrame(prefill))  # untimed warmup
            t0 = time.perf_counter()
            for pdf in batch_pdfs:
                drv.process_batch(spark.createDataFrame(pdf))
            dt = time.perf_counter() - t0
            events = batches * m * n_keys
            rows.append(
                (system, f"m={m}", events, events / dt, 1000.0 * dt / batches)
            )
    return header, rows
