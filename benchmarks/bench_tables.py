"""pytest-benchmark targets, one per evaluation table (DESIGN.md §3).

Each benchmark wraps the corresponding ``repro.experiments`` driver at
a reduced scale; regenerating a table at paper scale is
``python jobs/<name>.py``. The benchmark *value* is the wall time of
the whole experiment; the interesting numbers (per-algorithm medians /
throughputs) are what the driver returns and the jobs print.
"""
import pytest

from repro import experiments as ex

B = dict(rounds=1, iterations=1, warmup_rounds=0)


@pytest.mark.benchmark(group="T7-latency-bulk-evict")
def test_bench_fig07(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig07_latency_bulk_evict,
        kwargs=dict(n=2048, m=256, rounds=10, monoids=("sum",)),
        **B,
    )
    assert len(rows) == len(ex.ALGORITHMS)


@pytest.mark.benchmark(group="T8-latency-bulk-insert")
def test_bench_fig08(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig08_latency_bulk_insert,
        kwargs=dict(n=2048, m=256, rounds=10, monoids=("sum",)),
        **B,
    )
    assert len(rows) == len(ex.ALGORITHMS)


@pytest.mark.benchmark(group="T9-latency-ooo-insert")
def test_bench_fig09(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig09_latency_ooo_insert,
        kwargs=dict(n=2048, m=256, d=256, rounds=10, monoids=("sum",)),
        **B,
    )
    assert len(rows) == len(ex.OOO_ALGORITHMS)


@pytest.mark.benchmark(group="T10-ablation-freelist")
def test_bench_fig10(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig10_ablation_freelist,
        kwargs=dict(n=2048, m=512, rounds=10, monoids=("sum",)),
        **B,
    )
    assert len(rows) == 2


@pytest.mark.benchmark(group="T11-throughput-evict")
def test_bench_fig11(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig11_throughput_evict,
        kwargs=dict(n=2048, ms=(16, 256), total_items=2048,
                    monoids=("sum",), reps=1),
        **B,
    )
    assert all(r[4] > 0 for r in rows)


@pytest.mark.benchmark(group="T12-throughput-evict-insert")
def test_bench_fig12(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig12_throughput_evict_insert,
        kwargs=dict(n=2048, ms=(16, 256), total_items=2048,
                    monoids=("sum",), reps=1),
        **B,
    )
    assert all(r[4] > 0 for r in rows)


@pytest.mark.benchmark(group="T13-throughput-ooo-bulk")
def test_bench_fig13(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig13_throughput_ooo_bulk,
        kwargs=dict(n=2048, m=256, ds=(0, 256), total_items=1024,
                    monoids=("sum",), reps=1),
        **B,
    )
    assert all(r[4] > 0 for r in rows)


@pytest.mark.benchmark(group="T14-throughput-ooo-single")
def test_bench_fig14(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig14_throughput_ooo_single,
        kwargs=dict(n=2048, ds=(0, 256), total_items=1024,
                    monoids=("sum",), reps=1),
        **B,
    )
    assert all(r[4] > 0 for r in rows)


@pytest.mark.benchmark(group="T15-large-window")
def test_bench_fig15(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig15_large_window,
        kwargs=dict(n_small=2048, n_large=8192, m=256, rounds=8),
        **B,
    )
    assert len(rows) == 2


@pytest.mark.benchmark(group="T16-citibike")
def test_bench_fig16(benchmark):
    h, rows = benchmark.pedantic(
        ex.fig16_citibike,
        kwargs=dict(n_events=3000, window_seconds=3600.0,
                    monoids=("sum",), reps=1),
        **B,
    )
    assert len(rows) == 1 + len(ex.OOO_ALGORITHMS)


@pytest.mark.benchmark(group="T17-spark-system")
def test_bench_fig17(benchmark, spark):
    h, rows = benchmark.pedantic(
        ex.fig17_spark_system,
        args=(spark,),
        kwargs=dict(n=1024, ms=(256,), n_keys=2, batches=3),
        **B,
    )
    assert {r[0] for r in rows} == {"fiba_operator", "spark_recompute"}
