"""Cross-algorithm equivalence: every algorithm, same answers.

The registry's seven algorithms must agree with each other and with the
naive reference on identical op sequences — in-order streams for all,
out-of-order and bulk patterns for the FiBA variants. This is the
paper's implicit claim that all benchmarked algorithms compute the same
sliding-window aggregation.
"""
import random

import pytest

from repro import algorithms
from repro.core import NaiveSwag, get_monoid
from repro.harness.replay import replay
from repro.workloads.streams import citibike_like, evict_insert_rounds


@pytest.mark.parametrize("mname", ["sum", "concat"])
def test_all_algorithms_in_order_stream(mname):
    M = get_monoid(mname)
    algs = {name: algorithms.make(name, M) for name in algorithms.ALGORITHMS}
    ref = NaiveSwag(M)
    random.seed(2)
    t = 0
    for step in range(1200):
        if random.random() < 0.6 or len(ref) == 0:
            t += 1
            v = random.randint(0, 9)
            ref.insert(t, v)
            for a in algs.values():
                a.insert(t, v)
        else:
            ref.evict()
            for a in algs.values():
                a.evict()
        if step % 50 == 0:
            expect = ref.query()
            for name, a in algs.items():
                assert a.query() == expect, (name, step)


@pytest.mark.parametrize("mname", ["sum", "concat"])
@pytest.mark.parametrize("d", [0, 32, 128])
def test_ooo_algorithms_agree(mname, d):
    """b_fiba (native bulk) vs nb_fiba (loop emulation) on ooo bulks."""
    M = get_monoid(mname)
    prefill, ops = evict_insert_rounds(
        256, 32, d, 15, evict_mode="bulk", insert_mode="bulk", seed=d
    )
    results = {}
    for name in algorithms.OOO_ALGORITHMS:
        a = algorithms.make(name, M)
        replay(a, prefill)
        replay(a, ops)
        results[name] = (a.query(), len(a))
    vals = set(results.values())
    assert len(vals) == 1, results


def test_bulk_equals_loop_on_same_tree():
    """bulk_insert/bulk_evict == the equivalent single-op loop."""
    M = get_monoid("concat")
    a = algorithms.make("b_fiba4", M)
    b = algorithms.make("nb_fiba4", M)
    random.seed(13)
    tmax = 0.0
    for _ in range(40):
        batch = []
        for _ in range(random.randint(1, 30)):
            if random.random() < 0.5:
                tmax += 1
                batch.append((tmax, str(int(tmax))))
            else:
                batch.append((round(random.uniform(0, tmax), 3), "x"))
        a.bulk_insert(batch)
        b.bulk_insert(batch)
        assert a.query() == b.query()
        if random.random() < 0.5 and a.oldest() is not None:
            cut = a.oldest() + (a.youngest() - a.oldest()) * 0.2
            a.bulk_evict(cut)
            b.bulk_evict(cut)
            assert a.query() == b.query()
            assert len(a) == len(b)


def test_citibike_stream_all_fiba_variants_agree():
    cb = citibike_like(1500, seed=4, window_seconds=1800.0)
    ops = cb.to_ops()
    M = get_monoid("sum")
    results = {}
    for name in algorithms.OOO_ALGORITHMS:
        a = algorithms.make(name, M)
        replay(a, ops)
        results[name] = (round(a.query(), 6), len(a))
    assert len(set(results.values())) == 1, results


def test_make_unknown_algorithm_raises():
    with pytest.raises(KeyError, match="unknown algorithm"):
        algorithms.make("nope", get_monoid("sum"))


def test_registry_covers_paper_lineup():
    assert set(algorithms.OOO_ALGORITHMS) | set(algorithms.IN_ORDER_ONLY) == set(
        algorithms.ALGORITHMS
    )
