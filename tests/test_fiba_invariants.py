"""Property tests: every FiBA op preserves every §3.2 invariant.

Randomized operation sequences (single in-order/out-of-order inserts,
single evicts, bulk inserts, bulk evicts) are replayed against the
naive reference; after *every* operation the from-scratch invariant
checker runs and ``query()`` must equal the reference. The
non-commutative ``concat`` monoid makes any aggregation-order bug
visible; ``sum`` over integers is associativity-exact.
"""
import random

import pytest

from repro.core import FibaTree, NaiveSwag, get_monoid
from repro.core.debug import check_invariants

ARITIES = [2, 3, 4, 8]
MONOIDS = ["sum", "concat"]


def run_mixed(seed, mu, mname, nops, pool, p_ops):
    random.seed(seed)
    M = get_monoid(mname)
    tree = FibaTree(M, min_arity=mu, pool_enabled=pool)
    ref = NaiveSwag(M)
    tmax = 0.0
    p_ins, p_evict, p_binsert = p_ops
    for step in range(nops):
        r = random.random()
        if r < p_ins:
            if random.random() < 0.6:
                t = tmax + random.randint(1, 3)
            else:
                t = round(random.uniform(0, tmax + 5), 2)
            tmax = max(tmax, t)
            v = random.randint(0, 9)
            tree.insert(t, v)
            ref.insert(t, v)
        elif r < p_ins + p_evict:
            tree.evict()
            ref.evict()
        elif r < p_ins + p_evict + p_binsert:
            m = random.randint(0, 50)
            batch = []
            for _ in range(m):
                if random.random() < 0.5:
                    t = tmax + random.randint(1, 2)
                else:
                    t = round(random.uniform(0, tmax + 5), 2)
                tmax = max(tmax, t)
                batch.append((t, random.randint(0, 9)))
            random.shuffle(batch)
            tree.bulk_insert(batch)
            # stable sort by timestamp only: collision values must
            # combine in arrival order on both sides
            ref.bulk_insert(sorted(batch, key=lambda p: p[0]))
        else:
            if ref.times:
                ts = ref.times
                if random.random() < 0.1:
                    cut = ts[-1] + 1
                else:
                    cut = random.choice(ts[: min(len(ts), 60)])
                    if random.random() < 0.3:
                        cut = round(cut + 0.005, 4)
                tree.bulk_evict(cut)
                ref.bulk_evict(cut)
        check_invariants(tree)
        assert tree.query() == ref.query(), (seed, mu, mname, step)
        assert len(tree) == len(ref), (seed, mu, mname, step)


@pytest.mark.parametrize("mu", ARITIES)
@pytest.mark.parametrize("mname", MONOIDS)
@pytest.mark.parametrize("seed", [0, 1])
def test_mixed_ops(mu, mname, seed):
    run_mixed(seed, mu, mname, nops=250, pool=(seed % 2 == 0),
              p_ops=(0.35, 0.15, 0.2))


@pytest.mark.parametrize("mu", ARITIES)
@pytest.mark.parametrize("mname", MONOIDS)
def test_bulk_heavy(mu, mname):
    run_mixed(7, mu, mname, nops=150, pool=True, p_ops=(0.1, 0.05, 0.45))


@pytest.mark.parametrize("mu", ARITIES)
def test_in_order_stream(mu):
    """Pure streaming pattern: in-order insert + evict oldest."""
    M = get_monoid("sum")
    tree = FibaTree(M, min_arity=mu)
    ref = NaiveSwag(M)
    for t in range(400):
        tree.insert(t, t % 11)
        ref.insert(t, t % 11)
        if t >= 100:
            tree.evict()
            ref.evict()
        if t % 7 == 0:
            check_invariants(tree)
        assert tree.query() == ref.query()


@pytest.mark.parametrize("mu", [2, 4])
@pytest.mark.parametrize("d", [1, 16, 64])
def test_ooo_insert_distance(mu, d):
    """Out-of-order inserts at controlled distance from the young end."""
    random.seed(d)
    M = get_monoid("concat")
    tree = FibaTree(M, min_arity=mu)
    ref = NaiveSwag(M)
    n = 128
    for t in range(n):
        tree.insert(float(t), str(t))
        ref.insert(float(t), str(t))
    for i in range(60):
        lo = ref.times[-d]
        hi = ref.times[-1]
        t = round(random.uniform(lo, hi), 6)
        tree.insert(t, "x")
        ref.insert(t, "x")
        check_invariants(tree)
        assert tree.query() == ref.query(), (mu, d, i)


@pytest.mark.parametrize("mu", ARITIES)
def test_alternating_bulk_evict_insert_rounds(mu):
    """The §7 experiment loop itself, oracle-checked at small scale."""
    M = get_monoid("sum")
    tree = FibaTree(M, min_arity=mu)
    ref = NaiveSwag(M)
    n, m = 256, 32
    for t in range(n):
        tree.insert(float(t), 1)
        ref.insert(float(t), 1)
    nxt = float(n)
    for rnd in range(30):
        cut = ref.times[m - 1]
        tree.bulk_evict(cut)
        ref.bulk_evict(cut)
        batch = [(nxt + i, 1) for i in range(m)]
        nxt += m
        tree.bulk_insert(batch)
        ref.bulk_insert(batch)
        check_invariants(tree)
        assert tree.query() == ref.query() == float(n)
        assert len(tree) == n
