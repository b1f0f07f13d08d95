"""Monoid laws and adapters (§3.1): associativity, identity, lift/lower."""
import math
import pickle

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.monoids import MONOIDS, PAPER_MONOIDS, get

VALUES = st.one_of(
    st.integers(min_value=-1000, max_value=1000),
    st.floats(min_value=0.1, max_value=100.0, allow_nan=False),
)

# Monoids whose combine is bit-exact associative on any floats; sum and
# mean are exact only over integers (the property tests use ints there).
EXACT = ("max", "bloom", "concat", "first", "last")


@pytest.mark.parametrize("name", sorted(MONOIDS))
@given(vals=st.lists(VALUES, min_size=1, max_size=6))
@settings(max_examples=60, deadline=None)
def test_associativity_on_folds(name, vals):
    """((v1 v2) v3) == (v1 (v2 v3)) for every split point of a fold."""
    m = get(name)
    lifted = [m.lift(v) for v in vals]
    full = lifted[0]
    for x in lifted[1:]:
        full = m.combine(full, x)
    for cut in range(1, len(lifted)):
        left = lifted[0]
        for x in lifted[1:cut]:
            left = m.combine(left, x)
        right = lifted[cut]
        for x in lifted[cut + 1 :]:
            right = m.combine(right, x)
        two = m.combine(left, right)
        if name in EXACT:
            assert two == full
        else:
            assert _close(m.lower(two), m.lower(full))


def _close(a, b):
    if isinstance(a, float) and isinstance(b, float):
        return math.isclose(a, b, rel_tol=1e-9, abs_tol=1e-9)
    return a == b


@pytest.mark.parametrize("name", sorted(MONOIDS))
@given(v=VALUES)
@settings(max_examples=30, deadline=None)
def test_identity_laws(name, v):
    m = get(name)
    x = m.lift(v)
    assert m.combine(m.identity, x) == x
    assert m.combine(x, m.identity) == x


@pytest.mark.parametrize("name", sorted(MONOIDS))
def test_fold_matches_manual(name):
    m = get(name)
    vals = [3, 1, 4, 1, 5]
    acc = m.identity
    for v in vals:
        acc = m.combine(acc, m.lift(v))
    assert m.fold(vals) == acc


def test_sum_and_max_semantics():
    assert get("sum").fold([1, 2, 3]) == 6.0
    assert get("max").fold([1, 9, 3]) == 9.0


def test_mean_and_geomean_lowering():
    m = get("mean")
    assert m.lower(m.fold([2, 4])) == 3.0
    g = get("geomean")
    assert math.isclose(g.lower(g.fold([2, 8])), 4.0, rel_tol=1e-9)
    assert g.lower(g.identity) == 1.0


def test_concat_is_order_sensitive():
    m = get("concat")
    ab = m.combine(m.lift("a"), m.lift("b"))
    ba = m.combine(m.lift("b"), m.lift("a"))
    assert ab != ba
    assert not m.commutative


def test_first_last_semantics():
    f, l = get("first"), get("last")
    assert f.lower(f.fold(["x", "y", "z"])) == "x"
    assert l.lower(l.fold(["x", "y", "z"])) == "z"
    assert f.lower(f.identity) is None


def test_bloom_membership_behavior():
    m = get("bloom")
    agg = m.fold(["a", "b", "c"])
    for item in ("a", "b", "c"):
        assert m.lift(item) & agg == m.lift(item), "bloom must contain inserted"


def test_paper_monoids_registered():
    assert set(PAPER_MONOIDS) <= set(MONOIDS)


def test_get_unknown_raises():
    with pytest.raises(KeyError, match="unknown monoid"):
        get("nope")


@pytest.mark.parametrize("name", sorted(MONOIDS))
def test_monoids_pickle_roundtrip(name):
    """Monoids must ship to Spark executors (DESIGN.md streaming layer)."""
    m = get(name)
    m2 = pickle.loads(pickle.dumps(m))
    assert m2.name == m.name
    assert m2.fold([1, 2]) == m.fold([1, 2])
