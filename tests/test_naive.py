"""The reference SWAG implements the §3.1 ADT exactly."""
import pytest

from repro.core import NaiveSwag, get_monoid


def test_empty_query_is_identity():
    s = NaiveSwag(get_monoid("sum"))
    assert s.query() == 0.0
    assert len(s) == 0
    s.evict()  # no-op on empty
    assert len(s) == 0


def test_insert_orders_by_timestamp_not_arrival():
    s = NaiveSwag(get_monoid("concat"))
    s.insert(3, "c")
    s.insert(1, "a")
    s.insert(2, "b")
    assert s.query() == ("a", "b", "c")


def test_collision_combines_window_value_first():
    s = NaiveSwag(get_monoid("concat"))
    s.insert(1, "w")
    s.insert(1, "i")  # same timestamp: v_pre ⊗ v_in
    assert s.query() == ("w", "i")
    assert len(s) == 1


def test_evict_removes_oldest():
    s = NaiveSwag(get_monoid("concat"))
    s.bulk_insert([(1, "a"), (2, "b"), (3, "c")])
    s.evict()
    assert s.query() == ("b", "c")
    assert s.oldest() == 2 and s.youngest() == 3


@pytest.mark.parametrize("cut,expect", [(0, 3), (1, 2), (2, 1), (3, 0), (9, 0)])
def test_bulk_evict_threshold_inclusive(cut, expect):
    s = NaiveSwag(get_monoid("sum"))
    s.bulk_insert([(1, 1), (2, 1), (3, 1)])
    s.bulk_evict(cut)
    assert len(s) == expect


def test_bulk_evict_between_timestamps():
    s = NaiveSwag(get_monoid("sum"))
    s.bulk_insert([(1, 1), (2, 2), (3, 3)])
    s.bulk_evict(1.5)
    assert s.query() == 5.0


def test_bulk_insert_interleaves_and_combines():
    s = NaiveSwag(get_monoid("concat"))
    s.bulk_insert([(2, "b"), (4, "d")])
    s.bulk_insert([(1, "a"), (2, "B"), (3, "c")])
    assert s.query() == ("a", "b", "B", "c", "d")


def test_query_lowered():
    s = NaiveSwag(get_monoid("geomean"))
    s.bulk_insert([(1, 2.0), (2, 8.0)])
    assert abs(s.query_lowered() - 4.0) < 1e-9
