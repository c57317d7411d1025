"""Sparse-table RMQ vs brute force."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.rmq import SparseTable


@pytest.mark.parametrize("op,red", [("min", np.min), ("max", np.max)])
@pytest.mark.parametrize("k", [1, 2, 3, 7, 16, 100])
def test_all_ranges_small(op, red, k):
    g = np.random.default_rng(k)
    a = g.random(k)
    t = SparseTable(a, op=op)
    for i in range(k):
        for j in range(i, k):
            assert t.query(i, j) == pytest.approx(red(a[i : j + 1]))


def test_arg_query_returns_index_in_range():
    a = np.array([5.0, 1.0, 3.0, 1.0, 9.0])
    t = SparseTable(a, op="min")
    idx = t.arg_query(0, 4)
    assert a[idx] == 1.0
    assert t.arg_query(2, 2) == 2


def test_bad_ranges_raise():
    t = SparseTable(np.array([1.0, 2.0]))
    with pytest.raises(IndexError):
        t.query(1, 0)
    with pytest.raises(IndexError):
        t.query(0, 2)


def test_bad_op_raises():
    with pytest.raises(ValueError):
        SparseTable(np.array([1.0]), op="sum")


def test_duplicates_handled():
    a = np.array([2.0, 2.0, 2.0, 2.0])
    t = SparseTable(a, op="max")
    assert t.query(0, 3) == 2.0


@given(st.lists(st.floats(-1e6, 1e6), min_size=1, max_size=60), st.data())
@settings(max_examples=60, deadline=None)
def test_property_random(values, data):
    a = np.array(values)
    t = SparseTable(a, op="max")
    i = data.draw(st.integers(0, len(a) - 1))
    j = data.draw(st.integers(i, len(a) - 1))
    assert t.query(i, j) == pytest.approx(np.max(a[i : j + 1]))
