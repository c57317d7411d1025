"""Unit tests for the shared deterministic hash source."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.hashing import coin, edge_key, edge_rank, hash01, splitmix64


def test_splitmix64_deterministic():
    keys = np.arange(1000)
    a = splitmix64(keys, seed=7)
    b = splitmix64(keys, seed=7)
    assert np.array_equal(a, b)


def test_splitmix64_seed_changes_output():
    keys = np.arange(1000)
    assert not np.array_equal(splitmix64(keys, 0), splitmix64(keys, 1))


def test_splitmix64_rejects_negative():
    with pytest.raises(ValueError):
        splitmix64(np.array([-1]))


@pytest.mark.parametrize("seed", [0, 1, 42, 2**31])
def test_hash01_range_and_spread(seed):
    h = hash01(np.arange(10_000), seed)
    assert h.min() >= 0.0 and h.max() < 1.0
    # Roughly uniform: mean near 0.5, no mass collapse.
    assert 0.45 < h.mean() < 0.55
    assert len(np.unique(h)) == 10_000


def test_hash01_scalar_array_consistency():
    full = hash01(np.arange(100), seed=3)
    singles = np.array([hash01(np.array([i]), seed=3)[0] for i in range(100)])
    assert np.array_equal(full, singles)


@pytest.mark.parametrize("seed", [0, 5])
def test_coin_balance(seed):
    c = coin(np.arange(20_000), seed)
    assert 0.47 < c.mean() < 0.53


def test_edge_key_symmetric():
    u = np.array([1, 5, 9])
    v = np.array([4, 2, 9 + 1])
    assert np.array_equal(edge_key(u, v), edge_key(v, u))


def test_edge_key_unique_per_pair():
    n = 200
    uu, vv = np.meshgrid(np.arange(n), np.arange(n))
    mask = uu < vv
    keys = edge_key(uu[mask], vv[mask])
    assert len(np.unique(keys)) == mask.sum()


def test_edge_key_rejects_large_ids():
    with pytest.raises(ValueError):
        edge_key(np.array([1 << 32]), np.array([0]))


def test_edge_rank_orientation_invariant():
    u = np.array([0, 3, 8, 100])
    v = np.array([7, 1, 2, 5])
    assert np.array_equal(edge_rank(u, v, 9), edge_rank(v, u, 9))


@given(st.integers(0, 2**31), st.integers(0, 1000))
@settings(max_examples=30, deadline=None)
def test_hash01_property_bounds(key, seed):
    h = hash01(np.array([key]), seed)[0]
    assert 0.0 <= h < 1.0
