"""Tests for the Morton (Z-order) substrate."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines import morton


def test_known_values():
    # (1,0,0) -> bit 0; (0,1,0) -> bit 1; (0,0,1) -> bit 2.
    xyz = np.array([[1, 0, 0], [0, 1, 0], [0, 0, 1], [1, 1, 1]])
    assert morton.encode(xyz).tolist() == [1, 2, 4, 7]


def test_roundtrip_random():
    g = np.random.default_rng(0)
    xyz = g.integers(0, 1 << 21, (10_000, 3))
    assert np.array_equal(morton.decode(morton.encode(xyz)), xyz)


def test_roundtrip_extremes():
    xyz = np.array([[0, 0, 0], [(1 << 21) - 1] * 3])
    assert np.array_equal(morton.decode(morton.encode(xyz)), xyz)


def test_out_of_range_rejected():
    with pytest.raises(ValueError):
        morton.encode(np.array([[1 << 21, 0, 0]]))
    with pytest.raises(ValueError):
        morton.encode(np.array([[-1, 0, 0]]))


def test_locality():
    # Adjacent cells differ in few low-order bits: sorted Morton order
    # groups spatial neighbours (why Draco sorts by it).
    a = morton.encode(np.array([[4, 4, 4]]))[0]
    b = morton.encode(np.array([[5, 4, 4]]))[0]
    assert b - a == 1


@given(st.lists(st.tuples(
    st.integers(0, (1 << 21) - 1),
    st.integers(0, (1 << 21) - 1),
    st.integers(0, (1 << 21) - 1)), min_size=1, max_size=100))
@settings(max_examples=30, deadline=None)
def test_hypothesis_roundtrip(pts):
    xyz = np.array(pts, dtype=np.int64)
    assert np.array_equal(morton.decode(morton.encode(xyz)), xyz)
