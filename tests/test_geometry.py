"""Tests for geometric primitives."""
import numpy as np
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.space.geometry import IndoorPoint, euclid

pts = st.tuples(
    st.floats(-1e4, 1e4), st.floats(-1e4, 1e4), st.floats(-1e4, 1e4)
)


def test_euclid_basic():
    assert euclid((0, 0, 0), (3, 4, 0)) == pytest.approx(5.0)


def test_euclid_3d():
    assert euclid((1, 2, 2), (0, 0, 0)) == pytest.approx(3.0)


def test_euclid_accepts_numpy():
    assert euclid(np.array([0.0, 0.0, 0.0]), np.array([1.0, 0.0, 0.0])) == 1.0


@given(a=pts, b=pts)
def test_euclid_symmetric(a, b):
    assert euclid(a, b) == pytest.approx(euclid(b, a))


@given(a=pts)
def test_euclid_identity(a):
    assert euclid(a, a) == 0.0


@given(a=pts, b=pts, c=pts)
def test_euclid_triangle_inequality(a, b, c):
    assert euclid(a, c) <= euclid(a, b) + euclid(b, c) + 1e-6


def test_indoor_point_coords():
    p = IndoorPoint(3, (1.0, 2.0, 3.0))
    assert p.partition == 3
    assert np.array_equal(p.coords(), [1.0, 2.0, 3.0])


def test_indoor_point_hashable():
    assert IndoorPoint(1, (0.0, 0.0, 0.0)) == IndoorPoint(1, (0.0, 0.0, 0.0))
