"""Unit tests for the routing-cost functions (Eq. 2, 3, 4)."""
import math

import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core.costs import (
    BUFFER_W,
    lagging_coefficient,
    passing_contact,
    passing_time,
)


@pytest.mark.parametrize("is_q", [True, False])
def test_lagging_empty_partition(is_q):
    # δ = 0 → ρ = 1 + e^0 = 2
    assert lagging_coefficient(0.0, 1.0, is_q) == pytest.approx(2.0)


@pytest.mark.parametrize("is_q", [True, False])
def test_lagging_greater_than_one(is_q):
    for d in (0.0, 0.1, 0.5, 1.0, 5.0):
        assert lagging_coefficient(d, 1.0, is_q) > 1.0


@pytest.mark.parametrize("is_q", [True, False])
def test_lagging_monotone_in_density(is_q):
    vals = [lagging_coefficient(d, 1.0, is_q) for d in (0.0, 0.2, 0.5, 0.9, 1.3)]
    assert vals == sorted(vals)


@pytest.mark.parametrize("ratio", [0.1, 0.5, 0.9])
def test_q_crowd_lags_more_than_r(ratio):
    # below capacity the square shrinks the exponent, so R lags less
    q = lagging_coefficient(ratio, 1.0, True)
    r = lagging_coefficient(ratio, 1.0, False)
    assert q > r


def test_lagging_at_capacity_equal():
    # δ/Dmax = 1 → both types give 1 + e
    assert lagging_coefficient(1.0, 1.0, True) == pytest.approx(1.0 + math.e)
    assert lagging_coefficient(1.0, 1.0, False) == pytest.approx(1.0 + math.e)


def test_lagging_overflow_guard():
    assert math.isfinite(lagging_coefficient(1e6, 1.0, False))
    assert math.isfinite(lagging_coefficient(1e6, 1.0, True))


def test_negative_density_treated_as_zero():
    assert lagging_coefficient(-5.0, 1.0, True) == pytest.approx(2.0)


@pytest.mark.parametrize("dist,speed", [(10.0, 1.0), (30.0, 1.2), (0.0, 1.2)])
def test_passing_time_crowd_free(dist, speed):
    # ρ(δ=0) = 2 so T = 2 · dist/speed
    assert passing_time(dist, 0.0, 1.0, False, speed) == pytest.approx(
        2.0 * dist / speed
    )


def test_passing_time_scales_with_lagging():
    t0 = passing_time(10.0, 0.0, 1.0, True, 1.2)
    t1 = passing_time(10.0, 0.5, 1.0, True, 1.2)
    assert t1 > t0


def test_contact_r_partition_buffer_area():
    # Eq. 4 R-branch: len·w·δ
    assert passing_contact(20.0, 0.3, 1000.0, False) == pytest.approx(
        20.0 * BUFFER_W * 0.3
    )


def test_contact_q_partition_queue_slice():
    # Eq. 4 Q-branch: (w/len)·pop with pop = δ·Area
    area, dens, dist = 500.0, 0.2, 25.0
    assert passing_contact(dist, dens, area, True) == pytest.approx(
        (BUFFER_W / dist) * dens * area
    )


def test_contact_q_short_segment_clamped():
    # a segment shorter than the buffer cannot contact more than the queue
    area, dens = 100.0, 0.5
    pop = dens * area
    assert passing_contact(0.1, dens, area, True) <= pop


def test_contact_zero_density():
    assert passing_contact(15.0, 0.0, 100.0, False) == 0.0
    assert passing_contact(15.0, 0.0, 100.0, True) == 0.0


def test_contact_negative_density_clamped():
    assert passing_contact(15.0, -1.0, 100.0, False) == 0.0


@given(
    dist=st.floats(0.1, 1e4),
    dens=st.floats(0.0, 10.0),
    dmax=st.floats(0.1, 10.0),
    q=st.booleans(),
)
def test_passing_time_nonnegative_finite(dist, dens, dmax, q):
    t = passing_time(dist, dens, dmax, q, 1.2)
    assert t >= 0.0 and math.isfinite(t)


@given(
    dist=st.floats(0.1, 1e4),
    dens=st.floats(0.0, 10.0),
    area=st.floats(1.0, 1e5),
    q=st.booleans(),
)
def test_contact_nonnegative_finite(dist, dens, area, q):
    k = passing_contact(dist, dens, area, q)
    assert k >= 0.0 and math.isfinite(k)
