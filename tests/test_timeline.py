"""Unit tests for the discrete time grid (repro.core.timeline)."""
import numpy as np
import pytest

from repro.core.timeline import Timeline, reporting_mask, update_ticks


@pytest.mark.parametrize(
    "t,expected",
    [(0.0, 0), (9.99, 0), (10.0, 1), (25.0, 2), (599.0, 59), (1e9, 59)],
)
def test_tick_of_time(t, expected):
    tl = Timeline(ti=10.0, horizon=60)
    assert tl.tick(t) == expected


def test_tick_clamps_negative():
    assert Timeline(ti=5.0, horizon=10).tick(-3.0) == 0


@pytest.mark.parametrize("tick", [0, 1, 7, 59])
def test_seconds_roundtrip(tick):
    tl = Timeline(ti=10.0, horizon=60)
    assert tl.tick(tl.seconds(tick)) == tick


@pytest.mark.parametrize("ti", [5.0, 10.0, 15.0, 20.0])
def test_table2_intervals(ti):
    tl = Timeline(ti=ti, horizon=100)
    assert tl.seconds(1) == ti


@pytest.mark.parametrize("period", [1, 2, 3, 4, 5])
def test_reporting_mask_periodic(period):
    periods = np.array([period])
    ticks = [x for x in range(30) if reporting_mask(periods, x)[0]]
    assert ticks == list(range(0, 30, period))


def test_reporting_mask_vector():
    periods = np.array([1, 2, 3])
    assert reporting_mask(periods, 6).tolist() == [True, True, True]
    assert reporting_mask(periods, 5).tolist() == [True, False, False]


def test_reporting_mask_tick0_all_aligned():
    periods = np.arange(1, 6)
    assert reporting_mask(periods, 0).all()


@pytest.mark.parametrize(
    "periods,lo,hi,expected",
    [
        ([2], 0, 10, [2, 4, 6, 8, 10]),
        ([2, 3], 0, 6, [2, 3, 4, 6]),
        ([5], 4, 5, [5]),
        ([5], 5, 5, []),
        ([3], 10, 9, []),
    ],
)
def test_update_ticks(periods, lo, hi, expected):
    assert update_ticks(np.array(periods), lo, hi).tolist() == expected


def test_update_ticks_empty_periods():
    assert update_ticks(np.array([], dtype=int), 0, 10).tolist() == []


def test_update_ticks_is_sorted_unique():
    out = update_ticks(np.array([2, 3, 4]), 0, 50)
    assert (np.diff(out) > 0).all()
