"""Tests for door flow functions and λ fitting (Section 3.2)."""
import numpy as np
import pytest

from repro.core.flows import draw_flows, fit_lambda, fit_lambdas_per_edge


def test_fit_lambda_mean():
    assert fit_lambda(np.array([1, 2, 3, 2])) == pytest.approx(2.0)


def test_fit_lambda_empty():
    assert fit_lambda(np.array([])) == 0.0


def test_fit_lambda_rejects_negative():
    with pytest.raises(ValueError):
        fit_lambda(np.array([1.0, -2.0]))


def test_fit_lambda_recovers_poisson_mean():
    rng = np.random.default_rng(0)
    lam = 2.4
    samples = rng.poisson(lam, 20_000)
    assert fit_lambda(samples) == pytest.approx(lam, abs=0.05)


def test_fit_lambdas_per_edge():
    out = fit_lambdas_per_edge(np.array([10.0, 0.0, 6.0]), np.array([5, 0, 3]))
    assert out.tolist() == [2.0, 0.0, 2.0]


def test_fit_lambdas_zero_reports_safe():
    out = fit_lambdas_per_edge(np.array([0.0]), np.array([0]))
    assert out[0] == 0.0


def test_draw_flows_shape_and_range():
    rng = np.random.default_rng(1)
    lam = np.array([0.0, 1.0, 5.0])
    out = draw_flows(rng, lam)
    assert out.shape == (3,)
    assert out[0] == 0
    assert (out >= 0).all()


def test_draw_flows_mean_converges():
    rng = np.random.default_rng(2)
    lam = np.full(50_000, 1.7)
    assert draw_flows(rng, lam).mean() == pytest.approx(1.7, abs=0.05)
