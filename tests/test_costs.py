"""Tests for the seed-incentive cost models (§5.1)."""
import numpy as np
import pytest

from repro.costs.incentives import COST_MODELS, seed_costs


def test_linear():
    sigma = np.array([[1.0, 2.0, 10.0]])
    assert np.allclose(seed_costs(sigma, 0.5, "linear"), [[0.5, 1.0, 5.0]])


def test_quasilinear():
    sigma = np.array([[1.0, np.e]])
    got = seed_costs(sigma, 2.0, "quasilinear")
    assert got[0, 0] == pytest.approx(0.0)  # ln(1) = 0
    assert got[0, 1] == pytest.approx(2.0 * np.e)


def test_superlinear():
    sigma = np.array([[3.0]])
    assert seed_costs(sigma, 0.1, "superlinear")[0, 0] == pytest.approx(0.9)


def test_clamp_below_one():
    sigma = np.array([[0.2]])
    for model in COST_MODELS:
        c = seed_costs(sigma, 1.0, model)
        assert np.all(c >= 0.0)
    assert seed_costs(sigma, 1.0, "linear")[0, 0] == 1.0  # clamped σ = 1


def test_ordering_for_large_sigma():
    """For σ > e: superlinear > quasilinear > linear (per unit α)."""
    sigma = np.array([[5.0]])
    lin = seed_costs(sigma, 1.0, "linear")[0, 0]
    quasi = seed_costs(sigma, 1.0, "quasilinear")[0, 0]
    sup = seed_costs(sigma, 1.0, "superlinear")[0, 0]
    assert sup > quasi > lin


def test_alpha_scales_linearly():
    sigma = np.array([[4.0]])
    for model in COST_MODELS:
        a = seed_costs(sigma, 0.1, model)
        b = seed_costs(sigma, 0.2, model)
        assert np.allclose(b, 2 * a)


def test_unknown_model_raises():
    with pytest.raises(ValueError):
        seed_costs(np.array([[1.0]]), 1.0, "cubic")
