"""Tests for the Theorem 4.2 / Lemma B.7 bound machinery."""
import math

import numpy as np
import pytest

from repro.core.bounds import (
    lb_mean,
    mu_per_advertiser,
    theta_bar_max,
    theta_hat_max,
    theta_zero,
    ub_mean,
)


def test_mu_counts_cheapest_nodes():
    costs = np.array([[1.0, 2.0, 3.0, 10.0]])
    budgets = np.array([6.0])
    assert mu_per_advertiser(costs, budgets, 0.0)[0] == 3  # 1+2+3 = 6
    assert mu_per_advertiser(costs, budgets, 1.0)[0] == 3  # 12 < 16
    assert mu_per_advertiser(np.array([[5.0, 6.0]]), np.array([1.0]), 0.0)[0] == 1


def test_theta_formulas_positive_and_monotone():
    mu = np.array([3, 5])
    base = theta_hat_max(1000, 0.1, 0.01, 0.1, mu)
    assert base > 0
    assert theta_hat_max(1000, 0.05, 0.01, 0.1, mu) > base  # smaller ε → more
    assert theta_hat_max(1000, 0.1, 0.001, 0.1, mu) > base  # smaller δ → more
    tb = theta_bar_max(1000, 10.0, 0.1, 50.0, 0.01, 5, 4)
    assert tb > 0
    assert theta_bar_max(1000, 10.0, 0.05, 50.0, 0.01, 5, 4) > tb  # smaller ϱ
    t0 = theta_zero(1000, 10.0, 0.1, 50.0, 0.01, 5)
    assert 0 < t0 < tb  # θ₀ is far below θ̄_max


def test_ub_lb_bracket_estimate():
    """UB ≥ estimate ≥ LB always (a > 0)."""
    for t in (0.0, 5.0, 120.0):
        for a in (0.5, 3.0, 10.0):
            ub = ub_mean(t, 1000, 500.0, a)
            lb = lb_mean(t, 1000, 500.0, a)
            assert ub >= t - 1e-9
            assert lb <= t + 1e-9
            assert lb >= 0.0


def test_ub_lb_tighten_with_more_samples():
    t, a = 50.0, 5.0
    w1 = ub_mean(t, 1000, 500.0, a) - lb_mean(t, 1000, 500.0, a)
    w2 = ub_mean(t, 10000, 500.0, a) - lb_mean(t, 10000, 500.0, a)
    assert w2 < w1


@pytest.mark.parametrize("p", [0.05, 0.2, 0.5])
def test_bounds_cover_true_mean_empirically(p):
    """Simulated Bernoulli coverage: true mean inside [LB, UB] ≈ always."""
    rng = np.random.default_rng(0)
    n_gamma, n_rr = 100.0, 2000
    a = math.log(100.0)  # ~1% failure per side
    misses = 0
    trials = 50
    for _ in range(trials):
        x = rng.binomial(n_rr, p)
        est = x * n_gamma / n_rr
        true = p * n_gamma
        if not (lb_mean(est, n_rr, n_gamma, a) - 1e-9 <= true <= ub_mean(est, n_rr, n_gamma, a) + 1e-9):
            misses += 1
    assert misses <= 2


def test_lb_zero_when_estimate_tiny():
    assert lb_mean(0.0, 100, 100.0, 5.0) == 0.0
