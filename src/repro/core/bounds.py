"""Concentration-bound machinery for Section 4 (Theorem 4.2, Lemma B.7).

All quantities are in "RR units": an estimate π̃ relates to coverage X by
π̃ = X·nΓ/|R|. ``ub_mean``/``lb_mean`` are the martingale bounds of
Lemma B.7 (after [64]'s Lemmas 4.2–4.3) giving high-probability upper /
lower bounds on the true π from an observed estimate.
"""
from __future__ import annotations

import math

import numpy as np


def mu_per_advertiser(costs: np.ndarray, budgets: np.ndarray, rho: float) -> np.ndarray:
    """μ_i: max #nodes advertiser i can select within the relaxed budget.

    Computed from seeding costs alone (revenue payments only shrink the
    selectable count, so this is the upper bound Theorem 4.2 needs).
    Clamped to ≥ 1 so the ln(en/μ) terms stay finite.
    """
    h, n = costs.shape
    out = np.zeros(h, dtype=np.int64)
    for i in range(h):
        c = np.sort(costs[i])
        cum = np.cumsum(c)
        out[i] = int(np.searchsorted(cum, (1.0 + rho) * budgets[i] + 1e-12, "right"))
    return np.maximum(out, 1)


def theta_hat_max(n: int, eps: float, delta: float, lam: float, mu: np.ndarray) -> float:
    """θ̂_max of Theorem 4.2 (accuracy condition)."""
    ln4d = math.log(4.0 / delta)
    complexity = float(np.sum(mu * np.log(math.e * n / mu)))
    return (
        2.0
        * n
        / eps**2
        * (lam * math.sqrt(ln4d) + math.sqrt(lam * (ln4d + complexity))) ** 2
    )


def theta_bar_max(
    n: int, gamma: float, rho: float, b_min_budget: float, delta: float, h: int, mu_max: int
) -> float:
    """θ̄_max of Theorem 4.2 (budget-feasibility condition)."""
    return (
        8.0
        * n
        * gamma
        * (1.0 + rho)
        / (rho**2 * b_min_budget)
        * (math.log(4.0 * h / delta) + mu_max * math.log(math.e * n / mu_max))
    )


def theta_zero(
    n: int, gamma: float, rho: float, b_min_budget: float, delta_prime: float, h: int
) -> float:
    """θ₀ of Algorithm 6 Line 3 — the initial batch size."""
    return (
        4.0
        * n
        * gamma
        * (2.0 + rho / 3.0)
        / (rho**2 * b_min_budget)
        * math.log(h / delta_prime)
    )


def ub_mean(t1: float, n_rr: int, n_gamma: float, a: float) -> float:
    """Lemma B.7 upper bound on π given estimate ≤ t1 over n_rr RR sets."""
    x = max(t1, 0.0) * n_rr / n_gamma
    return (math.sqrt(x + a / 2.0) + math.sqrt(a / 2.0)) ** 2 * n_gamma / n_rr


def lb_mean(t2: float, n_rr: int, n_gamma: float, a: float) -> float:
    """Lemma B.7 lower bound on π given estimate ≥ t2 over n_rr RR sets."""
    x = max(t2, 0.0) * n_rr / n_gamma
    inner = math.sqrt(x + 2.0 * a / 9.0) - math.sqrt(a / 2.0)
    if inner <= 0.0:
        return 0.0
    val = (inner**2 - a / 18.0) * n_gamma / n_rr
    return max(val, 0.0)
