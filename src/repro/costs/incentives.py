"""Seed-incentive models (§5.1): Linear, QuasiLinear, SuperLinear.

Given a constant α > 0 and singleton spreads σ_i({u}):

- Linear:      c_i(u) = α·σ_i({u})
- QuasiLinear: c_i(u) = α·σ_i({u})·ln(σ_i({u}))
- SuperLinear: c_i(u) = α·σ_i({u})²

σ is #P-hard to compute exactly, so the instance builder estimates it once
from a dedicated RR collection shared by every algorithm (same fixed seed) —
the cost *definition* is then identical for all compared algorithms, which
is what fairness requires. σ estimates are clamped at ≥ 1 (a seed always
activates itself; keeps ln(σ) ≥ 0).
"""
from __future__ import annotations

import numpy as np

COST_MODELS = ("linear", "quasilinear", "superlinear")


def seed_costs(sigma: np.ndarray, alpha: float, model: str) -> np.ndarray:
    """(h, n) per-node seeding costs from (h, n) singleton spreads."""
    sigma = np.maximum(np.asarray(sigma, dtype=np.float64), 1.0)
    if model == "linear":
        return alpha * sigma
    if model == "quasilinear":
        return alpha * sigma * np.log(sigma)
    if model == "superlinear":
        return alpha * sigma**2
    raise ValueError(f"unknown cost model {model!r}; one of {COST_MODELS}")
