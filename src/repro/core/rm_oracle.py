"""Algorithm 5: RM_with_Oracle(τ) — dispatch on the number of advertisers.

Approximation ratio λ (Theorem 3.5 / Eqn (1)):
  h = 1     → 1/3                     (Greedy)
  h ∈ {2,3} → 1/(2(h+1)(1+τ))        (Search(τ, 1))
  h ≥ 4     → 1/((h+6)(1+τ))         (Search(τ, 2))
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.greedy import greedy
from repro.core.model import RMProblem
from repro.core.search import SearchResult, search


def approx_ratio(h: int, tau: float) -> float:
    """λ from Theorem 3.5."""
    if h == 1:
        return 1.0 / 3.0
    if h in (2, 3):
        return 1.0 / (2.0 * (h + 1) * (1.0 + tau))
    return 1.0 / ((h + 6) * (1.0 + tau))


@dataclass
class OracleResult:
    allocation: list
    pi_star: float
    search: SearchResult | None  # None when h = 1


def rm_with_oracle(prob: RMProblem, tau: float) -> OracleResult:
    """Run Algorithm 5 on ``prob`` (whose model may be oracle or sampled)."""
    h = prob.h
    if h == 1:
        res = greedy(prob, range(prob.n), 0)
        return OracleResult(
            allocation=[set(res.seeds)], pi_star=res.pi_star, search=None
        )
    sr = search(prob, tau, 1 if h <= 3 else 2)
    return OracleResult(allocation=sr.allocation, pi_star=sr.pi_star, search=sr)
