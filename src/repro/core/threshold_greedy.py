"""Algorithms 2–3: ThresholdGreedy(γ) and Fill (§3.2.1).

ThresholdGreedy pops elements (u, i) in decreasing marginal-*gain* order
(CA-style) but only keeps those whose marginal *rate* clears γ/B_i; the
first budget-overshooting node per advertiser is the stopple node D_i.
If exactly one advertiser depleted its budget, Algorithm 1 is re-run for it
over the unselected nodes (the A_i set of Theorem 3.2's b=1 case). Fill then
greedily tops up every advertiser by marginal rate.

Both use CELF lazy evaluation. An element's skip conditions (node already
used, advertiser depleted, rate below threshold) are all monotone — once
true they stay true — so evaluating them only when the element surfaces as
the current maximum is exactly the paper's semantics.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass

import numpy as np

from repro.core.greedy import greedy, _rate, _EPS
from repro.core.model import RMProblem


@dataclass
class TGResult:
    allocation: list  # S⃗* after Fill
    b: int  # number of budget-depleted advertisers |I|
    s_sets: list  # S_j from the main loop
    d_sets: list  # D_j stopple singletons
    a_sets: list  # A_j from the single-depleted-advertiser Greedy call
    pi_star: float  # π(S⃗*) under the problem's model


def _feasible_elements(prob: RMProblem):
    """Line 1 of Algorithms 2–3: elements with c_j(v) + π_j(v) ≤ B_j."""
    sp = prob.model.singleton_pi()
    ok = prob.costs + sp <= prob.budgets[:, None] + _EPS
    advs, nodes = np.nonzero(ok)
    return advs, nodes, sp


def threshold_greedy(prob: RMProblem, gamma: float) -> TGResult:
    """Run Algorithm 2 under threshold γ; returns the filled allocation."""
    h, costs, B = prob.h, prob.costs, prob.budgets
    advs, nodes, sp = _feasible_elements(prob)
    state = prob.model.state()
    heap = [
        (-float(sp[i, v]), int(v), int(i)) for i, v in zip(advs, nodes)
    ]
    heapq.heapify(heap)
    s_sets = [set() for _ in range(h)]
    d_sets = [set() for _ in range(h)]
    used: set[int] = set()  # nodes in ∪_j S_j ∪ D_j
    depleted: set[int] = set()  # I
    spend = np.zeros(h)  # c_i(S_i)
    pi_s = np.zeros(h)  # π_i(S_i)
    while heap and len(depleted) < h:
        negg, u, i = heapq.heappop(heap)
        if u in used or i in depleted:
            continue  # monotone skip conditions — discard early
        g = state.gain(u, i)
        if heap and g < -negg - _EPS:
            heapq.heappush(heap, (-g, u, i))
            continue
        # (u, i) is the current max-gain element of M.
        if gamma > 0.0 and _rate(g, float(costs[i, u])) < gamma / B[i] - _EPS:
            continue  # Line 5: rate below threshold — drop element
        if spend[i] + costs[i, u] + pi_s[i] + g <= B[i] + _EPS:
            state.add(u, i)
            s_sets[i].add(u)
            used.add(u)
            spend[i] += costs[i, u]
            pi_s[i] += g
        else:
            d_sets[i] = {u}
            used.add(u)
            depleted.add(i)
    a_sets = [set() for _ in range(h)]
    if len(depleted) == 1:
        i = next(iter(depleted))
        all_s = set().union(*s_sets)
        cand = [v for v in range(prob.n) if v not in all_s]
        a_sets[i] = greedy(prob, cand, i).seeds
    # Line 11: per advertiser, the best of {S_j, D_j, A_j}.
    best = []
    for j in range(h):
        options = [s_sets[j], d_sets[j], a_sets[j]]
        vals = [prob.model.pi_of(j, o) for o in options]
        best.append(set(options[int(np.argmax(vals))]))
    filled = fill(prob, best)
    return TGResult(
        allocation=filled,
        b=len(depleted),
        s_sets=s_sets,
        d_sets=d_sets,
        a_sets=a_sets,
        pi_star=prob.model.pi_alloc(filled),
    )


def fill(prob: RMProblem, allocation) -> list:
    """Algorithm 3: greedily top up by marginal rate until budgets deplete."""
    h, costs, B = prob.h, prob.costs, prob.budgets
    allocation = [set(s) for s in allocation]
    state = prob.model.state(allocation)
    spend = np.array([prob.cost_of(i, allocation[i]) for i in range(h)])
    pi_s = np.array([state.pi_i(i) for i in range(h)])
    used = set().union(*allocation) if h else set()
    advs, nodes, sp = _feasible_elements(prob)
    heap = []
    for i, v in zip(advs, nodes):
        i, v = int(i), int(v)
        g0 = float(sp[i, v])
        heap.append((-_rate(g0, float(costs[i, v])), v, i))
    heapq.heapify(heap)
    while heap:
        neg_r, u, i = heapq.heappop(heap)
        if u in used:
            continue
        g = state.gain(u, i)
        r = _rate(g, float(costs[i, u]))
        if heap and r < -neg_r - _EPS:
            heapq.heappush(heap, (-r, u, i))
            continue
        if spend[i] + costs[i, u] + pi_s[i] + g <= B[i] + _EPS:
            state.add(u, i)
            allocation[i].add(u)
            used.add(u)
            spend[i] += costs[i, u]
            pi_s[i] += g
    return allocation
