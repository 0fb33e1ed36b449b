"""Tests for the revenue-model abstraction (coverage + exact) and OPT."""
import numpy as np
import pytest

from repro.core.model import (
    CoverageRevenueModel,
    ExactRevenueModel,
    RMProblem,
    brute_force_opt,
)
from repro.influence.rrset import from_memberships

from tests.helpers import random_coverage_problem


@pytest.mark.parametrize("seed", range(8))
def test_coverage_state_matches_stateless(seed):
    prob = random_coverage_problem(seed)
    model = prob.model
    g = np.random.default_rng(seed)
    state = model.state()
    sets = [set() for _ in range(prob.h)]
    for _ in range(10):
        u, i = int(g.integers(0, prob.n)), int(g.integers(0, prob.h))
        gain = state.gain(u, i)
        assert gain == pytest.approx(
            model.pi_of(i, sets[i] | {u}) - model.pi_of(i, sets[i])
        )
        state.add(u, i)
        sets[i].add(u)
        assert state.pi_i(i) == pytest.approx(model.pi_of(i, sets[i]))
    assert state.pi_total() == pytest.approx(model.pi_alloc(sets))


@pytest.mark.parametrize("seed", range(8))
def test_coverage_monotone_submodular(seed):
    """π̃ is a coverage function: monotone and submodular by construction."""
    prob = random_coverage_problem(seed)
    model = prob.model
    g = np.random.default_rng(seed + 1000)
    for _ in range(10):
        i = int(g.integers(0, prob.h))
        small = set(int(x) for x in g.choice(prob.n, size=2, replace=False))
        big = small | {int(g.integers(0, prob.n))}
        u = int(g.integers(0, prob.n))
        assert model.pi_of(i, big) >= model.pi_of(i, small) - 1e-12
        gain_small = model.pi_of(i, small | {u}) - model.pi_of(i, small)
        gain_big = model.pi_of(i, big | {u}) - model.pi_of(i, big)
        assert gain_big <= gain_small + 1e-12


def test_state_from_allocation():
    prob = random_coverage_problem(0)
    alloc = [{0, 1}, {2}]
    state = prob.model.state(alloc)
    assert state.pi_i(0) == pytest.approx(prob.model.pi_of(0, {0, 1}))
    assert state.pi_i(1) == pytest.approx(prob.model.pi_of(1, {2}))


def test_exact_model_state_matches_stateless():
    src = np.array([0, 0, 1, 2])
    dst = np.array([1, 2, 3, 3])
    probs = np.array([[0.5, 0.3, 0.7, 0.4], [0.2, 0.6, 0.5, 0.8]])
    model = ExactRevenueModel(4, src, dst, probs, [1.0, 2.0])
    state = model.state()
    g0 = state.gain(0, 1)
    assert g0 == pytest.approx(model.pi_of(1, [0]))
    state.add(0, 1)
    g1 = state.gain(1, 1)
    assert g1 == pytest.approx(model.pi_of(1, [0, 1]) - model.pi_of(1, [0]))


def test_exact_model_cpe_scaling():
    src, dst = np.array([0]), np.array([1])
    probs = np.array([[0.5]])
    m1 = ExactRevenueModel(2, src, dst, probs, [1.0])
    m2 = ExactRevenueModel(2, src, dst, probs, [3.0])
    assert m2.pi_of(0, [0]) == pytest.approx(3 * m1.pi_of(0, [0]))
    assert m1.pi_of(0, [0]) == pytest.approx(1.5)  # 1 + 0.5


def test_rmproblem_feasibility():
    prob = random_coverage_problem(1)
    assert prob.is_feasible([set(), set()])
    # Overlapping allocations are infeasible (partition constraint).
    assert not prob.is_feasible([{0}, {0}])
    # Budget violation.
    big = [set(range(prob.n)), set()]
    if prob.cost_of(0, big[0]) + prob.model.pi_of(0, big[0]) > prob.budgets[0]:
        assert not prob.is_feasible(big)


@pytest.mark.parametrize("seed", range(5))
def test_brute_force_opt_is_feasible_and_maximal_locally(seed):
    prob = random_coverage_problem(seed, n=5, h=2, n_rr=25)
    opt, alloc = brute_force_opt(prob)
    assert prob.is_feasible(alloc)
    assert opt == pytest.approx(prob.model.pi_alloc(alloc))
    # No single-node addition can stay feasible and improve (local check).
    for i in range(prob.h):
        for u in range(prob.n):
            if u in alloc[0] | alloc[1]:
                continue
            cand = [set(s) for s in alloc]
            cand[i].add(u)
            if prob.is_feasible(cand):
                assert prob.model.pi_alloc(cand) <= opt + 1e-9


def test_factor_formula():
    rr = from_memberships(10, 2, [1.0, 3.0], [(0, {1}), (1, {2})])
    model = CoverageRevenueModel(rr)
    # π̃_1({2}) = nΓ·1/|R| = 10·4/2 = 20.
    assert model.pi_of(1, {2}) == pytest.approx(20.0)
    assert model.pi_of(0, {1}) == pytest.approx(20.0)
    assert model.pi_of(0, {2}) == 0.0
