"""Tests for the CSR adjacency layout and SUBSIM auxiliaries."""
import numpy as np
import pytest

from repro.graphs.csr import build_csr
from repro.graphs.generators import powerlaw_edges


def _ref_in_neighbors(src, dst, v):
    return sorted(src[dst == v].tolist())


def _ref_out_neighbors(src, dst, v):
    return sorted(dst[src == v].tolist())


@pytest.mark.parametrize("seed", range(5))
def test_csr_matches_edge_list(seed):
    n = 40
    src, dst = powerlaw_edges(n, 200, seed=seed)
    g = np.random.default_rng(seed)
    probs = g.uniform(0.05, 0.5, size=(2, len(src)))
    csr = build_csr(n, src, dst, probs, h=2, shared_probs=False)
    for v in range(n):
        lo, hi = csr.in_indptr[v], csr.in_indptr[v + 1]
        assert sorted(csr.in_indices[lo:hi].tolist()) == _ref_in_neighbors(src, dst, v)
        lo, hi = csr.out_indptr[v], csr.out_indptr[v + 1]
        assert sorted(csr.out_indices[lo:hi].tolist()) == _ref_out_neighbors(src, dst, v)


@pytest.mark.parametrize("seed", range(3))
def test_probs_aligned(seed):
    """Each (in-edge, prob) pair survives the CSR permutation intact."""
    n = 30
    src, dst = powerlaw_edges(n, 150, seed=seed)
    g = np.random.default_rng(seed + 10)
    probs = g.uniform(0.01, 0.9, size=(3, len(src)))
    csr = build_csr(n, src, dst, probs, h=3, shared_probs=False)
    ref = {}
    for e in range(len(src)):
        ref[(int(src[e]), int(dst[e]))] = probs[:, e]
    for v in range(n):
        for k in range(csr.in_indptr[v], csr.in_indptr[v + 1]):
            u = int(csr.in_indices[k])
            assert np.allclose(csr.in_probs[:, k], ref[(u, v)])
        for k in range(csr.out_indptr[v], csr.out_indptr[v + 1]):
            w = int(csr.out_indices[k])
            assert np.allclose(csr.out_probs[:, k], ref[(v, w)])


@pytest.mark.parametrize("seed", range(3))
def test_sorted_aux(seed):
    """SUBSIM aux: per-node slices sorted desc, same (index, prob) multiset."""
    n = 30
    src, dst = powerlaw_edges(n, 150, seed=seed)
    g = np.random.default_rng(seed + 20)
    probs = g.uniform(0.01, 0.9, size=(1, len(src)))
    csr = build_csr(n, src, dst, probs, h=1, shared_probs=True)
    for v in range(n):
        lo, hi = csr.in_indptr[v], csr.in_indptr[v + 1]
        if hi == lo:
            continue
        sl = csr.in_probs_sorted[0, lo:hi]
        assert np.all(np.diff(sl) <= 1e-15)
        pairs = sorted(zip(csr.in_probs[0, lo:hi], csr.in_indices[lo:hi]))
        pairs_sorted = sorted(zip(sl, csr.in_indices_sorted[0, lo:hi]))
        assert np.allclose([p for p, _ in pairs], [p for p, _ in pairs_sorted])


def test_equal_prob_flag_wc():
    """Weighted-Cascade probabilities are equal per node → flag always set."""
    src, dst = powerlaw_edges(50, 300, seed=3)
    n = 50
    indeg = np.bincount(dst, minlength=n)
    probs = (1.0 / indeg[dst])[None, :]
    csr = build_csr(n, src, dst, probs, h=4, shared_probs=True)
    assert bool(csr.in_equal_prob.all())


def test_equal_prob_flag_heterogeneous():
    src = np.array([0, 1], dtype=np.int64)
    dst = np.array([2, 2], dtype=np.int64)
    probs = np.array([[0.3, 0.6]])
    csr = build_csr(3, src, dst, probs, h=1, shared_probs=True)
    assert not csr.in_equal_prob[0, 2]
    assert csr.in_equal_prob[0, 0] and csr.in_equal_prob[0, 1]  # no in-edges


def test_probs_row_shared_vs_per_adv():
    src = np.array([0], dtype=np.int64)
    dst = np.array([1], dtype=np.int64)
    shared = build_csr(2, src, dst, np.array([[0.5]]), h=3, shared_probs=True)
    assert shared.probs_row(2)[0] == 0.5
    per = build_csr(
        2, src, dst, np.array([[0.1], [0.2], [0.3]]), h=3, shared_probs=False
    )
    assert per.probs_row(1)[0] == 0.2
