"""Benchmark: RR-set generation kernels (standard vs SUBSIM).

The kernel-level comparison behind Table 6: SUBSIM's subset sampling does
O(E[#selected]) work per node instead of O(indeg), which shows most clearly
on the Weighted-Cascade graphs with heavy-tailed in-degrees.
"""
import numpy as np
import pytest

from repro.graphs.csr import build_csr
from repro.graphs.generators import powerlaw_edges
from repro.influence.rrset import generate_rr_local


@pytest.fixture(scope="module")
def wc_graph():
    n = 4000
    src, dst = powerlaw_edges(n, 60000, seed=61)
    indeg = np.bincount(dst, minlength=n)
    probs = (1.0 / indeg[dst])[None, :]
    return build_csr(n, src, dst, probs, h=1, shared_probs=True)


@pytest.mark.parametrize("kernel", ["standard", "subsim"])
def test_rrgen_wc(benchmark, wc_graph, kernel):
    rr = benchmark.pedantic(
        lambda: generate_rr_local(wc_graph, [1.0], 20000, seed=62, kernel=kernel),
        rounds=2, iterations=1,
    )
    assert rr.n_rr == 20000


@pytest.fixture(scope="module")
def tic_graph():
    n = 1300
    src, dst = powerlaw_edges(n, 14700, seed=63)
    g = np.random.default_rng(63)
    probs = g.uniform(0.0, 0.15, size=(1, len(src)))
    return build_csr(n, src, dst, probs, h=1, shared_probs=True)


@pytest.mark.parametrize("kernel", ["standard", "subsim"])
def test_rrgen_tic(benchmark, tic_graph, kernel):
    rr = benchmark.pedantic(
        lambda: generate_rr_local(tic_graph, [1.0], 20000, seed=64, kernel=kernel),
        rounds=2, iterations=1,
    )
    assert rr.n_rr == 20000
