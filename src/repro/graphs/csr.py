"""CSR adjacency with per-advertiser activation probabilities.

The RR-set kernels traverse *in*-edges (reverse reachability), the forward
Monte-Carlo simulator traverses *out*-edges. Both layouts are built once per
instance and broadcast to executors. Probabilities are stored aligned to the
in-CSR edge order, one row per advertiser (or a single shared row under the
Weighted-Cascade model, where all ads share ``p_uv = 1/indeg(v)``).

For the SUBSIM kernel we additionally pre-sort each node's in-edge slice by
probability (descending) per advertiser, so the geometric-skipping sampler
can use the sorted prefix as its envelope.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class CSRGraph:
    """Immutable graph + influence-probability container."""

    n: int
    m: int
    h: int
    # In-CSR: in_indices[in_indptr[v]:in_indptr[v+1]] are in-neighbours of v.
    in_indptr: np.ndarray
    in_indices: np.ndarray
    # (h, m) probabilities aligned to in-CSR order; (1, m) when shared.
    in_probs: np.ndarray
    shared_probs: bool
    # Out-CSR for forward propagation.
    out_indptr: np.ndarray
    out_indices: np.ndarray
    out_probs: np.ndarray  # aligned to out-CSR order, same row convention
    # SUBSIM auxiliaries, aligned to in-CSR slices, sorted desc by prob.
    in_probs_sorted: np.ndarray = field(repr=False, default=None)
    in_indices_sorted: np.ndarray = field(repr=False, default=None)
    # True where all in-edge probs of a node are equal for that advertiser.
    in_equal_prob: np.ndarray = field(repr=False, default=None)

    def probs_row(self, adv: int) -> np.ndarray:
        """In-CSR-aligned probability row for advertiser ``adv``."""
        return self.in_probs[0 if self.shared_probs else adv]

    def out_probs_row(self, adv: int) -> np.ndarray:
        return self.out_probs[0 if self.shared_probs else adv]


def _csr_order(key: np.ndarray, other: np.ndarray, n: int):
    """Sort edges by ``key``; return (indptr, order) for a CSR over key."""
    order = np.argsort(key, kind="stable")
    counts = np.bincount(key, minlength=n)
    indptr = np.zeros(n + 1, dtype=np.int64)
    np.cumsum(counts, out=indptr[1:])
    return indptr, order


def build_csr(
    n: int,
    src: np.ndarray,
    dst: np.ndarray,
    probs: np.ndarray,
    *,
    h: int,
    shared_probs: bool,
) -> CSRGraph:
    """Assemble in/out CSR layouts plus SUBSIM auxiliaries.

    ``probs`` has shape (h, m) (edge order = input edge order) or (m,) when
    shared across advertisers.
    """
    m = len(src)
    probs2d = np.atleast_2d(np.asarray(probs, dtype=np.float64))
    if shared_probs:
        assert probs2d.shape == (1, m)
    else:
        assert probs2d.shape == (h, m)

    in_indptr, in_order = _csr_order(dst, src, n)
    in_indices = src[in_order].astype(np.int64)
    in_probs = probs2d[:, in_order]

    out_indptr, out_order = _csr_order(src, dst, n)
    out_indices = dst[out_order].astype(np.int64)
    out_probs = probs2d[:, out_order]

    rows = in_probs.shape[0]
    in_probs_sorted = np.empty_like(in_probs)
    in_indices_sorted = np.empty((rows, m), dtype=np.int64)
    in_equal_prob = np.zeros((rows, n), dtype=bool)
    for r in range(rows):
        for v in range(n):
            lo, hi = in_indptr[v], in_indptr[v + 1]
            if hi == lo:
                in_equal_prob[r, v] = True
                continue
            sl = in_probs[r, lo:hi]
            order = np.argsort(-sl, kind="stable")
            in_probs_sorted[r, lo:hi] = sl[order]
            in_indices_sorted[r, lo:hi] = in_indices[lo:hi][order]
            in_equal_prob[r, v] = bool(sl.max() - sl.min() < 1e-15)

    return CSRGraph(
        n=n,
        m=m,
        h=h,
        in_indptr=in_indptr,
        in_indices=in_indices,
        in_probs=in_probs,
        shared_probs=shared_probs,
        out_indptr=out_indptr,
        out_indices=out_indices,
        out_probs=out_probs,
        in_probs_sorted=in_probs_sorted,
        in_indices_sorted=in_indices_sorted,
        in_equal_prob=in_equal_prob,
    )
