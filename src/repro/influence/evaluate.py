"""Revenue / spread evaluation over an RR collection (Lemma 4.1).

The paper measures the revenue of every algorithm's output on 10^7 RR sets
generated independently of the algorithms (§5.1). We do the same with a
collection scaled to our graphs (default 10^5, see DESIGN.md). Singleton
spreads — needed by the seed-incentive cost models — are computed from a
dedicated collection with a Spark group-by that is oracle-checked against
DuckDB in tests.
"""
from __future__ import annotations

import numpy as np

from repro.influence.rrset import RRCollection


def covered_counts(rr: RRCollection, allocation) -> np.ndarray:
    """Per-advertiser number of RR sets covered by the allocation.

    ``allocation`` is a sequence of per-advertiser seed iterables
    (S_1, …, S_h). An RR set generated for advertiser i is covered iff it
    intersects S_i.
    """
    out = np.zeros(rr.h, dtype=np.int64)
    for i in range(rr.h):
        ids = [rr.rr_ids_for(int(u), i) for u in allocation[i]]
        if ids:
            out[i] = len(np.unique(np.concatenate(ids))) if any(
                len(a) for a in ids
            ) else 0
    return out


def evaluate_revenue(rr: RRCollection, allocation) -> tuple[float, np.ndarray]:
    """(total π̃, per-advertiser π̃_i) of an allocation on this collection."""
    cov = covered_counts(rr, allocation)
    per = cov * rr.factor
    return float(per.sum()), per


def singleton_spreads(rr: RRCollection) -> np.ndarray:
    """(h, n) estimated singleton spreads σ̂_i({u}) = nΓ·cnt_i(u)/(|R|·cpe_i).

    Clamped below at 1.0: σ_i({u}) ≥ 1 always (a seed activates itself),
    and the QuasiLinear cost model takes ln(σ) which must stay ≥ 0.
    """
    counts = rr.singleton_cover_counts().astype(np.float64)
    sigma = counts * rr.factor / rr.cpe[:, None]
    return np.maximum(sigma, 1.0)
