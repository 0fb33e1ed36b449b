"""TI-CARM / TI-CSRM — the practical algorithms of Aslay et al. [5].

Structure (per [5] and the complexity analysis in Appendix C):

- one RR collection *per advertiser* (non-uniform sampling — the §4.2
  strawman), sized by TIM's θ = λ*/KPT for the current latent seed size;
- latent seed sizes start at s_i = 1 and double whenever |S_i| reaches
  s_i, each doubling re-running KptEstimation and regenerating the
  advertiser's collection at the larger θ;
- greedy selection by marginal gain (TI-CARM) or marginal rate (TI-CSRM),
  with *conservative* budget feasibility — the estimated revenue is
  inflated by (1+ε) before being charged against the budget, which is how
  [5] guarantees feasibility from a sample and why their allocations
  under-utilise the budget (§2.2.1 limitation (iv));
- an advertiser closes when its chosen element would overshoot.

The per-advertiser θ is what makes these algorithms memory- and
time-hungry as ε shrinks (the paper's Fig. 4); the doubling regenerations
are why TI-CSRM — which selects many cheap seeds — is the slowest.
"""
from __future__ import annotations

import heapq

from dataclasses import dataclass, field

import numpy as np

from repro.baselines.tim import kpt_estimation, tim_theta
from repro.core.greedy import _rate, _EPS
from repro.graphs.csr import CSRGraph
from repro.influence.rrset import RRCollection


@dataclass
class TIResult:
    allocation: list
    n_rr_total: int
    regenerations: int
    diagnostics: dict = field(default_factory=dict)


class _AdvSample:
    """Per-advertiser RR collection + coverage state + θ bookkeeping."""

    def __init__(
        self, adv, cpe_i, n, gen, csr, eps, ell, sample_scale, rr_cap, seed,
        max_latent,
    ):
        self.adv = adv
        self.cpe_i = float(cpe_i)
        self.n = n
        self.gen = gen  # gen(n_rr, seed) -> RRCollection for this adv
        self.csr = csr
        self.eps = eps
        self.ell = ell
        self.scale = sample_scale
        self.rr_cap = rr_cap
        self.seed = seed
        self.max_latent = max_latent
        self.s_latent = 1
        self.epoch = 0
        self.spent = 0
        self.regens = 0
        self.rr: RRCollection | None = None
        self.covered: np.ndarray | None = None
        self.cov = 0
        self._resample(initial=True)

    def _theta(self) -> int:
        kpt, spent = kpt_estimation(
            self.gen,
            self.csr,
            self.s_latent,
            ell=self.ell,
            seed=self.seed + 31 * self.epoch,
            sample_scale=self.scale,
        )
        self.spent += spent
        theta = int(
            self.scale * tim_theta(self.n, self.s_latent, self.eps, self.ell, kpt)
        )
        theta = max(theta, 256)
        if self.rr_cap is not None:
            theta = min(theta, self.rr_cap)
        return theta

    def _resample(self, *, initial: bool, current_seeds=()):
        theta = self._theta()
        self.rr = self.gen(theta, self.seed + 997 * self.epoch + 1)
        self.spent += theta
        self.covered = np.zeros(self.rr.n_rr, dtype=bool)
        self.cov = 0
        for u in current_seeds:
            self.add(int(u))
        if not initial:
            self.regens += 1

    def _ids(self, u: int) -> np.ndarray:
        return self.rr.rr_ids_for(u, self.adv)

    def pi_hat(self) -> float:
        return self.cpe_i * self.n * self.cov / self.rr.n_rr

    def gain(self, u: int) -> float:
        ids = self._ids(u)
        if len(ids) == 0:
            return 0.0
        newly = int(np.count_nonzero(~self.covered[ids]))
        return self.cpe_i * self.n * newly / self.rr.n_rr

    def add(self, u: int) -> None:
        ids = self._ids(u)
        if len(ids):
            newly = ids[~self.covered[ids]]
            self.covered[newly] = True
            self.cov += len(newly)

    def maybe_double(self, current_seeds) -> bool:
        """Double the latent seed size and regenerate when |S_i| hits it."""
        if len(current_seeds) < self.s_latent:
            return False
        if self.max_latent is not None and self.s_latent >= self.max_latent:
            return False
        self.s_latent *= 2
        self.epoch += 1
        self._resample(initial=False, current_seeds=current_seeds)
        return True


def ti_rm(
    rr_gen_adv,
    csr: CSRGraph,
    costs: np.ndarray,
    budgets: np.ndarray,
    cpe: np.ndarray,
    *,
    rule: str,
    eps: float = 0.1,
    ell: float = 1.0,
    sample_scale: float = 1.0,
    rr_cap: int | None = None,
    seed: int = 11,
    max_latent: int | None = 32,
) -> TIResult:
    """Run TI-CARM (rule="gain") or TI-CSRM (rule="rate").

    ``rr_gen_adv(adv, n_rr, seed)`` generates RR sets with advertiser
    ``adv``'s probabilities only. ``max_latent`` caps the latent-seed-size
    doubling (regenerations stop once s_i reaches it) — a runtime bound for
    the scaled-down reproduction; set None for unbounded TIM behaviour.
    """
    assert rule in ("gain", "rate")
    costs = np.asarray(costs, dtype=np.float64)
    budgets = np.asarray(budgets, dtype=np.float64)
    h = len(budgets)
    n = csr.n
    samples = [
        _AdvSample(
            i,
            cpe[i],
            n,
            lambda n_rr, s, i=i: rr_gen_adv(i, n_rr, s),
            csr,
            eps,
            ell,
            sample_scale,
            rr_cap,
            seed + 17 * i,
            max_latent,
        )
        for i in range(h)
    ]
    alloc = [set() for _ in range(h)]
    spend = np.zeros(h)
    used: set[int] = set()
    closed: set[int] = set()
    epoch_of = [0] * h

    def push_all(heap, i):
        s = samples[i]
        counts = s.rr.singleton_cover_counts()[i].astype(np.float64)
        g0 = s.cpe_i * n * counts / s.rr.n_rr
        for u in range(n):
            if u in used or u in alloc[i]:
                continue
            if costs[i, u] + (1.0 + eps) * g0[u] <= budgets[i] + _EPS:
                key = g0[u] if rule == "gain" else _rate(g0[u], float(costs[i, u]))
                heapq.heappush(heap, (-key, u, i, epoch_of[i]))

    heap: list = []
    for i in range(h):
        push_all(heap, i)

    while heap and len(closed) < h:
        neg_k, u, i, ep = heapq.heappop(heap)
        if ep != epoch_of[i] or u in used or i in closed:
            continue
        s = samples[i]
        g = s.gain(u)
        key = g if rule == "gain" else _rate(g, float(costs[i, u]))
        if heap and key < -neg_k - _EPS:
            heapq.heappush(heap, (-key, u, i, ep))
            continue
        # Conservative feasibility: inflate the revenue estimate by (1+ε).
        if spend[i] + costs[i, u] + (1.0 + eps) * (s.pi_hat() + g) <= budgets[i] + _EPS:
            s.add(u)
            alloc[i].add(u)
            used.add(u)
            spend[i] += costs[i, u]
            if s.maybe_double(alloc[i]):
                epoch_of[i] += 1
                push_all(heap, i)
        else:
            closed.add(i)
    return TIResult(
        allocation=alloc,
        n_rr_total=int(sum(s.spent for s in samples)),
        regenerations=int(sum(s.regens for s in samples)),
        diagnostics={
            "latent_sizes": [s.s_latent for s in samples],
            "collection_sizes": [s.rr.n_rr for s in samples],
        },
    )
