"""Dataset presets and problem-instance assembly (§5.1 settings).

Presets are laptop-scale synthetic stand-ins for the paper's datasets
(DESIGN.md § Substitutions). ``lastfm_lite`` matches LastFM's real size;
the others are scaled down, with budgets scaled by the node-count ratio so
budget-to-reachable-revenue ratios are preserved.

Building an instance runs the Spark substrate end-to-end: edge generation,
TIC/WC probability materialisation (Spark SQL), CSR assembly, and singleton
spread estimation from a dedicated RR collection (Spark mapInPandas),
then attaches the seed-incentive costs.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.costs.incentives import seed_costs
from repro.graphs.csr import CSRGraph, build_csr
from repro.graphs.generators import edges_to_spark, powerlaw_edges, symmetrize
from repro.graphs.tic import (
    ad_mixtures,
    collect_edge_adv_probs,
    collect_edge_probs,
    tic_probs_spark,
    tic_topic_entries,
    wc_probs_spark,
)
from repro.influence.evaluate import singleton_spreads
from repro.influence.rrset import (
    RRCollection,
    generate_rr_collection,
    generate_rr_local,
)

# Below this many RR sets, a Spark job's fixed overhead (~0.3 s) dwarfs the
# work; generate on the driver with the identical kernels instead. The TIM
# baselines' KPT-estimation batches in particular are tiny and frequent.
_LOCAL_GEN_THRESHOLD = 20_000

# Paper Table 2 (LastFM at native scale; Flixster budgets scaled by n ratio
# 6K/30K = 1/5). WC presets use uniform budgets as in §5.2.3.
_LASTFM_BUDGETS = [100.0, 120.0, 150.0, 180.0, 220.0, 260.0, 300.0, 370.0, 500.0, 1200.0]
_FLIXSTER_BUDGETS = [600.0, 700.0, 800.0, 900.0, 1000.0, 1000.0, 1100.0, 1200.0, 1500.0, 2000.0]
_TIC_CPES = [1.0, 1.1, 1.2, 1.3, 1.4, 1.6, 1.7, 1.8, 1.9, 2.0]

PRESETS: dict[str, dict] = {
    # density tuned so the positive edge-ad probability fraction matches the
    # paper: 1-(1-d)^L = 0.77 (LastFM) / 0.95 (Flixster) at L=10.
    "lastfm_lite": dict(
        n=1300, m=14700, model="tic", L=10, density=0.137, p_max=0.4,
        h=10, budgets=_LASTFM_BUDGETS, cpes=_TIC_CPES, directed=True, seed=101,
    ),
    "flixster_lite": dict(
        n=3000, m=42500, model="tic", L=10, density=0.26, p_max=0.4,
        h=10, budgets=_FLIXSTER_BUDGETS, cpes=_TIC_CPES, directed=True, seed=102,
    ),
    "dblp_lite": dict(
        n=15000, m=50000, model="wc", h=5, uniform_budget=500.0,
        uniform_cpe=1.0, directed=False, seed=103,
    ),
    "livejournal_lite": dict(
        n=40000, m=600000, model="wc", h=5, uniform_budget=800.0,
        uniform_cpe=1.0, directed=True, seed=104,
    ),
    # Tiny preset for fast integration tests.
    "tiny": dict(
        n=60, m=240, model="tic", L=4, density=0.3, p_max=0.4,
        h=3, budgets=[30.0, 40.0, 50.0], cpes=[1.0, 1.5, 2.0],
        directed=True, seed=105,
    ),
}


@dataclass
class Instance:
    """A fully-assembled RM problem instance."""

    name: str
    n: int
    h: int
    src: np.ndarray
    dst: np.ndarray
    directed: bool
    cpe: np.ndarray
    budgets: np.ndarray
    edge_probs: np.ndarray  # (h, m) or (1, m); input-edge order
    shared_probs: bool
    csr: CSRGraph
    sigma1: np.ndarray  # (h, n) singleton spread estimates
    costs: np.ndarray  # (h, n) seeding costs
    alpha: float
    cost_model: str

    @property
    def m(self) -> int:
        return len(self.src)

    def edges_probs_pdf(self, adv: int) -> pd.DataFrame:
        """(src, dst, p) for advertiser ``adv`` — input to the Spark MC."""
        row = self.edge_probs[0 if self.shared_probs else adv]
        return pd.DataFrame({"src": self.src, "dst": self.dst, "p": row})

    def rr_gen(self, spark: SparkSession, kernel: str = "standard"):
        """Uniform-sampling RR generator for RMA: gen(n_rr, seed)."""

        def gen(n_rr: int, seed: int) -> RRCollection:
            if n_rr <= _LOCAL_GEN_THRESHOLD:
                return generate_rr_local(
                    self.csr, self.cpe, n_rr, seed=seed, kernel=kernel
                )
            return generate_rr_collection(
                spark, self.csr, self.cpe, n_rr, seed=seed, kernel=kernel
            )

        return gen

    def rr_gen_adv(self, spark: SparkSession, kernel: str = "standard"):
        """Per-advertiser RR generator for the TI baselines: gen(adv, n_rr, seed)."""

        def gen(adv: int, n_rr: int, seed: int) -> RRCollection:
            onehot = np.zeros(self.h)
            onehot[adv] = self.cpe[adv]
            if n_rr <= _LOCAL_GEN_THRESHOLD:
                return generate_rr_local(
                    self.csr, onehot, n_rr, seed=seed, kernel=kernel
                )
            return generate_rr_collection(
                spark, self.csr, onehot, n_rr, seed=seed, kernel=kernel
            )

        return gen


def _graph_and_probs(spark: SparkSession, cfg: dict):
    src, dst = powerlaw_edges(cfg["n"], cfg["m"], seed=cfg["seed"])
    if not cfg["directed"]:
        src, dst = symmetrize(src, dst)
    m = len(src)
    if cfg["model"] == "tic":
        h = cfg["h"]
        topic_pdf = tic_topic_entries(
            m, cfg["L"], seed=cfg["seed"] + 1, density=cfg["density"], p_max=cfg["p_max"]
        )
        phi = ad_mixtures(h, cfg["L"], seed=cfg["seed"] + 2)
        probs_df = tic_probs_spark(spark, topic_pdf, phi)
        probs = collect_edge_adv_probs(probs_df, h, m)
        shared = False
    else:
        edges_df = edges_to_spark(spark, src, dst)
        probs = collect_edge_probs(wc_probs_spark(spark, edges_df), m)[None, :]
        shared = True
    return src, dst, probs, shared


def build_instance(
    spark: SparkSession,
    preset: str,
    *,
    alpha: float = 0.1,
    cost_model: str = "linear",
    h: int | None = None,
    uniform_budget: float | None = None,
    n_sigma_rr: int | None = None,
    budget_override: np.ndarray | None = None,
) -> Instance:
    """Assemble an instance from a preset (no caching — see get_instance)."""
    cfg = dict(PRESETS[preset])
    src, dst, probs, shared = _graph_and_probs(spark, cfg)
    n, m = cfg["n"], len(src)
    if cfg["model"] == "wc":
        h = h if h is not None else cfg["h"]
        b = uniform_budget if uniform_budget is not None else cfg["uniform_budget"]
        budgets = np.full(h, float(b))
        cpe = np.full(h, float(cfg["uniform_cpe"]))
    else:
        assert h is None or h == cfg["h"], "TIC presets fix h (Table 2 settings)"
        h = cfg["h"]
        budgets = np.asarray(cfg["budgets"], dtype=np.float64)
        cpe = np.asarray(cfg["cpes"], dtype=np.float64)
    if budget_override is not None:
        budgets = np.asarray(budget_override, dtype=np.float64)
    csr = build_csr(n, src, dst, probs if shared else probs, h=h, shared_probs=shared)
    if n_sigma_rr is None:
        n_sigma_rr = min(20 * n, 200_000)
    sig_rr = generate_rr_collection(
        spark, csr, cpe, n_sigma_rr, seed=cfg["seed"] + 77
    )
    sigma1 = singleton_spreads(sig_rr)
    costs = seed_costs(sigma1, alpha, cost_model)
    return Instance(
        name=preset,
        n=n,
        h=h,
        src=src,
        dst=dst,
        directed=cfg["directed"],
        cpe=cpe,
        budgets=budgets,
        edge_probs=np.atleast_2d(probs),
        shared_probs=shared,
        csr=csr,
        sigma1=sigma1,
        costs=costs,
        alpha=alpha,
        cost_model=cost_model,
    )


_INSTANCE_CACHE: dict = {}
_EVAL_CACHE: dict = {}


def get_instance(
    spark: SparkSession,
    preset: str,
    *,
    alpha: float = 0.1,
    cost_model: str = "linear",
    **kw,
) -> Instance:
    """Session-cached builder. The expensive parts (graph, probabilities,
    CSR, singleton spreads) are cached independently of (α, cost model), so
    sweeping α re-derives only the cost matrix."""
    base_key = (preset, tuple(sorted((k, str(v)) for k, v in kw.items())))
    if base_key not in _INSTANCE_CACHE:
        _INSTANCE_CACHE[base_key] = build_instance(
            spark, preset, alpha=alpha, cost_model=cost_model, **kw
        )
    base = _INSTANCE_CACHE[base_key]
    if base.alpha == alpha and base.cost_model == cost_model:
        return base
    from dataclasses import replace

    return replace(
        base,
        costs=seed_costs(base.sigma1, alpha, cost_model),
        alpha=alpha,
        cost_model=cost_model,
    )


def get_eval_rr(
    spark: SparkSession, inst: Instance, *, n_eval: int = 100_000, seed: int = 424242
) -> RRCollection:
    """Independent evaluation collection (the paper's 10^7-RR analogue)."""
    key = (inst.name, inst.n, n_eval, seed)
    if key not in _EVAL_CACHE:
        _EVAL_CACHE[key] = generate_rr_collection(
            spark, inst.csr, inst.cpe, n_eval, seed=seed
        )
    return _EVAL_CACHE[key]
