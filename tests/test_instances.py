"""Tests for dataset presets and instance assembly."""
import numpy as np
import pytest

from repro.experiments.instances import (
    PRESETS,
    build_instance,
    get_eval_rr,
    get_instance,
)


def test_preset_catalogue():
    for name in ("lastfm_lite", "flixster_lite", "dblp_lite", "livejournal_lite"):
        assert name in PRESETS
    # Table 1 scale relations preserved: lastfm at native size.
    assert PRESETS["lastfm_lite"]["n"] == 1300
    assert PRESETS["lastfm_lite"]["m"] == 14700


def test_table2_budget_stats():
    """Our LastFM budgets/CPEs match the paper's Table 2 min/max, mean≈."""
    cfg = PRESETS["lastfm_lite"]
    b = np.asarray(cfg["budgets"])
    c = np.asarray(cfg["cpes"])
    assert b.min() == 100 and b.max() == 1200
    assert abs(b.mean() - 320) / 320 < 0.15
    assert c.min() == 1.0 and c.max() == 2.0
    assert c.mean() == pytest.approx(1.5)


@pytest.fixture(scope="module")
def tiny_inst(spark):
    return get_instance(spark, "tiny", alpha=0.1, cost_model="linear")


def test_tiny_instance_shapes(tiny_inst):
    inst = tiny_inst
    assert inst.n == 60 and inst.h == 3
    assert inst.costs.shape == (3, 60)
    assert inst.sigma1.shape == (3, 60)
    assert np.all(inst.sigma1 >= 1.0)
    assert np.all(inst.costs > 0) or np.any(inst.costs == 0)  # ≥ 0 by model
    assert inst.edge_probs.shape[0] == 3
    assert inst.csr.n == 60


def test_instance_cache_and_cost_variants(spark, tiny_inst):
    again = get_instance(spark, "tiny", alpha=0.1, cost_model="linear")
    assert again is tiny_inst
    sup = get_instance(spark, "tiny", alpha=0.2, cost_model="superlinear")
    assert sup is not tiny_inst
    # Graph and spreads shared; only costs differ.
    assert sup.csr is tiny_inst.csr
    assert np.allclose(sup.costs, 0.2 * tiny_inst.sigma1**2)


def test_costs_follow_model(tiny_inst):
    assert np.allclose(tiny_inst.costs, 0.1 * tiny_inst.sigma1)


def test_eval_rr_cached(spark, tiny_inst):
    a = get_eval_rr(spark, tiny_inst, n_eval=5000)
    b = get_eval_rr(spark, tiny_inst, n_eval=5000)
    assert a is b
    assert a.n_rr == 5000


def test_edges_probs_pdf(tiny_inst):
    pdf = tiny_inst.edges_probs_pdf(1)
    assert set(pdf.columns) == {"src", "dst", "p"}
    assert len(pdf) == tiny_inst.m
    assert np.allclose(pdf["p"].to_numpy(), tiny_inst.edge_probs[1])


def test_wc_instance_budget_override(spark):
    inst = build_instance(
        spark, "tiny_wc" if "tiny_wc" in PRESETS else "dblp_lite",
        h=2, uniform_budget=100.0, n_sigma_rr=4000,
    )
    assert inst.h == 2
    assert np.allclose(inst.budgets, 100.0)
    assert inst.shared_probs
    # WC probabilities: each in-edge of v carries 1/indeg(v).
    indeg = np.bincount(inst.dst, minlength=inst.n)
    assert np.allclose(inst.edge_probs[0], 1.0 / indeg[inst.dst])
