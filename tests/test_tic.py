"""Tests for the TIC / Weighted-Cascade probability substrate."""
import numpy as np
import pytest

import pyspark.sql.functions as F

from repro.graphs.generators import edges_to_spark, powerlaw_edges
from repro.graphs.tic import (
    ad_mixtures,
    collect_edge_adv_probs,
    collect_edge_probs,
    mixtures_to_pdf,
    tic_probs_spark,
    tic_topic_entries,
    wc_probs_spark,
)
from repro.oracle import assert_equivalent


@pytest.mark.parametrize("seed", range(3))
def test_mixtures_are_distributions(seed):
    phi = ad_mixtures(5, 8, seed=seed)
    assert phi.shape == (5, 8)
    assert np.all(phi > 0)
    assert np.allclose(phi.sum(axis=1), 1.0)


@pytest.mark.parametrize("seed", range(3))
def test_topic_entries_sparse(seed):
    m, L, density = 2000, 10, 0.2
    pdf = tic_topic_entries(m, L, seed=seed, density=density)
    frac = len(pdf) / (m * L)
    assert abs(frac - density) < 0.03
    assert pdf["p_hat"].min() >= 0.01


@pytest.mark.parametrize("seed", range(3))
def test_tic_probs_closed_form(spark, seed):
    """Spark mixing p^i = Σ_z φ_i(z)·p̂^z matches the dense numpy product."""
    m, L, h = 400, 6, 4
    pdf = tic_topic_entries(m, L, seed=seed, density=0.3)
    phi = ad_mixtures(h, L, seed=seed + 1)
    probs = collect_edge_adv_probs(tic_probs_spark(spark, pdf, phi), h, m)
    dense = np.zeros((m, L))
    dense[pdf["edge_id"], pdf["topic"]] = pdf["p_hat"]
    assert np.allclose(probs, phi @ dense.T)


def test_tic_probs_vs_duckdb(spark):
    """The Spark join+group-by is equivalent to the same SQL in DuckDB."""
    m, L, h = 200, 5, 3
    pdf = tic_topic_entries(m, L, seed=11, density=0.4)
    phi = ad_mixtures(h, L, seed=12)
    got = tic_probs_spark(spark, pdf, phi)
    assert_equivalent(
        got,
        """
        SELECT t.edge_id, a.adv, SUM(a.phi * t.p_hat) AS p
        FROM topics t JOIN ads a ON t.topic = a.topic
        GROUP BY t.edge_id, a.adv
        """,
        topics=pdf,
        ads=mixtures_to_pdf(phi),
    )


def test_positive_fraction_matches_density():
    """1-(1-d)^L positive-edge fraction — the Table-substitution knob."""
    m, L = 20000, 10
    for density, expect in ((0.137, 0.77), (0.26, 0.95)):
        pdf = tic_topic_entries(m, L, seed=5, density=density)
        frac = pdf["edge_id"].nunique() / m
        assert abs(frac - expect) < 0.02


def test_wc_probs(spark):
    src, dst = powerlaw_edges(80, 400, seed=9)
    edges = edges_to_spark(spark, src, dst)
    probs = collect_edge_probs(wc_probs_spark(spark, edges), len(src))
    indeg = np.bincount(dst, minlength=80)
    assert np.allclose(probs, 1.0 / indeg[dst])


def test_wc_probs_vs_duckdb(spark):
    src, dst = powerlaw_edges(60, 250, seed=10)
    edges = edges_to_spark(spark, src, dst)
    got = wc_probs_spark(spark, edges)
    assert_equivalent(
        got,
        """
        SELECT e.edge_id, 1.0 / d.indeg AS p
        FROM edges e JOIN (
            SELECT dst, COUNT(*) AS indeg FROM edges GROUP BY dst
        ) d ON e.dst = d.dst
        """,
        edges=edges,
    )


def test_collect_edge_adv_probs_zero_fill(spark):
    """Edge-ad pairs with no active topics collect as probability 0."""
    import pandas as pd

    pdf = pd.DataFrame({"edge_id": [0], "topic": [0], "p_hat": [0.5]})
    phi = np.array([[1.0, 0.0], [0.0, 1.0]])
    probs = collect_edge_adv_probs(tic_probs_spark(spark, pdf, phi), 2, 3)
    assert probs[0, 0] == pytest.approx(0.5)
    assert probs[1, 0] == 0.0 and np.all(probs[:, 1:] == 0.0)
