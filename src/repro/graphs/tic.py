"""Topic-aware Independent Cascade (TIC) and Weighted-Cascade models.

Under TIC (Barbieri et al. [9], as used by the paper) each edge (u, v)
carries per-topic probabilities ``p̂^z_{uv}`` and each ad i a topic mixture
``φ_i``; the ad-specific activation probability is
``p^i_{uv} = Σ_z φ_i(z) · p̂^z_{uv}``.

The per-(edge, ad) mixing is a join + group-by aggregation, so we run it as
a Spark SQL computation over (edge_id, topic, p_hat) and (adv, topic, phi)
tables and verify it against DuckDB with ``repro.oracle.assert_equivalent``.

The paper learns ``p̂^z`` from action logs; we sample sparse per-topic
probabilities with a per-preset density chosen to match the paper's reported
fraction of positive edge-ad probabilities (~95% Flixster, ~77% LastFM).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession


def tic_topic_entries(
    m: int,
    L: int,
    *,
    seed: int,
    density: float = 0.3,
    p_max: float = 0.3,
) -> pd.DataFrame:
    """Sparse per-topic edge probabilities as (edge_id, topic, p_hat) rows.

    Each (edge, topic) pair is active with probability ``density``; active
    pairs get p̂ ~ U(0.01, p_max). Only nonzero entries are materialised.
    """
    g = np.random.default_rng(seed)
    active = g.random((m, L)) < density
    edge_id, topic = np.nonzero(active)
    p_hat = g.uniform(0.01, p_max, size=len(edge_id))
    return pd.DataFrame(
        {"edge_id": edge_id.astype(np.int64), "topic": topic.astype(np.int64), "p_hat": p_hat}
    )


def ad_mixtures(h: int, L: int, *, seed: int, concentration: float = 0.25) -> np.ndarray:
    """Per-ad topic distributions φ_i: (h, L), rows sum to 1.

    A small Dirichlet concentration makes each ad load on a few topics, as
    learned mixtures do.
    """
    g = np.random.default_rng(seed)
    x = g.gamma(concentration, size=(h, L))
    x = np.maximum(x, 1e-12)
    return x / x.sum(axis=1, keepdims=True)


def mixtures_to_pdf(phi: np.ndarray) -> pd.DataFrame:
    h, L = phi.shape
    adv, topic = np.meshgrid(np.arange(h), np.arange(L), indexing="ij")
    return pd.DataFrame(
        {
            "adv": adv.ravel().astype(np.int64),
            "topic": topic.ravel().astype(np.int64),
            "phi": phi.ravel(),
        }
    )


def tic_probs_spark(
    spark: SparkSession, topic_pdf: pd.DataFrame, phi: np.ndarray
) -> DataFrame:
    """p^i_{uv} = Σ_z φ_i(z)·p̂^z_{uv} as a Spark aggregation.

    Returns (edge_id, adv, p) with one row per edge-ad pair that has a
    positive probability.
    """
    topics = spark.createDataFrame(topic_pdf)
    ads = spark.createDataFrame(mixtures_to_pdf(phi))
    return (
        topics.join(ads, "topic")
        .groupBy("edge_id", "adv")
        .agg(F.sum(F.col("phi") * F.col("p_hat")).alias("p"))
    )


def collect_edge_adv_probs(df: DataFrame, h: int, m: int) -> np.ndarray:
    """Materialise a (edge_id, adv, p) DataFrame into a dense (h, m) array."""
    pdf = df.toPandas()
    probs = np.zeros((h, m), dtype=np.float64)
    probs[pdf["adv"].to_numpy(), pdf["edge_id"].to_numpy()] = pdf["p"].to_numpy()
    return probs


def wc_probs_spark(spark: SparkSession, edges_df: DataFrame) -> DataFrame:
    """Weighted-Cascade probabilities p_uv = 1/indeg(v) as (edge_id, p)."""
    indeg = edges_df.groupBy("dst").agg(F.count("*").alias("indeg"))
    return edges_df.join(indeg, "dst").select(
        "edge_id", (F.lit(1.0) / F.col("indeg")).alias("p")
    )


def collect_edge_probs(df: DataFrame, m: int) -> np.ndarray:
    """Materialise an (edge_id, p) DataFrame into a dense (m,) array."""
    pdf = df.toPandas()
    probs = np.zeros(m, dtype=np.float64)
    probs[pdf["edge_id"].to_numpy()] = pdf["p"].to_numpy()
    return probs
