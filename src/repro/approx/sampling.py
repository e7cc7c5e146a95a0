"""ApproxTBC (Appendix A): the ApproxBFC edge-sampling scheme of
Sanei-Mehri et al. lifted to temporal butterflies.

Every edge survives independently with probability ``p``; the exact
temporal counter runs on the sampled graph and each per-type count is
scaled by ``p^-4`` (a butterfly survives iff its 4 edges all survive,
so the estimator is unbiased per type — the Appendix-A correctness
argument).
"""
from __future__ import annotations

from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.optimized import count_local, tbc_pp


def sample_edges_pdf(edges: pd.DataFrame, p: float, seed: int) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    keep = g.random(len(edges)) < p
    return edges.loc[keep].reset_index(drop=True)


def approx_tbc_local(
    edges: pd.DataFrame, delta: int, p: float, seed: int = 0,
    counter: Callable = count_local,
) -> np.ndarray:
    """Estimated per-type counts (floats) on a pandas edge frame."""
    sampled = sample_edges_pdf(edges, p, seed)
    return counter(sampled, delta) / p**4


def approx_tbc(
    spark: SparkSession,
    edges: DataFrame,
    delta: int,
    p: float,
    seed: int = 0,
    counter: Callable = tbc_pp,
) -> DataFrame:
    """Estimated counts as a (btype, est) frame; ``counter`` is any of
    the exact Spark counting algorithms (ApproxTBC / ApproxTBC⁺ /
    ApproxTBC⁺⁺ are the same wrapper over tbc / tbc_plus / tbc_pp)."""
    sampled = edges.where(F.rand(seed) < p)
    exact = counter(spark, sampled, delta)
    return exact.select("btype", (F.col("cnt") / F.lit(p**4)).alias("est"))


def mape(est: np.ndarray, exact: np.ndarray) -> float:
    """Mean absolute percentage error over the six types (paper's metric),
    ignoring types whose exact count is zero."""
    est = np.asarray(est, dtype=float)
    exact = np.asarray(exact, dtype=float)
    mask = exact > 0
    if not mask.any():
        return 0.0
    return float(np.mean(np.abs(est[mask] - exact[mask]) / exact[mask]))
