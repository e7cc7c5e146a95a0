"""Shared helpers for tests: tiny deterministic graphs and canonical forms."""
from __future__ import annotations

import numpy as np
import pandas as pd


def edges_pdf(rows: list[tuple[int, int, int]]) -> pd.DataFrame:
    """Edge frame from (u, v, t) triples."""
    return pd.DataFrame(rows, columns=["u", "v", "t"]).astype("int64")


def random_bipartite_pdf(
    n_u: int, n_l: int, n_e: int, *, seed: int, t_range: int | None = None
) -> pd.DataFrame:
    """Random temporal bipartite multigraph with pairwise-distinct times.

    ``t_range`` defaults to 4*n_e, small enough that random graphs carry
    butterflies within modest δ values.
    """
    g = np.random.default_rng(seed)
    t_range = t_range or 4 * n_e
    ts = g.choice(t_range, size=min(n_e, t_range), replace=False)
    n = len(ts)
    return pd.DataFrame(
        {
            "u": g.integers(0, n_u, n),
            "v": g.integers(0, n_l, n),
            "t": np.sort(ts),
        }
    ).astype("int64")


def canon_instances(pdf: pd.DataFrame) -> set[tuple]:
    """Canonical hashable form of an instance frame for set comparison."""
    cols = ["u1", "u2", "v1", "v2", "t11", "t12", "t21", "t22", "btype"]
    return {tuple(int(x) for x in row) for row in pdf[cols].itertuples(index=False)}
