"""sGrappTBC (Appendix A): the sGrapp windowed estimator lifted to
temporal butterflies.

The stream is segmented into non-overlapping windows of ``n_t_w``
unique timestamps each (the last may be short). Counts *within* each
window come from an exact temporal counter; the butterflies *spanning*
a window boundary are estimated, per type i, as ``EC_w ** theta_i`` for
every window w >= 2, where ``EC_w`` is the number of edges seen up to
and including window w — sGrapp's "butterfly count grows as a power of
the edge count" observation applied per type. ``theta_i`` is the
empirically preset exponent the paper denotes {θ_i} (typically within
[1.0, 1.5])."""
from __future__ import annotations

from typing import Callable, Sequence

import numpy as np
import pandas as pd

from repro.core.optimized import count_local
from repro.core.schema import N_TYPES


def split_windows(edges: pd.DataFrame, n_t_w: int) -> list[pd.DataFrame]:
    """Consecutive segments of ``n_t_w`` unique timestamps each."""
    if n_t_w <= 0:
        raise ValueError("n_t_w must be positive")
    ts = edges["t"].to_numpy()
    if not (np.diff(ts) >= 0).all():
        raise ValueError("stream edges must arrive in chronological order")
    uniq = pd.unique(edges["t"])
    out = []
    for start in range(0, len(uniq), n_t_w):
        sel = edges[edges["t"].isin(uniq[start : start + n_t_w])]
        out.append(sel.reset_index(drop=True))
    return out


def sgrapp_tbc(
    edges: pd.DataFrame,
    delta: int,
    n_t_w: int,
    thetas: Sequence[float] = (1.0,) * N_TYPES,
    counter: Callable = count_local,
) -> np.ndarray:
    """Estimated per-type counts (floats). ``counter`` is any exact
    pandas-level counter (sGrappTBC/⁺/⁺⁺ differ only in that plug)."""
    if len(thetas) != N_TYPES:
        raise ValueError("need one theta per butterfly type")
    windows = split_windows(edges, n_t_w)
    est = np.zeros(N_TYPES, dtype=float)
    seen_edges = len(windows[0]) if windows else 0
    if windows:
        est += counter(windows[0], delta)
    for w in windows[1:]:
        seen_edges += len(w)
        est += counter(w, delta)
        est += np.array([seen_edges**t for t in thetas])
    return est


def fit_thetas(
    edges: pd.DataFrame,
    delta: int,
    n_t_w: int,
    counter: Callable = count_local,
) -> np.ndarray:
    """Empirically preset {θ_i} for a dataset/window size (paper App. A:
    "we need to empirically preset a unique θ parameter for each type").

    Solves, per type, Σ_{w≥2} EC_w^θ = (exact count) − (in-window count)
    by bisection — the calibration pass the paper runs on reference data
    before deploying sGrapp. θ is clamped to [0, 2].
    """
    windows = split_windows(edges, n_t_w)
    exact = counter(edges, delta).astype(float)
    inwin = sum(
        (counter(w, delta) for w in windows),
        np.zeros(N_TYPES, dtype=np.int64),
    ).astype(float)
    ecs = np.cumsum([len(w) for w in windows])[1:]
    miss = exact - inwin
    out = np.zeros(N_TYPES, dtype=float)
    for i in range(N_TYPES):
        if len(ecs) == 0 or miss[i] <= len(ecs):
            out[i] = 0.0
            continue
        lo_t, hi_t = 0.0, 2.0
        for _ in range(60):
            mid = (lo_t + hi_t) / 2
            if np.sum(ecs.astype(float) ** mid) < miss[i]:
                lo_t = mid
            else:
                hi_t = mid
        out[i] = (lo_t + hi_t) / 2
    return out
