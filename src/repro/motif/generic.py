"""Generic δ-temporal motif counting specialized to the rectangle.

This reproduces the strategy of the general temporal-motif systems the
paper compares against (chronological edge-driven isomorphism search, à
la Mackey et al.): walk every chronologically ordered 4-edge
combination inside a δ window and test whether the induced graph is a
(2,2)-biclique. Complexity is O(Σ_i w_i^3) for per-edge δ-window sizes
w_i — the "cannot avoid permuting all possible combinations" blow-up
footnote 1 describes — so the paper excludes these competitors after
they exceed the time limit; our benchmark shows the same explosion in
miniature.
"""
from __future__ import annotations

from bisect import bisect_right
from itertools import combinations

import numpy as np
import pandas as pd

from repro.core.classify import classify_times
from repro.core.schema import N_TYPES


def _rectangle_type(es: tuple) -> int | None:
    """Type of 4 chronologically sorted (u, v, t) edges, or None if the
    induced static graph is not a butterfly."""
    us = {e[0] for e in es}
    vs = {e[1] for e in es}
    if len(us) != 2 or len(vs) != 2:
        return None
    if {(e[0], e[1]) for e in es} != {(u, v) for u in us for v in vs}:
        return None
    u1, u2 = sorted(us)
    v1, v2 = sorted(vs)
    t = {(e[0], e[1]): e[2] for e in es}
    return classify_times(t[(u1, v1)], t[(u1, v2)], t[(u2, v1)], t[(u2, v2)])


def generic_motif_counts(edges: pd.DataFrame, delta: int) -> np.ndarray:
    """Per-type counts by exhaustive 4-edge enumeration (tiny inputs only)."""
    rows = sorted(map(tuple, edges[["u", "v", "t"]].itertuples(index=False)),
                  key=lambda e: e[2])
    ts = [e[2] for e in rows]
    counts = np.zeros(N_TYPES, dtype=np.int64)
    for i, first in enumerate(rows):
        hi = bisect_right(ts, first[2] + delta)
        for trio in combinations(rows[i + 1 : hi], 3):
            es = (first, *trio)
            if len({e[2] for e in es}) != 4:
                continue
            bt = _rectangle_type(es)
            if bt is not None:
                counts[bt] += 1
    return counts
