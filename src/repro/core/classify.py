"""The 6-type temporal butterfly algebra (Figure 1 / §4.1 of the paper).

Two independent formulations are provided and cross-tested:

1. ``classify_times`` — anchor the earliest of the four edges and read
   the type from the order in which the U-sharing, L-sharing, and
   opposite edges follow (the table in DESIGN.md §1).
2. ``wedge_pair_type`` — the paper's wedge-set algebra: normalize both
   wedges to forward intervals, compare coverage pattern
   {non-overlap, intersect, cover} and direction pattern {same,
   different}, then apply the xor layer-conversion rule.

Both accept only butterflies with 4 pairwise-distinct timestamps; the
caller filters ties (the paper assumes tie-broken timestamps).
"""
from __future__ import annotations

import numpy as np


def classify_times(t11: int, t12: int, t21: int, t22: int) -> int:
    """Type of the butterfly with edge times tXY = t(uX, vY).

    ``u1, u2`` are the U-layer vertices and ``v1, v2`` the L-layer ones;
    the labelling within a layer does not matter (the classification is
    invariant under u1<->u2 and v1<->v2 swaps). Times must be pairwise
    distinct.
    """
    ts = (t11, t12, t21, t22)
    if len(set(ts)) != 4:
        raise ValueError(f"timestamps must be pairwise distinct: {ts}")
    anchor = min(ts)
    # anchor edge (a, b): shareU = (a, b'), shareL = (a', b), opp = (a', b')
    if anchor == t11:
        su, sl, op = t12, t21, t22
    elif anchor == t12:
        su, sl, op = t11, t22, t21
    elif anchor == t21:
        su, sl, op = t22, t11, t12
    else:
        su, sl, op = t21, t12, t11
    if sl < su and sl < op:  # e2 shares the L vertex
        return 0 if su < op else 3
    if su < sl and su < op:  # e2 shares the U vertex
        return 1 if sl < op else 2
    # e2 is the opposite edge
    return 4 if sl < su else 5


def classify_times_np(
    t11: np.ndarray, t12: np.ndarray, t21: np.ndarray, t22: np.ndarray
) -> np.ndarray:
    """Vectorized ``classify_times`` over aligned int arrays."""
    stacked = np.stack([t11, t12, t21, t22])
    anchor = stacked.min(axis=0)
    su = np.select(
        [anchor == t11, anchor == t12, anchor == t21], [t12, t11, t22], default=t21
    )
    sl = np.select(
        [anchor == t11, anchor == t12, anchor == t21], [t21, t22, t11], default=t12
    )
    op = np.select(
        [anchor == t11, anchor == t12, anchor == t21], [t22, t21, t12], default=t11
    )
    return np.select(
        [
            (sl < su) & (sl < op) & (su < op),
            (sl < su) & (sl < op),
            (su < sl) & (su < op) & (sl < op),
            (su < sl) & (su < op),
            sl < su,
        ],
        [0, 3, 1, 2, 4],
        default=5,
    ).astype(np.int64)


def classify_sql(t11: str, t12: str, t21: str, t22: str) -> str:
    """SQL CASE expression computing the butterfly type.

    The same text is valid Spark SQL and DuckDB SQL, so the correctness
    oracle and the Catalyst baseline share one classification source.
    Inputs are SQL expressions for the four (pairwise-distinct) times.
    """
    anchor = f"LEAST({t11}, {t12}, {t21}, {t22})"
    su = (
        f"(CASE WHEN {anchor} = {t11} THEN {t12} WHEN {anchor} = {t12} THEN {t11} "
        f"WHEN {anchor} = {t21} THEN {t22} ELSE {t21} END)"
    )
    sl = (
        f"(CASE WHEN {anchor} = {t11} THEN {t21} WHEN {anchor} = {t12} THEN {t22} "
        f"WHEN {anchor} = {t21} THEN {t11} ELSE {t12} END)"
    )
    op = (
        f"(CASE WHEN {anchor} = {t11} THEN {t22} WHEN {anchor} = {t12} THEN {t21} "
        f"WHEN {anchor} = {t21} THEN {t12} ELSE {t11} END)"
    )
    return (
        f"(CASE WHEN {sl} < {su} AND {sl} < {op} THEN "
        f"(CASE WHEN {su} < {op} THEN 0 ELSE 3 END) "
        f"WHEN {su} < {sl} AND {su} < {op} THEN "
        f"(CASE WHEN {sl} < {op} THEN 1 ELSE 2 END) "
        f"ELSE (CASE WHEN {sl} < {su} THEN 4 ELSE 5 END) END)"
    )


# --- the paper's wedge-set formulation -------------------------------------

#: coverage patterns between two forward-normalized wedge intervals
NON_OVERLAP, INTERSECT, COVER = 0, 1, 2


def wedge_pair_type(
    lo_i: int, hi_i: int, fwd_i: bool, lo_j: int, hi_j: int, fwd_j: bool, layer: int
) -> int | None:
    """Type from two wedges sharing start/end vertices (paper §4.1).

    Each wedge is forward-normalized: ``lo < hi`` with ``fwd`` recording
    whether the original wedge ran start->middle->end in increasing time
    (subset A) or not (subset D). ``layer`` is the start-vertex layer
    (0 = U, 1 = L). Returns None when the four timestamps are not
    pairwise distinct (no temporal butterfly). The caller checks the
    duration constraint.
    """
    if lo_i > lo_j or (lo_i == lo_j and hi_i > hi_j):
        lo_i, hi_i, fwd_i, lo_j, hi_j, fwd_j = lo_j, hi_j, fwd_j, lo_i, hi_i, fwd_i
    # after the swap lo_i <= lo_j < hi_j, so only three collisions remain
    if lo_i == lo_j or hi_i == lo_j or hi_i == hi_j:
        return None
    if hi_i < lo_j:
        pattern = NON_OVERLAP
    elif hi_i < hi_j:
        pattern = INTERSECT
    else:
        pattern = COVER
    same_dir = fwd_i == fwd_j
    base = pattern if same_dir else pattern + 3
    return base ^ layer
