"""Wedge-set combine kernels (§4 of the paper) — pure Python.

Each kernel consumes the wedges of one (start-vertex, end-vertex) group
— a list of ``(m, lo, hi, fwd)`` tuples with ``lo < hi ≤ lo + δ``
(Lemma-1-pruned, forward-normalized) — and produces the six per-type
butterfly counts (or the instances) contributed by that group.

* ``count_group_quadratic`` — reference: all cross-middle wedge pairs
  through ``wedge_pair_type``. Used by tests only.
* ``count_group_plus``      — TBC⁺: recursive set merging (Alg. 3) with
  the HP hashmap of ascending ``t_a`` arrays and binary search (Alg. 4).
* ``count_group_pp``        — TBC⁺⁺: same skeleton, HP replaced by the
  twin order-statistics trees TA/TS (Alg. 6); we realize the red-black
  trees as Fenwick trees over coordinate-compressed timestamps, which
  support the same O(log n) insert / delete / count / max-key API.
* ``enumerate_group``       — TBE⁺: the Alg. 5 range-traversal variant,
  emitting canonical instance rows.

Wedge priority (Definition 6): ``P_W(∠i) < P_W(∠j)`` iff
``∠i.t_s > ∠j.t_s``, ties broken by smaller ``t_a``; kernels process
wedges in priority-increasing order, i.e. ``t_s`` descending / ``t_a``
ascending — so each wedge is queried against the already-processed
wedges, whose ``t_s`` is strictly larger.
"""
from __future__ import annotations

import heapq
from bisect import bisect_left, bisect_right
from collections import defaultdict
from typing import Callable, Iterable

import numpy as np

from repro.core.classify import classify_times, wedge_pair_type
from repro.core.schema import N_TYPES

#: wedge tuple layout inside a group
M, LO, HI, FWD = range(4)

#: sort key realizing priority-increasing processing order
_PRIO_ORDER = lambda w: (-w[LO], w[HI])


def build_sets(wedges: Iterable[tuple]) -> list[tuple[list, list]]:
    """Group wedges by middle vertex into (A, D) subsets (Definition 5).

    Each subset is sorted in priority-increasing order. Only the sets —
    not the middle ids — matter for counting; enumeration keeps ``m``
    inside the tuples.
    """
    by_m: dict[int, tuple[list, list]] = defaultdict(lambda: ([], []))
    for w in wedges:
        by_m[w[M]][0 if w[FWD] else 1].append(w)
    sets = []
    for m in sorted(by_m):
        a, d = by_m[m]
        a.sort(key=_PRIO_ORDER)
        d.sort(key=_PRIO_ORDER)
        sets.append((a, d))
    return sets


# --------------------------------------------------------------------------
# reference kernel
# --------------------------------------------------------------------------


def count_group_quadratic(wedges: list[tuple], delta: int, layer: int) -> np.ndarray:
    """All cross-middle pairs, classified one by one. O(|W|^2) reference."""
    counts = np.zeros(N_TYPES, dtype=np.int64)
    ws = list(wedges)
    for i in range(len(ws)):
        for j in range(i + 1, len(ws)):
            wi, wj = ws[i], ws[j]
            if wi[M] == wj[M]:
                continue
            if max(wi[HI], wj[HI]) - min(wi[LO], wj[LO]) > delta:
                continue
            bt = wedge_pair_type(
                wi[LO], wi[HI], wi[FWD], wj[LO], wj[HI], wj[FWD], layer
            )
            if bt is not None:
                counts[bt] += 1
    return counts


# --------------------------------------------------------------------------
# shared recursive-merge skeleton (Algorithm 3)
# --------------------------------------------------------------------------


def _recur(sets: list, p: int, q: int, setcross: Callable):
    """Bottom-up merge: every cross-set wedge pair meets in exactly one
    SetCross call (Mergesort-style, Algorithm 3)."""
    if p + 1 >= q:
        return sets[p]
    mid = (p + q) // 2
    left = _recur(sets, p, mid, setcross)
    right = _recur(sets, mid, q, setcross)
    return setcross(left, right)


def _merge_sorted(x: list, y: list) -> list:
    return list(heapq.merge(x, y, key=_PRIO_ORDER))


# --------------------------------------------------------------------------
# TBC+ : HP hashmap of ascending t_a arrays (Algorithm 4)
# --------------------------------------------------------------------------


def _hp_delete(bound: int, hp: dict[int, list[int]]) -> None:
    """Pop every t_a > bound; ascending arrays pop from the back."""
    dead = []
    for ts, arr in hp.items():
        while arr and arr[-1] > bound:
            arr.pop()
        if not arr:
            dead.append(ts)
    for ts in dead:
        del hp[ts]


def _hp_query(
    w: tuple, hp_same: dict, hp_diff: dict, layer: int, counts: np.ndarray
) -> None:
    """Count the butterflies pairing ``w`` with already-processed wedges.

    ``w`` holds the batch-minimum ``t_s``; every wedge in the HPs has a
    strictly larger ``t_s``, so the coverage pattern reads off the HP key
    ``t`` (their t_s) and a binary search on their ascending ``t_a``:

        t  > w.hi            -> non-overlap  (c11)
        t  < w.hi, t_a > w.hi -> intersect   (c13)
        t  < w.hi, t_a < w.hi -> cover       (c15)

    Equal timestamps never form a butterfly and fall through every
    strict comparison.
    """
    hi = w[HI]
    for ts, arr in hp_same.items():
        if ts > hi:
            counts[0 ^ layer] += len(arr)
        elif ts < hi:
            counts[1 ^ layer] += len(arr) - bisect_right(arr, hi)
            counts[2 ^ layer] += bisect_left(arr, hi)
    for ts, arr in hp_diff.items():
        if ts > hi:
            counts[3 ^ layer] += len(arr)
        elif ts < hi:
            counts[4 ^ layer] += len(arr) - bisect_right(arr, hi)
            counts[5 ^ layer] += bisect_left(arr, hi)


def _setcross_plus(left, right, delta: int, layer: int, counts: np.ndarray):
    """SetCross (Algorithm 3 lines 8–29) with HP hashmaps."""
    lists = [left[0], left[1], right[0], right[1]]  # A_i, D_i, A_j, D_j
    # the opposite-side (same-direction, different-direction) HP per list
    partner = [(2, 3), (3, 2), (0, 1), (1, 0)]
    hps: list[dict[int, list[int]]] = [defaultdict(list) for _ in lists]
    ptr = [0, 0, 0, 0]
    while any(ptr[b] < len(lists[b]) for b in range(4)):
        maxn = max(
            lists[b][ptr[b]][LO] for b in range(4) if ptr[b] < len(lists[b])
        )
        for hp in hps:
            _hp_delete(maxn + delta, hp)
        pre = list(ptr)
        for b in range(4):
            lst = lists[b]
            while ptr[b] < len(lst) and lst[ptr[b]][LO] == maxn:
                same, diff = partner[b]
                _hp_query(lst[ptr[b]], hps[same], hps[diff], layer, counts)
                ptr[b] += 1
        for b in range(4):
            for k in range(pre[b], ptr[b]):
                w = lists[b][k]
                hps[b][w[LO]].append(w[HI])
    return (
        _merge_sorted(left[0], right[0]),
        _merge_sorted(left[1], right[1]),
    )


def count_group_plus(wedges: list[tuple], delta: int, layer: int) -> np.ndarray:
    counts = np.zeros(N_TYPES, dtype=np.int64)
    sets = build_sets(wedges)
    if len(sets) > 1:
        _recur(
            sets, 0, len(sets),
            lambda l, r: _setcross_plus(l, r, delta, layer, counts),
        )
    return counts


# --------------------------------------------------------------------------
# TBC++ : twin order-statistics trees TA / TS (Algorithm 6)
# --------------------------------------------------------------------------


class Fenwick:
    """Binary indexed tree over [0, n): multiset counts with order
    statistics and max-key — the operations Table 2 requires of the
    red-black trees, each O(log n)."""

    __slots__ = ("n", "tree", "total")

    def __init__(self, n: int):
        self.n = n
        self.tree = [0] * (n + 1)
        self.total = 0

    def add(self, i: int, d: int) -> None:
        self.total += d
        i += 1
        while i <= self.n:
            self.tree[i] += d
            i += i & (-i)

    def prefix(self, i: int) -> int:
        """Count of elements with coordinate <= i."""
        s = 0
        i += 1
        while i > 0:
            s += self.tree[i]
            i -= i & (-i)
        return s

    def count_lt(self, i: int) -> int:
        return self.prefix(i - 1) if i > 0 else 0

    def count_gt(self, i: int) -> int:
        return self.total - self.prefix(i)

    def count_ge(self, i: int) -> int:
        return self.total - self.count_lt(i)

    def max_key(self) -> int:
        """Largest coordinate with nonzero count; -1 if empty."""
        if self.total == 0:
            return -1
        pos, remaining = 0, self.total
        log = 1
        while (log << 1) <= self.n:
            log <<= 1
        s = 0
        while log > 0:
            nxt = pos + log
            if nxt <= self.n and s + self.tree[nxt] < remaining:
                pos = nxt
                s += self.tree[nxt]
            log >>= 1
        return pos  # 0-based coordinate of the max element


class TreePair:
    """The paper's synchronized trees: TA keyed by t_a, TS keyed by t_s.

    ``coord`` is the sorted list of every timestamp appearing in the
    group, shared by all pairs, so strict (<, >, >=) counts against any
    group timestamp are exact.
    """

    __slots__ = ("coord", "ta", "ts", "by_ta")

    def __init__(self, coord: list[int]):
        self.coord = coord
        self.ta = Fenwick(len(coord))
        self.ts = Fenwick(len(coord))
        self.by_ta: dict[int, list[int]] = defaultdict(list)

    def _i(self, x: int) -> int:
        return bisect_left(self.coord, x)

    def insert(self, lo: int, hi: int) -> None:
        self.ta.add(self._i(hi), 1)
        self.ts.add(self._i(lo), 1)
        self.by_ta[hi].append(lo)

    def delete_gt(self, bound: int) -> None:
        """Erase every wedge with t_a > bound from both trees (Alg. 6)."""
        while self.ta.total:
            mi = self.ta.max_key()
            hi = self.coord[mi]
            if hi <= bound:
                return
            lo = self.by_ta[hi].pop()
            if not self.by_ta[hi]:
                del self.by_ta[hi]
            self.ta.add(mi, -1)
            self.ts.add(self._i(lo), -1)


def _tree_query(
    w: tuple, same: TreePair, diff: TreePair, layer: int, counts: np.ndarray
) -> None:
    """Algorithm 6 Query(): three O(log n) counts per direction class."""
    for base, tp in ((0, same), (3, diff)):
        if tp.ta.total == 0:
            continue
        hi_i = tp._i(w[HI])
        c11 = tp.ts.count_gt(hi_i)
        c13 = tp.ta.count_gt(hi_i) - tp.ts.count_ge(hi_i)
        c15 = tp.ta.count_lt(hi_i)
        counts[(base + 0) ^ layer] += c11
        counts[(base + 1) ^ layer] += c13
        counts[(base + 2) ^ layer] += c15


def _setcross_pp(
    left, right, delta: int, layer: int, counts: np.ndarray, coord: list[int]
):
    lists = [left[0], left[1], right[0], right[1]]
    partner = [(2, 3), (3, 2), (0, 1), (1, 0)]
    trees = [TreePair(coord) for _ in lists]
    ptr = [0, 0, 0, 0]
    while any(ptr[b] < len(lists[b]) for b in range(4)):
        maxn = max(
            lists[b][ptr[b]][LO] for b in range(4) if ptr[b] < len(lists[b])
        )
        for tp in trees:
            tp.delete_gt(maxn + delta)
        pre = list(ptr)
        for b in range(4):
            lst = lists[b]
            while ptr[b] < len(lst) and lst[ptr[b]][LO] == maxn:
                same, diff = partner[b]
                _tree_query(lst[ptr[b]], trees[same], trees[diff], layer, counts)
                ptr[b] += 1
        for b in range(4):
            for k in range(pre[b], ptr[b]):
                w = lists[b][k]
                trees[b].insert(w[LO], w[HI])
    return (
        _merge_sorted(left[0], right[0]),
        _merge_sorted(left[1], right[1]),
    )


def count_group_pp(wedges: list[tuple], delta: int, layer: int) -> np.ndarray:
    counts = np.zeros(N_TYPES, dtype=np.int64)
    sets = build_sets(wedges)
    if len(sets) > 1:
        coord: list[int] = sorted(
            {w[LO] for w in wedges} | {w[HI] for w in wedges}
        )
        _recur(
            sets, 0, len(sets),
            lambda l, r: _setcross_pp(l, r, delta, layer, counts, coord),
        )
    return counts


# --------------------------------------------------------------------------
# TBE+ : enumeration via range traversal (Algorithm 5)
# --------------------------------------------------------------------------


def _raw_times(w: tuple) -> tuple[int, int]:
    """(t_sm, t_me): original first/second edge times of a wedge."""
    return (w[LO], w[HI]) if w[FWD] else (w[HI], w[LO])


def instance_row(s: int, e: int, layer: int, wi: tuple, wj: tuple) -> tuple:
    """Canonical instance (u1,u2,v1,v2,t11,t12,t21,t22,btype) from a
    wedge pair sharing start ``s`` / end ``e`` (gids)."""
    ti_sm, ti_me = _raw_times(wi)
    tj_sm, tj_me = _raw_times(wj)
    if layer == 0:  # s,e in U; middles in L
        ua, ub = s // 2, e // 2
        va, vb = wi[M] // 2, wj[M] // 2
        t = {(ua, va): ti_sm, (ub, va): ti_me, (ua, vb): tj_sm, (ub, vb): tj_me}
    else:  # s,e in L; middles in U
        va, vb = s // 2, e // 2
        ua, ub = wi[M] // 2, wj[M] // 2
        t = {(ua, va): ti_sm, (ua, vb): ti_me, (ub, va): tj_sm, (ub, vb): tj_me}
    u1, u2 = min(ua, ub), max(ua, ub)
    v1, v2 = min(va, vb), max(va, vb)
    t11, t12, t21, t22 = t[(u1, v1)], t[(u1, v2)], t[(u2, v1)], t[(u2, v2)]
    return (u1, u2, v1, v2, t11, t12, t21, t22,
            classify_times(t11, t12, t21, t22))


def _setcross_enum(
    left, right, delta: int, layer: int, s: int, e: int, out: list
):
    """SetCross emitting instances: HP arrays hold (t_a, wedge) entries
    ordered by t_a; type classes are contiguous ranges (Algorithm 5)."""
    lists = [left[0], left[1], right[0], right[1]]
    partner = [(2, 3), (3, 2), (0, 1), (1, 0)]
    hps: list[dict[int, list[tuple]]] = [defaultdict(list) for _ in lists]
    ptr = [0, 0, 0, 0]

    def emit(w, hp):
        hi = w[HI]
        for ts, arr in hp.items():
            if ts > hi:
                for _, other in arr:
                    out.append(instance_row(s, e, layer, w, other))
            elif ts < hi:
                keys = [a for a, _ in arr]
                for k in range(bisect_right(keys, hi), len(arr)):
                    out.append(instance_row(s, e, layer, w, arr[k][1]))
                for k in range(bisect_left(keys, hi)):
                    out.append(instance_row(s, e, layer, w, arr[k][1]))

    while any(ptr[b] < len(lists[b]) for b in range(4)):
        maxn = max(
            lists[b][ptr[b]][LO] for b in range(4) if ptr[b] < len(lists[b])
        )
        for hp in hps:
            dead = []
            for ts, arr in hp.items():
                while arr and arr[-1][0] > maxn + delta:
                    arr.pop()
                if not arr:
                    dead.append(ts)
            for ts in dead:
                del hp[ts]
        pre = list(ptr)
        for b in range(4):
            lst = lists[b]
            while ptr[b] < len(lst) and lst[ptr[b]][LO] == maxn:
                same, diff = partner[b]
                w = lst[ptr[b]]
                emit(w, hps[same])
                emit(w, hps[diff])
                ptr[b] += 1
        for b in range(4):
            for k in range(pre[b], ptr[b]):
                w = lists[b][k]
                hps[b][w[LO]].append((w[HI], w))
    return (
        _merge_sorted(left[0], right[0]),
        _merge_sorted(left[1], right[1]),
    )


def enumerate_group(
    wedges: list[tuple], delta: int, layer: int, s: int, e: int
) -> list[tuple]:
    """All canonical instances of one (s, e) group (TBE⁺ kernel)."""
    out: list[tuple] = []
    sets = build_sets(wedges)
    if len(sets) > 1:
        _recur(
            sets, 0, len(sets),
            lambda l, r: _setcross_enum(l, r, delta, layer, s, e, out),
        )
    return out
