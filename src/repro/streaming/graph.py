"""Chronological adjacency snapshot for the streaming algorithms.

Each vertex (gid space) keeps its incident temporal edges as a list of
``(t, neighbor_gid)`` sorted by timestamp — the paper's "store E(u) in a
queue and process it in chronological order", which makes every
``[lo, hi]`` time-range neighbourhood query a pair of binary searches.
"""
from __future__ import annotations

from bisect import bisect_left, bisect_right, insort
from collections import defaultdict

import pandas as pd


class StreamGraph:
    """Mutable temporal bipartite graph keyed by gids."""

    def __init__(self) -> None:
        self.adj: dict[int, list[tuple[int, int]]] = defaultdict(list)
        self.n_edges = 0

    @classmethod
    def from_pdf(cls, edges: pd.DataFrame) -> "StreamGraph":
        g = cls()
        for u, v, t in edges[["u", "v", "t"]].itertuples(index=False):
            g.insert(int(u), int(v), int(t))
        return g

    def insert(self, u: int, v: int, t: int) -> None:
        """Add edge (u ∈ U, v ∈ L, t). ``insort`` keeps lists sorted even
        for out-of-order insertion; chronological streams append in O(1)."""
        gu, gv = 2 * u, 2 * v + 1
        insort(self.adj[gu], (t, gv))
        insort(self.adj[gv], (t, gu))
        self.n_edges += 1

    def delete(self, u: int, v: int, t: int) -> None:
        gu, gv = 2 * u, 2 * v + 1
        for a, b in ((gu, gv), (gv, gu)):
            lst = self.adj[a]
            i = bisect_left(lst, (t, b))
            if i >= len(lst) or lst[i] != (t, b):
                raise KeyError(f"edge ({u}, {v}, {t}) not present")
            lst.pop(i)
        self.n_edges -= 1

    def neighbors_in(self, gid: int, lo: int, hi: int) -> list[tuple[int, int]]:
        """Incident (t, nbr) with lo <= t <= hi, by binary search."""
        lst = self.adj.get(gid)
        if not lst:
            return []
        i = bisect_left(lst, (lo, -1))
        j = bisect_right(lst, (hi, 1 << 62))
        return lst[i:j]

    def to_pdf(self) -> pd.DataFrame:
        """The current edge set as a time-sorted layer-local frame."""
        rows = [
            (gid // 2, nbr // 2, t)
            for gid, lst in self.adj.items()
            if gid % 2 == 0
            for t, nbr in lst
        ]
        return (
            pd.DataFrame(rows, columns=["u", "v", "t"])
            .astype("int64")
            .sort_values("t", ignore_index=True)
        )
