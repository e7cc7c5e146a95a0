"""Wedge enumeration vs an independent pandas reference."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.core.wedges import wedges, wedges_pruned
from tests.util import random_bipartite_pdf


def _ref_wedges(pdf: pd.DataFrame) -> set[tuple]:
    """All priority-filtered wedges, computed naively in pandas."""
    deg: dict[int, int] = {}
    adj: dict[int, list[tuple[int, int]]] = {}
    for u, v, t in pdf.itertuples(index=False):
        gu, gv = 2 * u, 2 * v + 1
        for g in (gu, gv):
            deg[g] = deg.get(g, 0) + 1
    for u, v, t in pdf.itertuples(index=False):
        gu, gv = 2 * u, 2 * v + 1
        adj.setdefault(gu, []).append((gv, t))
        adj.setdefault(gv, []).append((gu, t))
    pr = lambda g: (deg[g], g)
    out = set()
    for s in adj:
        for m, t1 in adj[s]:
            if pr(s) <= pr(m):
                continue
            for e, t2 in adj[m]:
                if pr(s) <= pr(e):
                    continue
                out.add((s, m, e, t1, t2))
    return out


@pytest.mark.parametrize("seed", range(5))
def test_wedges_match_reference(spark, seed):
    pdf = random_bipartite_pdf(5, 5, 40, seed=seed)
    got = {
        (r["s"], r["m"], r["e"], r["t1"], r["t2"])
        for r in wedges(spark.createDataFrame(pdf)).collect()
    }
    assert got == _ref_wedges(pdf)


def test_wedge_layers(spark):
    pdf = random_bipartite_pdf(5, 5, 40, seed=7)
    for r in wedges(spark.createDataFrame(pdf)).collect():
        assert r["layer"] == r["s"] % 2
        assert r["m"] % 2 == 1 - r["layer"]
        assert r["e"] % 2 == r["layer"]
        assert r["s"] != r["e"]


@pytest.mark.parametrize("delta_frac", [0.05, 0.3])
def test_pruned_wedges_satisfy_lemma1(spark, delta_frac):
    pdf = random_bipartite_pdf(5, 5, 60, seed=3)
    delta = max(1, int((pdf["t"].max() - pdf["t"].min()) * delta_frac))
    rows = wedges_pruned(spark.createDataFrame(pdf), delta).collect()
    assert rows, "pruned wedge stream should not be empty at this scale"
    for r in rows:
        assert r["lo"] < r["hi"]
        assert r["hi"] - r["lo"] <= delta


def test_pruned_is_filter_of_full(spark):
    pdf = random_bipartite_pdf(5, 5, 60, seed=4)
    delta = int((pdf["t"].max() - pdf["t"].min()) // 3)
    sdf = spark.createDataFrame(pdf)
    full = {
        (r["s"], r["m"], r["e"], min(r["t1"], r["t2"]), max(r["t1"], r["t2"]))
        for r in wedges(sdf).collect()
        if r["t1"] != r["t2"] and abs(r["t1"] - r["t2"]) <= delta
    }
    pruned = {
        (r["s"], r["m"], r["e"], r["lo"], r["hi"])
        for r in wedges_pruned(sdf, delta).collect()
    }
    assert pruned == full


def test_fwd_flag_encodes_direction(spark):
    pdf = random_bipartite_pdf(5, 5, 60, seed=5)
    delta = int(pdf["t"].max())
    sdf = spark.createDataFrame(pdf)
    raw = {(r["s"], r["m"], r["e"], r["t1"], r["t2"]) for r in wedges(sdf).collect()}
    for r in wedges_pruned(sdf, delta).collect():
        if r["fwd"]:
            assert (r["s"], r["m"], r["e"], r["lo"], r["hi"]) in raw
        else:
            assert (r["s"], r["m"], r["e"], r["hi"], r["lo"]) in raw
