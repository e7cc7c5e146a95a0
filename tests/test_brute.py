"""Brute-force reference vs hand counts and vs the DuckDB SQL oracle."""
from __future__ import annotations

import duckdb
import pytest

from repro.core.brute import brute_counts, brute_instances, sql_counts, sql_instances
from tests.util import canon_instances, edges_pdf, random_bipartite_pdf


def _duck_counts(pdf, delta: int) -> dict[int, int]:
    con = duckdb.connect()
    try:
        con.register("edges", pdf)
        rows = con.execute(sql_counts(delta)).fetchall()
    finally:
        con.close()
    return {int(b): int(c) for b, c in rows}


ONE_T0 = edges_pdf([(0, 0, 1), (1, 0, 2), (0, 1, 3), (1, 1, 4)])


def test_single_t0_butterfly():
    assert brute_counts(ONE_T0, delta=3) == {0: 1, 1: 0, 2: 0, 3: 0, 4: 0, 5: 0}


def test_duration_constraint_excludes():
    assert brute_counts(ONE_T0, delta=2) == {i: 0 for i in range(6)}


@pytest.mark.parametrize(
    "order, btype",
    [
        ([("u1v1", 1), ("u2v1", 2), ("u1v2", 3), ("u2v2", 4)], 0),
        ([("u1v1", 1), ("u1v2", 2), ("u2v1", 3), ("u2v2", 4)], 1),
        ([("u1v1", 1), ("u1v2", 2), ("u2v2", 3), ("u2v1", 4)], 2),
        ([("u1v1", 1), ("u2v1", 2), ("u2v2", 3), ("u1v2", 4)], 3),
        ([("u1v1", 1), ("u2v2", 2), ("u2v1", 3), ("u1v2", 4)], 4),
        ([("u1v1", 1), ("u2v2", 2), ("u1v2", 3), ("u2v1", 4)], 5),
    ],
)
def test_each_type_once(order, btype):
    pos = {"u1v1": (0, 0), "u1v2": (0, 1), "u2v1": (1, 0), "u2v2": (1, 1)}
    pdf = edges_pdf([(pos[name][0], pos[name][1], t) for name, t in order])
    want = {i: 0 for i in range(6)}
    want[btype] = 1
    assert brute_counts(pdf, delta=10) == want


def test_duplicate_timestamp_butterflies_dropped():
    pdf = edges_pdf([(0, 0, 1), (1, 0, 1), (0, 1, 3), (1, 1, 4)])
    assert brute_counts(pdf, delta=10) == {i: 0 for i in range(6)}


def test_multi_edges_multiply_instances():
    # two parallel (u1,v1) edges -> two distinct butterflies
    pdf = edges_pdf([(0, 0, 1), (0, 0, 5), (1, 0, 2), (0, 1, 3), (1, 1, 4)])
    inst = brute_instances(pdf, delta=10)
    assert len(inst) == 2
    assert set(inst["t11"]) == {1, 5}


def test_non_biclique_not_counted():
    # path, not a butterfly
    pdf = edges_pdf([(0, 0, 1), (1, 0, 2), (1, 1, 3)])
    assert brute_counts(pdf, delta=10) == {i: 0 for i in range(6)}


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("delta_frac", [0.1, 0.5, 1.0])
def test_brute_matches_duckdb_sql(seed, delta_frac):
    pdf = random_bipartite_pdf(5, 5, 40, seed=seed)
    delta = int((pdf["t"].max() - pdf["t"].min()) * delta_frac) or 1
    assert brute_counts(pdf, delta) == _duck_counts(pdf, delta)


@pytest.mark.parametrize("seed", range(4))
def test_brute_instances_match_duckdb_sql(seed):
    pdf = random_bipartite_pdf(4, 4, 30, seed=seed)
    delta = int((pdf["t"].max() - pdf["t"].min()) // 2) or 1
    con = duckdb.connect()
    try:
        con.register("edges", pdf)
        duck = con.execute(sql_instances(delta)).fetchdf()
    finally:
        con.close()
    assert canon_instances(brute_instances(pdf, delta)) == canon_instances(duck)


def test_total_equals_typeless_rectangle_count():
    """Sum over types == number of 4-edge rectangles within δ (sanity)."""
    pdf = random_bipartite_pdf(4, 4, 30, seed=99)
    delta = int(pdf["t"].max())
    inst = brute_instances(pdf, delta)
    assert sum(brute_counts(pdf, delta).values()) == len(inst)
