"""Vertex priority (Definition 4) properties."""
from __future__ import annotations

import pytest

from repro.core.priority import directed_halves, vertex_priority
from tests.util import edges_pdf, random_bipartite_pdf

GRAPH = edges_pdf(
    [(0, 0, 1), (0, 1, 2), (0, 2, 3), (1, 0, 4), (1, 0, 5), (2, 2, 6)]
)


@pytest.fixture(scope="module")
def prio_rows(spark):
    sdf = spark.createDataFrame(GRAPH)
    return {r["gid"]: r["prio"] for r in vertex_priority(sdf).collect()}


def test_priority_is_dense_permutation(prio_rows):
    n = len(prio_rows)
    assert sorted(prio_rows.values()) == list(range(1, n + 1))


def test_priority_orders_by_degree(prio_rows):
    # u0 has degree 3; v0 (gid 1) has degree 3; u1 degree 2; others 1
    deg = {0: 3, 1: 3, 2: 2, 3: 1, 5: 2, 4: 1}
    for g1, p1 in prio_rows.items():
        for g2, p2 in prio_rows.items():
            if deg[g1] > deg[g2]:
                assert p1 > p2, (g1, g2)


def test_priority_ties_break_by_gid(prio_rows):
    # u0 (gid 0) and v0 (gid 1) both have degree 3 -> gid 1 outranks gid 0
    assert prio_rows[1] > prio_rows[0]
    # u1 (gid 2) and v2 (gid 5) both have degree 2 -> gid 5 outranks gid 2
    assert prio_rows[5] > prio_rows[2]


def test_halves_count_twice_edges(spark):
    pdf = random_bipartite_pdf(6, 6, 50, seed=0)
    halves = directed_halves(spark.createDataFrame(pdf))
    assert halves.count() == 2 * len(pdf)


def test_halves_degree_matches_pandas(spark):
    pdf = random_bipartite_pdf(6, 6, 50, seed=1)
    halves = directed_halves(spark.createDataFrame(pdf))
    got = {r["a"]: r["cnt"] for r in halves.groupBy("a").count().withColumnRenamed("count", "cnt").collect()}
    want: dict[int, int] = {}
    for u, v, _ in pdf.itertuples(index=False):
        want[2 * u] = want.get(2 * u, 0) + 1
        want[2 * v + 1] = want.get(2 * v + 1, 0) + 1
    assert got == want


def test_priority_unique_on_random_graph(spark):
    pdf = random_bipartite_pdf(8, 8, 80, seed=2)
    prio = vertex_priority(spark.createDataFrame(pdf))
    vals = [r["prio"] for r in prio.collect()]
    assert len(set(vals)) == len(vals)
