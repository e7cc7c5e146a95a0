"""Vertex priority (Definition 4) over the unified gid space.

``P_V(u) > P_V(w)`` iff ``|E(u)| > |E(w)|``, ties broken by vertex id.
We materialize the priority as a dense integer rank so downstream joins
compare a single column instead of a (degree, id) tuple.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.schema import lower_gid, upper_gid


def directed_halves(edges: DataFrame) -> DataFrame:
    """Both orientations of every temporal edge, in gid space.

    Output columns: ``a`` (from-gid), ``b`` (to-gid), ``t``. Each
    temporal edge contributes one row per direction, so ``a``'s row
    count per gid is exactly ``|E(a)|``.
    """
    up = edges.select(
        upper_gid(F.col("u")).alias("a"), lower_gid(F.col("v")).alias("b"), "t"
    )
    down = edges.select(
        lower_gid(F.col("v")).alias("a"), upper_gid(F.col("u")).alias("b"), "t"
    )
    return up.unionAll(down)


def vertex_priority(edges: DataFrame) -> DataFrame:
    """(gid, prio) with prio in [1, |V|], higher = higher priority.

    The rank is a single unpartitioned window sort over |V| rows — tiny
    next to |E| and executed once per counting run, mirroring the
    paper's O(|V| log |V|) priority assignment.
    """
    deg = directed_halves(edges).groupBy("a").agg(F.count("*").alias("deg"))
    w = Window.orderBy(F.col("deg").asc(), F.col("a").asc())
    return deg.select(
        F.col("a").alias("gid"), F.row_number().over(w).cast("long").alias("prio")
    )
