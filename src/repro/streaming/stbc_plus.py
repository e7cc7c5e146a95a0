"""STBC⁺ (Algorithm 8): conflict-free batch deltas, Spark-parallel.

Lemma 8: restricting each edge's traversal to ``(t, t+δ]`` (deletion)
or ``[t-δ, t)`` (insertion) attributes every affected butterfly to its
minimum- (resp. maximum-) timestamp edge, so batch members can be
counted independently — no read-write conflicts, no double counting.
The paper parallelizes with OpenMP threads; we parallelize with Spark
tasks over the batch (``mapInPandas`` on a broadcast graph snapshot),
which is the same work decomposition.

Prerequisites mirror the paper: for deletion the batch must be the
window's chronological prefix (all edges still present while counting);
for insertion the batch must be the chronological suffix and be fully
inserted before counting.
"""
from __future__ import annotations

from typing import Iterable

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.schema import N_TYPES
from repro.streaming.graph import StreamGraph
from repro.streaming.stbc import edge_delta

_COUNT_COLS = [f"c{i}" for i in range(N_TYPES)]


def _batch_delta_local(
    g: StreamGraph, batch: Iterable[tuple], delta: int, mode: str
) -> np.ndarray:
    out = np.zeros(N_TYPES, dtype=np.int64)
    for u, v, t in batch:
        u, v, t = int(u), int(v), int(t)
        if mode == "delete":
            out += edge_delta(g, u, v, t, delta, lo=t + 1, hi=t + delta)
        else:
            out += edge_delta(g, u, v, t, delta, lo=t - delta, hi=t - 1)
    return out


def stbc_plus_batch(
    g: StreamGraph,
    batch: list[tuple],
    delta: int,
    mode: str,
    spark: SparkSession | None = None,
    parallelism: int = 1,
) -> np.ndarray:
    """Per-type delta of a whole batch (graph snapshot is not mutated).

    ``mode`` is ``"delete"`` or ``"insert"``. With ``spark`` given, the
    batch is spread over ``parallelism`` tasks (the paper's thread
    count); otherwise it runs in-process (STBC⁺-1).
    """
    if mode not in ("delete", "insert"):
        raise ValueError(f"mode must be delete/insert, got {mode!r}")
    if not batch:
        return np.zeros(N_TYPES, dtype=np.int64)
    if spark is None or parallelism <= 1:
        return _batch_delta_local(g, batch, delta, mode)

    bc = spark.sparkContext.broadcast(dict(g.adj))

    def run(batches: Iterable[pd.DataFrame]):
        snap = StreamGraph()
        snap.adj.update(bc.value)
        for pdf in batches:
            rows = list(pdf[["u", "v", "t"]].itertuples(index=False))
            yield pd.DataFrame(
                [_batch_delta_local(snap, rows, delta, mode)], columns=_COUNT_COLS
            )

    batch_df = spark.createDataFrame(
        pd.DataFrame(batch, columns=["u", "v", "t"]).astype("int64")
    ).repartition(parallelism)
    parts = batch_df.mapInPandas(run, schema=", ".join(f"{c} long" for c in _COUNT_COLS))
    row = parts.groupBy().sum().collect()
    if not row:
        return np.zeros(N_TYPES, dtype=np.int64)
    return np.array([row[0][i] or 0 for i in range(N_TYPES)], dtype=np.int64)
