"""Streaming algorithms vs from-scratch recomputation on every window."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.optimized import count_local
from repro.core.schema import days
from repro.streaming.graph import StreamGraph
from repro.streaming.stbc import edge_delta, stbc_delete_batch, stbc_insert_batch
from repro.streaming.stbc_plus import stbc_plus_batch
from repro.streaming.window import sliding_window_stbc, sliding_window_stbc_plus
from repro.synth_data import temporal_bipartite_pdf
from tests.util import edges_pdf, random_bipartite_pdf


def _stream(n=240, seed=0):
    return temporal_bipartite_pdf(
        n_upper=12,
        n_lower=14,
        n_edges=n,
        span_days=30.0,
        follow_frac=0.4,
        gap_days=1.0,
        seed=seed,
    )


DELTA = days(10)


class TestStreamGraph:
    def test_insert_delete_roundtrip(self):
        g = StreamGraph.from_pdf(edges_pdf([(0, 0, 1), (1, 0, 2), (0, 1, 3)]))
        assert g.n_edges == 3
        g.delete(1, 0, 2)
        assert g.n_edges == 2
        assert g.to_pdf().equals(edges_pdf([(0, 0, 1), (0, 1, 3)]))

    def test_delete_missing_raises(self):
        g = StreamGraph()
        g.insert(0, 0, 5)
        with pytest.raises(KeyError):
            g.delete(0, 0, 6)

    def test_range_query(self):
        g = StreamGraph.from_pdf(
            edges_pdf([(0, 0, 1), (0, 1, 5), (0, 2, 9), (0, 3, 12)])
        )
        got = [t for t, _ in g.neighbors_in(0, 5, 9)]
        assert got == [5, 9]

    def test_out_of_order_insert_stays_sorted(self):
        g = StreamGraph()
        for t in (5, 1, 9, 3):
            g.insert(0, t, t)
        assert [t for t, _ in g.adj[0]] == [1, 3, 5, 9]


class TestEdgeDelta:
    def test_counts_butterflies_containing_edge(self):
        # one T0 butterfly; each member edge sees exactly it
        pdf = edges_pdf([(0, 0, 1), (1, 0, 2), (0, 1, 3), (1, 1, 4)])
        g = StreamGraph.from_pdf(pdf)
        for u, v, t in pdf.itertuples(index=False):
            d = edge_delta(g, int(u), int(v), int(t), delta=5)
            assert d.tolist() == [1, 0, 0, 0, 0, 0]

    def test_restricted_ranges_attribute_min_and_max(self):
        pdf = edges_pdf([(0, 0, 1), (1, 0, 2), (0, 1, 3), (1, 1, 4)])
        g = StreamGraph.from_pdf(pdf)
        # only the min-edge (t=1) sees it under the delete range (t, t+δ]
        per_edge = [
            edge_delta(g, int(u), int(v), int(t), 5, lo=int(t) + 1, hi=int(t) + 5).sum()
            for u, v, t in pdf.itertuples(index=False)
        ]
        assert per_edge == [1, 0, 0, 0]
        # only the max-edge (t=4) sees it under the insert range [t-δ, t)
        per_edge = [
            edge_delta(g, int(u), int(v), int(t), 5, lo=int(t) - 5, hi=int(t) - 1).sum()
            for u, v, t in pdf.itertuples(index=False)
        ]
        assert per_edge == [0, 0, 0, 1]

    @pytest.mark.parametrize("seed", range(3))
    def test_full_range_deltas_sum_to_4x_total(self, seed):
        """Every butterfly contains 4 edges, so summing full-range deltas
        over all edges counts each butterfly exactly 4 times."""
        pdf = random_bipartite_pdf(5, 5, 40, seed=seed)
        g = StreamGraph.from_pdf(pdf)
        total = count_local(pdf, DELTA)
        acc = np.zeros(6, dtype=np.int64)
        for u, v, t in pdf.itertuples(index=False):
            acc += edge_delta(g, int(u), int(v), int(t), DELTA)
        assert (acc == 4 * total).all()


class TestBatches:
    def test_insert_batch_from_empty_equals_full_count(self):
        pdf = _stream(150)
        g = StreamGraph()
        rows = [tuple(map(int, r)) for r in pdf.itertuples(index=False)]
        inc = stbc_insert_batch(g, rows, DELTA)
        assert (inc == count_local(pdf, DELTA)).all()

    def test_plus_insert_batch_from_empty_equals_full_count(self):
        pdf = _stream(150, seed=1)
        g = StreamGraph.from_pdf(pdf)
        rows = [tuple(map(int, r)) for r in pdf.itertuples(index=False)]
        inc = stbc_plus_batch(g, rows, DELTA, "insert")
        assert (inc == count_local(pdf, DELTA)).all()

    def test_delete_batch_matches_recompute_difference(self):
        pdf = _stream(150, seed=2)
        rows = [tuple(map(int, r)) for r in pdf.itertuples(index=False)]
        cut = 40
        g = StreamGraph.from_pdf(pdf)
        before = count_local(pdf, DELTA)
        dec = stbc_delete_batch(g, rows[:cut], DELTA)
        after = count_local(pdf.iloc[cut:], DELTA)
        assert (before - dec == after).all()

    def test_plus_delete_batch_agrees_with_sequential(self):
        pdf = _stream(150, seed=3)
        rows = [tuple(map(int, r)) for r in pdf.itertuples(index=False)]
        cut = 40
        g1 = StreamGraph.from_pdf(pdf)
        dec_plus = stbc_plus_batch(g1, rows[:cut], DELTA, "delete")
        g2 = StreamGraph.from_pdf(pdf)
        dec_seq = stbc_delete_batch(g2, rows[:cut], DELTA)
        assert (dec_plus == dec_seq).all()

    def test_bad_mode_raises(self):
        with pytest.raises(ValueError):
            stbc_plus_batch(StreamGraph(), [(0, 0, 1)], DELTA, "upsert")


@pytest.mark.parametrize("algo", ["stbc", "stbc_plus"])
def test_sliding_window_matches_recompute(algo):
    pdf = _stream(240, seed=4)
    window, stride = 120, 30
    run = sliding_window_stbc if algo == "stbc" else sliding_window_stbc_plus
    steps = run(pdf, window=window, stride=stride, delta=DELTA)
    assert len(steps) == 1 + (240 - window) // stride
    for st in steps:
        want = count_local(pdf.iloc[st.start : st.end], DELTA)
        assert (st.counts == want).all(), (st.start, st.end)


def test_sliding_window_algorithms_agree():
    pdf = _stream(200, seed=5)
    a = sliding_window_stbc(pdf, window=100, stride=25, delta=DELTA)
    b = sliding_window_stbc_plus(pdf, window=100, stride=25, delta=DELTA)
    assert len(a) == len(b)
    for x, y in zip(a, b):
        assert (x.counts == y.counts).all()


def test_unsorted_stream_rejected():
    pdf = _stream(50, seed=6).iloc[::-1].reset_index(drop=True)
    with pytest.raises(ValueError):
        sliding_window_stbc(pdf, window=20, stride=5, delta=DELTA)


def test_stbc_plus_spark_parallel_agrees(spark):
    pdf = _stream(200, seed=7)
    rows = [tuple(map(int, r)) for r in pdf.itertuples(index=False)]
    g = StreamGraph.from_pdf(pdf)
    local = stbc_plus_batch(g, rows[:60], DELTA, "delete")
    dist = stbc_plus_batch(g, rows[:60], DELTA, "delete", spark=spark, parallelism=4)
    assert (local == dist).all()


def test_sliding_window_spark_parallel_agrees(spark):
    pdf = _stream(160, seed=8)
    a = sliding_window_stbc_plus(pdf, window=80, stride=40, delta=DELTA)
    b = sliding_window_stbc_plus(
        pdf, window=80, stride=40, delta=DELTA, spark=spark, parallelism=4
    )
    for x, y in zip(a, b):
        assert (x.counts == y.counts).all()
