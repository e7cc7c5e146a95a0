"""Benchmark helpers: one-shot timing + result-row recording.

Every benchmark runs once (``pedantic(rounds=1)``) — the workloads are
seconds-scale Spark dataflows, and the paper's evaluation also reports
single-run wall-clock — and appends its measured row (counts,
percentages, speedups) to ``results/<table>.csv`` so EXPERIMENTS.md can
be regenerated from artifacts.
"""
from __future__ import annotations

import csv
from pathlib import Path

RESULTS_DIR = Path(__file__).resolve().parents[1] / "results"


def once(benchmark, fn):
    """Run ``fn`` exactly once under pytest-benchmark timing."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)


def record(table: str, row: dict) -> None:
    """Append one result row to results/<table>.csv (header on create)."""
    RESULTS_DIR.mkdir(exist_ok=True)
    path = RESULTS_DIR / f"{table}.csv"
    new = not path.exists()
    with path.open("a", newline="") as f:
        w = csv.DictWriter(f, fieldnames=list(row))
        if new:
            w.writeheader()
        w.writerow(row)
