"""The §4.4 extreme case (Figure 8): correctness and kernel crossover."""
from __future__ import annotations

import time

import pytest

from repro.core.brute import brute_counts
from repro.core.optimized import count_local
from repro.core.schema import days
from repro.core.wedge_set import count_group_plus, count_group_pp
from repro.synth_data import extreme_hub_pdf


def _group(pdf):
    """The single (hub, hub) wedge group of the extreme graph."""
    tt = pdf.pivot_table(index="v", columns="u", values="t").to_numpy()
    return [
        (2 * i + 1, int(min(a, b)), int(max(a, b)), bool(a < b))
        for i, (a, b) in enumerate(tt)
    ]


def test_structure():
    pdf = extreme_hub_pdf(n_middles=50, span_days=1.0, seed=0)
    assert len(pdf) == 100
    assert pdf["u"].nunique() == 2 and pdf["v"].nunique() == 50
    assert pdf["t"].is_unique


@pytest.mark.parametrize("seed", range(3))
def test_counts_match_brute(seed):
    pdf = extreme_hub_pdf(n_middles=16, span_days=1.0, seed=seed)
    d = days(2)
    got = count_local(pdf, d)
    assert {i: int(got[i]) for i in range(6)} == brute_counts(pdf, d)


def test_all_pairs_form_butterflies_with_covering_delta():
    n = 30
    pdf = extreme_hub_pdf(n_middles=n, span_days=1.0, seed=1)
    got = count_local(pdf, days(2))
    assert got.sum() == n * (n - 1) // 2


def test_kernels_agree_on_extreme_group():
    pdf = extreme_hub_pdf(n_middles=300, span_days=10.0, seed=2)
    ws = _group(pdf)
    d = days(11)
    assert (count_group_plus(ws, d, 0) == count_group_pp(ws, d, 0)).all()


def test_tree_kernel_beats_hashmap_kernel_here():
    """TBC⁺⁺'s raison d'être: on all-distinct-t_s hub groups the HP scan
    degenerates quadratically while the trees stay O(log n)."""
    ws = _group(extreme_hub_pdf(n_middles=2500, span_days=10.0, seed=3))
    d = days(11)
    t0 = time.perf_counter()
    a = count_group_plus(ws, d, 0)
    t_plus = time.perf_counter() - t0
    t0 = time.perf_counter()
    b = count_group_pp(ws, d, 0)
    t_pp = time.perf_counter() - t0
    assert (a == b).all()
    assert t_pp < t_plus, (t_pp, t_plus)
