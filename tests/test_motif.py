"""Generic temporal-motif comparator: exactness and cost explosion."""
from __future__ import annotations

import time

import pytest

from repro.core.brute import brute_counts
from repro.core.optimized import count_local
from repro.core.schema import days
from repro.motif.generic import generic_motif_counts
from repro.synth_data import temporal_bipartite_pdf
from tests.util import random_bipartite_pdf


@pytest.mark.parametrize("seed", range(5))
def test_matches_brute_force(seed):
    pdf = random_bipartite_pdf(5, 5, 35, seed=seed)
    delta = max(1, int((pdf["t"].max() - pdf["t"].min()) // 3))
    got = generic_motif_counts(pdf, delta)
    assert {i: int(got[i]) for i in range(6)} == brute_counts(pdf, delta)


def test_matches_optimized_counter():
    pdf = temporal_bipartite_pdf(
        n_upper=8, n_lower=8, n_edges=120, span_days=20.0,
        follow_frac=0.4, gap_days=1.0, seed=1,
    )
    delta = days(5)
    assert (generic_motif_counts(pdf, delta) == count_local(pdf, delta)).all()


def test_cost_explodes_relative_to_specialized():
    """The §6 exclusion argument in miniature: on a few hundred edges the
    generic enumerator is already orders of magnitude slower."""
    pdf = temporal_bipartite_pdf(
        n_upper=10, n_lower=10, n_edges=220, span_days=10.0,
        follow_frac=0.3, gap_days=1.0, seed=2,
    )
    delta = days(1)
    t0 = time.perf_counter()
    spec = count_local(pdf, delta)
    t_spec = time.perf_counter() - t0
    t0 = time.perf_counter()
    gen = generic_motif_counts(pdf, delta)
    t_gen = time.perf_counter() - t0
    assert (gen == spec).all()
    assert t_gen > 3 * t_spec, (t_gen, t_spec)
