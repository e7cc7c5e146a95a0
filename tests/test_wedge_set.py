"""Combine kernels (TBC+/TBC++/TBE+ cores) vs the quadratic reference."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.classify import classify_times
from repro.core.schema import N_TYPES
from repro.core.wedge_set import (
    Fenwick,
    build_sets,
    count_group_plus,
    count_group_pp,
    count_group_quadratic,
    enumerate_group,
    instance_row,
)


def _wedge_strategy(delta: int):
    def make(m, lo, span, fwd):
        return (m, lo, lo + 1 + span, fwd)

    return st.builds(
        make,
        st.integers(1, 9, ),
        st.integers(0, 40),
        st.integers(0, delta - 1),
        st.booleans(),
    )


def _groups(delta: int, max_size: int = 24):
    return st.lists(_wedge_strategy(delta), min_size=0, max_size=max_size)


@given(_groups(delta=8), st.integers(0, 1))
@settings(max_examples=300, deadline=None)
def test_plus_matches_quadratic(wedges, layer):
    wedges = [(2 * m + 1 - layer, lo, hi, f) for m, lo, hi, f in wedges]
    want = count_group_quadratic(wedges, 8, layer)
    got = count_group_plus(wedges, 8, layer)
    assert (got == want).all(), (wedges, got, want)


@given(_groups(delta=8), st.integers(0, 1))
@settings(max_examples=300, deadline=None)
def test_pp_matches_quadratic(wedges, layer):
    wedges = [(2 * m + 1 - layer, lo, hi, f) for m, lo, hi, f in wedges]
    want = count_group_quadratic(wedges, 8, layer)
    got = count_group_pp(wedges, 8, layer)
    assert (got == want).all(), (wedges, got, want)


@given(_groups(delta=6, max_size=16), st.integers(0, 1))
@settings(max_examples=200, deadline=None)
def test_enumeration_counts_match_quadratic(wedges, layer):
    wedges = [(2 * m + 1 - layer, lo, hi, f) for m, lo, hi, f in wedges]
    s, e = (100, 102) if layer == 0 else (101, 103)
    rows = enumerate_group(wedges, 6, layer, s, e)
    got = np.zeros(N_TYPES, dtype=np.int64)
    for r in rows:
        got[r[8]] += 1
    assert (got == count_group_quadratic(wedges, 6, layer)).all()


@given(_groups(delta=6, max_size=12), st.integers(0, 1))
@settings(max_examples=100, deadline=None)
def test_enumerated_instances_are_valid(wedges, layer):
    wedges = [(2 * m + 1 - layer, lo, hi, f) for m, lo, hi, f in wedges]
    s, e = (100, 102) if layer == 0 else (101, 103)
    for u1, u2, v1, v2, t11, t12, t21, t22, bt in enumerate_group(
        wedges, 6, layer, s, e
    ):
        assert u1 < u2 and v1 < v2
        ts = [t11, t12, t21, t22]
        assert len(set(ts)) == 4
        assert max(ts) - min(ts) <= 6
        assert classify_times(t11, t12, t21, t22) == bt


def test_empty_and_single_set_groups():
    for kernel in (count_group_plus, count_group_pp, count_group_quadratic):
        assert (kernel([], 5, 0) == 0).all()
        # single middle vertex -> no butterflies
        ws = [(1, 0, 3, True), (1, 1, 4, False), (1, 2, 5, True)]
        assert (kernel(ws, 5, 0) == 0).all()


def test_two_wedges_single_butterfly():
    # forward (0,1)-(2,3): non-overlap, same direction, U start -> T0
    ws = [(1, 0, 1, True), (3, 2, 3, True)]
    for kernel in (count_group_plus, count_group_pp, count_group_quadratic):
        got = kernel(ws, 5, 0)
        assert got[0] == 1 and got.sum() == 1
        got_l = kernel(ws, 5, 1)
        assert got_l[1] == 1 and got_l.sum() == 1


def test_delta_excludes_far_pairs():
    ws = [(1, 0, 1, True), (3, 10, 11, True)]
    for kernel in (count_group_plus, count_group_pp):
        assert kernel(ws, 5, 0).sum() == 0
        assert kernel(ws, 11, 0).sum() == 1


def test_equal_lo_pairs_are_excluded():
    ws = [(1, 0, 2, True), (3, 0, 3, True)]
    for kernel in (count_group_plus, count_group_pp, count_group_quadratic):
        assert kernel(ws, 9, 0).sum() == 0


def test_equal_hi_pairs_are_excluded():
    ws = [(1, 0, 4, True), (3, 2, 4, True)]
    for kernel in (count_group_plus, count_group_pp, count_group_quadratic):
        assert kernel(ws, 9, 0).sum() == 0


def test_boundary_hi_equals_other_lo_excluded():
    ws = [(1, 0, 2, True), (3, 2, 4, True)]
    for kernel in (count_group_plus, count_group_pp, count_group_quadratic):
        assert kernel(ws, 9, 0).sum() == 0


def test_build_sets_splits_directions_and_sorts():
    ws = [(1, 5, 7, True), (1, 2, 9, False), (1, 5, 6, False), (3, 0, 1, True)]
    sets = build_sets(ws)
    assert len(sets) == 2
    a, d = sets[0]  # middle 1
    assert a == [(1, 5, 7, True)]
    assert d == [(1, 5, 6, False), (1, 2, 9, False)]  # lo desc
    assert sets[1] == ([(3, 0, 1, True)], [])


def test_instance_row_reconstructs_edges():
    # U start s=4 (u=2), e=8 (u=4); middles 1 (v=0) and 3 (v=1)
    wi = (1, 10, 20, True)  # (u2,v0)@10, (u4,v0)@20
    wj = (3, 12, 15, False)  # backward: (u2,v1)@15, (u4,v1)@12
    row = instance_row(4, 8, 0, wi, wj)
    assert row[:4] == (2, 4, 0, 1)
    assert row[4:8] == (10, 15, 20, 12)
    assert row[8] == classify_times(10, 15, 20, 12)


def test_instance_row_L_perspective():
    # L start s=1 (v=0), e=3 (v=1); middles 2 (u=1), 6 (u=3)
    wi = (2, 10, 20, True)  # (u1,v0)@10, (u1,v1)@20
    wj = (6, 12, 15, True)  # (u3,v0)@12, (u3,v1)@15
    row = instance_row(1, 3, 1, wi, wj)
    assert row[:4] == (1, 3, 0, 1)
    assert row[4:8] == (10, 20, 12, 15)


class TestFenwick:
    def test_basic_counts(self):
        f = Fenwick(10)
        for i in [3, 3, 7, 9, 0]:
            f.add(i, 1)
        assert f.total == 5
        assert f.prefix(3) == 3
        assert f.count_lt(3) == 1
        assert f.count_gt(3) == 2
        assert f.count_ge(3) == 4
        assert f.max_key() == 9

    def test_delete_and_max(self):
        f = Fenwick(5)
        f.add(4, 1)
        f.add(2, 1)
        assert f.max_key() == 4
        f.add(4, -1)
        assert f.max_key() == 2
        f.add(2, -1)
        assert f.max_key() == -1

    @given(st.lists(st.integers(0, 63), min_size=0, max_size=60))
    @settings(max_examples=200, deadline=None)
    def test_against_list(self, xs):
        f = Fenwick(64)
        for x in xs:
            f.add(x, 1)
        for probe in range(0, 64, 7):
            assert f.count_lt(probe) == sum(1 for x in xs if x < probe)
            assert f.count_gt(probe) == sum(1 for x in xs if x > probe)
            assert f.count_ge(probe) == sum(1 for x in xs if x >= probe)
        assert f.max_key() == (max(xs) if xs else -1)
