"""Triangulator: DP vs brute force, structural invariants."""
from __future__ import annotations

import random

import pytest

from repro.core.queries_table1 import DIAMONDS, SNOWFLAKES
from repro.core.triangulate import (
    Triangulation,
    brute_force_triangulate,
    triangulate,
    triangulate_query,
)


def _rand_weight(seed: int):
    rng = random.Random(seed)
    cache: dict[frozenset, float] = {}

    def w(u: str, v: str) -> float:
        key = frozenset((u, v))
        if key not in cache:
            cache[key] = rng.uniform(1, 1000)
        return cache[key]

    return w


def _vars(n: int) -> list[str]:
    return [f"v{i}" for i in range(n)]


def test_triangle_needs_no_chords():
    t = triangulate(_vars(3), _rand_weight(0))
    assert t.chords == ()
    assert t.triangles == (("v0", "v1", "v2"),)
    assert t.cost == 0.0


def test_too_short_cycle_rejected():
    with pytest.raises(ValueError):
        triangulate(_vars(2), _rand_weight(0))


@pytest.mark.parametrize("L", [4, 5, 6, 7, 8])
@pytest.mark.parametrize("seed", [0, 1, 2])
def test_dp_matches_brute_force(L, seed):
    w = _rand_weight(seed * 100 + L)
    dp = triangulate(_vars(L), w)
    bf = brute_force_triangulate(_vars(L), w)
    assert dp.cost == pytest.approx(bf.cost)


@pytest.mark.parametrize("L", [4, 5, 6, 7, 8])
def test_chord_and_triangle_counts(L):
    t = triangulate(_vars(L), _rand_weight(L))
    assert len(t.triangles) == L - 2
    assert len(set(t.chords)) == L - 3


@pytest.mark.parametrize("L", [4, 5, 6])
def test_chords_are_not_sides(L):
    t = triangulate(_vars(L), _rand_weight(L))
    cyc = list(t.cycle)
    sides = {frozenset((cyc[i], cyc[(i + 1) % L])) for i in range(L)}
    for u, v in t.chords:
        assert frozenset((u, v)) not in sides


@pytest.mark.parametrize("L", [4, 5, 6])
def test_triangle_sides_are_sides_or_chords(L):
    t = triangulate(_vars(L), _rand_weight(L))
    cyc = list(t.cycle)
    sides = {frozenset((cyc[i], cyc[(i + 1) % L])) for i in range(L)}
    chords = {frozenset(c) for c in t.chords}
    for a, b, c in t.triangles:
        for pair in (frozenset((a, b)), frozenset((b, c)), frozenset((a, c))):
            assert pair in sides | chords


def test_4cycle_picks_cheaper_diagonal():
    def w(u, v):
        return 5.0 if frozenset((u, v)) == frozenset(("v0", "v2")) else 50.0

    t = triangulate(_vars(4), w)
    assert t.chords == (("v0", "v2"),)
    assert t.cost == 5.0


def test_dp_cost_equals_sum_of_chord_weights():
    w = _rand_weight(7)
    t = triangulate(_vars(6), w)
    assert t.cost == pytest.approx(sum(w(u, v) for u, v in set(t.chords)))


# -- on real queries -----------------------------------------------------------
@pytest.mark.parametrize("q", SNOWFLAKES, ids=lambda q: q.name)
def test_acyclic_queries_not_triangulated(catalog, q):
    assert triangulate_query(q, catalog) is None


@pytest.mark.parametrize("q", DIAMONDS, ids=lambda q: q.name)
def test_diamonds_get_one_chord(catalog, q):
    t = triangulate_query(q, catalog)
    assert isinstance(t, Triangulation)
    assert len(t.chords) == 1
    assert len(t.triangles) == 2
    # chord endpoints are opposite corners of the 4-cycle
    cyc = t.cycle
    u, v = t.chords[0]
    assert {u, v} in ({cyc[0], cyc[2]}, {cyc[1], cyc[3]})
