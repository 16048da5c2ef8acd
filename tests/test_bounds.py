"""Bound correctness: LB1 <= LB2 <= core <= UB <= h-degree, and the
power-graph identity for UB."""
import numpy as np
import pytest

from repro.core.bounds import batch_h_degrees, h_degree_as_ub, lower_bounds, upper_bound
from repro.core.hlbub import build_intervals, improve_lb
from repro.core.reference import (
    brute_force_cores,
    classic_core_decomposition,
    power_graph,
)
from tests.conftest import small_graph


@pytest.mark.parametrize("model", ["er", "er-dense", "ba", "ws", "grid"])
@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("h", [2, 3, 4])
def test_bound_sandwich(model, seed, h):
    g = small_graph(model, seed)
    A = g.adjacency
    core = brute_force_cores(g, h)
    lb1, lb2 = lower_bounds(A, h)
    ub = upper_bound(A, h)
    hdeg = h_degree_as_ub(A, h)
    assert (lb1 <= lb2).all()
    assert (lb2 <= core).all(), "LB2 must lower-bound the core index (Obs. 2)"
    assert (core <= ub).all(), "UB must upper-bound the core index (Obs. 3)"
    assert (ub <= hdeg).all(), "power-graph core index <= degree in G^h"


def test_ub_at_h1_is_classic_core():
    """At h=1 the implicit power graph is G itself, so Algorithm 5 reduces
    to classic BZ exactly."""
    for seed in range(4):
        g = small_graph("er", seed)
        ub = upper_bound(g.adjacency, 1)
        assert np.array_equal(ub, classic_core_decomposition(g))


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
@pytest.mark.parametrize("h", [2, 3])
def test_ub_and_power_graph_core_both_upper_bound(seed, h):
    """§4.4: Algorithm 5 peels the *implicit* power graph, recomputing
    h-neighborhoods in the shrinking graph, so it need not equal the classic
    core of the static G^h — but both must upper-bound the true core index.
    """
    g = small_graph("er", seed)
    ub = upper_bound(g.adjacency, h)
    static = classic_core_decomposition(power_graph(g, h))
    core = brute_force_cores(g, h)
    assert (ub >= core).all()
    assert (static >= core).all()


def test_lb1_is_half_h_degree(star_graph):
    A = star_graph.adjacency
    lb1, lb2 = lower_bounds(A, 2)  # floor(2/2)=1 -> LB1 = degree
    assert (lb1 == star_graph.degrees).all()
    # LB2: the max LB1 within the 1-neighborhood; leaves see the center.
    assert lb2[1] == 5 and lb2[0] == 5


def test_lower_bounds_h1_degenerate():
    g = small_graph("er", 0)
    lb1, lb2 = lower_bounds(g.adjacency, 1)
    assert (lb1 == 0).all() and (lb2 == 0).all()


def test_build_intervals_matches_example4():
    """Example 4 verbatim: U={5,10,15,20,25,30}, lb0=3."""
    ub = np.array([5, 10, 15, 20, 25, 30])
    lb2 = np.array([3, 5, 7, 9, 11, 13])
    assert build_intervals(ub, lb2, s=2) == [(21, 30), (11, 20), (3, 10)]
    assert build_intervals(ub, lb2, s=1) == [
        (26, 30), (21, 25), (16, 20), (11, 15), (6, 10), (3, 5)
    ]


def test_build_intervals_cover_and_disjoint():
    g = small_graph("ba", 3)
    core = brute_force_cores(g, 2)
    lb1, lb2 = lower_bounds(g.adjacency, 2)
    ub = upper_bound(g.adjacency, 2)
    for s in (1, 2, 5):
        ivs = build_intervals(ub, lb2, s)
        # top-down, disjoint, contiguous
        for (k0, k1), (k0n, k1n) in zip(ivs, ivs[1:]):
            assert k0 <= k1 and k1n == k0 - 1
        # every true core index falls in exactly one interval
        for c in core:
            hits = [1 for k0, k1 in ivs if k0 <= c <= k1]
            assert sum(hits) == 1 or (c < min(k0 for k0, _ in ivs))


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_improve_lb_is_sound(seed):
    """LB3 from Property 3 must never exceed the true core index, and the
    cleaning pass must never drop a vertex of the current partition."""
    g = small_graph("er", seed)
    A = g.adjacency
    h = 2
    core = brute_force_cores(g, h)
    _, lb2 = lower_bounds(A, h)
    ub = upper_bound(A, h)
    for kmin in (1, 2, int(ub.max())):
        vk0 = ub >= kmin
        vk, lb3, _ = improve_lb(A, h, vk0, kmin, lb2)
        ids = np.flatnonzero(vk0)
        assert (lb3[ids] <= core[ids]).all(), "Property 3 violated"
        # no vertex with core >= kmin may be cleaned away
        keep = core >= kmin
        assert (vk[keep] | ~vk0[keep]).all()


def test_batch_h_degrees_respects_alive():
    g = small_graph("ws", 1)
    A = g.adjacency
    alive = np.ones(g.n, dtype=bool)
    alive[:5] = False
    degs = batch_h_degrees(A, alive, 2)
    assert (degs[:5] == 0).all()
    assert degs[alive].max() <= int(alive.sum()) - 1
