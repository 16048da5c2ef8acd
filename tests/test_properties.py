"""Structural properties of the (k,h)-core (paper §3) + Hypothesis fuzzing."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import h_bz, h_lb, h_lb_ub
from repro.core.kernels import all_h_degrees
from repro.core.reference import brute_force_cores, kh_core_members
from repro.graphs.graph import Graph
from tests.conftest import small_graph


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("h", [2, 3])
def test_containment_property(seed, h):
    """Property 2: the (k+1,h)-core is a subgraph of the (k,h)-core."""
    g = small_graph("er", seed)
    prev = np.ones(g.n, dtype=bool)
    k = 1
    while True:
        cur = kh_core_members(g, h, k)
        assert (cur <= prev).all()
        if not cur.any():
            break
        prev = cur
        k += 1


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("h", [2, 3])
def test_core_definition_holds(seed, h):
    """Every vertex of the (k,h)-core has h-degree >= k inside the core."""
    g = small_graph("ba", seed)
    core = brute_force_cores(g, h)
    for k in np.unique(core):
        if k == 0:
            continue
        mask = core >= k
        degs = all_h_degrees(g.adjacency, mask, h)
        assert (degs[mask] >= k).all()


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_maximality(seed):
    """No vertex outside the (k,h)-core could be added: adding its whole
    excluded set back would have to give someone an h-degree < k."""
    g = small_graph("er", seed)
    h, core = 2, brute_force_cores(g, 2)
    kstar = int(core.max())
    mask = core >= kstar
    outside = ~mask
    for v in np.flatnonzero(outside)[:5]:
        trial = mask.copy()
        trial[v] = True
        degs = all_h_degrees(g.adjacency, trial, h)
        # v itself must fail the bar (otherwise the fix-point would have kept
        # it — possible only if some of its support was also deleted, in
        # which case iterating deletions removes v again).
        sub = trial.copy()
        while True:
            d = all_h_degrees(g.adjacency, sub, h)
            drop = sub & (d < kstar)
            if not drop.any():
                break
            sub &= ~drop
        assert not sub[v]


def _graph_from_bits(n: int, bits: list[bool]) -> Graph:
    pairs = [(i, j) for i in range(n) for j in range(i + 1, n)]
    edges = [p for p, b in zip(pairs, bits) if b]
    return Graph.from_edges(n, np.array(edges, dtype=np.int64).reshape(-1, 2))


@settings(max_examples=30, deadline=None)
@given(
    n=st.integers(6, 12),
    h=st.integers(2, 3),
    data=st.data(),
)
def test_hypothesis_all_algorithms_agree(n, h, data):
    bits = data.draw(st.lists(st.booleans(), min_size=n * (n - 1) // 2,
                              max_size=n * (n - 1) // 2))
    g = _graph_from_bits(n, bits)
    ref = brute_force_cores(g, h)
    assert np.array_equal(h_bz(g, h).core, ref)
    assert np.array_equal(h_lb(g, h).core, ref)
    assert np.array_equal(h_lb_ub(g, h).core, ref)
    assert np.array_equal(h_lb_ub(g, h, s=1).core, ref)


@settings(max_examples=20, deadline=None)
@given(n=st.integers(5, 10), data=st.data())
def test_hypothesis_h1_equals_classic(n, data):
    from repro.core.reference import classic_core_decomposition

    bits = data.draw(st.lists(st.booleans(), min_size=n * (n - 1) // 2,
                              max_size=n * (n - 1) // 2))
    g = _graph_from_bits(n, bits)
    assert np.array_equal(h_bz(g, 1).core, classic_core_decomposition(g))


@settings(max_examples=20, deadline=None)
@given(n=st.integers(6, 11), h=st.integers(2, 4), data=st.data())
def test_hypothesis_bound_sandwich(n, h, data):
    from repro.core.bounds import lower_bounds, upper_bound

    bits = data.draw(st.lists(st.booleans(), min_size=n * (n - 1) // 2,
                              max_size=n * (n - 1) // 2))
    g = _graph_from_bits(n, bits)
    core = brute_force_cores(g, h)
    lb1, lb2 = lower_bounds(g.adjacency, h)
    ub = upper_bound(g.adjacency, h)
    assert (lb1 <= lb2).all() and (lb2 <= core).all() and (core <= ub).all()
