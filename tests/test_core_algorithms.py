"""Cross-validation battery: h-BZ, h-LB, h-LB+UB vs the definitional
brute-force reference, classic-core reduction at h=1, and hand-built cases."""
import numpy as np
import pytest

from repro.core import h_bz, h_lb, h_lb_ub
from repro.core.reference import (
    brute_force_cores,
    classic_core_decomposition,
    kh_core_members,
    power_graph,
)
from repro.graphs.graph import Graph
from tests.conftest import small_graph

ALGOS = {
    "h-BZ": h_bz,
    "h-LB": h_lb,
    "h-LB+UB": lambda g, h: h_lb_ub(g, h),
}


@pytest.mark.parametrize("algo", sorted(ALGOS))
@pytest.mark.parametrize("model", ["er", "er-dense", "ba", "ws", "grid"])
@pytest.mark.parametrize("seed", [0, 1, 2, 3])
@pytest.mark.parametrize("h", [2, 3])
def test_algorithms_match_brute_force(algo, model, seed, h):
    g = small_graph(model, seed)
    ref = brute_force_cores(g, h)
    got = ALGOS[algo](g, h).core
    assert np.array_equal(got, ref), (algo, model, seed, h)


@pytest.mark.parametrize("algo", sorted(ALGOS))
@pytest.mark.parametrize("seed", [0, 1, 2])
def test_h1_reduces_to_classic_core(algo, seed):
    g = small_graph("er", seed)
    got = ALGOS[algo](g, 1).core
    assert np.array_equal(got, classic_core_decomposition(g)), (algo, seed)


@pytest.mark.parametrize("s", [1, 2, 3, 8, None])
@pytest.mark.parametrize("seed", [0, 1])
def test_hlbub_partition_size_invariant(s, seed):
    g = small_graph("ba", seed)
    ref = brute_force_cores(g, 2)
    assert np.array_equal(h_lb_ub(g, 2, s=s).core, ref)


@pytest.mark.parametrize("lb", ["none", "lb1", "lb2"])
@pytest.mark.parametrize("seed", [0, 1])
def test_hlb_lower_bound_variants(lb, seed):
    g = small_graph("ws", seed)
    ref = brute_force_cores(g, 3)
    assert np.array_equal(h_lb(g, 3, lb=lb).core, ref)


@pytest.mark.parametrize("ub_kind", ["ub", "hdegree"])
def test_hlbub_upper_bound_variants(ub_kind):
    g = small_graph("er", 5)
    ref = brute_force_cores(g, 2)
    assert np.array_equal(h_lb_ub(g, 2, ub_kind=ub_kind).core, ref)


def test_path_graph_cores(path_graph):
    # P5, h=2: ends see 2 vertices, middle sees 4. The (2,2)-core is all of
    # P5; the (3,2)-core would need every vertex to see 3 others — peeling
    # the ends leaves P3 where ends see only 2 — so max core is 2.
    res = h_bz(path_graph, 2)
    assert res.core.tolist() == [2, 2, 2, 2, 2]


def test_star_graph_cores(star_graph):
    # Star K1,5 at h=2: everyone sees all 5 others -> (5,2)-core is the
    # whole graph.
    res = h_bz(star_graph, 2)
    assert res.core.tolist() == [5] * 6


def test_clique_all_h(clique_graph):
    for h in (1, 2, 3):
        res = h_lb(clique_graph, h)
        assert (res.core == 5).all()


def test_example1_finer_granularity(fig1_like_graph):
    """The paper's Example 1 claim: (k,2) distinguishes vertices that the
    classic decomposition lumps together (here v5 and v7 both have classic
    core 1 but (k,2)-core indexes 5 and 4)."""
    g = fig1_like_graph
    classic = classic_core_decomposition(g)
    kh = h_bz(g, 2).core
    assert classic[5] == classic[7]
    assert kh[5] == 5 and kh[7] == 4


def test_power_graph_decomposition_is_not_kh(fig1_like_graph):
    """Example 2: classic core of G^h upper-bounds but can differ from the
    (k,h)-core index."""
    g = fig1_like_graph
    h = 2
    gh = power_graph(g, h)
    power_core = classic_core_decomposition(gh)
    kh = brute_force_cores(g, h)
    assert (power_core >= kh).all()
    # v5/v6 (ids 5 and 6): power-core 6 vs true (k,2)-core 5.
    assert kh[5] == 5 and kh[7] == 4
    assert power_core[5] == 6
    assert (power_core != kh).any(), "expected a strict gap on this graph"


def test_kh_core_members_nested():
    g = small_graph("er", 7)
    prev = kh_core_members(g, 2, 1)
    for k in range(2, 6):
        cur = kh_core_members(g, 2, k)
        assert (prev | cur == prev).all(), "containment violated"
        prev = cur


def test_core_result_helpers():
    g = small_graph("ba", 0)
    res = h_bz(g, 2)
    assert res.degeneracy == int(res.core.max())
    assert res.members(0).all()
    assert res.distinct_cores() == len(np.unique(res.core))
    assert res.order is not None and len(res.order) == g.n
    assert sorted(res.order) == list(range(g.n))


def test_visits_ordering_lb_below_bz():
    """The whole point of the bounds: h-LB must do far fewer h-BFS visits."""
    g = small_graph("er-dense", 1)
    bz = h_bz(g, 3)
    lb = h_lb(g, 3)
    assert lb.visits < bz.visits


def test_empty_and_singleton_graphs():
    g0 = Graph.from_edges(1, np.zeros((0, 2), dtype=np.int64))
    for fn in ALGOS.values():
        assert fn(g0, 2).core.tolist() == [0]
    g3 = Graph.from_edges(3, np.zeros((0, 2), dtype=np.int64))
    assert h_lb(g3, 2).core.tolist() == [0, 0, 0]
