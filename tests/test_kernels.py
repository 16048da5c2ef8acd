"""h-bounded BFS kernels: reach masks, exact-distance masks, counters, budgets."""
import numpy as np
import pytest

from repro.core.kernels import (
    BudgetExceeded,
    Counter,
    all_h_degrees,
    bounded_reach,
    distance_matrix,
    h_degree,
)
from tests.conftest import small_graph


@pytest.mark.parametrize("model", ["er", "ba", "ws", "grid"])
@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("h", [1, 2, 3, 4])
def test_bounded_reach_matches_distance_matrix(model, seed, h):
    g = small_graph(model, seed)
    A = g.adjacency
    alive = np.ones(g.n, dtype=bool)
    dist = distance_matrix(A)
    for v in range(0, g.n, 3):
        reached, at_h = bounded_reach(A, v, alive, h)
        expect = (dist[v] >= 1) & (dist[v] <= h)
        assert (reached == expect).all(), (v,)
        assert (at_h == (dist[v] == h)).all(), (v,)


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_bounded_reach_respects_alive_mask(seed):
    g = small_graph("er", seed)
    A = g.adjacency
    alive = np.ones(g.n, dtype=bool)
    alive[::4] = False  # kill every 4th vertex
    sub, ids = g.induced(alive)
    dist_sub = distance_matrix(sub.adjacency)
    pos = {int(orig): i for i, orig in enumerate(ids)}
    for v in np.flatnonzero(alive)[:8]:
        reached, _ = bounded_reach(A, int(v), alive, 2)
        expect = np.zeros(g.n, dtype=bool)
        dv = dist_sub[pos[int(v)]]
        for orig, i in pos.items():
            if 1 <= dv[i] <= 2:
                expect[orig] = True
        assert (reached == expect).all()


def test_bounded_reach_h_zero_and_h_one(path_graph):
    A = path_graph.adjacency
    alive = np.ones(5, dtype=bool)
    r0, e0 = bounded_reach(A, 2, alive, 0)
    assert not r0.any() and not e0.any()
    r1, e1 = bounded_reach(A, 2, alive, 1)
    assert np.flatnonzero(r1).tolist() == [1, 3]
    assert (e1 == r1).all()  # h=1: everything reached is at distance exactly 1


def test_h_degree_path(path_graph):
    A = path_graph.adjacency
    alive = np.ones(5, dtype=bool)
    assert h_degree(A, 0, alive, 2) == 2
    assert h_degree(A, 2, alive, 2) == 4
    assert h_degree(A, 2, alive, 4) == 4


def test_all_h_degrees_subset(path_graph):
    A = path_graph.adjacency
    alive = np.ones(5, dtype=bool)
    out = all_h_degrees(A, alive, 2, vertices=np.array([0, 2]))
    assert out[0] == 2 and out[2] == 4 and out[1] == 0  # 1 not computed


def test_counter_counts_visits(star_graph):
    A = star_graph.adjacency
    alive = np.ones(6, dtype=bool)
    c = Counter()
    bounded_reach(A, 0, alive, 1, c)
    assert c.bfs_calls == 1
    assert c.visits == 5  # scanned the 5 leaves
    bounded_reach(A, 1, alive, 2, c)
    # level 1 scans the center (1 visit), level 2 scans its 5 alive nbrs.
    assert c.visits == 5 + 1 + 5


def test_visit_budget_raises(clique_graph):
    A = clique_graph.adjacency
    alive = np.ones(6, dtype=bool)
    c = Counter(visit_budget=3)
    with pytest.raises(BudgetExceeded):
        for v in range(6):
            bounded_reach(A, v, alive, 1, c)


def test_deadline_raises(clique_graph):
    A = clique_graph.adjacency
    alive = np.ones(6, dtype=bool)
    c = Counter(deadline=0.0)  # already in the past
    with pytest.raises(BudgetExceeded):
        bounded_reach(A, 0, alive, 2, c)


def test_distance_matrix_path(path_graph):
    dist = distance_matrix(path_graph.adjacency)
    assert dist[0, 4] == 4
    assert dist[1, 3] == 2
    assert (np.diag(dist) == 0).all()


def test_distance_matrix_disconnected():
    from repro.graphs.graph import Graph

    g = Graph.from_edges(4, np.array([[0, 1], [2, 3]]))
    dist = distance_matrix(g.adjacency)
    assert dist[0, 2] == -1
    assert dist[0, 1] == 1


def test_distance_matrix_alive_mask(path_graph):
    alive = np.array([True, True, False, True, True])
    dist = distance_matrix(path_graph.adjacency, alive)
    assert dist[0, 1] == 1
    assert dist[0, 3] == -1  # severed by removing vertex 2
    assert (dist[2] == -1).all()
