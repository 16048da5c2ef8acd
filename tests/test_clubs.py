"""Maximum h-club: exactness vs brute force, Theorem 3, Algorithm 7, budgets."""
from itertools import combinations

import numpy as np
import pytest

from repro.clubs import (
    NodeBudgetExceeded,
    drop_heuristic,
    is_h_club,
    max_h_club_dbc,
    max_h_club_itdbc,
    max_h_club_with_cores,
    star_incumbent,
)
from repro.core.reference import brute_force_cores
from repro.graphs.generators import erdos_renyi
from repro.graphs.graph import Graph
from tests.conftest import small_graph


def brute_max_club(g: Graph, h: int) -> int:
    for size in range(g.n, 0, -1):
        for sub in combinations(range(g.n), size):
            m = np.zeros(g.n, dtype=bool)
            m[list(sub)] = True
            if is_h_club(g.adjacency, m, h):
                return size
    return 0


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("h", [2, 3])
def test_solvers_match_brute_force(seed, h):
    g = erdos_renyi(10, 0.25, seed=seed)
    ref = brute_max_club(g, h)
    d = max_h_club_dbc(g, h)
    i = max_h_club_itdbc(g, h)
    assert is_h_club(g.adjacency, d, h) and int(d.sum()) == ref
    assert is_h_club(g.adjacency, i, h) and int(i.sum()) == ref


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("algo", [max_h_club_dbc, max_h_club_itdbc])
def test_wrapper_matches_direct(seed, algo):
    g = erdos_renyi(12, 0.2, seed=seed)
    h = 2
    direct = int(algo(g, h).sum())
    wrapped = max_h_club_with_cores(g, h, algo)
    assert is_h_club(g.adjacency, wrapped, h)
    assert int(wrapped.sum()) == direct


@pytest.mark.parametrize("seed", range(5))
def test_theorem3_club_inside_core(seed):
    """Every h-club of size k+1 is inside the (k,h)-core."""
    g = erdos_renyi(14, 0.2, seed=seed)
    h = 2
    core = brute_force_cores(g, h)
    club = max_h_club_dbc(g, h)
    k = int(club.sum()) - 1
    assert (core[club] >= k).all()


def test_is_h_club_basics(path_graph, clique_graph, star_graph):
    full = np.ones(5, dtype=bool)
    assert not is_h_club(path_graph.adjacency, full, 2)  # P5 diameter 4
    assert is_h_club(path_graph.adjacency, full, 4)
    assert is_h_club(clique_graph.adjacency, np.ones(6, bool), 1)
    assert is_h_club(star_graph.adjacency, np.ones(6, bool), 2)
    assert not is_h_club(star_graph.adjacency, np.ones(6, bool), 1)


def test_is_h_club_induced_semantics():
    """The defining subtlety: distances are measured in the induced
    subgraph, so dropping the hub of a star breaks the club."""
    g = Graph.from_edges(4, np.array([[0, 1], [0, 2], [0, 3]]))
    leaves = np.array([False, True, True, True])
    assert not is_h_club(g.adjacency, leaves, 2)  # leaves are disconnected


def test_star_incumbent_is_club_and_max_degree(star_graph):
    mask = np.ones(6, dtype=bool)
    s = star_incumbent(star_graph.adjacency, mask, 2)
    assert int(s.sum()) == 6
    assert is_h_club(star_graph.adjacency, s, 2)


def test_star_incumbent_h1_edge(path_graph):
    s = star_incumbent(path_graph.adjacency, np.ones(5, bool), 1)
    assert int(s.sum()) == 2
    assert is_h_club(path_graph.adjacency, s, 1)


def test_drop_heuristic_feasible():
    g = erdos_renyi(16, 0.2, seed=3)
    club = drop_heuristic(g.adjacency, np.ones(g.n, bool), 2, max_iter=50)
    assert is_h_club(g.adjacency, club, 2)
    assert club.any()


def test_node_budget_raises_with_incumbent():
    g = erdos_renyi(30, 0.15, seed=1)
    with pytest.raises(NodeBudgetExceeded) as ei:
        max_h_club_dbc(g, 2, node_budget=0)
    assert ei.value.incumbent.any()  # carries a feasible fallback


def test_disconnected_components_handled():
    # Two cliques of different sizes, no connection.
    edges = [[i, j] for i in range(4) for j in range(i + 1, 4)]
    edges += [[i, j] for i in range(4, 10) for j in range(i + 1, 10)]
    g = Graph.from_edges(10, np.array(edges))
    club = max_h_club_dbc(g, 2)
    assert int(club.sum()) == 6  # the bigger clique


def test_empty_mask():
    g = erdos_renyi(5, 0.3, seed=0)
    out = max_h_club_itdbc(g, 2, mask=np.zeros(5, dtype=bool))
    assert int(out.sum()) <= 1
