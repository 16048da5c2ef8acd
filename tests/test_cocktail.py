"""Distance-generalized cocktail party (Appendix B)."""
import numpy as np
import pytest

from repro.cocktail import cocktail_party
from repro.core.kernels import all_h_degrees
from repro.graphs.generators import erdos_renyi
from repro.graphs.graph import Graph


@pytest.mark.parametrize("seed", range(4))
def test_solution_contains_query_connected_min_degree(seed):
    g = erdos_renyi(20, 0.2, seed=seed)
    q = [0, 5]
    mask, k = cocktail_party(g, q, h=2)
    if k < 0:
        pytest.skip("query not connected in this draw")
    assert mask[q].all()
    degs = all_h_degrees(g.adjacency, mask, 2)
    assert int(degs[mask].min()) >= k


@pytest.mark.parametrize("seed", range(4))
def test_optimality_vs_bruteforce(seed):
    """No connected superset of Q achieves a larger minimum h-degree."""
    from itertools import combinations

    g = erdos_renyi(9, 0.3, seed=seed)
    q = [0, 1]
    h = 2
    mask, k = cocktail_party(g, q, h)
    best = -1
    others = [v for v in range(g.n) if v not in q]
    for r in range(len(others) + 1):
        for extra in combinations(others, r):
            trial = np.zeros(g.n, dtype=bool)
            trial[q] = True
            trial[list(extra)] = True
            # connectivity of the induced subgraph containing q
            from repro.cocktail.cocktail import _component_of

            comp = _component_of(g.adjacency, trial, q[0])
            if not (comp[q].all() and (comp == trial).all()):
                continue
            degs = all_h_degrees(g.adjacency, trial, h)
            best = max(best, int(degs[trial].min()))
    if k < 0:
        assert best == -1
    else:
        assert k == best


def test_disconnected_query_returns_empty():
    g = Graph.from_edges(4, np.array([[0, 1], [2, 3]]))
    mask, k = cocktail_party(g, [0, 2], h=3)
    assert k == -1 and not mask.any()


def test_single_query_vertex_gets_top_core_component():
    g = erdos_renyi(15, 0.3, seed=1)
    mask, k = cocktail_party(g, [3], h=2)
    assert mask[3]
    assert k >= 0
