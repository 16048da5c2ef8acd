"""Shared fixtures/helpers for the test suite (Spark fixture is in the root
conftest). Everything here is driver-side graph plumbing."""
from __future__ import annotations

import numpy as np
import pytest

from repro.graphs.generators import barabasi_albert, erdos_renyi, grid2d, watts_strogatz
from repro.graphs.graph import Graph


def small_graph(model: str, seed: int) -> Graph:
    """Deterministic small graph for algorithm cross-validation batteries."""
    if model == "er":
        return erdos_renyi(28, 0.13, seed=seed)
    if model == "er-dense":
        return erdos_renyi(22, 0.3, seed=seed)
    if model == "ba":
        return barabasi_albert(30, 2, seed=seed)
    if model == "ws":
        return watts_strogatz(30, 4, 0.2, seed=seed)
    if model == "grid":
        return grid2d(6, 5, extra_p=0.2, seed=seed)
    raise ValueError(model)


@pytest.fixture
def path_graph() -> Graph:
    """P5: 0-1-2-3-4."""
    return Graph.from_edges(5, np.array([[0, 1], [1, 2], [2, 3], [3, 4]]))


@pytest.fixture
def star_graph() -> Graph:
    """K1,5: center 0."""
    return Graph.from_edges(6, np.array([[0, i] for i in range(1, 6)]))


@pytest.fixture
def clique_graph() -> Graph:
    """K6."""
    edges = [[i, j] for i in range(6) for j in range(i + 1, 6)]
    return Graph.from_edges(6, np.array(edges))


@pytest.fixture
def fig1_like_graph() -> Graph:
    """The paper's Example-2 regime: v5 and v6 become adjacent in G^2 only
    through the low-core vertex v7, so the classic core index of G^2
    strictly exceeds their (k,2)-core index (6 vs 5, verified by hand)."""
    edges = [[i, j] for i in range(5) for j in range(i + 1, 5)]  # K5
    edges += [[0, 5], [1, 6], [5, 7], [6, 7]]
    return Graph.from_edges(8, np.array(edges))
