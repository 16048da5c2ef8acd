"""In-memory undirected graph with a dense boolean adjacency matrix.

All decomposition kernels in this reproduction operate on graphs of a few
hundred to a few thousand vertices (scaled-down analogues of the paper's
datasets, see DESIGN.md §4). At that scale a dense ``(n, n)`` boolean
adjacency matrix is both the fastest representation for NumPy-vectorized
h-bounded BFS and cheap to broadcast to Spark tasks (bit-packed, n²/8 bytes).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


def canonical_edges(edges: np.ndarray) -> np.ndarray:
    """Normalize an edge array to unique undirected edges ``u < v``.

    Self-loops are dropped; duplicates (in either orientation) are merged.
    Returns an ``(m, 2)`` int64 array sorted lexicographically.
    """
    e = np.asarray(edges, dtype=np.int64).reshape(-1, 2)
    e = e[e[:, 0] != e[:, 1]]
    lo = np.minimum(e[:, 0], e[:, 1])
    hi = np.maximum(e[:, 0], e[:, 1])
    e = np.unique(np.stack([lo, hi], axis=1), axis=0)
    return e


@dataclass
class Graph:
    """Simple undirected graph on vertices ``0..n-1``.

    Attributes:
        n: number of vertices.
        edges: canonical ``(m, 2)`` array, each row ``u < v``, no duplicates.
    """

    n: int
    edges: np.ndarray
    _adj: np.ndarray | None = field(default=None, repr=False, compare=False)

    @classmethod
    def from_edges(cls, n: int, edges: np.ndarray) -> "Graph":
        """Build a graph from any (possibly messy) edge array."""
        e = canonical_edges(edges)
        if len(e) and int(e.max()) >= n:
            raise ValueError(f"edge endpoint {int(e.max())} out of range for n={n}")
        return cls(n=n, edges=e)

    @property
    def m(self) -> int:
        """Number of undirected edges."""
        return len(self.edges)

    @property
    def adjacency(self) -> np.ndarray:
        """Dense symmetric boolean adjacency matrix (cached)."""
        if self._adj is None:
            A = np.zeros((self.n, self.n), dtype=bool)
            if len(self.edges):
                A[self.edges[:, 0], self.edges[:, 1]] = True
                A[self.edges[:, 1], self.edges[:, 0]] = True
            self._adj = A
        return self._adj

    @property
    def degrees(self) -> np.ndarray:
        """Vertex degrees as an int64 array."""
        d = np.zeros(self.n, dtype=np.int64)
        if len(self.edges):
            np.add.at(d, self.edges[:, 0], 1)
            np.add.at(d, self.edges[:, 1], 1)
        return d

    def neighbors(self, v: int) -> np.ndarray:
        """Sorted neighbor ids of ``v``."""
        return np.flatnonzero(self.adjacency[v])

    def induced(self, mask: np.ndarray) -> tuple["Graph", np.ndarray]:
        """Subgraph induced by the boolean ``mask``.

        Returns ``(subgraph, vertex_ids)`` where ``vertex_ids[i]`` is the
        original id of subgraph vertex ``i``.
        """
        ids = np.flatnonzero(mask)
        remap = np.full(self.n, -1, dtype=np.int64)
        remap[ids] = np.arange(len(ids))
        keep = mask[self.edges[:, 0]] & mask[self.edges[:, 1]]
        sub_edges = remap[self.edges[keep]]
        return Graph.from_edges(len(ids), sub_edges), ids

    def both_directions(self) -> np.ndarray:
        """Edge array with both (u, v) and (v, u) rows — for Spark edge frames."""
        return np.concatenate([self.edges, self.edges[:, ::-1]], axis=0)


def pack_adjacency(A: np.ndarray) -> bytes:
    """Bit-pack a boolean adjacency matrix for cheap Spark broadcast."""
    return np.packbits(A, axis=1).tobytes()


def unpack_adjacency(buf: bytes, n: int) -> np.ndarray:
    """Inverse of :func:`pack_adjacency`."""
    packed = np.frombuffer(buf, dtype=np.uint8).reshape(n, -1)
    return np.unpackbits(packed, axis=1, count=n).astype(bool)
