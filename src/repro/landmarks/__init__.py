"""Landmark selection for shortest-path estimation (paper §6.6)."""
from repro.landmarks.landmarks import (
    betweenness_centrality,
    closeness_centrality,
    estimate_error,
    select_landmarks,
)

__all__ = [
    "select_landmarks",
    "closeness_centrality",
    "betweenness_centrality",
    "estimate_error",
]
