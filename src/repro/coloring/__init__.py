"""Distance-h coloring (paper §5.1)."""
from repro.coloring.coloring import (
    greedy_distance_h_coloring,
    is_valid_distance_h_coloring,
)

__all__ = ["greedy_distance_h_coloring", "is_valid_distance_h_coloring"]
