"""Distance-h densest subgraph (paper §5.3)."""
from repro.densest.densest import (
    avg_h_degree,
    core_based_densest,
    exact_densest_bruteforce,
)

__all__ = ["avg_h_degree", "core_based_densest", "exact_densest_bruteforce"]
