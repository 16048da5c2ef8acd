"""Distance-generalized cocktail party / community search (paper Appendix B)."""
from repro.cocktail.cocktail import cocktail_party

__all__ = ["cocktail_party"]
