"""Statistical analysis: Friedman test and Nemenyi critical distance."""
from .stats import FriedmanResult, friedman_nemenyi, rank_matrix, significance_groups

__all__ = [
    "FriedmanResult",
    "friedman_nemenyi",
    "rank_matrix",
    "significance_groups",
]
