"""P-Tucker: the paper's contribution — row-wise gradient-based ALS."""
from repro.core.config import PTuckerConfig, PTuckerResult

__all__ = ["PTuckerConfig", "PTuckerResult"]
