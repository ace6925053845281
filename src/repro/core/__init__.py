"""The paper's contribution: Randomised Contraction."""
from .api import connected_components, normalize_labels
from .contraction import (
    RCResult,
    randomised_contraction,
    randomised_contraction_fast,
)

__all__ = [
    "RCResult",
    "connected_components",
    "normalize_labels",
    "randomised_contraction",
    "randomised_contraction_fast",
]
