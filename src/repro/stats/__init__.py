"""Per-epoch statistics estimation (Fig. 5: sample in epoch i, evaluate
in i+1, reconfigure in i+2)."""
from .estimator import estimate_statistics

__all__ = ["estimate_statistics"]
