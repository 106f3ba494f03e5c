"""Clustering-quality metrics (Acc, F1, NMI, ARI) and Hungarian matching."""
from .clustering import accuracy, all_metrics, ari, best_matching, f1_score, nmi
from .hungarian import linear_sum_assignment

__all__ = [
    "accuracy",
    "all_metrics",
    "ari",
    "best_matching",
    "f1_score",
    "nmi",
    "linear_sum_assignment",
]
