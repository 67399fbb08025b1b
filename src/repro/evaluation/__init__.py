"""Metrics, query selection, dataset registry, and the experiment harness."""
from .harness import run_algorithms, standard_algorithms, summarize, variant_algorithms
from .metrics import ari_binary, f1_binary, nmi_binary, score_against_best_truth
from .queries import query_sets

__all__ = [
    "run_algorithms",
    "standard_algorithms",
    "variant_algorithms",
    "summarize",
    "nmi_binary",
    "ari_binary",
    "f1_binary",
    "score_against_best_truth",
    "query_sets",
]
