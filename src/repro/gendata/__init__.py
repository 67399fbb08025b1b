"""Synthetic graph generators: LFR-lite benchmark + classic/analog graphs."""
from .classic import (
    dolphin_analog,
    karate,
    mexican_analog,
    overlapping_communities,
    polblogs_analog,
    ring_of_cliques,
)
from .lfr import lfr_graph

__all__ = [
    "karate",
    "ring_of_cliques",
    "dolphin_analog",
    "mexican_analog",
    "polblogs_analog",
    "overlapping_communities",
    "lfr_graph",
]
