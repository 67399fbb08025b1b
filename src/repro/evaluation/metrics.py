"""Accuracy metrics (paper §6.1 "Evaluation Metric").

Community search is scored as a binary classification over the node
universe: membership in the identified community C vs membership in the
ground-truth community T containing the query nodes. We implement

* NMI  — Danon et al. [19] normalization 2·I/(H_C + H_T),
* ARI  — Hubert & Arabie [35], pair-counting over the 2×2 contingency,
* F1   — harmonic precision/recall on node sets (van Rijsbergen [53]).

All return values in [0, 1] (ARI clipped at 0 as the paper's plots do).
"""
from __future__ import annotations

import math
from typing import Iterable, Sequence, Set, Tuple


def _contingency(n: int, found: Set[int], truth: Set[int]) -> Tuple[int, int, int, int]:
    n11 = len(found & truth)
    n10 = len(found) - n11
    n01 = len(truth) - n11
    n00 = n - n11 - n10 - n01
    return n11, n10, n01, n00


def _entropy(*counts: int) -> float:
    tot = sum(counts)
    h = 0.0
    for c in counts:
        if c > 0:
            p = c / tot
            h -= p * math.log(p)
    return h


def nmi_binary(n: int, found: Set[int], truth: Set[int]) -> float:
    """NMI of the binary partitions {C, V\\C} and {T, V\\T}."""
    n11, n10, n01, n00 = _contingency(n, found, truth)
    hx = _entropy(n11 + n10, n01 + n00)  # partition by C
    hy = _entropy(n11 + n01, n10 + n00)  # partition by T
    if hx == 0.0 and hy == 0.0:
        return 1.0 if found == truth else 0.0
    if hx == 0.0 or hy == 0.0:
        return 0.0
    mi = 0.0
    for nij, a, b in (
        (n11, n11 + n10, n11 + n01),
        (n10, n11 + n10, n10 + n00),
        (n01, n01 + n00, n11 + n01),
        (n00, n01 + n00, n10 + n00),
    ):
        if nij > 0:
            mi += (nij / n) * math.log(n * nij / (a * b))
    return min(1.0, max(0.0, 2.0 * mi / (hx + hy)))


def ari_binary(n: int, found: Set[int], truth: Set[int]) -> float:
    n11, n10, n01, n00 = _contingency(n, found, truth)

    def c2(x: int) -> float:
        return x * (x - 1) / 2.0

    index = c2(n11) + c2(n10) + c2(n01) + c2(n00)
    sum_a = c2(n11 + n10) + c2(n01 + n00)
    sum_b = c2(n11 + n01) + c2(n10 + n00)
    expected = sum_a * sum_b / c2(n) if n > 1 else 0.0
    max_index = (sum_a + sum_b) / 2.0
    if max_index == expected:
        return 1.0 if found == truth else 0.0
    return min(1.0, max(0.0, (index - expected) / (max_index - expected)))


def f1_binary(n: int, found: Set[int], truth: Set[int]) -> float:
    n11 = len(found & truth)
    if not found or not truth or n11 == 0:
        return 0.0
    p = n11 / len(found)
    r = n11 / len(truth)
    return 2 * p * r / (p + r)


def score_against_best_truth(
    n: int,
    found: Set[int],
    communities: Sequence[Set[int]],
    queries: Iterable[int],
) -> Tuple[float, float, float]:
    """(NMI, ARI, F1) against the best-matching ground-truth community
    containing all query nodes (paper §6.3: with overlapping ground
    truth, compare to every containing community and report the best)."""
    qs = set(queries)
    candidates = [t for t in communities if qs <= t]
    if not candidates or not found:
        return 0.0, 0.0, 0.0
    best = (0.0, 0.0, 0.0)
    for t in candidates:
        trio = (
            nmi_binary(n, found, t),
            ari_binary(n, found, t),
            f1_binary(n, found, t),
        )
        if trio[0] >= best[0]:
            best = trio
    return best
