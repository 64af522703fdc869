"""Ranking-quality metrics used in the paper's Table 1: mean average
precision (MAP) with a binary relevance threshold on |r|, and nDCG@k with
graded relevance |r| (paper §5.4: "the absolute value of the correlation").
"""
from __future__ import annotations

import math
from typing import Sequence

import numpy as np


def average_precision(relevances: Sequence[bool]) -> float:
    """AP of one ranked list with binary relevance. ``nan`` when the list
    has no relevant item (the query is skipped by MAP, matching standard
    IR practice when relevance judgments are empty)."""
    hits = 0
    total = 0.0
    for i, rel in enumerate(relevances, start=1):
        if rel:
            hits += 1
            total += hits / i
    if hits == 0:
        return float("nan")
    return total / hits


def mean_average_precision(
    ranked_lists: Sequence[Sequence[bool]],
) -> float:
    """MAP over queries; queries without relevant items are skipped."""
    aps = [average_precision(r) for r in ranked_lists]
    aps = [a for a in aps if not math.isnan(a)]
    if not aps:
        return float("nan")
    return float(np.mean(aps))


def dcg_at_k(gains: Sequence[float], k: int) -> float:
    """DCG@k with the standard log2 discount, graded gains."""
    g = np.asarray(list(gains)[:k], dtype=np.float64)
    if len(g) == 0:
        return 0.0
    discounts = 1.0 / np.log2(np.arange(2, len(g) + 2))
    return float((g * discounts).sum())


def ndcg_at_k(gains: Sequence[float], k: int) -> float:
    """nDCG@k: DCG of the ranking divided by DCG of the ideal ordering of
    the *same* candidate pool. ``nan`` if all gains are zero."""
    ideal = sorted(gains, reverse=True)
    denom = dcg_at_k(ideal, k)
    if denom == 0.0:
        return float("nan")
    return dcg_at_k(gains, k) / denom


def mean_ndcg_at_k(gain_lists: Sequence[Sequence[float]], k: int) -> float:
    """Mean nDCG@k over queries; all-zero-gain queries are skipped."""
    vals = [ndcg_at_k(g, k) for g in gain_lists]
    vals = [v for v in vals if not math.isnan(v)]
    if not vals:
        return float("nan")
    return float(np.mean(vals))
