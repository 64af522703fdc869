"""KMV (k-minimum-values) cardinality statistics (paper §2.1, §3.3).

A Correlation Sketch retains everything a KMV synopsis holds (the n
minimum hashed keys), so every minimum-value-family statistic is still
available: distinct-value counts, union/intersection cardinalities, and
Jaccard similarity/containment. The ranking layer uses the containment
estimate as the ``ĵc`` baseline scorer.

All estimators operate on unit hashes ``h_u ∈ [0,1)`` sorted ascending,
exactly as stored in :class:`repro.core.sketch.CorrelationSketch`.
"""
from __future__ import annotations

import numpy as np

from .hashing import fibonacci_unit
from .sketch import CorrelationSketch


def dv_basic(k: int, kth_unit_hash: float) -> float:
    """Basic DV estimator ``D̂ = k / U(k)`` (paper §2.1)."""
    if k < 1 or kth_unit_hash <= 0:
        return float("nan")
    return k / kth_unit_hash


def dv_unbiased(k: int, kth_unit_hash: float) -> float:
    """Beyer et al.'s unbiased estimator ``D̂ = (k − 1)/U(k)``.

    For a sketch that retained *all* distinct values (U(k) is not a true
    k-th minimum of a larger set), callers should use the exact count
    instead; see :func:`distinct_estimate`.
    """
    if k < 2 or kth_unit_hash <= 0:
        return float("nan")
    return (k - 1) / kth_unit_hash


def distinct_estimate(sk: CorrelationSketch) -> float:
    """Distinct keys of the sketched column: exact when the sketch is not
    full (every distinct key retained), else the unbiased KMV estimate."""
    if len(sk) < sk.n_max:
        return float(len(sk))
    return dv_unbiased(len(sk), sk.kth_unit_hash)


def _combined(lx: CorrelationSketch, ly: CorrelationSketch):
    """The ⊕ combination (paper §2.1): k smallest of the union of hashes,
    with k = min(|Lx|, |Ly|). Returns (k, union_kth_hu, n_common_in_L)."""
    k = min(len(lx), len(ly))
    if k == 0:
        return 0, float("nan"), 0
    union_hk = np.union1d(lx.hk, ly.hk)
    union_hu = np.sort(fibonacci_unit(union_hk))
    kth = float(union_hu[k - 1])
    common = np.intersect1d(lx.hk, ly.hk)
    if len(common):
        common_hu = fibonacci_unit(common)
        k_cap = int(np.count_nonzero(common_hu <= kth))
    else:
        k_cap = 0
    return k, kth, k_cap


def union_estimate(lx: CorrelationSketch, ly: CorrelationSketch) -> float:
    """Estimated |K_X ∪ K_Y| via the combined synopsis L = Lx ⊕ Ly."""
    k, kth, _ = _combined(lx, ly)
    if k == 0:
        return float("nan")
    if len(lx) < lx.n_max and len(ly) < ly.n_max:
        return float(len(np.union1d(lx.hk, ly.hk)))  # both exhaustive → exact
    return dv_unbiased(k, kth)


def intersection_estimate(lx: CorrelationSketch, ly: CorrelationSketch) -> float:
    """Paper Eq. (1): ``D̂_∩ = (K_∩ / k) · (k − 1) / U(k)``."""
    k, kth, k_cap = _combined(lx, ly)
    if k < 2 or not (kth > 0):
        return float("nan")
    if len(lx) < lx.n_max and len(ly) < ly.n_max:
        return float(len(np.intersect1d(lx.hk, ly.hk)))  # exhaustive → exact
    return (k_cap / k) * ((k - 1) / kth)


def jaccard_containment_estimate(
    lq: CorrelationSketch, lc: CorrelationSketch
) -> float:
    """``ĵc`` baseline: estimated |K_Q ∩ K_C| / |K_Q| (containment of the
    query key set in the candidate, as used for joinability ranking)."""
    inter = intersection_estimate(lq, lc)
    dq = distinct_estimate(lq)
    if not np.isfinite(inter) or not (dq > 0):
        return float("nan")
    return float(min(1.0, inter / dq))


def join_size_estimate(lx: CorrelationSketch, ly: CorrelationSketch) -> float:
    """Estimated |K_X ∩ K_Y| = number of rows of the aggregated join
    ``T_{X⋈Y}`` (paper §3.3 lists this among the retained KMV abilities)."""
    return intersection_estimate(lx, ly)
