"""Sample correlation estimators (paper §2.2, §5.3).

All estimators take two aligned 1-D numpy arrays (the paired sample
reconstructed by the sketch join) and return a float in ``[-1, 1]`` or
``nan`` when undefined (fewer than 2 points, or zero variance).

Implemented estimators, mirroring paper §5.3:

1. ``pearson`` — Pearson's sample correlation (Eq. 3).
2. ``spearman`` — Pearson over average-tie ranks.
3. ``rin`` — Rank-based Inverse Normal: Pearson over the *rankit*
   transform ``Φ⁻¹((r(x) − 1/2) / n)``. ``Φ⁻¹`` is Acklam's rational
   approximation (no scipy in this environment; |rel err| < 1.15e-9).
4. ``qn`` — robust correlation from the Rousseeuw–Croux ``Q_n`` scale
   estimator via the Gnanadesikan–Kettenring identity
   ``r = (Q_n(u)² − Q_n(v)²)/(Q_n(u)² + Q_n(v)²)`` with
   ``u = x/Q_n(x) + y/Q_n(y)``, ``v = x/Q_n(x) − y/Q_n(y)`` (the
   consistency constants cancel in the ratio).
5. ``pm1_bootstrap`` — mean of Pearson correlations over bootstrap
   resamples, with the paper's adaptive stop: resampling halts once the
   probability of moving the running mean by more than 0.01 drops below
   0.05% (normal approximation), or at a hard cap.

Everything is pure numpy so the same code runs on the Spark driver and
inside ``applyInPandas`` workers.
"""
from __future__ import annotations

import numpy as np

MIN_SAMPLE = 2  # below this, correlation is undefined


def pearson(x: np.ndarray, y: np.ndarray) -> float:
    """Pearson's sample correlation r (paper Eq. 3); nan if undefined."""
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    n = len(x)
    if n < MIN_SAMPLE:
        return float("nan")
    xc = x - x.mean()
    yc = y - y.mean()
    denom = np.sqrt((xc * xc).sum() * (yc * yc).sum())
    if denom == 0.0 or not np.isfinite(denom):
        return float("nan")
    # Clip: accumulated fp error can push |r| epsilon past 1.
    return float(np.clip((xc * yc).sum() / denom, -1.0, 1.0))


def rankdata(x: np.ndarray) -> np.ndarray:
    """Average-tie ranks in 1..n (Spearman's convention)."""
    x = np.asarray(x)
    order = np.argsort(x, kind="stable")
    ranks = np.empty(len(x), dtype=np.float64)
    ranks[order] = np.arange(1, len(x) + 1, dtype=np.float64)
    # Average ranks within tie groups.
    sx = x[order]
    i = 0
    while i < len(sx):
        j = i
        while j + 1 < len(sx) and sx[j + 1] == sx[i]:
            j += 1
        if j > i:
            ranks[order[i : j + 1]] = (i + j) / 2.0 + 1.0
        i = j + 1
    return ranks


def spearman(x: np.ndarray, y: np.ndarray) -> float:
    """Spearman's rank correlation: Pearson over average-tie ranks."""
    if len(x) < MIN_SAMPLE:
        return float("nan")
    return pearson(rankdata(x), rankdata(y))


# -- Acklam's inverse normal CDF ------------------------------------------
_A = (-3.969683028665376e01, 2.209460984245205e02, -2.759285104469687e02,
      1.383577518672690e02, -3.066479806614716e01, 2.506628277459239e00)
_B = (-5.447609879822406e01, 1.615858368580409e02, -1.556989798598866e02,
      6.680131188771972e01, -1.328068155288572e01)
_C = (-7.784894002430293e-03, -3.223964580411365e-01, -2.400758277161838e00,
      -2.549732539343734e00, 4.374664141464968e00, 2.938163982698783e00)
_D = (7.784695709041462e-03, 3.224671290700398e-01, 2.445134137142996e00,
      3.754408661907416e00)
_P_LOW = 0.02425


def norm_ppf(p: np.ndarray) -> np.ndarray:
    """Φ⁻¹(p) via Peter Acklam's rational approximation (vectorised)."""
    p = np.asarray(p, dtype=np.float64)
    out = np.full(p.shape, np.nan)
    lo = (0 < p) & (p < _P_LOW)
    hi = (1 - _P_LOW < p) & (p < 1)
    mid = (_P_LOW <= p) & (p <= 1 - _P_LOW)
    if mid.any():
        q = p[mid] - 0.5
        r = q * q
        num = ((((_A[0] * r + _A[1]) * r + _A[2]) * r + _A[3]) * r + _A[4]) * r + _A[5]
        den = ((((_B[0] * r + _B[1]) * r + _B[2]) * r + _B[3]) * r + _B[4]) * r + 1.0
        out[mid] = q * num / den
    if lo.any():
        q = np.sqrt(-2.0 * np.log(p[lo]))
        num = ((((_C[0] * q + _C[1]) * q + _C[2]) * q + _C[3]) * q + _C[4]) * q + _C[5]
        den = (((_D[0] * q + _D[1]) * q + _D[2]) * q + _D[3]) * q + 1.0
        out[lo] = num / den
    if hi.any():
        q = np.sqrt(-2.0 * np.log(1.0 - p[hi]))
        num = ((((_C[0] * q + _C[1]) * q + _C[2]) * q + _C[3]) * q + _C[4]) * q + _C[5]
        den = (((_D[0] * q + _D[1]) * q + _D[2]) * q + _D[3]) * q + 1.0
        out[hi] = -num / den
    return out


def rankit(x: np.ndarray) -> np.ndarray:
    """Rankit transform h(x) = Φ⁻¹((r(x) − 1/2)/n) (paper §5.3, [14])."""
    n = len(x)
    return norm_ppf((rankdata(x) - 0.5) / n)


def rin(x: np.ndarray, y: np.ndarray) -> float:
    """Rank-based Inverse Normal correlation: Pearson over rankits."""
    if len(x) < MIN_SAMPLE:
        return float("nan")
    return pearson(rankit(x), rankit(y))


def qn_scale(x: np.ndarray) -> float:
    """Unnormalised Rousseeuw–Croux Q_n: the k-th order statistic of the
    pairwise distances ``|x_i − x_j|, i<j`` with ``k = C(h,2)``,
    ``h = ⌊n/2⌋ + 1``. Consistency constants are omitted because the
    correlation ratio cancels them. O(n²) — fine at sketch sizes.
    """
    x = np.asarray(x, dtype=np.float64)
    n = len(x)
    if n < 2:
        return float("nan")
    iu = np.triu_indices(n, k=1)
    diffs = np.abs(x[iu[0]] - x[iu[1]])
    h = n // 2 + 1
    k = h * (h - 1) // 2
    return float(np.partition(diffs, k - 1)[k - 1])


def qn(x: np.ndarray, y: np.ndarray) -> float:
    """Robust Q_n correlation (paper §5.3 item 4; Shevlyakov–Oja)."""
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    if len(x) < MIN_SAMPLE:
        return float("nan")
    sx, sy = qn_scale(x), qn_scale(y)
    if not (sx > 0) or not (sy > 0):
        return float("nan")
    u = x / sx + y / sy
    v = x / sx - y / sy
    qu, qv = qn_scale(u) ** 2, qn_scale(v) ** 2
    if qu + qv == 0:
        return float("nan")
    return float(np.clip((qu - qv) / (qu + qv), -1.0, 1.0))


def pm1_bootstrap(
    x: np.ndarray,
    y: np.ndarray,
    *,
    seed: int = 0,
    batch: int = 100,
    max_resamples: int = 5000,
    move_tol: float = 0.01,
    stop_prob: float = 5e-4,
) -> float:
    """Bootstrap Pearson estimate with the paper's adaptive stopping rule.

    Draws resamples in batches; after each batch, estimates the
    probability that one more resample moves the running mean by more
    than ``move_tol`` (normal approximation on the resample spread) and
    stops when it falls below ``stop_prob`` (paper: 0.01 / 0.05%).
    """
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    n = len(x)
    if n < MIN_SAMPLE:
        return float("nan")
    rng = np.random.default_rng(seed)
    rs: list[float] = []
    while len(rs) < max_resamples:
        idx = rng.integers(0, n, size=(batch, n))
        for row in idx:
            r = pearson(x[row], y[row])
            if np.isfinite(r):
                rs.append(r)
        b = len(rs)
        if b >= 2 * batch:
            sd = float(np.std(rs))
            if sd == 0.0:
                break
            # One extra resample r* moves the mean by (r* − mean)/(b+1);
            # P(|move| > tol) ≈ 2(1 − Φ(tol·(b+1)/sd)).
            z = move_tol * (b + 1) / sd
            if 2.0 * _norm_sf(z) < stop_prob:
                break
    if not rs:
        return float("nan")
    return float(np.mean(rs))


def _norm_sf(z: float) -> float:
    """Standard normal survival function via erfc."""
    import math

    return 0.5 * math.erfc(z / math.sqrt(2.0))


ESTIMATORS = {
    "pearson": pearson,
    "spearman": spearman,
    "rin": rin,
    "qn": qn,
    "pm1": pm1_bootstrap,
}
