"""Confidence bounds and risk penalisation factors (paper §4.2–§4.4).

Three error-risk statistics drive the scoring functions:

- :func:`fisher_se` — Fisher-z standard error ``1/sqrt(n − 3)``.
- :func:`hoeffding_ci` — the paper's new distribution-free confidence
  interval for Pearson's ρ: Hoeffding bounds on each of the five moment
  parameters ``µ_A, µ_B, v_A, v_B, v_{A,B}`` at level ``α/5``, combined by
  a union bound through Eqs. (6)–(7). Includes both the *true*
  probabilistic interval and the ``ρ_HFD`` variant whose denominator is
  replaced by the sample standard deviations (paper, "Effect of Small
  Sample Sizes") — the variant the scoring functions use.
- :func:`pm1_ci` — Wilcox's PM1 modified-percentile bootstrap interval
  with B = 599 resamples and sample-size-adjusted order statistics.

All functions are pure numpy/math so they run identically on the driver
and inside ``applyInPandas``.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from .estimators import pearson


def fisher_se(n: int) -> float:
    """Fisher-z standard error ``SE_z = 1/sqrt(n − 3)`` (paper §4.2).

    The scoring layer guards small n with ``max(4, n)``; this function
    returns the raw statistic and expects ``n >= 4``.
    """
    if n < 4:
        raise ValueError("fisher_se requires n >= 4")
    return 1.0 / math.sqrt(n - 3)


def se_z_factor(n: int) -> float:
    """Risk factor ``se_z = 1 − 1/sqrt(max(4, n) − 3)`` (paper §4.4)."""
    return 1.0 - 1.0 / math.sqrt(max(4, n) - 3)


@dataclass(frozen=True)
class HoeffdingCI:
    """Result of the Hoeffding-bound analysis for one sketch join.

    ``lo``/``hi`` are the true union-bound interval (Eqs. 6–7, clipped to
    [−1, 1]); ``hfd_lo``/``hfd_hi`` are the ``ρ_HFD`` small-sample variant.
    ``length`` is the ``ci_length = ρ_HFD^high − ρ_HFD^low`` statistic the
    ``ci_h`` scoring factor normalises per ranked list.
    """

    lo: float
    hi: float
    hfd_lo: float
    hfd_hi: float

    @property
    def length(self) -> float:
        return self.hfd_hi - self.hfd_lo


def hoeffding_ci(
    x: np.ndarray,
    y: np.ndarray,
    *,
    c_low: float,
    c_high: float,
    alpha: float = 0.05,
) -> HoeffdingCI:
    """Distribution-free CI for ρ from the sketch-join sample (paper §4.3).

    Parameters
    ----------
    x, y:
        The paired sample from the sketch join ``L_{X⋈Y}``.
    c_low, c_high:
        Global bounds over the *full* columns X and Y
        (``C_low = min{x∈X, y∈Y}``, ``C_high = max{...}``), pre-computed
        during sketch construction. ``C = c_high − c_low`` is the range
        driving the Hoeffding deviations.
    """
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    n = len(x)
    if n < 2 or not (c_high > c_low):
        return HoeffdingCI(-1.0, 1.0, -1.0, 1.0)
    c = c_high - c_low
    a = x - c_low
    b = y - c_low
    mu_a, mu_b = a.mean(), b.mean()
    v_a, v_b = (a * a).mean(), (b * b).mean()
    v_ab = (a * b).mean()
    # Hoeffding at level α/5 per parameter: 2·exp(−2nt²/C²) = α/5.
    t = math.sqrt(math.log(10.0 / alpha) * c**2 / (2.0 * n))
    t2 = math.sqrt(math.log(10.0 / alpha) * c**4 / (2.0 * n))
    mu_a_lo, mu_a_hi = mu_a - t, mu_a + t
    mu_b_lo, mu_b_hi = mu_b - t, mu_b + t
    v_a_lo, v_a_hi = v_a - t2, v_a + t2
    v_b_lo, v_b_hi = v_b - t2, v_b + t2
    v_ab_lo, v_ab_hi = v_ab - t2, v_ab + t2

    num_lo = v_ab_lo - mu_a_hi * mu_b_hi
    num_hi = v_ab_hi - mu_a_lo * mu_b_lo
    den_lo = math.sqrt(
        max(0.0, v_a_lo - mu_a_hi**2) * max(0.0, v_b_lo - mu_b_hi**2)
    )
    den_hi = math.sqrt(
        max(0.0, v_a_hi - mu_a_lo**2) * max(0.0, v_b_hi - mu_b_lo**2)
    )

    lo = _safe_div(num_lo, den_hi if num_lo >= 0 else den_lo, default=-1.0)
    hi = _safe_div(num_hi, den_lo if num_hi >= 0 else den_hi, default=1.0)

    # ρ_HFD variant: replace both denominators by the product of sample
    # standard deviations of the sketch-join sample. These are *not*
    # probabilistic bounds (paper, "Effect of Small Sample Sizes") so they
    # are deliberately NOT clipped to [−1, 1]: their length must keep its
    # ~C²/√n scaling to discriminate risk between candidates; clipping
    # would collapse every small-sample candidate to length 2.
    den_s = math.sqrt(max(0.0, v_a - mu_a**2)) * math.sqrt(max(0.0, v_b - mu_b**2))
    hfd_lo = _safe_div(num_lo, den_s, default=-1.0)
    hfd_hi = _safe_div(num_hi, den_s, default=1.0)

    return HoeffdingCI(
        lo=max(-1.0, min(1.0, lo)),
        hi=max(-1.0, min(1.0, hi)),
        hfd_lo=hfd_lo,
        hfd_hi=hfd_hi,
    )


def _safe_div(num: float, den: float, *, default: float) -> float:
    """num/den with zero/invalid denominators mapped to the widest bound."""
    if den <= 0 or not math.isfinite(den):
        return default
    v = num / den
    return v if math.isfinite(v) else default


# -- PM1 bootstrap confidence interval (Wilcox 1996) ----------------------

_B_PM1 = 599
# Wilcox's sample-size-adjusted order statistics (1-indexed low rank a and
# the count c such that the CI is [r_(a+1), r_(c)] among 599 sorted
# resample correlations).
_PM1_RANKS = ((40, 6, 593), (80, 7, 592), (180, 10, 589), (250, 13, 586))


def pm1_ranks(n: int) -> tuple[int, int]:
    """Wilcox's (low, high) 1-indexed order statistics for B = 599."""
    for bound, lo, hi in _PM1_RANKS:
        if n < bound:
            return lo, hi
    return 15, 584


def pm1_ci(
    x: np.ndarray, y: np.ndarray, *, seed: int = 0
) -> tuple[float, float, float]:
    """PM1 modified-percentile bootstrap: returns ``(r_b, lo, hi)``.

    ``r_b`` is the mean of the resample correlations (the PM1 point
    estimate used by scoring function ``s3``); ``(lo, hi)`` is Wilcox's
    adjusted percentile interval over B = 599 resamples.
    """
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    n = len(x)
    if n < 2:
        return float("nan"), -1.0, 1.0
    rng = np.random.default_rng(seed)
    idx = rng.integers(0, n, size=(_B_PM1, n))
    rs = np.array([pearson(x[row], y[row]) for row in idx])
    rs = rs[np.isfinite(rs)]
    if len(rs) == 0:
        return float("nan"), -1.0, 1.0
    rs.sort()
    lo_rank, hi_rank = pm1_ranks(n)
    # Scale ranks if invalid resamples were dropped (constant resamples).
    scale = len(rs) / _B_PM1
    lo_i = max(0, min(len(rs) - 1, int(round(lo_rank * scale))))
    hi_i = max(0, min(len(rs) - 1, int(round(hi_rank * scale)) - 1))
    return float(rs.mean()), float(rs[lo_i]), float(rs[hi_i])
