"""Scoring functions for ranking correlated-column candidates (paper §4.4).

Each scorer maps a candidate-statistics DataFrame (one row per retrieved
candidate for a single query, as produced by the sparkflow estimation
flows) to a score array; higher is better. The paper's framework is
``score = |r̂| · (1 − risk)`` (Eq. 5) with risk factors:

- ``s1 = r_p``            — Pearson estimate, no penalisation;
- ``s2 = r_p · se_z``     — Fisher-z factor ``1 − 1/sqrt(max(4,n) − 3)``;
- ``s3 = r_b · ci_b``     — PM1 bootstrap estimate with bootstrap-CI factor
                            ``1 − (ρ^hi_PM1 − ρ^lo_PM1)/2``;
- ``s4 = r_p · ci_h``     — Hoeffding factor: the ρ_HFD interval length
                            min-max normalised **within the ranked list**
                            (``ci_max``/``ci_min`` are per-query, §4.4).

Baselines: exact Jaccard containment ``jc`` (requires ground truth),
sketch-estimated ``ĵc``, and ``random``.

Missing statistics (overlap below the minimum) score 0 — a candidate the
sketch cannot estimate is ranked last, which is what a search engine
would do.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _abs_est(df: pd.DataFrame, col: str) -> np.ndarray:
    return np.abs(df[col].to_numpy(dtype=np.float64))


def _finite_or_zero(v: np.ndarray) -> np.ndarray:
    out = v.copy()
    out[~np.isfinite(out)] = 0.0
    return out


def score_rp(df: pd.DataFrame) -> np.ndarray:
    """s1: |Pearson estimate|."""
    return _finite_or_zero(_abs_est(df, "est_pearson"))


def sez_factor(n: np.ndarray) -> np.ndarray:
    return 1.0 - 1.0 / np.sqrt(np.maximum(4, n) - 3)


def score_rp_sez(df: pd.DataFrame) -> np.ndarray:
    """s2: |r_p| · se_z."""
    return _finite_or_zero(
        _abs_est(df, "est_pearson") * sez_factor(df["n"].to_numpy(dtype=np.float64))
    )


def score_rb_cib(df: pd.DataFrame) -> np.ndarray:
    """s3: |r_b(PM1)| · (1 − (pm1_hi − pm1_lo)/2)."""
    cib = 1.0 - (df["pm1_hi"].to_numpy() - df["pm1_lo"].to_numpy()) / 2.0
    return _finite_or_zero(_abs_est(df, "est_pm1") * cib)


def ci_h_factor(ci_len: np.ndarray) -> np.ndarray:
    """Per-ranked-list min-max normalisation of the ρ_HFD interval length
    (paper §4.4): 1 for the tightest interval in the list, 0 for the
    widest. Lists where every candidate has the same length get factor 1
    (no information to discriminate ⇒ no penalty)."""
    finite = np.isfinite(ci_len)
    out = np.ones_like(ci_len, dtype=np.float64)
    if finite.sum() >= 2:
        lo, hi = ci_len[finite].min(), ci_len[finite].max()
        if hi > lo:
            out[finite] = 1.0 - (ci_len[finite] - lo) / (hi - lo)
    out[~finite] = 0.0
    return out


def score_rp_cih(df: pd.DataFrame) -> np.ndarray:
    """s4: |r_p| · ci_h (Hoeffding-based; the paper's headline scorer)."""
    return _finite_or_zero(
        _abs_est(df, "est_pearson") * ci_h_factor(df["ci_len"].to_numpy(dtype=np.float64))
    )


def score_jc_exact(df: pd.DataFrame) -> np.ndarray:
    """Baseline jc: exact Jaccard containment (needs the ``jc`` ground
    truth column — the strongest joinability-only baseline)."""
    return _finite_or_zero(df["jc"].to_numpy(dtype=np.float64))


def score_jc_est(df: pd.DataFrame) -> np.ndarray:
    """Baseline ĵc: sketch-estimated Jaccard containment."""
    return _finite_or_zero(df["jc_est"].to_numpy(dtype=np.float64))


def make_score_random(seed: int):
    """Baseline random: uniform scores, deterministic in ``seed``."""

    def score_random(df: pd.DataFrame) -> np.ndarray:
        rng = np.random.default_rng(seed + len(df))
        return rng.uniform(0.0, 1.0, size=len(df))

    return score_random


#: Ranker registry in the paper's Table 1 naming.
def rankers(seed: int = 0) -> dict:
    return {
        "rp*cih": score_rp_cih,
        "rb*cib": score_rb_cib,
        "rp": score_rp,
        "rp*sez": score_rp_sez,
        "jc": score_jc_exact,
        "jc_est": score_jc_est,
        "random": make_score_random(seed),
    }


def rank_candidates(df: pd.DataFrame, scorer) -> pd.DataFrame:
    """Sort one query's candidate frame by the scorer, descending, with a
    deterministic tiebreak on candidate id."""
    scores = scorer(df)
    out = df.assign(score=scores)
    return out.sort_values(
        ["score", "candidate"], ascending=[False, True], kind="mergesort"
    ).reset_index(drop=True)
