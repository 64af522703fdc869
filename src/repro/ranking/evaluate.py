"""End-to-end ranking evaluation (paper §5.4, Table 1).

Pipeline: per-pair sketch statistics (`sparkflow.join.estimate_all_pairs`)
+ exact ground truth (`sparkflow.truth.true_pair_stats`) →
per-query candidate frames → ranked lists per scoring function →
MAP(|r| > θ) and nDCG@k.

The paper's protocol: every column pair in the collection is a query; its
candidates are all other joinable column pairs; relevance is the absolute
*true* after-join correlation (binary-thresholded for MAP, graded for
nDCG). Queries with fewer than ``min_candidates`` candidates carry no
ranking signal and are skipped.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from .metrics import average_precision, ndcg_at_k
from .scoring import rank_candidates, rankers

#: columns a candidate frame must carry for every scorer to work.
FRAME_COLUMNS = [
    "candidate", "n", "est_pearson", "est_pm1", "pm1_lo", "pm1_hi",
    "ci_len", "jc_est", "jc", "r_true",
]


def build_query_frames(
    est: pd.DataFrame,
    truth: pd.DataFrame,
    *,
    min_candidates: int = 2,
) -> dict[str, pd.DataFrame]:
    """Assemble per-query candidate frames from the symmetric pair tables.

    ``est``: output of ``estimate_all_pairs`` (must include ``est_pearson``,
    ``ci_len``, ``jc_est``; PM1 columns optional — absent ones are filled
    with nan so ``rb*cib`` degrades to score 0 rather than crashing).
    ``truth``: output of ``true_pair_stats``. The candidate set is the
    ground-truth joinable set (the paper retrieves all joinable columns);
    sketch statistics are attached where available, else nan (the sketch
    failed to estimate that candidate — scored 0).
    """
    est = est.copy()
    for col in ("est_pm1", "pm1_lo", "pm1_hi"):
        if col not in est.columns:
            est[col] = np.nan
    merged = truth.merge(est, on=["px", "py"], how="left")
    frames: dict[str, list] = {}
    stat_cols = ["n", "est_pearson", "est_pm1", "pm1_lo", "pm1_hi", "ci_len", "jc_est"]
    for _, row in merged.iterrows():
        base = {c: row.get(c, np.nan) for c in stat_cols}
        base["n"] = int(base["n"]) if pd.notna(base["n"]) else 0
        frames.setdefault(row["px"], []).append(
            {**base, "candidate": row["py"], "jc": row["jc_x"], "r_true": row["r_true"]}
        )
        frames.setdefault(row["py"], []).append(
            {**base, "candidate": row["px"], "jc": row["jc_y"], "r_true": row["r_true"]}
        )
    out = {}
    for q, rows in frames.items():
        df = pd.DataFrame(rows)[FRAME_COLUMNS]
        df = df[np.isfinite(df["r_true"])]
        if len(df) >= min_candidates:
            out[q] = df.reset_index(drop=True)
    return out


@dataclass(frozen=True)
class RankingReport:
    """Table-1-shaped results: one row per (ranker, metric)."""

    table: pd.DataFrame  # index: ranker; columns: metric names
    n_queries: int

    def relative_to(self, baseline: str = "jc") -> pd.DataFrame:
        """The paper's '%' column: relative improvement over ``baseline``."""
        base = self.table.loc[baseline]
        return (self.table - base) / base * 100.0


def evaluate_rankings(
    frames: dict[str, pd.DataFrame],
    *,
    map_thresholds: tuple[float, ...] = (0.5, 0.75),
    ndcg_ks: tuple[int, ...] = (5, 10),
    seed: int = 0,
) -> RankingReport:
    """Compute MAP(|r|>θ) and nDCG@k for every scoring function."""
    scorer_map = rankers(seed)
    metrics = [f"map_{t:g}" for t in map_thresholds] + [f"ndcg_{k}" for k in ndcg_ks]
    acc: dict[str, dict[str, list]] = {
        name: {m: [] for m in metrics} for name in scorer_map
    }
    for _, frame in sorted(frames.items()):
        for name, scorer in scorer_map.items():
            ranked = rank_candidates(frame, scorer)
            gains = np.abs(ranked["r_true"].to_numpy())
            for t in map_thresholds:
                ap = average_precision(list(gains > t))
                if not np.isnan(ap):
                    acc[name][f"map_{t:g}"].append(ap)
            for k in ndcg_ks:
                nd = ndcg_at_k(list(gains), k)
                if not np.isnan(nd):
                    acc[name][f"ndcg_{k}"].append(nd)
    rows = {
        name: {m: (float(np.mean(v)) if v else float("nan")) for m, v in per.items()}
        for name, per in acc.items()
    }
    return RankingReport(table=pd.DataFrame(rows).T, n_queries=len(frames))
