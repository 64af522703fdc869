"""Scoring functions (paper §4.4), ranking metrics, and the Table 1
evaluation harness."""
from .evaluate import RankingReport, build_query_frames, evaluate_rankings
from .metrics import (
    average_precision,
    dcg_at_k,
    mean_average_precision,
    mean_ndcg_at_k,
    ndcg_at_k,
)
from .scoring import (
    ci_h_factor,
    rank_candidates,
    rankers,
    score_jc_est,
    score_jc_exact,
    score_rb_cib,
    score_rp,
    score_rp_cih,
    score_rp_sez,
    sez_factor,
)

__all__ = [
    "RankingReport",
    "average_precision",
    "build_query_frames",
    "ci_h_factor",
    "dcg_at_k",
    "evaluate_rankings",
    "mean_average_precision",
    "mean_ndcg_at_k",
    "ndcg_at_k",
    "rank_candidates",
    "rankers",
    "score_jc_est",
    "score_jc_exact",
    "score_rb_cib",
    "score_rp",
    "score_rp_cih",
    "score_rp_sez",
    "sez_factor",
]
