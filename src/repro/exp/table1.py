"""Table 1 harness (paper §5.4): ranking quality of the scoring functions
on an NYC-like collection.

Protocol (mirrors the paper): every ⟨K, X⟩ column pair in the collection
is a query; candidates are all ground-truth-joinable pairs; rankers are
the four §4.4 scoring functions plus the jc / ĵc / random baselines;
metrics are MAP(|r|>.75), MAP(|r|>.50), nDCG@5, nDCG@10, each with the
'%' relative improvement over the exact-jc baseline.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from repro.datagen.collection import collection_to_long_df
from repro.datagen.opendata import make_nyc_like
from repro.ranking.evaluate import RankingReport, build_query_frames, evaluate_rankings
from repro.sparkflow.build import build_sketches, column_stats
from repro.sparkflow.join import estimate_all_pairs
from repro.sparkflow.truth import true_pair_stats

#: ranker display order of the paper's Table 1.
RANKER_ORDER = ["rp*cih", "rb*cib", "rp", "rp*sez", "jc", "jc_est", "random"]

#: Paper's Table 1 values (NYC collection), for EXPERIMENTS.md diffing.
PAPER_TABLE1 = pd.DataFrame(
    {
        "map_0.75": {"rp*cih": 0.529, "rb*cib": 0.516, "rp": 0.507,
                     "rp*sez": 0.420, "jc": 0.180, "jc_est": 0.172, "random": 0.161},
        "map_0.5": {"rp*sez": 0.472, "rp*cih": 0.467, "rp": 0.452,
                    "rb*cib": 0.428, "jc_est": 0.239, "jc": 0.234, "random": 0.202},
        "ndcg_5": {"rb*cib": 0.714, "rp*cih": 0.705, "rp": 0.699,
                   "rp*sez": 0.689, "random": 0.481, "jc_est": 0.480, "jc": 0.471},
        "ndcg_10": {"rb*cib": 0.845, "rp": 0.843, "rp*cih": 0.841,
                    "rp*sez": 0.832, "jc_est": 0.726, "random": 0.724, "jc": 0.717},
    }
)


@dataclass(frozen=True)
class Table1Config:
    n_tables: int = 80
    rows_scale: float = 1.0
    sketch_size: int = 256
    seed: int = 0
    with_pm1: bool = True
    min_overlap: int = 3
    min_candidates: int = 2


def run_table1(spark: SparkSession, cfg: Table1Config = Table1Config()) -> RankingReport:
    """Run the full Table 1 pipeline and return the report."""
    coll = make_nyc_like(
        n_tables=cfg.n_tables, rows_scale=cfg.rows_scale, seed=cfg.seed
    )
    long_df = collection_to_long_df(spark, coll)
    sketches = build_sketches(long_df, n_max=cfg.sketch_size).cache()
    stats = column_stats(long_df)
    est = estimate_all_pairs(
        sketches, stats,
        n_max=cfg.sketch_size,
        estimators=("pearson",),
        with_pm1=cfg.with_pm1,
        min_overlap=cfg.min_overlap,
    ).toPandas()
    truth = true_pair_stats(long_df, min_overlap=cfg.min_overlap).toPandas()
    sketches.unpersist()
    frames = build_query_frames(est, truth, min_candidates=cfg.min_candidates)
    return evaluate_rankings(
        frames, map_thresholds=(0.5, 0.75), ndcg_ks=(5, 10), seed=cfg.seed
    )


def format_table1(report: RankingReport) -> str:
    """Paper-style rendering: per metric, rankers sorted by score with the
    '%' improvement over jc."""
    lines = [f"Table 1 reproduction — {report.n_queries} queries"]
    rel = report.relative_to("jc")
    for metric, title in [
        ("map_0.75", "MAP (r > .75)"), ("map_0.5", "MAP (r > .50)"),
        ("ndcg_5", "nDCG@5"), ("ndcg_10", "nDCG@10"),
    ]:
        lines.append(f"\n  ({title})")
        lines.append(f"  {'ranker':<10} {'score':>7} {'%':>8} {'paper':>7}")
        ordered = report.table[metric].sort_values(ascending=False)
        for name, score in ordered.items():
            paper = PAPER_TABLE1[metric].get(name, float("nan"))
            lines.append(
                f"  {name:<10} {score:>7.3f} {rel.loc[name, metric]:>+7.1f}% {paper:>7.3f}"
            )
    return "\n".join(lines)
