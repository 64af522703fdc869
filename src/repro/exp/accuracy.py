"""Correlation-estimation accuracy study (paper §5.2 / §5.3).

Figures 3 and 4 are out of scope as *figures*, but the numbers behind
them validate the central claim — sketch estimates converge to the true
correlations as the sketch-join size grows — so this harness reproduces
them as tables: per dataset (SBN / NYC-like / WBF-like), per estimator,
per maximum sketch size, the RMSE of sketch estimate vs. population
coefficient, bucketed by sketch intersection size (Fig. 4's x-axis).

Each estimator is compared against its *own* population coefficient,
except PM1 which targets population Pearson (paper §5.3).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datagen.collection import (
    collection_to_long_df,
    sbn_candidate_pairs,
    sbn_to_long_df,
)
from repro.datagen.opendata import make_nyc_like, make_wbf_like
from repro.datagen.sbn import make_sbn_collection
from repro.sparkflow.build import build_sketches, column_stats
from repro.sparkflow.join import estimate_all_pairs
from repro.sparkflow.truth import true_pair_estimators

#: Fig. 4 style intersection-size buckets.
BUCKETS = [(3, 10), (10, 20), (20, 50), (50, 100), (100, 256), (256, 1025)]


@dataclass(frozen=True)
class AccuracyConfig:
    dataset: str = "sbn"  # sbn | nyc | wbf
    sketch_sizes: tuple[int, ...] = (64, 256)
    estimators: tuple[str, ...] = ("pearson", "spearman", "rin")
    with_pm1: bool = False
    with_qn: bool = False
    # scale knobs
    sbn_t: int = 60
    sbn_n_max: int = 4000
    n_tables: int = 40
    rows_scale: float = 0.5
    seed: int = 0


def _dataset_long(spark: SparkSession, cfg: AccuracyConfig):
    if cfg.dataset == "sbn":
        pairs = make_sbn_collection(
            t=cfg.sbn_t, n_max=cfg.sbn_n_max, n_min=60, seed=cfg.seed
        )
        cand = spark.createDataFrame(
            pd.DataFrame(sbn_candidate_pairs(pairs), columns=["px", "py"])
        )
        return sbn_to_long_df(spark, pairs), cand
    if cfg.dataset == "nyc":
        coll = make_nyc_like(
            n_tables=cfg.n_tables, rows_scale=cfg.rows_scale, seed=cfg.seed
        )
    elif cfg.dataset == "wbf":
        coll = make_wbf_like(
            n_tables=cfg.n_tables, rows_scale=cfg.rows_scale, seed=cfg.seed
        )
    else:
        raise ValueError(f"unknown dataset {cfg.dataset!r}")
    return collection_to_long_df(spark, coll), None


def run_accuracy(spark: SparkSession, cfg: AccuracyConfig = AccuracyConfig()) -> pd.DataFrame:
    """Returns a long table: dataset, sketch_size, estimator, bucket,
    count, rmse — the Fig. 4-as-table numbers."""
    long_df, cand = _dataset_long(spark, cfg)
    long_df = long_df.cache()
    # PM1 is driven solely by ``with_pm1`` (it is bootstrap-of-Pearson and
    # is handled by its dedicated estimate_all_pairs switch).
    estimators = [e for e in cfg.estimators if e != "pm1"]
    if cfg.with_qn and "qn" not in estimators:
        estimators.append("qn")
    truth = true_pair_estimators(
        long_df, estimators=estimators, candidates=cand
    ).toPandas()
    stats = column_stats(long_df)
    records = []
    for size in cfg.sketch_sizes:
        sketches = build_sketches(long_df, n_max=size)
        est = estimate_all_pairs(
            sketches, stats,
            n_max=size,
            estimators=estimators,
            with_pm1=cfg.with_pm1,
            candidates=cand,
        ).toPandas()
        merged = est.merge(truth, on=["px", "py"])
        for e in estimators + (["pm1"] if cfg.with_pm1 else []):
            if e == "pm1":
                err = merged["est_pm1"] - merged["true_pearson"]
            else:
                err = merged[f"est_{e}"] - merged[f"true_{e}"]
            for lo, hi in BUCKETS:
                if lo >= size + 1:
                    continue
                mask = (merged["n"] >= lo) & (merged["n"] < hi) & np.isfinite(err)
                cnt = int(mask.sum())
                records.append(
                    {
                        "dataset": cfg.dataset,
                        "sketch_size": size,
                        "estimator": e,
                        "bucket": f"[{lo},{hi})",
                        "count": cnt,
                        "rmse": float(np.sqrt((err[mask] ** 2).mean())) if cnt else np.nan,
                    }
                )
            mask = (merged["n"] >= 3) & np.isfinite(err)
            records.append(
                {
                    "dataset": cfg.dataset,
                    "sketch_size": size,
                    "estimator": e,
                    "bucket": "all",
                    "count": int(mask.sum()),
                    "rmse": float(np.sqrt((err[mask] ** 2).mean())) if mask.any() else np.nan,
                }
            )
    long_df.unpersist()
    return pd.DataFrame(records)


def format_accuracy(table: pd.DataFrame) -> str:
    """Pivot to a Fig.4-style grid: rows = (sketch_size, estimator),
    columns = intersection buckets, cells = RMSE."""
    lines = [f"Accuracy (RMSE vs population coefficient) — dataset={table['dataset'].iloc[0]}"]
    pivot = table.pivot_table(
        index=["sketch_size", "estimator"], columns="bucket", values="rmse"
    )
    cols = [f"[{lo},{hi})" for lo, hi in BUCKETS if f"[{lo},{hi})" in pivot.columns]
    cols += ["all"]
    lines.append("  " + f"{'size':>5} {'estimator':<10}" + "".join(f"{c:>11}" for c in cols))
    for (size, est), row in pivot.iterrows():
        cells = "".join(
            f"{row.get(c, float('nan')):>11.3f}" for c in cols
        )
        lines.append(f"  {size:>5} {est:<10}{cells}")
    return "\n".join(lines)
