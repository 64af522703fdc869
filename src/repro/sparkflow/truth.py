"""Ground-truth computation: the exact full-join correlations that the
paper's evaluation compares sketch estimates against (§5.2, §5.4).

``T_{X⋈Y}`` is materialised the way the paper defines it (Fig. 1): each
column pair is aggregated per key (mean by default), the two aggregated
relations are inner-joined on the raw key, and the population statistics
are computed over the joined rows. Pearson and the exact Jaccard
containment come from native Spark aggregates; the rank-based population
coefficients (Spearman/RIN/Q_n, needed by the §5.3 accuracy study) need a
full sort per pair and run in ``applyInPandas``.
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.estimators import ESTIMATORS

TRUTH_ESTIMATORS = ("pearson", "spearman", "rin")


def aggregate_by_key(long_df: DataFrame, *, agg: str = "mean") -> DataFrame:
    """``(pair_id, key, v)`` — numeric values aggregated per key, i.e. the
    relation the paper joins (repeated keys collapsed, Fig. 1)."""
    spark_aggs = {"mean": F.avg, "sum": F.sum, "min": F.min, "max": F.max,
                  "count": F.count}
    if agg not in spark_aggs:
        raise ValueError(f"unsupported aggregate {agg!r}")
    return long_df.groupBy("pair_id", "key").agg(
        spark_aggs[agg]("x").cast("double").alias("v")
    )


def joined_pairs(
    agg_df: DataFrame, *, candidates: DataFrame | None = None
) -> DataFrame:
    """Row-level join table: ``(px, py, key, vx, vy)`` for px < py."""
    a = agg_df.select(F.col("pair_id").alias("px"), "key", F.col("v").alias("vx"))
    b = agg_df.select(F.col("pair_id").alias("py"), "key", F.col("v").alias("vy"))
    j = a.join(b, "key").where(F.col("px") < F.col("py"))
    if candidates is not None:
        j = j.join(candidates.select("px", "py"), ["px", "py"])
    return j


def true_pair_stats(
    long_df: DataFrame,
    *,
    agg: str = "mean",
    min_overlap: int = 3,
    candidates: DataFrame | None = None,
) -> DataFrame:
    """Exact per-pair ground truth via native Spark aggregates:
    ``(px, py, n_join, r_true, jc_x, jc_y)`` where ``r_true`` is the
    population Pearson correlation of the joined columns and ``jc_x`` /
    ``jc_y`` the exact Jaccard containments ``|K_X ∩ K_Y| / |K_X|`` and
    ``|K_X ∩ K_Y| / |K_Y|`` (containment is directional: the evaluation
    uses the query side's containment)."""
    agg_df = aggregate_by_key(long_df, agg=agg)
    distincts = agg_df.groupBy("pair_id").agg(F.count("*").alias("d"))
    pairs = (
        joined_pairs(agg_df, candidates=candidates)
        .groupBy("px", "py")
        .agg(
            F.count("*").alias("n_join"),
            F.corr("vx", "vy").alias("r_true"),
        )
        .where(F.col("n_join") >= min_overlap)
    )
    dx = distincts.select(F.col("pair_id").alias("px"), F.col("d").alias("dx"))
    dy = distincts.select(F.col("pair_id").alias("py"), F.col("d").alias("dy"))
    return (
        pairs.join(dx, "px")
        .join(dy, "py")
        .withColumn("jc_x", F.col("n_join") / F.col("dx"))
        .withColumn("jc_y", F.col("n_join") / F.col("dy"))
        .drop("dx", "dy")
    )


def true_pair_estimators(
    long_df: DataFrame,
    *,
    agg: str = "mean",
    estimators: Sequence[str] = TRUTH_ESTIMATORS,
    min_overlap: int = 3,
    candidates: DataFrame | None = None,
    qn_max_n: int = 4000,
) -> DataFrame:
    """Population values of every requested estimator over the full join
    (needed by the §5.3 accuracy study, where each sketch estimate is
    compared to *its own* population coefficient — Spearman's estimate to
    population Spearman, etc.).

    ``qn`` is O(n²) in the join size; population values for joins larger
    than ``qn_max_n`` are returned as nan rather than allocating O(n²)
    pairwise-distance buffers (the accuracy study drops those pairs for
    the Q_n line only).
    """
    schema = T.StructType(
        [
            T.StructField("px", T.StringType(), False),
            T.StructField("py", T.StringType(), False),
            T.StructField("n_join", T.LongType(), False),
        ]
        + [T.StructField(f"true_{e}", T.DoubleType(), True) for e in estimators]
    )

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        out = {
            "px": pdf["px"].iloc[0],
            "py": pdf["py"].iloc[0],
            "n_join": len(pdf),
        }
        xv = pdf["vx"].to_numpy()
        yv = pdf["vy"].to_numpy()
        for e in estimators:
            if len(pdf) < min_overlap or (e == "qn" and len(pdf) > qn_max_n):
                out[f"true_{e}"] = float("nan")
            else:
                out[f"true_{e}"] = ESTIMATORS[e](xv, yv)
        return pd.DataFrame([out])

    agg_df = aggregate_by_key(long_df, agg=agg)
    return (
        joined_pairs(agg_df, candidates=candidates)
        .groupBy("px", "py")
        .applyInPandas(fn, schema)
        .where(F.col("n_join") >= min_overlap)
    )
