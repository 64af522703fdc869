"""Sketch-join estimation dataflows (paper §3.2, §4).

Two flows:

- :func:`estimate_all_pairs` — offline evaluation over a whole collection:
  find candidate pairs by sketch-key overlap, regroup the *full* sketches
  of both sides per candidate pair, and compute every per-pair statistic
  (correlation estimates, Hoeffding/ρ_HFD bounds, Fisher-z n, KMV
  intersection and ĵc) inside ``applyInPandas`` by reusing the exact same
  numpy core (`repro.core`) that the local reference implementation uses.

- :func:`query_estimates` — the online path: one small query sketch is
  **broadcast** (explicit ``F.broadcast`` hint — the session fixture
  disables automatic broadcast so the all-pairs flows exercise shuffles,
  and the paper's query shape is exactly small-probe × large-index) and
  joined against the sketch index on ``hk``.
"""
from __future__ import annotations

import math
from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.bounds import hoeffding_ci, pm1_ci
from repro.core.estimators import ESTIMATORS
from repro.core.hashing import murmur3_32
from repro.core.kmv import (
    distinct_estimate,
    intersection_estimate,
    jaccard_containment_estimate,
)
from repro.core.sketch import CorrelationSketch, join_sketches

DEFAULT_ESTIMATORS = ("pearson", "spearman", "rin")


def _result_schema(estimators: Sequence[str], with_pm1: bool) -> T.StructType:
    fields = [
        T.StructField("px", T.StringType(), False),
        T.StructField("py", T.StringType(), False),
        T.StructField("n", T.LongType(), False),
    ]
    for e in estimators:
        fields.append(T.StructField(f"est_{e}", T.DoubleType(), True))
    fields += [
        T.StructField("hfd_lo", T.DoubleType(), True),
        T.StructField("hfd_hi", T.DoubleType(), True),
        T.StructField("ci_len", T.DoubleType(), True),
        T.StructField("hoeff_lo", T.DoubleType(), True),
        T.StructField("hoeff_hi", T.DoubleType(), True),
        T.StructField("inter_est", T.DoubleType(), True),
        T.StructField("jc_est", T.DoubleType(), True),
    ]
    if with_pm1:
        fields += [
            T.StructField("est_pm1", T.DoubleType(), True),
            T.StructField("pm1_lo", T.DoubleType(), True),
            T.StructField("pm1_hi", T.DoubleType(), True),
        ]
    return T.StructType(fields)


def _side_sketch(rows: pd.DataFrame, n_max: int) -> CorrelationSketch:
    order = np.argsort(rows["hu"].to_numpy(), kind="stable")
    return CorrelationSketch(
        hk=rows["hk"].to_numpy()[order].astype(np.uint32),
        hu=rows["hu"].to_numpy()[order],
        xk=rows["xk"].to_numpy()[order],
        n_max=n_max,
        x_min=float(rows["x_min"].iloc[0]),
        x_max=float(rows["x_max"].iloc[0]),
        n_rows=int(rows["n_rows"].iloc[0]),
        n_distinct=int(rows["n_distinct"].iloc[0]),
    )


def _estimate_group(
    pdf: pd.DataFrame,
    *,
    n_max: int,
    estimators: Sequence[str],
    with_pm1: bool,
    alpha: float,
    min_overlap: int,
) -> pd.DataFrame:
    sx = _side_sketch(pdf[pdf["side"] == "x"], n_max)
    sy = _side_sketch(pdf[pdf["side"] == "y"], n_max)
    _, xv, yv = join_sketches(sx, sy)
    n = len(xv)
    out: dict = {
        "px": pdf["px"].iloc[0],
        "py": pdf["py"].iloc[0],
        "n": n,
        "inter_est": intersection_estimate(sx, sy),
        "jc_est": jaccard_containment_estimate(sx, sy),
    }
    if n < min_overlap:
        for e in estimators:
            out[f"est_{e}"] = math.nan
        out.update(
            hfd_lo=math.nan, hfd_hi=math.nan, ci_len=math.nan,
            hoeff_lo=math.nan, hoeff_hi=math.nan,
        )
        if with_pm1:
            out.update(est_pm1=math.nan, pm1_lo=math.nan, pm1_hi=math.nan)
        return pd.DataFrame([out])
    for e in estimators:
        out[f"est_{e}"] = ESTIMATORS[e](xv, yv)
    ci = hoeffding_ci(
        xv, yv,
        c_low=min(sx.x_min, sy.x_min), c_high=max(sx.x_max, sy.x_max),
        alpha=alpha,
    )
    out.update(
        hfd_lo=ci.hfd_lo, hfd_hi=ci.hfd_hi, ci_len=ci.length,
        hoeff_lo=ci.lo, hoeff_hi=ci.hi,
    )
    if with_pm1:
        # Deterministic per-pair seed so reruns are reproducible. Python's
        # built-in hash() is salted per process (different across Spark
        # workers) — murmur3 is not.
        seed = murmur3_32(f"{out['px']}|{out['py']}")
        rb, lo, hi = pm1_ci(xv, yv, seed=seed)
        out.update(est_pm1=rb, pm1_lo=lo, pm1_hi=hi)
    return pd.DataFrame([out])


def candidate_pairs(sketches: DataFrame, *, min_overlap: int = 3) -> DataFrame:
    """All ``(px, py)`` with at least ``min_overlap`` common sketch keys
    (px < py lexicographically; the measure is symmetric)."""
    a = sketches.select(F.col("pair_id").alias("px"), "hk")
    b = sketches.select(F.col("pair_id").alias("py"), "hk")
    return (
        a.join(b, "hk")
        .where(F.col("px") < F.col("py"))
        .groupBy("px", "py")
        .agg(F.count("*").alias("sketch_overlap"))
        .where(F.col("sketch_overlap") >= min_overlap)
    )


def estimate_all_pairs(
    sketches: DataFrame,
    stats: DataFrame,
    *,
    n_max: int,
    estimators: Sequence[str] = DEFAULT_ESTIMATORS,
    with_pm1: bool = False,
    alpha: float = 0.05,
    min_overlap: int = 3,
    candidates: DataFrame | None = None,
) -> DataFrame:
    """Per-candidate-pair sketch statistics for a whole collection.

    ``candidates`` defaults to :func:`candidate_pairs`; pass an explicit
    ``(px, py)`` DataFrame to restrict (e.g. SBN's own-pair combinations).
    Output columns: ``px, py, n, est_<e>…, hfd_lo, hfd_hi, ci_len,
    hoeff_lo, hoeff_hi, inter_est, jc_est[, est_pm1, pm1_lo, pm1_hi]``.
    """
    if candidates is None:
        candidates = candidate_pairs(sketches, min_overlap=min_overlap)
    cand = candidates.select("px", "py")
    enriched = sketches.join(stats, "pair_id")
    rows_x = cand.join(
        enriched, cand.px == enriched.pair_id
    ).select("px", "py", F.lit("x").alias("side"), "hk", "hu", "xk",
             "x_min", "x_max", "n_rows", "n_distinct")
    rows_y = cand.join(
        enriched, cand.py == enriched.pair_id
    ).select("px", "py", F.lit("y").alias("side"), "hk", "hu", "xk",
             "x_min", "x_max", "n_rows", "n_distinct")
    schema = _result_schema(estimators, with_pm1)

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        return _estimate_group(
            pdf, n_max=n_max, estimators=estimators, with_pm1=with_pm1,
            alpha=alpha, min_overlap=min_overlap,
        )

    return rows_x.unionByName(rows_y).groupBy("px", "py").applyInPandas(fn, schema)


QUERY_SCHEMA = T.StructType(
    [
        T.StructField("pair_id", T.StringType(), False),
        T.StructField("n", T.LongType(), False),
        T.StructField("est_pearson", T.DoubleType(), True),
        T.StructField("hfd_lo", T.DoubleType(), True),
        T.StructField("hfd_hi", T.DoubleType(), True),
        T.StructField("ci_len", T.DoubleType(), True),
        T.StructField("jc_est", T.DoubleType(), True),
    ]
)


def query_estimates(
    spark: SparkSession,
    sketches: DataFrame,
    stats: DataFrame,
    summaries: DataFrame,
    query: CorrelationSketch,
    *,
    alpha: float = 0.05,
    min_overlap: int = 3,
) -> DataFrame:
    """Online query path: broadcast-join one query sketch against the
    indexed sketches and estimate the join-correlation per candidate.

    ``ĵc`` here uses the query side's distinct estimate with the Eq. 1
    intersection computed from the candidate's KMV summary
    (``k``, ``U(k)``) — the paper's query-time setting where only the
    probe's sketch and the index rows are in hand.
    """
    qdf = spark.createDataFrame(
        pd.DataFrame(
            {
                "hk": query.hk.astype(np.int64),
                "q_hu": query.hu,
                "q_x": query.xk,
            }
        )
    )
    q_min, q_max = query.x_min, query.x_max
    q_distinct = distinct_estimate(query)
    q_k, q_kth = len(query), query.kth_unit_hash

    joined = (
        sketches.join(F.broadcast(qdf), "hk")
        .join(stats, "pair_id")
        .join(summaries, "pair_id")
    )

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        n = len(pdf)
        cand_k = int(pdf["k"].iloc[0])
        cand_kth = float(pdf["kth_hu"].iloc[0])
        # Combined-sketch intersection estimate from summaries: the union's
        # k-th minimum is bounded by min of both sides' U(k); with equal
        # fixed-size sketches this is the standard KMV ⊕ approximation.
        k = min(q_k, cand_k)
        kth = min(q_kth, cand_kth)
        k_cap = int((pdf["hu"] <= kth).sum()) if n else 0
        inter = (k_cap / k) * ((k - 1) / kth) if k >= 2 and kth > 0 else math.nan
        jc_est = (
            min(1.0, inter / q_distinct)
            if math.isfinite(inter) and q_distinct > 0
            else math.nan
        )
        out = {
            "pair_id": pdf["pair_id"].iloc[0],
            "n": n,
            "est_pearson": math.nan,
            "hfd_lo": math.nan,
            "hfd_hi": math.nan,
            "ci_len": math.nan,
            "jc_est": jc_est,
        }
        if n >= min_overlap:
            order = np.argsort(pdf["q_hu"].to_numpy(), kind="stable")
            xv = pdf["q_x"].to_numpy()[order]
            yv = pdf["xk"].to_numpy()[order]
            out["est_pearson"] = ESTIMATORS["pearson"](xv, yv)
            ci = hoeffding_ci(
                xv, yv,
                c_low=min(q_min, float(pdf["x_min"].iloc[0])),
                c_high=max(q_max, float(pdf["x_max"].iloc[0])),
                alpha=alpha,
            )
            out.update(hfd_lo=ci.hfd_lo, hfd_hi=ci.hfd_hi, ci_len=ci.length)
        return pd.DataFrame([out])

    return joined.groupBy("pair_id").applyInPandas(fn, QUERY_SCHEMA)
