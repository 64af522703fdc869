"""Distributed Correlation Sketch construction (paper §3.1) as a Spark
DataFrame map/reduce over the long-format collection.

One job sketches every ⟨key, numeric⟩ column pair in a collection:

1. **map** — hash every key with MurmurHash3 (vectorised pandas UDF) and
   derive the unit hash ``h_u`` via Fibonacci hashing;
2. **reduce** — ``groupBy(pair_id, hk)`` applies the streaming aggregate
   (mean/sum/min/max/count) to repeated keys. Grouping on the *hash*
   rather than the raw key matches the local builder bit-for-bit (both
   treat ``h`` as collision-free, like the paper);
3. **select** — a window per ``pair_id`` ordered by ``(h_u, hk)`` keeps the
   ``n`` minimum tuples.

``column_stats`` computes, in the same single pass over the data that the
paper describes (§4.2), the per-column metadata the ranking layer needs:
value range (Hoeffding's ``C``), row count, and exact distinct-key count.

The ``first``/``last`` aggregates of the local builder are intentionally
unsupported here: their result depends on row order, which a distributed
shuffle does not preserve.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T
from pyspark.sql.window import Window

from repro.core.hashing import fibonacci_unit, murmur3_32_np

SKETCH_SCHEMA = T.StructType(
    [
        T.StructField("pair_id", T.StringType(), False),
        T.StructField("hk", T.LongType(), False),
        T.StructField("hu", T.DoubleType(), False),
        T.StructField("xk", T.DoubleType(), False),
    ]
)

_SPARK_AGGS = {
    "mean": F.avg,
    "sum": F.sum,
    "min": F.min,
    "max": F.max,
    "count": F.count,
}

SPARK_AGG_NAMES = tuple(_SPARK_AGGS)


@F.pandas_udf(T.LongType())
def _murmur_udf(keys: pd.Series) -> pd.Series:
    return pd.Series(murmur3_32_np(keys.to_numpy()).astype(np.int64))


@F.pandas_udf(T.DoubleType())
def _fib_udf(hk: pd.Series) -> pd.Series:
    return pd.Series(fibonacci_unit(hk.to_numpy().astype(np.uint64).astype(np.uint32)))


def with_hashes(long_df: DataFrame) -> DataFrame:
    """Add ``hk = h(key)`` (int64-widened uint32) and ``hu = h_u(hk)``."""
    return long_df.withColumn("hk", _murmur_udf("key")).withColumn(
        "hu", _fib_udf("hk")
    )


def build_sketches(long_df: DataFrame, *, n_max: int, agg: str = "mean") -> DataFrame:
    """Build all sketches of a long-format collection in one dataflow.

    Returns a DataFrame ``(pair_id, hk, hu, xk)`` with at most ``n_max``
    rows per ``pair_id`` — the distributed twin of
    :class:`repro.core.sketch.CorrelationSketch`.
    """
    if agg not in _SPARK_AGGS:
        raise ValueError(
            f"unsupported aggregate {agg!r} for the distributed flow; "
            f"pick one of {SPARK_AGG_NAMES}"
        )
    hashed = with_hashes(long_df)
    agged = hashed.groupBy("pair_id", "hk").agg(
        _SPARK_AGGS[agg]("x").cast("double").alias("xk"),
        F.first("hu").alias("hu"),
    )
    w = Window.partitionBy("pair_id").orderBy("hu", "hk")
    return (
        agged.withColumn("rn", F.row_number().over(w))
        .where(F.col("rn") <= n_max)
        .drop("rn")
        .select("pair_id", "hk", "hu", "xk")
    )


STATS_SCHEMA = T.StructType(
    [
        T.StructField("pair_id", T.StringType(), False),
        T.StructField("x_min", T.DoubleType(), True),
        T.StructField("x_max", T.DoubleType(), True),
        T.StructField("n_rows", T.LongType(), False),
        T.StructField("n_distinct", T.LongType(), False),
    ]
)


def column_stats(long_df: DataFrame) -> DataFrame:
    """Per-pair single-pass statistics: value range (→ Hoeffding ``C``),
    row count, exact distinct-key count (distinct *hashes*, matching the
    local builder's collision handling)."""
    return with_hashes(long_df).groupBy("pair_id").agg(
        F.min("x").alias("x_min"),
        F.max("x").alias("x_max"),
        F.count("x").alias("n_rows"),
        F.countDistinct("hk").alias("n_distinct"),
    )


def sketch_summaries(sketches: DataFrame) -> DataFrame:
    """Per-sketch KMV summary: retained size ``k`` and the k-th minimum
    unit hash ``U(k)`` — the inputs to distinct-value estimation that the
    query path needs without seeing the full sketch."""
    return sketches.groupBy("pair_id").agg(
        F.count("hk").alias("k"),
        F.max("hu").alias("kth_hu"),
    )
