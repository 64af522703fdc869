"""Long-format collection representation for the Spark dataflows.

The whole table collection becomes ONE DataFrame with schema
``(pair_id string, key string, x double)`` where ``pair_id`` identifies a
⟨key column, numeric column⟩ pair (the unit the paper sketches). All
downstream flows — sketch construction, ground truth, stats — are single
map/reduce passes over this long DataFrame, which is what lets one Spark
job sketch an arbitrary number of heterogeneous tables at once.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from .opendata import Collection
from .sbn import SBNPair

LONG_SCHEMA = T.StructType(
    [
        T.StructField("pair_id", T.StringType(), False),
        T.StructField("key", T.StringType(), False),
        T.StructField("x", T.DoubleType(), False),
    ]
)


def pair_id_of(table: str, key_col: str, val_col: str) -> str:
    return f"{table}.{key_col}.{val_col}"


def collection_to_pandas_long(coll: Collection) -> pd.DataFrame:
    """Flatten a collection to long format in pandas (rows with null keys
    or non-finite values dropped, mirroring the sketch builder)."""
    frames = []
    for table, key_col, val_col in coll.column_pairs():
        df = coll.tables[table]
        vals = pd.to_numeric(df[val_col], errors="coerce")
        mask = df[key_col].notna() & np.isfinite(vals)
        frames.append(
            pd.DataFrame(
                {
                    "pair_id": pair_id_of(table, key_col, val_col),
                    "key": df[key_col][mask].astype(str),
                    "x": vals[mask].astype(np.float64),
                }
            )
        )
    if not frames:
        return pd.DataFrame(columns=["pair_id", "key", "x"])
    return pd.concat(frames, ignore_index=True)


def collection_to_long_df(spark: SparkSession, coll: Collection) -> DataFrame:
    """Long-format Spark DataFrame for an open-data collection."""
    return spark.createDataFrame(collection_to_pandas_long(coll), schema=LONG_SCHEMA)


def sbn_to_long_df(spark: SparkSession, pairs: list[SBNPair]) -> DataFrame:
    """Long-format Spark DataFrame for SBN pairs. Pair ``p`` contributes
    pair_ids ``{p}.X`` (from T_X) and ``{p}.Y`` (from T_Y)."""
    frames = []
    for p in pairs:
        frames.append(
            pd.DataFrame(
                {"pair_id": f"{p.pair_id}.X", "key": p.table_x["key"], "x": p.table_x["x"]}
            )
        )
        frames.append(
            pd.DataFrame(
                {"pair_id": f"{p.pair_id}.Y", "key": p.table_y["key"], "x": p.table_y["y"]}
            )
        )
    pdf = pd.concat(frames, ignore_index=True)
    return spark.createDataFrame(pdf, schema=LONG_SCHEMA)


def sbn_candidate_pairs(pairs: list[SBNPair]) -> list[tuple[str, str]]:
    """The (pair_id_x, pair_id_y) combinations SBN evaluates: each table
    pair's X against its own Y (other combinations share no keys)."""
    return [(f"{p.pair_id}.X", f"{p.pair_id}.Y") for p in pairs]


def spark_table_of(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Small helper for tests: a Spark DataFrame with key as string."""
    pdf = pdf.copy()
    key_cols = [c for c in pdf.columns if pdf[c].dtype == object]
    for c in key_cols:
        pdf[c] = pdf[c].astype(str)
    return spark.createDataFrame(pdf)


def filter_long(long_df: DataFrame) -> DataFrame:
    """Defensive null/NaN filter for externally-supplied long DataFrames."""
    return long_df.where(
        F.col("pair_id").isNotNull()
        & F.col("key").isNotNull()
        & F.col("x").isNotNull()
        & ~F.isnan("x")
    )
