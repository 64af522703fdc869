"""Tests for the distributed sketch construction flow: parity with the
local reference builder and DuckDB oracle checks on every query-shaped
intermediate."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.sketch import build_sketch
from repro.datagen.collection import collection_to_pandas_long
from repro.datagen.opendata import make_nyc_like
from repro.oracle import assert_equivalent
from repro.sparkflow.build import (
    build_sketches,
    column_stats,
    sketch_summaries,
    with_hashes,
)


@pytest.fixture(scope="module")
def small_long(spark):
    coll = make_nyc_like(n_tables=8, rows_scale=0.25, seed=11)
    pdf = collection_to_pandas_long(coll)
    return spark.createDataFrame(pdf), pdf


def test_with_hashes_matches_reference(spark, small_long):
    from repro.core.hashing import fibonacci_unit, murmur3_32

    df, pdf = small_long
    got = with_hashes(df).select("key", "hk", "hu").distinct().toPandas()
    for _, row in got.head(200).iterrows():
        hk = murmur3_32(row["key"])
        assert row["hk"] == hk
        assert row["hu"] == pytest.approx(float(fibonacci_unit(hk)), abs=0)


def test_spark_sketches_equal_local_builder(spark, small_long):
    df, pdf = small_long
    n_max = 32
    got = build_sketches(df, n_max=n_max, agg="mean").toPandas()
    for pair_id, grp in pdf.groupby("pair_id"):
        local = build_sketch(grp["key"], grp["x"], n_max=n_max, agg="mean")
        sg = got[got["pair_id"] == pair_id].sort_values("hu")
        np.testing.assert_array_equal(
            sg["hk"].to_numpy().astype(np.uint32), local.hk,
            err_msg=f"hash selection mismatch for {pair_id}",
        )
        np.testing.assert_allclose(sg["xk"].to_numpy(), local.xk, rtol=1e-9)


@pytest.mark.parametrize("agg", ["mean", "sum", "min", "max", "count"])
def test_spark_sketches_all_aggs_match_local(spark, agg):
    rng = np.random.default_rng(0)
    pdf = pd.DataFrame(
        {
            "pair_id": "t.k.v",
            "key": [f"k{rng.integers(0, 40)}" for _ in range(300)],
            "x": rng.normal(size=300),
        }
    )
    got = build_sketches(spark.createDataFrame(pdf), n_max=16, agg=agg).toPandas()
    local = build_sketch(pdf["key"], pdf["x"], n_max=16, agg=agg)
    sg = got.sort_values("hu")
    np.testing.assert_array_equal(sg["hk"].to_numpy().astype(np.uint32), local.hk)
    np.testing.assert_allclose(sg["xk"].to_numpy(), local.xk, rtol=1e-9)


def test_unsupported_agg_raises(spark, small_long):
    df, _ = small_long
    with pytest.raises(ValueError):
        build_sketches(df, n_max=8, agg="first")


def test_sketch_size_capped(spark, small_long):
    df, _ = small_long
    sizes = (
        build_sketches(df, n_max=16).groupBy("pair_id").count().toPandas()["count"]
    )
    assert (sizes <= 16).all()


def test_aggregation_oracle(spark, small_long):
    """The per-key mean aggregation (the reduce step feeding the window)
    must match DuckDB exactly."""
    df, pdf = small_long
    agged = (
        with_hashes(df)
        .groupBy("pair_id", "key")
        .agg(F.avg("x").alias("v"))
    )
    assert_equivalent(
        agged,
        "SELECT pair_id, key, avg(x) AS v FROM longt GROUP BY pair_id, key",
        longt=pdf,
    )


def test_column_stats_oracle(spark, small_long):
    df, pdf = small_long
    stats = column_stats(df).drop("n_distinct")  # distinct-by-hash ≠ SQL distinct-by-key only on collisions; compare separately
    assert_equivalent(
        stats,
        "SELECT pair_id, min(x) AS x_min, max(x) AS x_max, count(x) AS n_rows"
        " FROM longt GROUP BY pair_id",
        longt=pdf,
    )


def test_column_stats_distinct_matches_keys(spark, small_long):
    """At test scale there are no murmur collisions, so distinct hashes
    equal distinct keys."""
    df, pdf = small_long
    got = column_stats(df).select("pair_id", "n_distinct").toPandas()
    expect = pdf.groupby("pair_id")["key"].nunique()
    for _, row in got.iterrows():
        assert row["n_distinct"] == expect[row["pair_id"]]


def test_sketch_summaries(spark, small_long):
    df, _ = small_long
    sk = build_sketches(df, n_max=16)
    summ = sketch_summaries(sk).toPandas().set_index("pair_id")
    pdf_sk = sk.toPandas()
    for pair_id, grp in pdf_sk.groupby("pair_id"):
        assert summ.loc[pair_id, "k"] == len(grp)
        assert summ.loc[pair_id, "kth_hu"] == pytest.approx(grp["hu"].max())
