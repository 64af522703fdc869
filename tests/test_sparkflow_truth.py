"""Tests for the ground-truth flow — oracle-checked against DuckDB SQL
(the full join + corr the paper computes explicitly)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.estimators import pearson, rin, spearman
from repro.datagen.collection import collection_to_pandas_long
from repro.datagen.opendata import make_nyc_like
from repro.oracle import assert_equivalent
from repro.sparkflow.truth import (
    aggregate_by_key,
    true_pair_estimators,
    true_pair_stats,
)


@pytest.fixture(scope="module")
def truth_long(spark):
    coll = make_nyc_like(n_tables=6, rows_scale=0.25, seed=21)
    pdf = collection_to_pandas_long(coll)
    return spark.createDataFrame(pdf), pdf


TRUTH_SQL = """
WITH agg AS (
  SELECT pair_id, key, avg(x) AS v FROM longt GROUP BY pair_id, key
),
j AS (
  SELECT a.pair_id AS px, b.pair_id AS py,
         count(*) AS n_join, corr(a.v, b.v) AS r_true
  FROM agg a JOIN agg b ON a.key = b.key AND a.pair_id < b.pair_id
  GROUP BY 1, 2
  HAVING count(*) >= 3
),
d AS (SELECT pair_id, count(*) AS d FROM agg GROUP BY 1)
SELECT j.px, j.py, j.n_join, j.r_true,
       j.n_join / CAST(dx.d AS DOUBLE) AS jc_x,
       j.n_join / CAST(dy.d AS DOUBLE) AS jc_y
FROM j JOIN d dx ON j.px = dx.pair_id JOIN d dy ON j.py = dy.pair_id
"""


def test_aggregate_by_key_oracle(spark, truth_long):
    df, pdf = truth_long
    assert_equivalent(
        aggregate_by_key(df, agg="mean"),
        "SELECT pair_id, key, avg(x) AS v FROM longt GROUP BY pair_id, key",
        longt=pdf,
    )


def test_bad_agg_raises(spark, truth_long):
    df, _ = truth_long
    with pytest.raises(ValueError):
        aggregate_by_key(df, agg="median")


def test_true_pair_stats_oracle(spark, truth_long):
    df, pdf = truth_long
    assert_equivalent(true_pair_stats(df, agg="mean"), TRUTH_SQL, longt=pdf)


def test_true_pair_stats_has_candidates(spark, truth_long):
    df, _ = truth_long
    got = true_pair_stats(df).toPandas()
    assert len(got) > 0
    assert (got["n_join"] >= 3).all()
    assert ((got["jc_x"] > 0) & (got["jc_x"] <= 1.0)).all()
    assert ((got["jc_y"] > 0) & (got["jc_y"] <= 1.0)).all()


def test_true_pair_estimators_match_driver(spark, truth_long):
    """Population Spearman/RIN per pair must equal a direct pandas/numpy
    computation of the same join."""
    df, pdf = truth_long
    got = (
        true_pair_estimators(df, estimators=("pearson", "spearman", "rin"))
        .toPandas()
        .set_index(["px", "py"])
        .sort_index()
    )
    agg = pdf.groupby(["pair_id", "key"])["x"].mean().reset_index()
    checked = 0
    for (px, py), row in got.head(30).iterrows():
        a = agg[agg["pair_id"] == px].set_index("key")["x"]
        b = agg[agg["pair_id"] == py].set_index("key")["x"]
        j = pd.concat([a, b], axis=1, join="inner")
        xv, yv = j.iloc[:, 0].to_numpy(), j.iloc[:, 1].to_numpy()
        assert row["n_join"] == len(j)
        assert row["true_pearson"] == pytest.approx(pearson(xv, yv), abs=1e-9, nan_ok=True)
        assert row["true_spearman"] == pytest.approx(spearman(xv, yv), abs=1e-9, nan_ok=True)
        assert row["true_rin"] == pytest.approx(rin(xv, yv), abs=1e-9, nan_ok=True)
        checked += 1
    assert checked > 0


def test_candidates_filter_restricts(spark, truth_long):
    df, _ = truth_long
    full = true_pair_stats(df).toPandas()
    some = full.head(2)[["px", "py"]]
    cand = spark.createDataFrame(some)
    got = true_pair_stats(df, candidates=cand).toPandas()
    assert set(map(tuple, got[["px", "py"]].to_numpy())) == set(
        map(tuple, some.to_numpy())
    )
