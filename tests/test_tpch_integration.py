"""Integration test on the provided TPC-H-lite generators: sketch column
pairs keyed on orderkey and estimate their join correlations, validating
ground truth against DuckDB.

The paper enumerates all 2-combinations of ⟨K, X⟩ pairs, including pairs
from the same table (§5.1), so we use three pairs over the orderkey
universe:

- ``li.okey.price``   — mean l_extendedprice per order,
- ``li.okey.revenue`` — mean l_extendedprice·(1−l_discount) per order
  (strongly correlated with price by construction),
- ``od.okey.total``   — o_totalprice (independent of lineitem prices in
  the synthetic generator ⇒ a true near-zero-correlation candidate).

Exercises: synth_data (provided scaffolding), integer-keyed columns cast
to strings, the full Spark pipeline, and the DuckDB oracle.
"""
import pytest
from pyspark.sql import functions as F

from repro.core.estimators import pearson
from repro.oracle import assert_equivalent
from repro.sparkflow.build import build_sketches, column_stats
from repro.sparkflow.join import estimate_all_pairs
from repro.sparkflow.truth import true_pair_stats
from repro.synth_data import lineitem, orders

P_PRICE = "li.okey.price"
P_REV = "li.okey.revenue"
P_TOTAL = "od.okey.total"


@pytest.fixture(scope="module")
def tpch_long(spark):
    li = lineitem(spark, sf=0.002, seed=0)
    od = orders(spark, sf=0.002, seed=1)
    a = li.select(
        F.lit(P_PRICE).alias("pair_id"),
        F.col("l_orderkey").cast("string").alias("key"),
        F.col("l_extendedprice").alias("x"),
    )
    r = li.select(
        F.lit(P_REV).alias("pair_id"),
        F.col("l_orderkey").cast("string").alias("key"),
        (F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias("x"),
    )
    b = od.select(
        F.lit(P_TOTAL).alias("pair_id"),
        F.col("o_orderkey").cast("string").alias("key"),
        F.col("o_totalprice").alias("x"),
    )
    long_df = a.unionByName(r).unionByName(b).cache()
    long_df.count()
    return long_df, li.toPandas(), od.toPandas()


def test_truth_flow_matches_duckdb(spark, tpch_long):
    long_df, li_pdf, od_pdf = tpch_long
    two = long_df.where(F.col("pair_id").isin(P_PRICE, P_TOTAL))
    truth = true_pair_stats(two, agg="mean")
    assert_equivalent(
        truth,
        f"""
        WITH a AS (SELECT CAST(l_orderkey AS VARCHAR) AS key,
                          avg(l_extendedprice) AS v
                   FROM li GROUP BY 1),
             b AS (SELECT CAST(o_orderkey AS VARCHAR) AS key,
                          avg(o_totalprice) AS v
                   FROM od GROUP BY 1),
             j AS (SELECT count(*) AS n_join, corr(a.v, b.v) AS r_true
                   FROM a JOIN b ON a.key = b.key)
        SELECT '{P_PRICE}' AS px, '{P_TOTAL}' AS py,
               j.n_join, j.r_true,
               j.n_join / CAST((SELECT count(*) FROM a) AS DOUBLE) AS jc_x,
               j.n_join / CAST((SELECT count(*) FROM b) AS DOUBLE) AS jc_y
        FROM j
        """,
        li=li_pdf,
        od=od_pdf,
    )


@pytest.fixture(scope="module")
def estimates_and_truth(spark, tpch_long):
    long_df, _, _ = tpch_long
    sketches = build_sketches(long_df, n_max=512)
    stats = column_stats(long_df)
    est = (
        estimate_all_pairs(sketches, stats, n_max=512,
                           estimators=("pearson", "spearman"))
        .toPandas()
        .set_index(["px", "py"])
    )
    truth = true_pair_stats(long_df).toPandas().set_index(["px", "py"])
    return est, truth


def test_planted_correlation_detected(spark, estimates_and_truth):
    est, truth = estimates_and_truth
    key = (P_PRICE, P_REV)
    r_true = truth.loc[key, "r_true"]
    assert r_true > 0.9  # revenue = price·(1−discount), discount ≤ 10%
    assert est.loc[key, "n"] >= 100  # same key universe → near-full overlap
    assert est.loc[key, "est_pearson"] == pytest.approx(r_true, abs=0.1)


def test_independent_columns_near_zero(spark, estimates_and_truth):
    est, truth = estimates_and_truth
    key = (P_PRICE, P_TOTAL)
    assert abs(truth.loc[key, "r_true"]) < 0.2  # generator independence
    assert abs(est.loc[key, "est_pearson"]) < 0.35


def test_sketch_jc_estimate_close_to_exact(spark, estimates_and_truth):
    est, truth = estimates_and_truth
    for key in [(P_PRICE, P_REV), (P_PRICE, P_TOTAL)]:
        assert est.loc[key, "jc_est"] == pytest.approx(
            truth.loc[key, "jc_x"], abs=0.15
        )


def test_local_vs_spark_estimate_parity(spark, tpch_long):
    long_df, _, _ = tpch_long
    from repro.core.sketch import build_sketch, join_sketches

    pdf = long_df.toPandas()
    sketches = build_sketches(long_df, n_max=256)
    stats = column_stats(long_df)
    est = (
        estimate_all_pairs(sketches, stats, n_max=256)
        .toPandas()
        .set_index(["px", "py"])
    )
    locals_ = {
        pid: build_sketch(g["key"], g["x"], n_max=256)
        for pid, g in pdf.groupby("pair_id")
    }
    _, xv, yv = join_sketches(locals_[P_PRICE], locals_[P_TOTAL])
    key = (P_PRICE, P_TOTAL)
    assert est.loc[key, "n"] == len(xv)
    assert est.loc[key, "est_pearson"] == pytest.approx(pearson(xv, yv), abs=1e-9)
