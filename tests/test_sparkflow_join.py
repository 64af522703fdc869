"""Tests for the sketch-join estimation flows: parity with the local core
(same numbers as driver-side sketches), DuckDB oracle on the candidate
overlap counts, accuracy on SBN data, and the broadcast query path."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.bounds import hoeffding_ci
from repro.core.estimators import pearson
from repro.core.kmv import jaccard_containment_estimate
from repro.core.sketch import build_sketch, join_sketches
from repro.datagen.collection import (
    collection_to_pandas_long,
    sbn_candidate_pairs,
    sbn_to_long_df,
)
from repro.datagen.opendata import make_nyc_like
from repro.datagen.sbn import make_sbn_collection
from repro.oracle import assert_equivalent
from repro.sparkflow.build import build_sketches, column_stats, sketch_summaries
from repro.sparkflow.join import candidate_pairs, estimate_all_pairs, query_estimates

N_MAX = 64


@pytest.fixture(scope="module")
def flow(spark):
    coll = make_nyc_like(n_tables=8, rows_scale=0.3, seed=31)
    pdf = collection_to_pandas_long(coll)
    df = spark.createDataFrame(pdf)
    sketches = build_sketches(df, n_max=N_MAX).cache()
    stats = column_stats(df).cache()
    return df, pdf, sketches, stats


def local_sketches(pdf, n_max=N_MAX):
    return {
        pid: build_sketch(g["key"], g["x"], n_max=n_max)
        for pid, g in pdf.groupby("pair_id")
    }


class TestCandidates:
    def test_overlap_counts_oracle(self, spark, flow):
        _, _, sketches, _ = flow
        sk_pdf = sketches.select("pair_id", "hk").toPandas()
        assert_equivalent(
            candidate_pairs(sketches, min_overlap=3),
            """
            SELECT a.pair_id AS px, b.pair_id AS py, count(*) AS sketch_overlap
            FROM sk a JOIN sk b ON a.hk = b.hk AND a.pair_id < b.pair_id
            GROUP BY 1, 2 HAVING count(*) >= 3
            """,
            sk=sk_pdf,
        )

    def test_min_overlap_respected(self, spark, flow):
        _, _, sketches, _ = flow
        got = candidate_pairs(sketches, min_overlap=10).toPandas()
        assert (got["sketch_overlap"] >= 10).all()


class TestEstimateAllPairs:
    def test_matches_local_core(self, spark, flow):
        """Every Spark-computed statistic equals the driver-side value from
        the local reference sketches."""
        _, pdf, sketches, stats = flow
        got = estimate_all_pairs(
            sketches, stats, n_max=N_MAX, estimators=("pearson",)
        ).toPandas()
        assert len(got) > 0
        locals_ = local_sketches(pdf)
        checked = 0
        for _, row in got.iterrows():
            lx, ly = locals_[row["px"]], locals_[row["py"]]
            _, xv, yv = join_sketches(lx, ly)
            assert row["n"] == len(xv)
            if row["n"] >= 3:
                assert row["est_pearson"] == pytest.approx(
                    pearson(xv, yv), abs=1e-9, nan_ok=True
                )
                ci = hoeffding_ci(
                    xv, yv,
                    c_low=min(lx.x_min, ly.x_min),
                    c_high=max(lx.x_max, ly.x_max),
                )
                assert row["ci_len"] == pytest.approx(ci.length, rel=1e-9)
                assert row["hoeff_lo"] == pytest.approx(ci.lo, abs=1e-9)
            assert row["jc_est"] == pytest.approx(
                jaccard_containment_estimate(lx, ly), abs=1e-9, nan_ok=True
            )
            checked += 1
        assert checked >= 3

    def test_explicit_candidates(self, spark, flow):
        _, _, sketches, stats = flow
        all_pairs = candidate_pairs(sketches).toPandas()
        two = spark.createDataFrame(all_pairs.head(2)[["px", "py"]])
        got = estimate_all_pairs(
            sketches, stats, n_max=N_MAX, candidates=two
        ).toPandas()
        assert len(got) == 2

    def test_pm1_columns_present_and_ordered(self, spark, flow):
        _, _, sketches, stats = flow
        got = estimate_all_pairs(
            sketches, stats, n_max=N_MAX, estimators=("pearson",), with_pm1=True
        ).toPandas()
        ok = got.dropna(subset=["est_pm1"])
        assert len(ok) > 0
        assert (ok["pm1_lo"] <= ok["pm1_hi"]).all()


class TestSBNAccuracy:
    def test_estimates_track_target_correlation(self, spark):
        """End-to-end §5.2 shape at test scale: sketch estimates of SBN
        pairs correlate strongly with the ground truth."""
        pairs = make_sbn_collection(t=25, n_max=3000, n_min=1500, seed=41)
        long_df = sbn_to_long_df(spark, pairs)
        sketches = build_sketches(long_df, n_max=256)
        stats = column_stats(long_df)
        cand = spark.createDataFrame(
            pd.DataFrame(sbn_candidate_pairs(pairs), columns=["px", "py"])
        )
        got = (
            estimate_all_pairs(
                sketches, stats, n_max=256, estimators=("pearson",), candidates=cand
            )
            .toPandas()
            .set_index("px")
        )
        errs = []
        for p in pairs:
            row = got.loc[f"{p.pair_id}.X"]
            joined = p.table_x.merge(p.table_y, on="key")
            truth = pearson(joined["x"].to_numpy(), joined["y"].to_numpy())
            if row["n"] >= 20:
                errs.append(abs(row["est_pearson"] - truth))
        assert len(errs) >= 10
        assert np.mean(errs) < 0.15
        assert np.median(errs) < 0.1


class TestQueryPath:
    def test_query_matches_local(self, spark, flow):
        _, pdf, sketches, stats = flow
        summaries = sketch_summaries(sketches)
        locals_ = local_sketches(pdf)
        qid = sorted(locals_)[0]
        query = locals_[qid]
        got = (
            query_estimates(spark, sketches, stats, summaries, query)
            .toPandas()
            .set_index("pair_id")
        )
        assert qid in got.index  # self-match present
        for pid, row in got.iterrows():
            _, xv, yv = join_sketches(query, locals_[pid])
            assert row["n"] == len(xv)
            if row["n"] >= 3:
                assert row["est_pearson"] == pytest.approx(
                    pearson(xv, yv), abs=1e-9, nan_ok=True
                )

    def test_query_self_estimate_is_one(self, spark, flow):
        _, pdf, sketches, stats = flow
        summaries = sketch_summaries(sketches)
        locals_ = local_sketches(pdf)
        # Pick a pair with enough distinct keys and variance.
        qid = max(locals_, key=lambda p: len(locals_[p]))
        got = (
            query_estimates(spark, sketches, stats, summaries, locals_[qid])
            .toPandas()
            .set_index("pair_id")
        )
        assert got.loc[qid, "est_pearson"] == pytest.approx(1.0, abs=1e-6)
        assert got.loc[qid, "jc_est"] == pytest.approx(1.0, abs=0.2)

    def test_query_uses_broadcast_join(self, spark, flow):
        """The probe side must be broadcast (paper's small-query/large-index
        asymmetry; the session disables automatic broadcasting)."""
        _, pdf, sketches, stats = flow
        summaries = sketch_summaries(sketches)
        locals_ = local_sketches(pdf)
        query = locals_[sorted(locals_)[0]]
        df = query_estimates(spark, sketches, stats, summaries, query)
        plan = df._jdf.queryExecution().executedPlan().toString()
        assert "Broadcast" in plan
