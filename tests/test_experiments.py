"""Small-scale end-to-end runs of every experiment harness: the same code
paths the benchmarks use, at test scale, with shape assertions mirroring
the paper's qualitative claims."""
import numpy as np
import pytest

from repro.exp.accuracy import AccuracyConfig, format_accuracy, run_accuracy
from repro.exp.querytime import QueryTimeConfig, format_querytime, run_querytime
from repro.exp.table1 import PAPER_TABLE1, Table1Config, format_table1, run_table1
from repro.exp.table2 import Table2Config, format_table2, run_table2


@pytest.fixture(scope="module")
def table1_report(spark):
    return run_table1(
        spark,
        Table1Config(
            n_tables=24, rows_scale=0.5, sketch_size=64, seed=7,
            with_pm1=True, min_candidates=2,
        ),
    )


class TestTable1:
    def test_report_complete(self, table1_report):
        t = table1_report.table
        assert set(t.index) == set(PAPER_TABLE1.columns.tolist()) or set(t.index) == {
            "rp*cih", "rb*cib", "rp", "rp*sez", "jc", "jc_est", "random"
        }
        assert set(t.columns) == {"map_0.5", "map_0.75", "ndcg_5", "ndcg_10"}
        assert table1_report.n_queries > 5
        assert np.isfinite(t.to_numpy()).all()

    def test_scores_in_unit_interval(self, table1_report):
        t = table1_report.table
        assert ((t >= 0) & (t <= 1)).all().all()

    def test_correlation_rankers_beat_baselines(self, table1_report):
        """The paper's central Table 1 claim: every correlation-based
        ranker beats jc/random on MAP."""
        t = table1_report.table
        corr_rankers = ["rp*cih", "rp", "rp*sez", "rb*cib"]
        for metric in ["map_0.5", "map_0.75"]:
            best_baseline = t.loc[["jc", "jc_est", "random"], metric].max()
            for rk in corr_rankers:
                assert t.loc[rk, metric] > best_baseline, (metric, rk, t[metric])

    def test_ndcg_improvement(self, table1_report):
        t = table1_report.table
        assert t.loc["rp*cih", "ndcg_5"] > t.loc["jc", "ndcg_5"]
        assert t.loc["rp*cih", "ndcg_10"] > t.loc["jc", "ndcg_10"]

    def test_format_includes_paper_numbers(self, table1_report):
        s = format_table1(table1_report)
        assert "MAP (r > .75)" in s
        assert "0.529" in s  # paper's headline rp*cih value
        assert "nDCG@10" in s


class TestTable2:
    @pytest.fixture(scope="class")
    def table2(self):
        return run_table2(
            Table2Config(n_pairs=40, size_median=800, size_sigma=1.2,
                         max_rows=20000, sketch_size=64, seed=3)
        )

    def test_all_cells_present(self, table2):
        assert list(table2.columns) == [
            "full_join", "full_rs", "full_rp", "sk_join", "sk_rp", "sk_rs"
        ]
        assert list(table2.index) == ["mean", "std", "75%", "90%", "99%", "99.9%"]
        assert np.isfinite(table2.to_numpy()).all()

    def test_sketch_orders_of_magnitude_faster(self, table2):
        """The paper's Table 2 claim, at the tail: full-data join and
        Spearman are orders of magnitude slower than the sketch path."""
        assert table2.loc["99%", "full_join"] > 10 * table2.loc["99%", "sk_join"]
        assert table2.loc["99%", "full_rs"] > 5 * table2.loc["99%", "sk_rs"]
        assert table2.loc["mean", "full_join"] > table2.loc["mean", "sk_join"]

    def test_sketch_times_predictable(self, table2):
        """Fixed-size sketches ⇒ flat tail (99.9% within a small constant
        of the 75th percentile, unlike the full path)."""
        assert table2.loc["99.9%", "sk_rp"] < 5.0  # ms, generous bound
        full_spread = table2.loc["99.9%", "full_join"] / max(table2.loc["75%", "full_join"], 1e-6)
        sk_spread = table2.loc["99.9%", "sk_join"] / max(table2.loc["75%", "sk_join"], 1e-6)
        assert sk_spread < full_spread

    def test_format(self, table2):
        s = format_table2(table2)
        assert "99.9%" in s and "full_join" in s


class TestAccuracy:
    @pytest.fixture(scope="class")
    def acc(self, spark):
        return run_accuracy(
            spark,
            AccuracyConfig(
                dataset="sbn", sketch_sizes=(16, 64), sbn_t=30,
                sbn_n_max=1200, seed=5,
            ),
        )

    def test_table_shape(self, acc):
        assert set(acc["estimator"]) == {"pearson", "spearman", "rin"}
        assert set(acc["sketch_size"]) == {16, 64}
        assert (acc["count"] >= 0).all()

    def test_rmse_decreases_with_intersection_size(self, acc):
        """Fig. 4's trend: larger sketch-join samples → lower RMSE."""
        for est in ["pearson", "spearman"]:
            sub = acc[(acc["estimator"] == est) & (acc["sketch_size"] == 64)]
            small = sub[sub["bucket"] == "[3,10)"]["rmse"].iloc[0]
            big = sub[sub["bucket"] == "[20,50)"]["rmse"].iloc[0]
            if np.isfinite(small) and np.isfinite(big):
                assert big < small

    def test_larger_sketch_lowers_overall_rmse(self, acc):
        p16 = acc.query("estimator=='pearson' and sketch_size==16 and bucket=='all'")["rmse"].iloc[0]
        p64 = acc.query("estimator=='pearson' and sketch_size==64 and bucket=='all'")["rmse"].iloc[0]
        assert p64 < p16

    def test_overall_rmse_reasonable(self, acc):
        """Paper: RMSE stabilises around 0.1 for well-populated sketches."""
        p64 = acc.query("estimator=='pearson' and sketch_size==64 and bucket=='all'")["rmse"].iloc[0]
        assert p64 < 0.45

    def test_format(self, acc):
        s = format_accuracy(acc)
        assert "pearson" in s and "[3,10)" in s

    def test_bad_dataset_raises(self, spark):
        with pytest.raises(ValueError):
            run_accuracy(spark, AccuracyConfig(dataset="mars"))


class TestQueryTime:
    def test_latency_stats(self, spark):
        stats = run_querytime(
            spark,
            QueryTimeConfig(n_tables=20, rows_scale=0.3, sketch_size=128, seed=9),
        )
        assert stats["n_queries"] > 0
        assert stats["n_answered"] > 0
        assert stats["p50_ms"] > 0
        assert stats["pct_under_200ms"] >= stats["pct_under_100ms"]
        s = format_querytime(stats)
        assert "under 100 ms" in s
