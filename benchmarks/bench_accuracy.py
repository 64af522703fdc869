"""Benchmark + supplementary accuracy reproduction (§5.2/§5.3, the
numbers behind Figs. 3–4): RMSE of sketch estimates vs population
coefficients by intersection-size bucket, on SBN and NYC-like data."""
import pytest

from repro.exp.accuracy import AccuracyConfig, format_accuracy, run_accuracy
from repro.exp.report import save_report

SBN_CFG = AccuracyConfig(
    dataset="sbn", sketch_sizes=(64, 256), sbn_t=120, sbn_n_max=20000,
    estimators=("pearson", "spearman", "rin"), with_pm1=False, seed=0,
)
NYC_CFG = AccuracyConfig(
    dataset="nyc", sketch_sizes=(64, 256), n_tables=50, rows_scale=1.0,
    estimators=("pearson", "spearman", "rin"), with_qn=True, seed=0,
)


@pytest.mark.benchmark(group="accuracy")
def test_accuracy_sbn(spark, benchmark):
    table = benchmark.pedantic(
        run_accuracy, args=(spark, SBN_CFG), rounds=1, iterations=1
    )
    print()
    save_report("accuracy_sbn", format_accuracy(table))
    overall = table.query(
        "estimator=='pearson' and sketch_size==256 and bucket=='all'"
    )["rmse"].iloc[0]
    assert overall < 0.3  # paper: RMSE stabilises ≈ 0.1


@pytest.mark.benchmark(group="accuracy")
def test_accuracy_nyc(spark, benchmark):
    table = benchmark.pedantic(
        run_accuracy, args=(spark, NYC_CFG), rounds=1, iterations=1
    )
    print()
    save_report("accuracy_nyc", format_accuracy(table))
    # NOTE: at reproduction scale, NYC-like key universes are small
    # (≤730 keys), so a *small* sketch intersection usually means the
    # sketch captured the whole join — estimates there are exact (RMSE≈0),
    # inverting the left edge of the paper's Fig. 4 (whose tables are huge
    # and small intersections are true subsamples). The testable trends:
    # (a) §3.3 space/accuracy trade-off: bigger sketch → lower overall RMSE;
    pearson = table.query("estimator=='pearson' and bucket=='all'").set_index("sketch_size")
    assert pearson.loc[256, "rmse"] < pearson.loc[64, "rmse"]
    # (b) Fig. 4 trend where subsampling is real (sketch 64, buckets past
    # the exact-join region): more samples → lower RMSE.
    sub = table.query("estimator=='pearson' and sketch_size==64").set_index("bucket")
    assert sub.loc["[50,100)", "rmse"] < sub.loc["[20,50)", "rmse"]
