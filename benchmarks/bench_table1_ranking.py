"""Benchmark + reproduction of the paper's **Table 1** (ranking quality,
§5.4) at SF≈0.1 scale. The benchmark times the full pipeline (sketch
build → all-pairs estimation → ground truth → ranking metrics) and
prints the paper-style table for EXPERIMENTS.md.
"""
import pytest

from repro.exp.report import save_report
from repro.exp.table1 import Table1Config, format_table1, run_table1

CFG = Table1Config(
    n_tables=60, rows_scale=1.0, sketch_size=256, seed=0, with_pm1=True
)


@pytest.mark.benchmark(group="table1")
def test_table1_ranking(spark, benchmark):
    report = benchmark.pedantic(
        run_table1, args=(spark, CFG), rounds=1, iterations=1
    )
    print()
    save_report("table1_ranking", format_table1(report))
    t = report.table
    # Paper's qualitative result must hold at bench scale.
    for metric in ["map_0.5", "map_0.75", "ndcg_5", "ndcg_10"]:
        best_corr = t.loc[["rp*cih", "rb*cib", "rp", "rp*sez"], metric].max()
        best_base = t.loc[["jc", "jc_est", "random"], metric].max()
        assert best_corr > best_base, metric
