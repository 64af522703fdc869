"""Benchmark + reproduction of the paper's **Table 2** (running times of
join/r_p/r_s on full data vs sketches, §5.5) with a heavy-tailed workload.

One benchmark runs the whole percentile harness and prints the table;
two micro-benchmarks time the largest single pair on the full-data path
vs the sketch path, so pytest-benchmark's own statistics exhibit the
orders-of-magnitude gap directly.
"""
import numpy as np
import pytest

from repro.core.estimators import pearson, spearman
from repro.core.sketch import join_sketches
from repro.exp.report import save_report
from repro.exp.table2 import (
    Table2Config,
    format_table2,
    make_workload,
    run_table2,
)

CFG = Table2Config(
    n_pairs=300, size_median=3000, size_sigma=1.6, max_rows=400_000,
    sketch_size=256, seed=0,
)


@pytest.fixture(scope="module")
def workload():
    return make_workload(
        Table2Config(n_pairs=8, size_median=200_000, size_sigma=0.1,
                     max_rows=400_000, sketch_size=256, seed=1)
    )


@pytest.mark.benchmark(group="table2")
def test_table2_percentiles(benchmark):
    table = benchmark.pedantic(run_table2, args=(CFG,), rounds=1, iterations=1)
    print()
    save_report("table2_runtime", format_table2(table))
    assert table.loc["99%", "full_join"] > 10 * table.loc["99%", "sk_join"]


@pytest.mark.benchmark(group="table2-micro")
def test_full_join_correlation_largest_pair(benchmark, workload):
    p = max(workload, key=lambda w: len(w.tx))

    def full():
        j = p.tx.merge(p.ty, on="key")
        x, y = j["x"].to_numpy(), j["y"].to_numpy()
        return pearson(x, y), spearman(x, y)

    rp, rs = benchmark(full)
    assert np.isfinite(rp) and np.isfinite(rs)


@pytest.mark.benchmark(group="table2-micro")
def test_sketch_join_correlation_largest_pair(benchmark, workload):
    p = max(workload, key=lambda w: len(w.tx))

    def sk():
        _, x, y = join_sketches(p.lx, p.ly)
        return pearson(x, y), spearman(x, y)

    rp, rs = benchmark(sk)
    assert np.isfinite(rp) and np.isfinite(rs)
