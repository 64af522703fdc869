"""Benchmark + reproduction of the §5.5 query-evaluation latency claims
(94% of queries < 100 ms, ~98.5% < 200 ms) on the inverted-index
substrate, corpus sketches built by Spark at sketch size 1024."""
import numpy as np
import pytest

from repro.exp.querytime import QueryTimeConfig, format_querytime, run_querytime
from repro.exp.report import save_report

CFG = QueryTimeConfig(n_tables=80, rows_scale=1.0, sketch_size=1024, seed=0)


@pytest.mark.benchmark(group="query")
def test_query_latency_distribution(spark, benchmark):
    stats = benchmark.pedantic(
        run_querytime, args=(spark, CFG), rounds=1, iterations=1
    )
    print()
    save_report("query_latency", format_querytime(stats))
    assert stats["pct_under_200ms"] >= 90.0


@pytest.mark.benchmark(group="query")
def test_single_query_latency(spark, benchmark):
    """Per-query latency as a proper pytest-benchmark statistic."""
    from repro.datagen.collection import collection_to_long_df
    from repro.datagen.opendata import make_nyc_like
    from repro.index.inverted import InvertedIndex
    from repro.sparkflow.build import build_sketches, column_stats

    coll = make_nyc_like(n_tables=60, rows_scale=1.0, seed=1)
    long_df = collection_to_long_df(spark, coll)
    sketches = build_sketches(long_df, n_max=1024).toPandas()
    stats = column_stats(long_df).toPandas()
    idx = InvertedIndex.from_pandas(sketches, stats, n_max=1024)
    qid = max(idx.store, key=lambda p: len(idx.store[p].hk))
    q = idx.store[qid].as_sketch(1024)

    results = benchmark(idx.query, q, top_n=100, k=100, exclude=qid)
    assert isinstance(results, list)
    assert np.isfinite([r.score for r in results]).all()
