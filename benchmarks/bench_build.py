"""Benchmark of distributed sketch construction throughput: one Spark
map/reduce pass sketching every column pair of an NYC-like collection at
SF≈0.1 (~10⁶ long rows)."""
import pytest

from repro.datagen.collection import collection_to_long_df, collection_to_pandas_long
from repro.datagen.opendata import make_nyc_like
from repro.sparkflow.build import build_sketches


@pytest.fixture(scope="module")
def long_df(spark):
    coll = make_nyc_like(n_tables=120, rows_scale=8.0, seed=0)
    n_rows = len(collection_to_pandas_long(coll))
    df = collection_to_long_df(spark, coll).cache()
    df.count()  # materialise
    print(f"\n[bench_build] long rows = {n_rows}")
    return df


@pytest.mark.benchmark(group="build")
def test_build_sketches_256(spark, benchmark, long_df):
    def build():
        return build_sketches(long_df, n_max=256).count()

    total = benchmark.pedantic(build, rounds=2, iterations=1)
    assert total > 0


@pytest.mark.benchmark(group="build")
def test_build_sketches_1024(spark, benchmark, long_df):
    def build():
        return build_sketches(long_df, n_max=1024).count()

    total = benchmark.pedantic(build, rounds=2, iterations=1)
    assert total > 0
