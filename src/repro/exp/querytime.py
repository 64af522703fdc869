"""Query-evaluation latency experiment (paper §5.5, "Query Evaluation").

The paper splits the NYC column pairs into a query set and a corpus set,
indexes the corpus (sketch size 1024) in an inverted index, issues every
query, and reports that 94% of queries finish under 100 ms and ~98.5%
under 200 ms (retrieve top-100 by key overlap + read sketches + re-rank
by estimated correlation).

Here the corpus sketches come out of the distributed Spark build and are
served from the in-memory inverted index substrate (DESIGN.md §3).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.datagen.collection import collection_to_long_df
from repro.datagen.opendata import make_nyc_like
from repro.index.inverted import InvertedIndex
from repro.sparkflow.build import build_sketches, column_stats


@dataclass(frozen=True)
class QueryTimeConfig:
    n_tables: int = 80
    rows_scale: float = 1.0
    sketch_size: int = 1024
    top_n: int = 100
    seed: int = 0


def run_querytime(spark: SparkSession, cfg: QueryTimeConfig = QueryTimeConfig()) -> dict:
    """Build the index from the Spark artifacts, run all queries, return
    latency statistics."""
    coll = make_nyc_like(n_tables=cfg.n_tables, rows_scale=cfg.rows_scale, seed=cfg.seed)
    long_df = collection_to_long_df(spark, coll)
    sketches = build_sketches(long_df, n_max=cfg.sketch_size).toPandas()
    stats = column_stats(long_df).toPandas()
    pair_ids = sorted(sketches["pair_id"].unique())
    rng = np.random.default_rng(cfg.seed)
    perm = rng.permutation(len(pair_ids))
    half = len(pair_ids) // 2
    query_ids = {pair_ids[i] for i in perm[:half]}
    corpus_ids = {pair_ids[i] for i in perm[half:]}

    corpus_sketches = sketches[sketches["pair_id"].isin(corpus_ids)]
    idx = InvertedIndex.from_pandas(
        corpus_sketches, stats[stats["pair_id"].isin(corpus_ids)],
        n_max=cfg.sketch_size,
    )
    query_store = InvertedIndex.from_pandas(
        sketches[sketches["pair_id"].isin(query_ids)],
        stats[stats["pair_id"].isin(query_ids)],
        n_max=cfg.sketch_size,
    ).store

    latencies = []
    answered = 0
    for qid in sorted(query_store):
        q = query_store[qid].as_sketch(cfg.sketch_size)
        results = idx.query(q, top_n=cfg.top_n, k=100)
        if results:
            latencies.append(results[0].elapsed_ms)
            answered += 1
    lat = np.array(latencies) if latencies else np.array([np.nan])
    return {
        "n_queries": len(query_store),
        "n_answered": answered,
        "mean_ms": float(np.nanmean(lat)),
        "p50_ms": float(np.nanpercentile(lat, 50)),
        "p90_ms": float(np.nanpercentile(lat, 90)),
        "p99_ms": float(np.nanpercentile(lat, 99)),
        "max_ms": float(np.nanmax(lat)),
        "pct_under_100ms": float((lat < 100).mean() * 100),
        "pct_under_200ms": float((lat < 200).mean() * 100),
    }


def format_querytime(stats: dict) -> str:
    return (
        "Query evaluation latency (paper §5.5: 94% < 100 ms, ~98.5% < 200 ms)\n"
        f"  queries={stats['n_queries']} answered={stats['n_answered']}\n"
        f"  mean={stats['mean_ms']:.3f} ms  p50={stats['p50_ms']:.3f}  "
        f"p90={stats['p90_ms']:.3f}  p99={stats['p99_ms']:.3f}  max={stats['max_ms']:.3f}\n"
        f"  under 100 ms: {stats['pct_under_100ms']:.1f}%   "
        f"under 200 ms: {stats['pct_under_200ms']:.1f}%"
    )
