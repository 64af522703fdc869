"""Spark DataFrame dataflows: sketch construction, sketch-join estimation,
and full-join ground truth."""
from .build import (
    SKETCH_SCHEMA,
    SPARK_AGG_NAMES,
    build_sketches,
    column_stats,
    sketch_summaries,
    with_hashes,
)
from .join import (
    DEFAULT_ESTIMATORS,
    candidate_pairs,
    estimate_all_pairs,
    query_estimates,
)
from .truth import (
    aggregate_by_key,
    joined_pairs,
    true_pair_estimators,
    true_pair_stats,
)

__all__ = [
    "DEFAULT_ESTIMATORS",
    "SKETCH_SCHEMA",
    "SPARK_AGG_NAMES",
    "aggregate_by_key",
    "build_sketches",
    "candidate_pairs",
    "column_stats",
    "estimate_all_pairs",
    "joined_pairs",
    "query_estimates",
    "sketch_summaries",
    "true_pair_estimators",
    "true_pair_stats",
]
