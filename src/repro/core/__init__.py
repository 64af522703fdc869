"""Core algorithms: hashing, sketches, estimators, bounds, KMV statistics."""
from .bounds import HoeffdingCI, fisher_se, hoeffding_ci, pm1_ci, se_z_factor
from .estimators import ESTIMATORS, pearson, pm1_bootstrap, qn, rin, spearman
from .hashing import fibonacci_unit, g_unit, g_unit_np, murmur3_32, murmur3_32_np
from .kmv import (
    distinct_estimate,
    dv_basic,
    dv_unbiased,
    intersection_estimate,
    jaccard_containment_estimate,
    join_size_estimate,
    union_estimate,
)
from .sketch import AGG_NAMES, CorrelationSketch, SketchBuilder, build_sketch, join_sketches

__all__ = [
    "AGG_NAMES",
    "CorrelationSketch",
    "ESTIMATORS",
    "HoeffdingCI",
    "SketchBuilder",
    "build_sketch",
    "distinct_estimate",
    "dv_basic",
    "dv_unbiased",
    "fibonacci_unit",
    "fisher_se",
    "g_unit",
    "g_unit_np",
    "hoeffding_ci",
    "intersection_estimate",
    "jaccard_containment_estimate",
    "join_size_estimate",
    "join_sketches",
    "murmur3_32",
    "murmur3_32_np",
    "pearson",
    "pm1_bootstrap",
    "pm1_ci",
    "qn",
    "rin",
    "se_z_factor",
    "spearman",
    "union_estimate",
]
