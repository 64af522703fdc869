"""Tests for repro.core.kmv: DV estimators, Eq. 1 intersections, Jaccard
containment — accuracy against known set cardinalities."""
import numpy as np
import pytest

from repro.core.kmv import (
    distinct_estimate,
    dv_basic,
    dv_unbiased,
    intersection_estimate,
    jaccard_containment_estimate,
    join_size_estimate,
    union_estimate,
)
from repro.core.sketch import build_sketch


def sketch_of(keys, n_max=256, tag=""):
    return build_sketch([f"{tag}{k}" for k in keys], np.zeros(len(keys)), n_max=n_max)


class TestDVEstimators:
    def test_formulas(self):
        assert dv_basic(10, 0.05) == pytest.approx(200.0)
        assert dv_unbiased(10, 0.05) == pytest.approx(180.0)

    def test_invalid(self):
        assert np.isnan(dv_basic(0, 0.5))
        assert np.isnan(dv_unbiased(1, 0.5))
        assert np.isnan(dv_unbiased(10, 0.0))

    @pytest.mark.parametrize("d", [1000, 10000, 100000])
    def test_unbiased_estimator_accuracy(self, d):
        sk = sketch_of(range(d), n_max=256, tag=f"d{d}-")
        est = dv_unbiased(len(sk), sk.kth_unit_hash)
        # relative std ≈ 1/sqrt(k−2) ≈ 6.3%; allow 4σ
        assert est == pytest.approx(d, rel=0.25)

    def test_exact_when_sketch_not_full(self):
        sk = sketch_of(range(50), n_max=256)
        assert distinct_estimate(sk) == 50.0

    def test_estimate_when_full(self):
        sk = sketch_of(range(5000), n_max=128)
        assert distinct_estimate(sk) == pytest.approx(5000, rel=0.4)


class TestSetOperations:
    def test_union_exact_small(self):
        la = sketch_of(range(0, 30), n_max=256)
        lb = sketch_of(range(20, 60), n_max=256)
        assert union_estimate(la, lb) == pytest.approx(60.0)

    def test_union_estimate_large(self):
        la = sketch_of(range(0, 20000), n_max=256)
        lb = sketch_of(range(10000, 30000), n_max=256)
        assert union_estimate(la, lb) == pytest.approx(30000, rel=0.3)

    def test_intersection_exact_small(self):
        la = sketch_of(range(0, 30), n_max=256)
        lb = sketch_of(range(20, 60), n_max=256)
        assert intersection_estimate(la, lb) == pytest.approx(10.0)

    @pytest.mark.parametrize("overlap", [2000, 10000, 18000])
    def test_intersection_estimate_eq1(self, overlap):
        la = sketch_of(range(0, 20000), n_max=512)
        lb = sketch_of(range(20000 - overlap, 40000 - overlap), n_max=512)
        est = intersection_estimate(la, lb)
        assert est == pytest.approx(overlap, rel=0.35)

    def test_disjoint_intersection_near_zero(self):
        la = sketch_of(range(0, 10000), n_max=256, tag="a")
        lb = sketch_of(range(0, 10000), n_max=256, tag="b")
        est = intersection_estimate(la, lb)
        assert est == pytest.approx(0.0, abs=200)

    def test_join_size_alias(self):
        la = sketch_of(range(100), n_max=64)
        lb = sketch_of(range(50, 150), n_max=64)
        assert join_size_estimate(la, lb) == intersection_estimate(la, lb)


class TestJaccardContainment:
    @pytest.mark.parametrize("frac", [0.1, 0.5, 0.9])
    def test_containment_estimate(self, frac):
        dq = 8000
        overlap = int(dq * frac)
        lq = sketch_of(range(dq), n_max=512)
        lc = sketch_of(range(dq - overlap, 2 * dq - overlap), n_max=512)
        assert jaccard_containment_estimate(lq, lc) == pytest.approx(frac, abs=0.15)

    def test_full_containment_is_one(self):
        lq = sketch_of(range(500), n_max=1024)
        lc = sketch_of(range(2000), n_max=1024)
        assert jaccard_containment_estimate(lq, lc) == pytest.approx(1.0, abs=0.05)

    def test_clipped_to_one(self):
        lq = sketch_of(range(100), n_max=256)
        assert jaccard_containment_estimate(lq, lq) <= 1.0

    def test_empty_query_nan(self):
        lq = sketch_of([], n_max=16)
        lc = sketch_of(range(10), n_max=16)
        assert np.isnan(jaccard_containment_estimate(lq, lc))
