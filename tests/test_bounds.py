"""Tests for repro.core.bounds: Fisher z, Hoeffding CI (coverage, width
scaling, HFD fallback), and the PM1 bootstrap CI."""
import math

import numpy as np
import pytest

from repro.core.bounds import (
    HoeffdingCI,
    fisher_se,
    hoeffding_ci,
    pm1_ci,
    pm1_ranks,
    se_z_factor,
)
from repro.core.estimators import pearson


def bivariate(rng, n, rho):
    cov = [[1.0, rho], [rho, 1.0]]
    xy = rng.multivariate_normal([0, 0], cov, size=n)
    return xy[:, 0], xy[:, 1]


class TestFisherZ:
    def test_formula(self):
        assert fisher_se(28) == pytest.approx(0.2)
        assert fisher_se(103) == pytest.approx(0.1)

    def test_requires_n_ge_4(self):
        with pytest.raises(ValueError):
            fisher_se(3)

    def test_se_z_factor_guards_small_n(self):
        assert se_z_factor(0) == se_z_factor(4) == 0.0
        assert se_z_factor(103) == pytest.approx(0.9)
        assert 0 <= se_z_factor(10) <= 1


class TestHoeffdingCI:
    def test_contains_sample_estimate(self):
        rng = np.random.default_rng(0)
        x, y = bivariate(rng, 5000, 0.7)
        c_lo = min(x.min(), y.min())
        c_hi = max(x.max(), y.max())
        n = 200
        ci = hoeffding_ci(x[:n], y[:n], c_low=c_lo, c_high=c_hi)
        r = pearson(x[:n], y[:n])
        assert ci.lo <= r <= ci.hi

    @pytest.mark.parametrize("rho", [-0.8, 0.0, 0.6])
    def test_coverage_at_least_95(self, rho):
        """Empirical coverage of the true union-bound interval must be
        ≥ 1 − α (it is conservative, so typically ≈ 1)."""
        rng = np.random.default_rng(1)
        N, n, reps = 4000, 300, 60
        hits = 0
        for _ in range(reps):
            X, Y = bivariate(rng, N, rho)
            true_rho = pearson(X, Y)
            idx = rng.choice(N, size=n, replace=False)
            ci = hoeffding_ci(
                X[idx], Y[idx],
                c_low=min(X.min(), Y.min()), c_high=max(X.max(), Y.max()),
                alpha=0.05,
            )
            hits += ci.lo <= true_rho <= ci.hi
        assert hits / reps >= 0.95

    def test_width_shrinks_with_n(self):
        rng = np.random.default_rng(2)
        X, Y = bivariate(rng, 100000, 0.5)
        c_lo, c_hi = min(X.min(), Y.min()), max(X.max(), Y.max())
        widths = []
        for n in [50, 500, 5000]:
            ci = hoeffding_ci(X[:n], Y[:n], c_low=c_lo, c_high=c_hi)
            widths.append(ci.length)
        assert widths[0] > widths[1] > widths[2]

    def test_width_scales_inverse_sqrt_n(self):
        """HFD interval length ∝ 1/√n for fixed data distribution (§4.3)."""
        rng = np.random.default_rng(3)
        X, Y = bivariate(rng, 200000, 0.0)
        c_lo, c_hi = min(X.min(), Y.min()), max(X.max(), Y.max())
        w1 = hoeffding_ci(X[:1000], Y[:1000], c_low=c_lo, c_high=c_hi).length
        w2 = hoeffding_ci(X[:4000], Y[:4000], c_low=c_lo, c_high=c_hi).length
        assert w1 / w2 == pytest.approx(2.0, rel=0.35)

    def test_width_grows_with_range_c(self):
        rng = np.random.default_rng(4)
        x, y = bivariate(rng, 200, 0.5)
        narrow = hoeffding_ci(x, y, c_low=-4, c_high=4)
        wide = hoeffding_ci(x, y, c_low=-40, c_high=40)
        assert wide.length > narrow.length

    def test_bounds_clipped(self):
        rng = np.random.default_rng(5)
        x, y = bivariate(rng, 5, 0.0)
        ci = hoeffding_ci(x, y, c_low=-100, c_high=100)
        for v in (ci.lo, ci.hi):
            assert -1.0 <= v <= 1.0
        assert ci.lo <= ci.hi
        # ρ_HFD is intentionally unclipped but must still bracket.
        assert ci.hfd_lo <= ci.hfd_hi

    def test_degenerate_inputs_widest_interval(self):
        ci = hoeffding_ci(np.array([1.0]), np.array([1.0]), c_low=0, c_high=1)
        assert (ci.lo, ci.hi) == (-1.0, 1.0)
        ci2 = hoeffding_ci(np.ones(10), np.ones(10), c_low=1, c_high=1)
        assert (ci2.lo, ci2.hi) == (-1.0, 1.0)

    def test_hfd_informative_at_small_n(self):
        """At small n the true denominators hit the max(0, ·) floor and the
        interval degenerates to [-1, 1]; ρ_HFD stays informative: finite,
        ordered, and still shrinking with n (so ci_h can rank candidates)."""
        rng = np.random.default_rng(6)
        x, y = bivariate(rng, 8, 0.9)
        ci = hoeffding_ci(x, y, c_low=-20, c_high=20)
        assert (ci.lo, ci.hi) == (-1.0, 1.0)
        assert np.isfinite(ci.length) and ci.length > 0
        x2, y2 = bivariate(rng, 64, 0.9)
        ci2 = hoeffding_ci(x2, y2, c_low=-20, c_high=20)
        assert ci2.length < ci.length

    def test_length_property(self):
        ci = HoeffdingCI(lo=-1, hi=1, hfd_lo=-0.25, hfd_hi=0.75)
        assert ci.length == pytest.approx(1.0)


class TestPM1CI:
    def test_ranks_table(self):
        assert pm1_ranks(10) == (6, 593)
        assert pm1_ranks(50) == (7, 592)
        assert pm1_ranks(100) == (10, 589)
        assert pm1_ranks(200) == (13, 586)
        assert pm1_ranks(1000) == (15, 584)

    def test_interval_contains_point_estimate(self):
        rng = np.random.default_rng(7)
        x, y = bivariate(rng, 120, 0.5)
        rb, lo, hi = pm1_ci(x, y, seed=0)
        assert lo <= rb <= hi

    def test_interval_shrinks_with_n(self):
        rng = np.random.default_rng(8)
        x1, y1 = bivariate(rng, 30, 0.5)
        x2, y2 = bivariate(rng, 500, 0.5)
        _, lo1, hi1 = pm1_ci(x1, y1, seed=0)
        _, lo2, hi2 = pm1_ci(x2, y2, seed=0)
        assert (hi2 - lo2) < (hi1 - lo1)

    def test_empirical_coverage(self):
        rng = np.random.default_rng(9)
        hits, reps = 0, 40
        for _ in range(reps):
            X, Y = bivariate(rng, 5000, 0.4)
            rho = pearson(X, Y)
            idx = rng.choice(5000, size=100, replace=False)
            _, lo, hi = pm1_ci(X[idx], Y[idx], seed=int(rng.integers(1 << 31)))
            hits += lo <= rho <= hi
        assert hits / reps >= 0.85  # nominal 95%, allow MC slack

    def test_degenerate(self):
        rb, lo, hi = pm1_ci(np.array([1.0]), np.array([1.0]))
        assert math.isnan(rb) and (lo, hi) == (-1.0, 1.0)
