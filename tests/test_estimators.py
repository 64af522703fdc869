"""Tests for repro.core.estimators against independent references:
numpy.corrcoef, DuckDB's corr(), closed forms, and invariance properties."""
import duckdb
import numpy as np
import pytest

from repro.core.estimators import (
    norm_ppf,
    pearson,
    pm1_bootstrap,
    qn,
    qn_scale,
    rankdata,
    rankit,
    rin,
    spearman,
)


def bivariate(rng, n, rho):
    cov = [[1.0, rho], [rho, 1.0]]
    xy = rng.multivariate_normal([0, 0], cov, size=n)
    return xy[:, 0], xy[:, 1]


class TestPearson:
    @pytest.mark.parametrize("seed", range(5))
    def test_matches_numpy(self, seed):
        rng = np.random.default_rng(seed)
        x, y = bivariate(rng, 200, 0.6)
        assert pearson(x, y) == pytest.approx(np.corrcoef(x, y)[0, 1], abs=1e-12)

    def test_matches_duckdb(self):
        rng = np.random.default_rng(42)
        x, y = bivariate(rng, 500, -0.4)
        expected = duckdb.sql(
            "SELECT corr(a, b) FROM (SELECT unnest($x) a, unnest($y) b)",
            params={"x": list(x), "y": list(y)},
        ).fetchone()[0]
        assert pearson(x, y) == pytest.approx(expected, abs=1e-9)

    def test_perfect_linear(self):
        x = np.arange(50.0)
        assert pearson(x, 3 * x + 7) == pytest.approx(1.0)
        assert pearson(x, -2 * x) == pytest.approx(-1.0)

    def test_undefined_cases(self):
        assert np.isnan(pearson(np.array([1.0]), np.array([2.0])))
        assert np.isnan(pearson(np.ones(10), np.arange(10.0)))  # zero variance

    def test_shift_scale_invariance(self):
        rng = np.random.default_rng(1)
        x, y = bivariate(rng, 100, 0.3)
        assert pearson(5 * x + 100, 0.01 * y - 3) == pytest.approx(pearson(x, y))

    def test_clipped_to_unit_interval(self):
        x = np.array([1.0, 1.0 + 1e-15, 1.0 + 2e-15])
        r = pearson(x, x)
        assert np.isnan(r) or -1.0 <= r <= 1.0


class TestRankdata:
    def test_no_ties(self):
        np.testing.assert_array_equal(rankdata(np.array([30.0, 10.0, 20.0])), [3, 1, 2])

    def test_average_ties(self):
        np.testing.assert_array_equal(
            rankdata(np.array([1.0, 2.0, 2.0, 3.0])), [1, 2.5, 2.5, 4]
        )

    def test_all_tied(self):
        np.testing.assert_array_equal(rankdata(np.ones(5)), [3.0] * 5)


class TestSpearman:
    def test_monotonic_nonlinear_is_one(self):
        x = np.linspace(0.1, 5, 60)
        assert spearman(x, np.exp(x)) == pytest.approx(1.0)
        assert spearman(x, -np.log(x)) == pytest.approx(-1.0)

    def test_matches_closed_form_no_ties(self):
        rng = np.random.default_rng(2)
        x = rng.permutation(100).astype(float)
        y = rng.permutation(100).astype(float)
        d = rankdata(x) - rankdata(y)
        closed = 1 - 6 * (d**2).sum() / (100 * (100**2 - 1))
        assert spearman(x, y) == pytest.approx(closed, abs=1e-12)

    def test_outlier_robustness_vs_pearson(self):
        x = np.arange(50.0)
        y = x.copy()
        y[-1] = -1e6
        assert spearman(x, y) > 0.8
        assert pearson(x, y) < 0.5


class TestNormPpf:
    @pytest.mark.parametrize(
        "p,z",
        [(0.5, 0.0), (0.975, 1.959963985), (0.025, -1.959963985),
         (0.8413447461, 1.0), (0.0013498980, -3.0), (0.999, 3.090232306)],
    )
    def test_known_quantiles(self, p, z):
        assert float(norm_ppf(p)) == pytest.approx(z, abs=1e-6)

    def test_symmetry(self):
        ps = np.linspace(0.01, 0.99, 23)
        np.testing.assert_allclose(norm_ppf(ps), -norm_ppf(1 - ps), atol=1e-9)

    def test_out_of_domain_nan(self):
        assert np.isnan(norm_ppf(np.array([0.0]))).all()
        assert np.isnan(norm_ppf(np.array([1.0]))).all()


class TestRIN:
    def test_rankit_is_monotone_and_centred(self):
        rng = np.random.default_rng(3)
        x = rng.exponential(size=200)
        t = rankit(x)
        order = np.argsort(x)
        assert (np.diff(t[order]) >= 0).all()
        assert abs(t.mean()) < 0.05

    def test_rin_equals_spearman_direction(self):
        rng = np.random.default_rng(4)
        x = rng.exponential(size=150)
        y = x**2 + rng.normal(scale=0.01, size=150)
        assert rin(x, y) > 0.99

    def test_rin_invariant_to_monotone_transform(self):
        rng = np.random.default_rng(5)
        x, y = bivariate(rng, 300, 0.5)
        assert rin(np.exp(x), y) == pytest.approx(rin(x, y), abs=1e-9)


class TestQn:
    def test_qn_scale_proportional_to_sigma(self):
        rng = np.random.default_rng(6)
        a = rng.normal(scale=1.0, size=400)
        b = rng.normal(scale=5.0, size=400)
        assert qn_scale(b) / qn_scale(a) == pytest.approx(5.0, rel=0.25)

    def test_qn_detects_strong_correlation(self):
        rng = np.random.default_rng(7)
        x, y = bivariate(rng, 300, 0.9)
        assert qn(x, y) > 0.7

    def test_qn_sign(self):
        rng = np.random.default_rng(8)
        x, y = bivariate(rng, 300, -0.8)
        assert qn(x, y) < -0.5

    def test_qn_outlier_robustness(self):
        rng = np.random.default_rng(9)
        x, y = bivariate(rng, 200, 0.85)
        y2 = y.copy()
        y2[:4] = 1e5  # 2% contamination
        assert qn(x, y2) > 0.6  # Pearson would collapse toward 0
        assert abs(pearson(x, y2)) < 0.2

    def test_qn_range(self):
        rng = np.random.default_rng(10)
        for rho in [-0.9, 0.0, 0.9]:
            x, y = bivariate(rng, 100, rho)
            assert -1.0 <= qn(x, y) <= 1.0


class TestPM1Bootstrap:
    def test_close_to_pearson_large_n(self):
        rng = np.random.default_rng(11)
        x, y = bivariate(rng, 400, 0.6)
        assert pm1_bootstrap(x, y, seed=0) == pytest.approx(pearson(x, y), abs=0.03)

    def test_deterministic_given_seed(self):
        rng = np.random.default_rng(12)
        x, y = bivariate(rng, 60, 0.4)
        assert pm1_bootstrap(x, y, seed=5) == pm1_bootstrap(x, y, seed=5)

    def test_adaptive_stop_uses_fewer_than_cap(self):
        rng = np.random.default_rng(13)
        x, y = bivariate(rng, 500, 0.9)  # tight resample spread → early stop
        # Indirect check: result is finite and within [-1, 1]; the stopping
        # rule is exercised because max_resamples is large.
        r = pm1_bootstrap(x, y, seed=1, max_resamples=10000)
        assert -1 <= r <= 1

    def test_small_sample_nan(self):
        assert np.isnan(pm1_bootstrap(np.array([1.0]), np.array([1.0])))
