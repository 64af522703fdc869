"""Tests for the §4.4 scoring functions and the ranking evaluation
harness (query-frame assembly, metric plumbing)."""
import numpy as np
import pandas as pd
import pytest

from repro.ranking.evaluate import build_query_frames, evaluate_rankings
from repro.ranking.scoring import (
    ci_h_factor,
    make_score_random,
    rank_candidates,
    rankers,
    score_jc_est,
    score_jc_exact,
    score_rb_cib,
    score_rp,
    score_rp_cih,
    score_rp_sez,
    sez_factor,
)


def frame(**overrides) -> pd.DataFrame:
    base = pd.DataFrame(
        {
            "candidate": ["c1", "c2", "c3"],
            "n": [100, 10, 5],
            "est_pearson": [0.8, -0.9, 0.3],
            "est_pm1": [0.75, -0.85, 0.2],
            "pm1_lo": [0.6, -0.95, -0.5],
            "pm1_hi": [0.85, -0.6, 0.7],
            "ci_len": [0.2, 1.0, 3.0],
            "jc_est": [0.9, 0.3, 0.5],
            "jc": [0.95, 0.25, 0.55],
            "r_true": [0.85, -0.8, 0.1],
        }
    )
    for k, v in overrides.items():
        base[k] = v
    return base


class TestFactors:
    def test_sez_formula(self):
        np.testing.assert_allclose(
            sez_factor(np.array([103.0])), [1 - 0.1]
        )
        assert sez_factor(np.array([4.0]))[0] == 0.0
        assert sez_factor(np.array([1.0]))[0] == 0.0  # guarded by max(4, n)

    def test_ci_h_normalisation(self):
        f = ci_h_factor(np.array([0.2, 1.0, 3.0]))
        assert f[0] == pytest.approx(1.0)  # tightest
        assert f[2] == pytest.approx(0.0)  # widest
        assert 0 < f[1] < 1

    def test_ci_h_constant_list_no_penalty(self):
        np.testing.assert_allclose(ci_h_factor(np.array([0.5, 0.5])), [1.0, 1.0])

    def test_ci_h_nan_scores_zero(self):
        f = ci_h_factor(np.array([0.1, np.nan, 0.9]))
        assert f[1] == 0.0


class TestScorers:
    def test_rp_absolute_value(self):
        np.testing.assert_allclose(score_rp(frame()), [0.8, 0.9, 0.3])

    def test_rp_sez_penalises_small_n(self):
        s = score_rp_sez(frame())
        assert s[0] == pytest.approx(0.8 * (1 - 1 / np.sqrt(97)))
        assert s[2] == pytest.approx(0.3 * (1 - 1 / np.sqrt(2)))

    def test_rb_cib(self):
        s = score_rb_cib(frame())
        assert s[0] == pytest.approx(0.75 * (1 - 0.25 / 2))
        assert s[2] == pytest.approx(0.2 * (1 - 1.2 / 2))

    def test_rp_cih_downweights_wide_ci(self):
        s = score_rp_cih(frame())
        assert s[0] == pytest.approx(0.8)  # tightest CI, no penalty
        assert s[2] == pytest.approx(0.0)  # widest CI fully penalised

    def test_jc_scorers(self):
        np.testing.assert_allclose(score_jc_exact(frame()), [0.95, 0.25, 0.55])
        np.testing.assert_allclose(score_jc_est(frame()), [0.9, 0.3, 0.5])

    def test_nan_estimates_score_zero(self):
        f = frame(est_pearson=[np.nan, 0.5, np.nan])
        s = score_rp(f)
        assert s[0] == 0.0 and s[2] == 0.0 and s[1] == 0.5

    def test_random_deterministic(self):
        f = frame()
        sc = make_score_random(7)
        np.testing.assert_allclose(sc(f), sc(f))

    def test_registry_names(self):
        assert set(rankers()) == {
            "rp*cih", "rb*cib", "rp", "rp*sez", "jc", "jc_est", "random"
        }


class TestRankCandidates:
    def test_sorted_descending(self):
        ranked = rank_candidates(frame(), score_rp)
        assert list(ranked["candidate"]) == ["c2", "c1", "c3"]

    def test_deterministic_tiebreak(self):
        f = frame(est_pearson=[0.5, 0.5, 0.5], ci_len=[1, 1, 1])
        ranked = rank_candidates(f, score_rp)
        assert list(ranked["candidate"]) == ["c1", "c2", "c3"]


class TestBuildQueryFrames:
    def pair_tables(self):
        truth = pd.DataFrame(
            {
                "px": ["a", "a", "b"],
                "py": ["b", "c", "c"],
                "n_join": [50, 40, 30],
                "r_true": [0.9, 0.1, -0.7],
                "jc_x": [0.5, 0.4, 0.3],
                "jc_y": [0.25, 0.2, 0.15],
            }
        )
        est = pd.DataFrame(
            {
                "px": ["a", "a", "b"],
                "py": ["b", "c", "c"],
                "n": [20, 15, 10],
                "est_pearson": [0.85, 0.05, -0.6],
                "ci_len": [0.3, 0.5, 0.8],
                "jc_est": [0.45, 0.35, 0.28],
            }
        )
        return est, truth

    def test_symmetric_queries(self):
        est, truth = self.pair_tables()
        frames = build_query_frames(est, truth, min_candidates=1)
        assert set(frames) == {"a", "b", "c"}
        assert set(frames["a"]["candidate"]) == {"b", "c"}
        assert set(frames["c"]["candidate"]) == {"a", "b"}

    def test_directional_jc(self):
        est, truth = self.pair_tables()
        frames = build_query_frames(est, truth, min_candidates=1)
        a = frames["a"].set_index("candidate")
        b = frames["b"].set_index("candidate")
        assert a.loc["b", "jc"] == 0.5  # jc_x of (a, b)
        assert b.loc["a", "jc"] == 0.25  # jc_y of (a, b)

    def test_missing_estimates_filled_nan(self):
        est, truth = self.pair_tables()
        est = est.head(1)  # only (a, b) estimated
        frames = build_query_frames(est, truth, min_candidates=1)
        a = frames["a"].set_index("candidate")
        assert np.isnan(a.loc["c", "est_pearson"])
        assert a.loc["c", "n"] == 0

    def test_min_candidates_filter(self):
        est, truth = self.pair_tables()
        frames = build_query_frames(est, truth.head(1), min_candidates=2)
        assert frames == {}


class TestEvaluateRankings:
    def test_correlation_ranker_beats_random_on_planted_data(self):
        """Synthetic check of the Table 1 mechanism: when estimates track
        truth, rp MAP must beat random and jc (which is uninformative)."""
        rng = np.random.default_rng(0)
        frames = {}
        for q in range(30):
            n_cand = 12
            r_true = rng.uniform(-1, 1, n_cand)
            est = np.clip(r_true + rng.normal(0, 0.1, n_cand), -1, 1)
            frames[f"q{q}"] = pd.DataFrame(
                {
                    "candidate": [f"c{i}" for i in range(n_cand)],
                    "n": rng.integers(20, 200, n_cand),
                    "est_pearson": est,
                    "est_pm1": est,
                    "pm1_lo": est - 0.2,
                    "pm1_hi": est + 0.2,
                    "ci_len": rng.uniform(0.1, 1.0, n_cand),
                    "jc_est": rng.uniform(0, 1, n_cand),
                    "jc": rng.uniform(0, 1, n_cand),
                    "r_true": r_true,
                }
            )
        report = evaluate_rankings(frames, seed=1)
        t = report.table
        assert t.loc["rp", "map_0.5"] > t.loc["random", "map_0.5"] + 0.15
        assert t.loc["rp", "map_0.5"] > t.loc["jc", "map_0.5"] + 0.15
        assert t.loc["rp*cih", "ndcg_5"] > t.loc["jc", "ndcg_5"]

    def test_relative_to_baseline(self):
        rng = np.random.default_rng(2)
        frames = {
            "q": pd.DataFrame(
                {
                    "candidate": ["c0", "c1"],
                    "n": [50, 60],
                    "est_pearson": [0.9, 0.1],
                    "est_pm1": [0.9, 0.1],
                    "pm1_lo": [0.8, -0.1],
                    "pm1_hi": [0.95, 0.3],
                    "ci_len": [0.2, 0.4],
                    "jc_est": [0.5, 0.6],
                    "jc": [0.5, 0.6],
                    "r_true": [0.85, 0.05],
                }
            )
        }
        report = evaluate_rankings(frames)
        rel = report.relative_to("jc")
        assert rel.loc["jc"].abs().max() == 0.0

    def test_report_counts_queries(self):
        report = evaluate_rankings({}, seed=0)
        assert report.n_queries == 0
