"""Tests for MAP / nDCG against hand-computed examples."""
import math

import pytest

from repro.ranking.metrics import (
    average_precision,
    dcg_at_k,
    mean_average_precision,
    mean_ndcg_at_k,
    ndcg_at_k,
)


class TestAveragePrecision:
    def test_perfect_ranking(self):
        assert average_precision([True, True, False, False]) == pytest.approx(1.0)

    def test_hand_computed(self):
        # hits at ranks 1 and 3: (1/1 + 2/3) / 2
        assert average_precision([True, False, True]) == pytest.approx((1 + 2 / 3) / 2)

    def test_worst_ranking(self):
        # single hit at last of 4: AP = 1/4
        assert average_precision([False, False, False, True]) == pytest.approx(0.25)

    def test_no_relevant_is_nan(self):
        assert math.isnan(average_precision([False, False]))

    def test_empty_is_nan(self):
        assert math.isnan(average_precision([]))

    def test_map_skips_nan_queries(self):
        got = mean_average_precision([[True], [False], [False, True]])
        assert got == pytest.approx((1.0 + 0.5) / 2)

    def test_map_all_nan(self):
        assert math.isnan(mean_average_precision([[False]]))


class TestNDCG:
    def test_dcg_hand_computed(self):
        # 3/log2(2) + 2/log2(3) + 1/log2(4)
        expect = 3 / 1 + 2 / math.log2(3) + 1 / 2
        assert dcg_at_k([3, 2, 1], 3) == pytest.approx(expect)

    def test_dcg_truncates_at_k(self):
        assert dcg_at_k([3, 2, 1], 2) == pytest.approx(3 + 2 / math.log2(3))

    def test_ideal_ordering_is_one(self):
        assert ndcg_at_k([0.9, 0.5, 0.1], 3) == pytest.approx(1.0)

    def test_reversed_ordering_below_one(self):
        assert ndcg_at_k([0.1, 0.5, 0.9], 3) < 1.0

    def test_hand_computed(self):
        gains = [0.2, 1.0]
        got = ndcg_at_k(gains, 2)
        expect = (0.2 + 1.0 / math.log2(3)) / (1.0 + 0.2 / math.log2(3))
        assert got == pytest.approx(expect)

    def test_all_zero_is_nan(self):
        assert math.isnan(ndcg_at_k([0.0, 0.0], 5))

    def test_mean_ndcg_skips_nan(self):
        got = mean_ndcg_at_k([[1.0, 0.0], [0.0, 0.0]], 2)
        assert got == pytest.approx(1.0)

    def test_k_larger_than_list(self):
        assert ndcg_at_k([0.5], 10) == pytest.approx(1.0)
