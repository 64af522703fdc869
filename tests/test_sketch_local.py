"""Tests for the local streaming Correlation Sketch builder (paper §3.1).

Covers: bottom-n selection by h_u, streaming aggregation of repeated keys,
batch/stream equivalence, order invariance, metadata (range, counts), and
the sketch join.
"""
import numpy as np
import pytest

from repro.core.hashing import fibonacci_unit, g_unit, murmur3_32
from repro.core.sketch import (
    AGG_NAMES,
    SketchBuilder,
    build_sketch,
    join_sketches,
)


def keys_of(n, prefix="k"):
    return [f"{prefix}{i}" for i in range(n)]


class TestSelection:
    def test_keeps_all_when_under_capacity(self):
        sk = build_sketch(keys_of(10), np.arange(10.0), n_max=64)
        assert len(sk) == 10
        assert sk.n_rows == 10
        assert sk.n_distinct == 10

    def test_caps_at_n_max(self):
        sk = build_sketch(keys_of(1000), np.arange(1000.0), n_max=32)
        assert len(sk) == 32

    def test_selects_n_smallest_g(self):
        ks = keys_of(500)
        sk = build_sketch(ks, np.arange(500.0), n_max=20)
        g = sorted((g_unit(k), murmur3_32(k)) for k in ks)
        expected = {hk for _, hk in g[:20]}
        assert sk.key_set() == expected

    def test_sorted_by_hu(self):
        sk = build_sketch(keys_of(200), np.zeros(200), n_max=50)
        assert (np.diff(sk.hu) >= 0).all()
        np.testing.assert_allclose(sk.hu, fibonacci_unit(sk.hk))

    def test_values_follow_keys(self):
        ks = keys_of(300)
        vals = np.arange(300.0) * 2.5
        sk = build_sketch(ks, vals, n_max=40)
        lookup = {murmur3_32(k): v for k, v in zip(ks, vals)}
        for hk, x in zip(sk.hk, sk.xk):
            assert lookup[int(hk)] == x

    def test_insertion_order_invariance(self):
        ks = keys_of(400)
        vals = list(np.arange(400.0))
        sk1 = build_sketch(ks, vals, n_max=30)
        rng = np.random.default_rng(7)
        perm = rng.permutation(400)
        sk2 = build_sketch([ks[i] for i in perm], [vals[i] for i in perm], n_max=30)
        np.testing.assert_array_equal(sk1.hk, sk2.hk)
        np.testing.assert_array_equal(sk1.xk, sk2.xk)


class TestAggregation:
    @pytest.mark.parametrize("agg", AGG_NAMES)
    def test_agg_matches_pandas(self, agg):
        import pandas as pd

        rng = np.random.default_rng(0)
        ks = [f"k{rng.integers(0, 30)}" for _ in range(500)]
        vals = rng.normal(size=500)
        sk = build_sketch(ks, vals, n_max=1000, agg=agg)
        pandas_agg = {"mean": "mean", "sum": "sum", "max": "max", "min": "min",
                      "first": "first", "last": "last", "count": "count"}[agg]
        expected = pd.DataFrame({"k": ks, "v": vals}).groupby("k")["v"].agg(pandas_agg)
        got = {int(hk): x for hk, x in zip(sk.hk, sk.xk)}
        for key, val in expected.items():
            assert got[murmur3_32(key)] == pytest.approx(float(val))

    def test_streaming_mean_is_true_mean(self):
        # Mean must be count+sum streaming, not mean-of-means.
        sk = build_sketch(["a", "a", "a"], [1.0, 2.0, 6.0], n_max=4)
        assert sk.xk[0] == pytest.approx(3.0)

    def test_paper_figure2_example(self):
        """Table T_Y from Fig. 1: key 2021-01 → mean(5.5, 4.5) = 5.0 etc."""
        ks = ["2021-01", "2021-01", "2021-02", "2021-02", "2021-03", "2021-03", "2021-04"]
        vs = [5.5, 4.5, 3.9, 2.0, 4.0, 1.0, 4.0]
        sk = build_sketch(ks, vs, n_max=100, agg="mean")
        got = {int(hk): x for hk, x in zip(sk.hk, sk.xk)}
        assert got[murmur3_32("2021-01")] == pytest.approx(5.0)
        assert got[murmur3_32("2021-02")] == pytest.approx(2.95)
        assert got[murmur3_32("2021-03")] == pytest.approx(2.5)
        assert got[murmur3_32("2021-04")] == pytest.approx(4.0)

    def test_repeated_key_outside_sketch_not_added(self):
        """A key whose g(k) is above the retained threshold stays out even
        if it repeats many times."""
        ks = keys_of(200)
        sk_small = build_sketch(ks, np.zeros(200), n_max=10)
        outside = [k for k in ks if murmur3_32(k) not in sk_small.key_set()][0]
        b = SketchBuilder(n_max=10)
        b.add_many(ks, np.zeros(200))
        for _ in range(50):
            b.add(outside, 1.0)
        sk2 = b.build()
        np.testing.assert_array_equal(sk2.hk, sk_small.hk)


class TestMetadata:
    def test_range_covers_full_column_not_just_sketch(self):
        ks = keys_of(1000)
        vals = np.linspace(-50, 80, 1000)
        sk = build_sketch(ks, vals, n_max=8)
        assert sk.x_min == pytest.approx(-50.0)
        assert sk.x_max == pytest.approx(80.0)

    def test_counts(self):
        ks = ["a", "b", "a", "c", "b", "a"]
        sk = build_sketch(ks, np.arange(6.0), n_max=100)
        assert sk.n_rows == 6
        assert sk.n_distinct == 3

    def test_skips_nulls_and_nonfinite(self):
        b = SketchBuilder(n_max=10)
        b.add(None, 1.0)
        b.add("a", None)
        b.add("b", float("nan"))
        b.add("c", float("inf"))
        b.add("d", 2.0)
        sk = b.build()
        assert len(sk) == 1
        assert sk.n_rows == 1

    def test_empty_sketch(self):
        sk = SketchBuilder(n_max=5).build()
        assert len(sk) == 0
        assert np.isnan(sk.x_min)


class TestValidation:
    def test_bad_size(self):
        with pytest.raises(ValueError):
            SketchBuilder(n_max=0)

    def test_bad_agg(self):
        with pytest.raises(ValueError):
            SketchBuilder(n_max=4, agg="median")


class TestJoin:
    def test_join_is_key_intersection(self):
        ka = keys_of(100, "a")
        shared = keys_of(50, "s")
        kb = keys_of(100, "b")
        la = build_sketch(ka + shared, np.arange(150.0), n_max=1000)
        lb = build_sketch(shared + kb, np.arange(150.0), n_max=1000)
        hk, x, y = join_sketches(la, lb)
        assert set(int(h) for h in hk) == {murmur3_32(k) for k in shared}

    def test_join_pairs_aligned_by_key(self):
        ks = keys_of(80)
        xv = np.arange(80.0)
        yv = np.arange(80.0) * -3
        lx = build_sketch(ks, xv, n_max=30)
        ly = build_sketch(ks, yv, n_max=30)
        hk, x, y = join_sketches(lx, ly)
        assert len(hk) == 30  # identical key sets → full overlap (§3.1)
        np.testing.assert_allclose(y, x * -3)

    def test_join_sorted_by_hu(self):
        ks = keys_of(300)
        lx = build_sketch(ks, np.arange(300.0), n_max=64)
        ly = build_sketch(ks, np.arange(300.0), n_max=64)
        hk, _, _ = join_sketches(lx, ly)
        hu = fibonacci_unit(hk)
        assert (np.diff(hu) >= 0).all()

    def test_dependent_inclusion_beats_uniform_sampling(self):
        """§3.1 key idea: min-hash selection makes both sketches include the
        same keys; overlap ≈ n, not n²/N."""
        n, N = 32, 5000
        ks = keys_of(N)
        lx = build_sketch(ks, np.zeros(N), n_max=n)
        ly = build_sketch(ks, np.ones(N), n_max=n)
        hk, _, _ = join_sketches(lx, ly)
        assert len(hk) == n  # would be ~n²/N ≈ 0.2 for independent sampling

    def test_theorem1_structural_property(self):
        """Proof of Thm 1: if |L_KX ∩ L_KY| = m, it equals the m smallest
        g(k) over the full key intersection."""
        rng = np.random.default_rng(3)
        ka = [f"x{i}" for i in range(400)]
        kb = [f"x{i}" for i in range(200, 700)]
        lx = build_sketch(ka, rng.normal(size=400), n_max=48)
        ly = build_sketch(kb, rng.normal(size=500), n_max=48)
        hk, _, _ = join_sketches(lx, ly)
        inter_keys = [f"x{i}" for i in range(200, 400)]
        ranked = sorted(inter_keys, key=g_unit)
        expected = {murmur3_32(k) for k in ranked[: len(hk)]}
        assert set(int(h) for h in hk) == expected

    def test_uniform_sample_is_unbiased(self):
        """Statistical check of Thm 1: over many seeds, the mean of sampled
        x values is centred on the joined-table population mean."""
        N = 2000
        pop = np.arange(N, dtype=np.float64)
        pop_mean = pop.mean()
        means = []
        for rep in range(40):
            ks = [f"r{rep}-{i}" for i in range(N)]
            lx = build_sketch(ks, pop, n_max=64)
            ly = build_sketch(ks, pop, n_max=64)
            _, x, _ = join_sketches(lx, ly)
            means.append(x.mean())
        se = N / np.sqrt(12 * 64 * 40)  # σ_uniform/√(n·reps)
        assert abs(np.mean(means) - pop_mean) < 4 * se
