"""Property-based tests (hypothesis) for core invariants."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.bounds import hoeffding_ci
from repro.core.estimators import pearson, rankdata, spearman
from repro.core.hashing import fibonacci_unit, g_unit, murmur3_32
from repro.core.sketch import build_sketch

keys = st.text(min_size=0, max_size=24)


@given(keys, st.integers(min_value=0, max_value=2**32 - 1))
@settings(max_examples=200, deadline=None)
def test_murmur_range_and_determinism(s, seed):
    h1 = murmur3_32(s, seed)
    assert 0 <= h1 < 2**32
    assert h1 == murmur3_32(s, seed)


@given(st.integers(min_value=0, max_value=2**32 - 1))
@settings(max_examples=200, deadline=None)
def test_fibonacci_unit_interval(hk):
    u = fibonacci_unit(hk)
    assert 0.0 <= u < 1.0


@given(st.lists(keys, min_size=1, max_size=60, unique=True),
       st.integers(min_value=1, max_value=16))
@settings(max_examples=50, deadline=None)
def test_sketch_selects_exact_bottom_n(ks, n_max):
    sk = build_sketch(ks, np.zeros(len(ks)), n_max=n_max)
    # distinct-by-hash keys, ranked by g
    by_hash = {murmur3_32(k): g_unit(k) for k in ks}
    expected = set(sorted(by_hash, key=lambda h: (by_hash[h], h))[:n_max])
    assert sk.key_set() == expected


@given(st.lists(st.floats(min_value=-1e6, max_value=1e6,
                          allow_nan=False, allow_infinity=False),
                min_size=3, max_size=50))
@settings(max_examples=100, deadline=None)
def test_pearson_bounded_or_nan(xs):
    rng = np.random.default_rng(0)
    x = np.array(xs)
    y = rng.normal(size=len(x))
    r = pearson(x, y)
    assert np.isnan(r) or -1.0 <= r <= 1.0


@given(st.lists(st.floats(min_value=-1e3, max_value=1e3,
                          allow_nan=False, allow_infinity=False),
                min_size=2, max_size=40))
@settings(max_examples=100, deadline=None)
def test_rankdata_is_permutation_invariant_sum(xs):
    x = np.array(xs)
    ranks = rankdata(x)
    # rank sums are conserved: sum = n(n+1)/2
    assert np.isclose(ranks.sum(), len(x) * (len(x) + 1) / 2)


@given(st.integers(min_value=3, max_value=60), st.integers(min_value=0, max_value=100))
@settings(max_examples=50, deadline=None)
def test_spearman_invariant_to_monotone_transform(n, seed):
    rng = np.random.default_rng(seed)
    x = rng.normal(size=n)
    y = rng.normal(size=n)
    a = spearman(x, y)
    b = spearman(np.exp(x), y)  # strictly monotone transform of x
    if np.isfinite(a) and np.isfinite(b):
        assert np.isclose(a, b, atol=1e-9)


@given(st.integers(min_value=2, max_value=80), st.integers(min_value=0, max_value=50))
@settings(max_examples=50, deadline=None)
def test_hoeffding_hfd_brackets(n, seed):
    rng = np.random.default_rng(seed)
    x = rng.uniform(-5, 5, size=n)
    y = rng.uniform(-5, 5, size=n)
    ci = hoeffding_ci(x, y, c_low=-5, c_high=5)
    assert ci.lo <= ci.hi
    assert ci.hfd_lo <= ci.hfd_hi
    assert ci.length >= 0
