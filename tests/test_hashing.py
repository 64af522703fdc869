"""Tests for repro.core.hashing: MurmurHash3 vectors, Fibonacci hashing,
scalar/vectorised parity, and uniformity of g(k)."""
import numpy as np
import pytest

from repro.core.hashing import (
    fibonacci_unit,
    g_unit,
    g_unit_np,
    murmur3_32,
    murmur3_32_np,
)

# Published MurmurHash3_x86_32 test vectors (Appleby's reference impl).
KNOWN_VECTORS = [
    (b"", 0, 0),
    (b"", 1, 0x514E28B7),
    (b"", 0xFFFFFFFF, 0x81F16F39),
    (b"\x00\x00\x00\x00", 0, 0x2362F9DE),
    (b"aaaa", 0x9747B28C, 0x5A97808A),
    (b"aaa", 0x9747B28C, 0x283E0130),
    (b"aa", 0x9747B28C, 0x5D211726),
    (b"a", 0x9747B28C, 0x7FA09EA6),
    (b"abcd", 0x9747B28C, 0xF0478627),
    (b"abc", 0x9747B28C, 0xC84A62DD),
    (b"ab", 0x9747B28C, 0x74875592),
    (b"Hello, world!", 0x9747B28C, 0x24884CBA),
]


@pytest.mark.parametrize("data,seed,expected", KNOWN_VECTORS)
def test_murmur3_known_vectors(data, seed, expected):
    assert murmur3_32(data, seed) == expected


def test_murmur3_str_is_utf8_bytes():
    assert murmur3_32("abc", 7) == murmur3_32("abc".encode(), 7)
    assert murmur3_32("café") == murmur3_32("café".encode("utf-8"))


def test_murmur3_deterministic():
    assert murmur3_32("2021-01") == murmur3_32("2021-01")


def test_murmur3_range():
    for s in ["", "x", "zip:10001", "a" * 100]:
        h = murmur3_32(s)
        assert 0 <= h < 2**32


@pytest.mark.parametrize("n", [0, 1, 7, 100])
def test_vectorised_matches_scalar(n):
    rng = np.random.default_rng(n)
    strs = ["k%d" % rng.integers(0, 10**9) + "x" * int(rng.integers(0, 9)) for _ in range(n)]
    vec = murmur3_32_np(strs)
    assert vec.dtype == np.uint32
    assert list(vec) == [murmur3_32(s) for s in strs]


def test_vectorised_mixed_lengths_and_unicode():
    strs = ["", "a", "ab", "abc", "abcd", "abcde", "café", "naïve-key", "日本語"]
    assert list(murmur3_32_np(strs)) == [murmur3_32(s) for s in strs]


def test_fibonacci_unit_scalar_matches_vector():
    hks = np.array([0, 1, 12345, 2**32 - 1], dtype=np.uint32)
    vec = fibonacci_unit(hks)
    for hk, v in zip(hks, vec):
        assert fibonacci_unit(int(hk)) == pytest.approx(v, abs=0)


def test_fibonacci_unit_range_and_bijectivity():
    rng = np.random.default_rng(0)
    hks = rng.integers(0, 2**32, size=10000, dtype=np.uint64).astype(np.uint32)
    hks = np.unique(hks)
    u = fibonacci_unit(hks)
    assert ((0 <= u) & (u < 1)).all()
    # Multiplication by an odd constant mod 2^32 is a bijection: distinct
    # inputs → distinct unit hashes.
    assert len(np.unique(u)) == len(hks)


def test_g_unit_composition():
    for k in ["2021-01", "zip:10001", ""]:
        assert g_unit(k) == pytest.approx(float(fibonacci_unit(murmur3_32(k))))
    keys = ["a", "b", "c"]
    np.testing.assert_allclose(g_unit_np(keys), [g_unit(k) for k in keys])


def test_g_uniformity():
    """g(k) should be approximately uniform on [0,1): mean≈1/2, KS-style
    max deviation of the empirical CDF small at n=20000."""
    keys = [f"key-{i}" for i in range(20000)]
    u = np.sort(g_unit_np(keys))
    n = len(u)
    ecdf_dev = np.abs(u - (np.arange(1, n + 1) / n)).max()
    assert abs(u.mean() - 0.5) < 0.01
    assert ecdf_dev < 0.02  # KS 1% critical value ≈ 1.63/sqrt(n) ≈ 0.0115


def test_distinct_keys_distinct_hashes_mostly():
    keys = [f"key-{i}" for i in range(5000)]
    assert len(np.unique(murmur3_32_np(keys))) >= 4997  # birthday-bound slack
