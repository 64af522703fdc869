"""Hash functions used by Correlation Sketches (paper §3.1, §3.4).

The paper uses two functions:

- ``h``: 32-bit MurmurHash3, mapping key values to integers that serve as
  tuple identifiers in the sketch. We implement the standard
  MurmurHash3_x86_32 over the key's UTF-8 bytes, both as a scalar function
  (tests, streaming builder) and as a numpy-vectorised function (Spark
  pandas UDFs, datagen). The two implementations are asserted equal in
  tests — the sketch built on the driver and the sketch built by Spark must
  pick the exact same tuples.
- ``h_u``: Fibonacci (golden-ratio multiplicative) hashing, mapping the
  32-bit integer ``h(k)`` uniformly to ``[0, 1)``. Because ``h_u`` is a
  deterministic function of ``h(k)``, sketches only need to store ``h(k)``
  (paper, Fig. 2 caption).

``g = h_u(h(k))`` is the composition used throughout Theorem 1's proof.
"""
from __future__ import annotations

import numpy as np

# floor(2^32 / golden_ratio), the classic Fibonacci hashing multiplier
# (Knuth TAOCP vol. 3 §6.4); odd variant 2654435769 = 0x9E3779B9.
_FIB_MULT = np.uint32(2654435769)
_C1 = np.uint32(0xCC9E2D51)
_C2 = np.uint32(0x1B873593)


def murmur3_32(data: bytes | str, seed: int = 0) -> int:
    """Standard MurmurHash3_x86_32 of ``data`` (str encoded as UTF-8).

    Returns an unsigned 32-bit integer. Reference: Austin Appleby's
    MurmurHash3.cpp; verified in tests against published test vectors.
    """
    if isinstance(data, str):
        data = data.encode("utf-8")
    length = len(data)
    h = seed & 0xFFFFFFFF
    rounded = length - (length & 3)
    for i in range(0, rounded, 4):
        k = int.from_bytes(data[i : i + 4], "little")
        k = (k * 0xCC9E2D51) & 0xFFFFFFFF
        k = ((k << 15) | (k >> 17)) & 0xFFFFFFFF
        k = (k * 0x1B873593) & 0xFFFFFFFF
        h ^= k
        h = ((h << 13) | (h >> 19)) & 0xFFFFFFFF
        h = (h * 5 + 0xE6546B64) & 0xFFFFFFFF
    k = 0
    tail = length & 3
    if tail >= 3:
        k ^= data[rounded + 2] << 16
    if tail >= 2:
        k ^= data[rounded + 1] << 8
    if tail >= 1:
        k ^= data[rounded]
        k = (k * 0xCC9E2D51) & 0xFFFFFFFF
        k = ((k << 15) | (k >> 17)) & 0xFFFFFFFF
        k = (k * 0x1B873593) & 0xFFFFFFFF
        h ^= k
    h ^= length
    h ^= h >> 16
    h = (h * 0x85EBCA6B) & 0xFFFFFFFF
    h ^= h >> 13
    h = (h * 0xC2B2AE35) & 0xFFFFFFFF
    h ^= h >> 16
    return h


def murmur3_32_np(values, seed: int = 0) -> np.ndarray:
    """Vectorised MurmurHash3_x86_32 over an array-like of strings.

    Groups inputs by encoded byte length so each group hashes fully
    vectorised (body blocks column-wise, then tail + finalizer). Key
    columns typically have a handful of distinct lengths (zip codes,
    dates, ids), so this runs at numpy speed.
    """
    vals = np.asarray(values, dtype=object)
    out = np.zeros(len(vals), dtype=np.uint32)
    if len(vals) == 0:
        return out
    encoded = np.array([v.encode("utf-8") for v in vals], dtype=object)
    lengths = np.array([len(b) for b in encoded], dtype=np.int64)
    with np.errstate(over="ignore"):
        for length in np.unique(lengths):
            idx = np.nonzero(lengths == length)[0]
            buf = b"".join(encoded[idx])
            mat = np.frombuffer(buf, dtype=np.uint8).reshape(len(idx), length)
            out[idx] = _murmur3_32_fixed(mat, seed)
    return out


def _murmur3_32_fixed(mat: np.ndarray, seed: int) -> np.ndarray:
    """Murmur3_x86_32 of rows of a fixed-width uint8 matrix."""
    n, length = mat.shape
    h = np.full(n, seed, dtype=np.uint32)
    rounded = length - (length & 3)
    mul5 = np.uint32(5)
    add = np.uint32(0xE6546B64)
    for i in range(0, rounded, 4):
        k = (
            mat[:, i].astype(np.uint32)
            | (mat[:, i + 1].astype(np.uint32) << np.uint32(8))
            | (mat[:, i + 2].astype(np.uint32) << np.uint32(16))
            | (mat[:, i + 3].astype(np.uint32) << np.uint32(24))
        )
        k = k * _C1
        k = (k << np.uint32(15)) | (k >> np.uint32(17))
        k = k * _C2
        h ^= k
        h = (h << np.uint32(13)) | (h >> np.uint32(19))
        h = h * mul5 + add
    tail = length & 3
    if tail:
        k = np.zeros(n, dtype=np.uint32)
        if tail >= 3:
            k ^= mat[:, rounded + 2].astype(np.uint32) << np.uint32(16)
        if tail >= 2:
            k ^= mat[:, rounded + 1].astype(np.uint32) << np.uint32(8)
        k ^= mat[:, rounded].astype(np.uint32)
        k = k * _C1
        k = (k << np.uint32(15)) | (k >> np.uint32(17))
        k = k * _C2
        h ^= k
    h ^= np.uint32(length)
    h ^= h >> np.uint32(16)
    h = h * np.uint32(0x85EBCA6B)
    h ^= h >> np.uint32(13)
    h = h * np.uint32(0xC2B2AE35)
    h ^= h >> np.uint32(16)
    return h


def fibonacci_unit(hk) -> np.ndarray | float:
    """``h_u``: map 32-bit integer hash(es) uniformly to ``[0, 1)``.

    Golden-ratio multiplicative hashing (paper §3.4): multiply by
    ``floor(2^32/φ)`` modulo ``2^32``, then scale to the unit interval.
    Accepts a scalar or numpy array; returns matching type.
    """
    if np.isscalar(hk):
        return float((int(hk) * int(_FIB_MULT)) % (1 << 32)) / float(1 << 32)
    arr = np.asarray(hk, dtype=np.uint64)
    with np.errstate(over="ignore"):
        mixed = (arr * np.uint64(_FIB_MULT)) & np.uint64(0xFFFFFFFF)
    return mixed.astype(np.float64) / float(1 << 32)


def g_unit(key: str) -> float:
    """``g(k) = h_u(h(k))`` — the unit-interval rank that drives bottom-n
    selection (Theorem 1)."""
    return float(fibonacci_unit(murmur3_32(key)))


def g_unit_np(values) -> np.ndarray:
    """Vectorised ``g(k)`` over an array-like of key strings."""
    return fibonacci_unit(murmur3_32_np(values))
