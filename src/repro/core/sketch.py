"""Local (single-machine, streaming) Correlation Sketch builder — paper §3.1/§3.4.

The paper builds a sketch for a column pair ``⟨K, X⟩`` by one pass over the
rows, maintaining the ``n`` tuples ``⟨h(k), x_k⟩`` with the smallest
``h_u(h(k))`` in a tree; repeated keys are folded into the existing tuple
with a streaming aggregate ``x_k ← f(x_k_old, x_new)``. We use a
max-heap keyed on ``h_u`` (equivalent asymptotics to the paper's tree) plus
a dict for O(1) repeated-key lookup.

This builder is the *reference implementation*: the distributed Spark
construction in :mod:`repro.sparkflow.build` is tested to produce
bit-identical sketches.

Alongside the selected tuples, the builder records the column statistics
the ranking layer needs and that the paper computes in the same single
pass (§4.2): min/max of the numeric column (for the Hoeffding range ``C``)
and the exact distinct-key count (for tests; the KMV estimate is also
available from the sketch itself).
"""
from __future__ import annotations

import heapq
import math
from dataclasses import dataclass, field
from typing import Callable, Iterable

import numpy as np

from .hashing import fibonacci_unit, murmur3_32

# Streaming-mergeable aggregate functions (paper lists mean, sum, max, min,
# first, last). Each is expressed as (init, merge, finish) over a state so
# mean is the *true* mean (count+sum state), not a running mean of means.
_AGGS: dict[str, tuple[Callable, Callable, Callable]] = {
    "mean": (lambda x: (x, 1), lambda s, x: (s[0] + x, s[1] + 1), lambda s: s[0] / s[1]),
    "sum": (lambda x: x, lambda s, x: s + x, lambda s: s),
    "max": (lambda x: x, lambda s, x: max(s, x), lambda s: s),
    "min": (lambda x: x, lambda s, x: min(s, x), lambda s: s),
    "first": (lambda x: x, lambda s, x: s, lambda s: s),
    "last": (lambda x: x, lambda s, x: x, lambda s: s),
    "count": (lambda x: 1, lambda s, x: s + 1, lambda s: float(s)),
}

AGG_NAMES = tuple(_AGGS)


@dataclass
class CorrelationSketch:
    """An immutable built sketch for one ``⟨K, X⟩`` column pair.

    Attributes
    ----------
    hk, hu, xk:
        Parallel arrays sorted ascending by ``hu``: tuple identifiers
        ``h(k)``, unit hashes ``h_u(h(k))``, and (aggregated) numeric
        values. ``hu`` is redundant (derivable from ``hk``) but cheap and
        convenient; the serialised/Spark representation stores only ``hk``.
    n_max:
        The configured maximum sketch size (paper's ``n``).
    x_min, x_max:
        Range of the *full* numeric column (not just sketched tuples) —
        inputs to the Hoeffding bound's ``C``.
    n_rows, n_distinct:
        Total rows consumed and exact distinct-key count of the full column.
    """

    hk: np.ndarray
    hu: np.ndarray
    xk: np.ndarray
    n_max: int
    x_min: float
    x_max: float
    n_rows: int
    n_distinct: int

    def __len__(self) -> int:
        return len(self.hk)

    @property
    def kth_unit_hash(self) -> float:
        """``U(k)`` — the largest retained unit hash (KMV's k-th minimum)."""
        return float(self.hu[-1])

    def key_set(self) -> set[int]:
        return set(int(v) for v in self.hk)


@dataclass
class SketchBuilder:
    """Streaming bottom-``n`` builder. ``add(key, value)`` per row, then
    ``build()``.

    Non-finite values and ``None`` keys are skipped (real open data has
    missing values; the paper's columns are pre-parsed by Tablesaw and we
    mirror "missing → absent row").
    """

    n_max: int
    agg: str = "mean"
    _heap: list = field(default_factory=list)  # max-heap via (-hu, hk)
    _state: dict = field(default_factory=dict)  # hk -> [hu, agg_state]
    _x_min: float = math.inf
    _x_max: float = -math.inf
    _n_rows: int = 0
    _seen_keys: set = field(default_factory=set)

    def __post_init__(self) -> None:
        if self.n_max < 1:
            raise ValueError("sketch size must be >= 1")
        if self.agg not in _AGGS:
            raise ValueError(f"unknown aggregate {self.agg!r}; pick one of {AGG_NAMES}")
        self._init, self._merge, self._finish = _AGGS[self.agg]

    def add(self, key, value) -> None:
        if key is None or value is None:
            return
        value = float(value)
        if not math.isfinite(value):
            return
        key = str(key)
        self._n_rows += 1
        self._x_min = min(self._x_min, value)
        self._x_max = max(self._x_max, value)
        hk = murmur3_32(key)
        self._seen_keys.add(hk)
        if hk in self._state:
            # Repeated key: fold into the existing aggregate state whether or
            # not it is currently retained — a key can re-enter consideration
            # only if already retained (bottom-n set only shrinks hu-wise),
            # so only update retained entries.
            self._state[hk][1] = self._merge(self._state[hk][1], value)
            return
        hu = fibonacci_unit(hk)
        if len(self._heap) < self.n_max:
            heapq.heappush(self._heap, (-hu, hk))
            self._state[hk] = [hu, self._init(value)]
        elif hu < -self._heap[0][0]:
            _, evicted = heapq.heapreplace(self._heap, (-hu, hk))
            del self._state[evicted]
            self._state[hk] = [hu, self._init(value)]
        # else: hu too large, tuple not sketched.

    def add_many(self, keys: Iterable, values: Iterable) -> None:
        for k, v in zip(keys, values):
            self.add(k, v)

    def build(self) -> CorrelationSketch:
        items = sorted((hu, hk, st) for hk, (hu, st) in self._state.items())
        return CorrelationSketch(
            hk=np.array([hk for _, hk, _ in items], dtype=np.uint32),
            hu=np.array([hu for hu, _, _ in items], dtype=np.float64),
            xk=np.array([self._finish(st) for _, _, st in items], dtype=np.float64),
            n_max=self.n_max,
            x_min=self._x_min if self._n_rows else math.nan,
            x_max=self._x_max if self._n_rows else math.nan,
            n_rows=self._n_rows,
            n_distinct=len(self._seen_keys),
        )


def build_sketch(keys, values, *, n_max: int, agg: str = "mean") -> CorrelationSketch:
    """Convenience one-shot builder over two aligned sequences."""
    b = SketchBuilder(n_max=n_max, agg=agg)
    b.add_many(keys, values)
    return b.build()


def join_sketches(
    lx: CorrelationSketch, ly: CorrelationSketch
) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Sketch join ``L_{X⋈Y}`` (paper §3.2, Fig. 2).

    Inner-joins the two sketches on the tuple identifier ``h(k)`` and
    returns ``(hk, x, y)`` sorted by ``h_u`` ascending. By Theorem 1 the
    pairs ``(x, y)`` form a uniform random sample of the aggregated joined
    table ``T_{X⋈Y}``.
    """
    common, ix, iy = np.intersect1d(lx.hk, ly.hk, return_indices=True)
    hu = fibonacci_unit(common)
    order = np.argsort(hu, kind="stable")
    return common[order], lx.xk[ix][order], ly.xk[iy][order]
