"""In-memory inverted index over hashed sketch keys (paper §4, §5.5).

The paper indexes sketches with Apache Lucene and answers a top-k
join-correlation query by (1) retrieving the top-N candidate columns by
key overlap from the inverted index, (2) reading their sketches, and
(3) re-ranking by estimated correlation. This module is the offline-
container substitute (DESIGN.md §3): a Python postings dict with exactly
that query plan. It is built from the Spark-built sketch DataFrame, so
the distributed construction and the serving index share one artifact.

Latency characteristics match the paper's setting: postings lookups are
O(sketch size) per query key and re-ranking touches only the retrieved
candidates' fixed-size sketches.
"""
from __future__ import annotations

import time
from collections import Counter
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.bounds import hoeffding_ci
from repro.core.estimators import pearson
from repro.core.sketch import CorrelationSketch, join_sketches


@dataclass
class IndexedSketch:
    """A served sketch: hash-sorted arrays + the stats the scorer needs."""

    pair_id: str
    hk: np.ndarray  # uint32, sorted ascending (for intersect1d)
    hu: np.ndarray
    xk: np.ndarray
    x_min: float
    x_max: float

    def as_sketch(self, n_max: int) -> CorrelationSketch:
        order = np.argsort(self.hu, kind="stable")
        return CorrelationSketch(
            hk=self.hk[order], hu=self.hu[order], xk=self.xk[order],
            n_max=n_max, x_min=self.x_min, x_max=self.x_max,
            n_rows=len(self.hk), n_distinct=len(self.hk),
        )


@dataclass
class QueryResult:
    pair_id: str
    overlap: int  # postings overlap (number of shared sketch keys)
    n: int  # sketch-join sample size used for the estimate
    est: float  # Pearson estimate (nan if n < min_overlap)
    ci_len: float
    score: float  # |est| · ci_h, filled by `query`
    elapsed_ms: float = 0.0  # per-query wall time, on the first result only


@dataclass
class InvertedIndex:
    """Postings ``hk → [pair_id…]`` plus a sketch store."""

    n_max: int
    postings: dict[int, list[str]] = field(default_factory=dict)
    store: dict[str, IndexedSketch] = field(default_factory=dict)

    @classmethod
    def from_pandas(
        cls, sketches: pd.DataFrame, stats: pd.DataFrame, *, n_max: int
    ) -> "InvertedIndex":
        """Build from collected sketch/stats frames (the Spark artifacts:
        ``(pair_id, hk, hu, xk)`` and ``(pair_id, x_min, x_max, …)``)."""
        idx = cls(n_max=n_max)
        st = stats.set_index("pair_id")
        for pair_id, grp in sketches.groupby("pair_id"):
            order = np.argsort(grp["hk"].to_numpy())
            idx.store[pair_id] = IndexedSketch(
                pair_id=pair_id,
                hk=grp["hk"].to_numpy()[order].astype(np.uint32),
                hu=grp["hu"].to_numpy()[order],
                xk=grp["xk"].to_numpy()[order],
                x_min=float(st.loc[pair_id, "x_min"]),
                x_max=float(st.loc[pair_id, "x_max"]),
            )
            for hk in grp["hk"]:
                idx.postings.setdefault(int(hk), []).append(pair_id)
        return idx

    def retrieve(self, query: CorrelationSketch, *, top_n: int = 100) -> list[tuple[str, int]]:
        """Step 1: top-N candidates by postings (key) overlap."""
        counts: Counter = Counter()
        for hk in query.hk:
            for pid in self.postings.get(int(hk), ()):
                counts[pid] += 1
        return counts.most_common(top_n)

    def query(
        self,
        query: CorrelationSketch,
        *,
        top_n: int = 100,
        k: int = 10,
        min_overlap: int = 3,
        exclude: str | None = None,
    ) -> list[QueryResult]:
        """Full §5.5 query plan: retrieve top-N by overlap, estimate the
        correlation of each from its sketch, re-rank by |r̂|·ci_h, return
        the top-k. The first result carries the end-to-end wall time."""
        t0 = time.perf_counter()
        results: list[QueryResult] = []
        for pid, overlap in self.retrieve(query, top_n=top_n):
            if pid == exclude:
                continue
            cand = self.store[pid].as_sketch(self.n_max)
            _, xv, yv = join_sketches(query, cand)
            if len(xv) >= min_overlap:
                est = pearson(xv, yv)
                ci = hoeffding_ci(
                    xv, yv,
                    c_low=min(query.x_min, cand.x_min),
                    c_high=max(query.x_max, cand.x_max),
                )
                ci_len = ci.length
            else:
                est, ci_len = float("nan"), float("nan")
            results.append(
                QueryResult(
                    pair_id=pid, overlap=overlap, n=len(xv),
                    est=est, ci_len=ci_len, score=0.0,
                )
            )
        # ci_h normalisation over this ranked list (paper §4.4).
        lens = np.array([r.ci_len for r in results])
        finite = np.isfinite(lens)
        factors = np.zeros(len(results))
        if finite.sum() >= 2 and lens[finite].max() > lens[finite].min():
            lo, hi = lens[finite].min(), lens[finite].max()
            factors[finite] = 1.0 - (lens[finite] - lo) / (hi - lo)
        else:
            factors[finite] = 1.0
        for r, f in zip(results, factors):
            r.score = (abs(r.est) if np.isfinite(r.est) else 0.0) * f
        results.sort(key=lambda r: (-r.score, r.pair_id))
        results = results[:k]
        if results:
            results[0].elapsed_ms = (time.perf_counter() - t0) * 1e3
        return results
