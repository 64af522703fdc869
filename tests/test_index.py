"""Tests for the inverted-index query substrate (§5.5): retrieval equals
brute-force overlap, estimates match the core, latency bookkeeping."""
import numpy as np
import pandas as pd
import pytest

from repro.core.estimators import pearson
from repro.core.sketch import build_sketch, join_sketches
from repro.datagen.collection import collection_to_pandas_long
from repro.datagen.opendata import make_nyc_like
from repro.index.inverted import InvertedIndex

N_MAX = 48


@pytest.fixture(scope="module")
def corpus():
    coll = make_nyc_like(n_tables=15, rows_scale=0.3, seed=51)
    pdf = collection_to_pandas_long(coll)
    sketches = {
        pid: build_sketch(g["key"], g["x"], n_max=N_MAX)
        for pid, g in pdf.groupby("pair_id")
    }
    rows, stats = [], []
    for pid, sk in sketches.items():
        rows.append(
            pd.DataFrame(
                {"pair_id": pid, "hk": sk.hk.astype(np.int64), "hu": sk.hu, "xk": sk.xk}
            )
        )
        stats.append({"pair_id": pid, "x_min": sk.x_min, "x_max": sk.x_max})
    idx = InvertedIndex.from_pandas(
        pd.concat(rows, ignore_index=True), pd.DataFrame(stats), n_max=N_MAX
    )
    return idx, sketches


def test_store_complete(corpus):
    idx, sketches = corpus
    assert set(idx.store) == set(sketches)


def test_retrieve_equals_bruteforce(corpus):
    idx, sketches = corpus
    for qid in list(sketches)[:8]:
        q = sketches[qid]
        got = dict(idx.retrieve(q, top_n=10**9))
        expect = {}
        qset = q.key_set()
        for pid, sk in sketches.items():
            ov = len(qset & sk.key_set())
            if ov:
                expect[pid] = ov
        assert got == expect


def test_retrieve_top_n_cut(corpus):
    idx, sketches = corpus
    q = sketches[next(iter(sketches))]
    full = idx.retrieve(q, top_n=10**9)
    cut = idx.retrieve(q, top_n=3)
    assert len(cut) <= 3
    if len(full) >= 3:
        assert [c for _, c in cut] == sorted([c for _, c in full], reverse=True)[: len(cut)]


def test_query_estimates_match_core(corpus):
    idx, sketches = corpus
    qid = max(sketches, key=lambda p: len(sketches[p]))
    q = sketches[qid]
    results = idx.query(q, top_n=50, k=50, exclude=qid)
    assert results, "query must retrieve candidates"
    for r in results:
        _, xv, yv = join_sketches(q, sketches[r.pair_id])
        assert r.n == len(xv)
        if r.n >= 3:
            assert r.est == pytest.approx(pearson(xv, yv), abs=1e-9, nan_ok=True)


def test_query_excludes_self(corpus):
    idx, sketches = corpus
    qid = next(iter(sketches))
    results = idx.query(sketches[qid], exclude=qid)
    assert all(r.pair_id != qid for r in results)


def test_query_scores_sorted_and_k_respected(corpus):
    idx, sketches = corpus
    qid = max(sketches, key=lambda p: len(sketches[p]))
    results = idx.query(sketches[qid], k=5, exclude=qid)
    assert len(results) <= 5
    scores = [r.score for r in results]
    assert scores == sorted(scores, reverse=True)


def test_query_latency_recorded(corpus):
    idx, sketches = corpus
    qid = next(iter(sketches))
    results = idx.query(sketches[qid], exclude=qid)
    if results:
        assert results[0].elapsed_ms > 0


def test_self_query_ranks_self_first(corpus):
    idx, sketches = corpus
    qid = max(sketches, key=lambda p: len(sketches[p]))
    results = idx.query(sketches[qid], k=3)
    assert results[0].pair_id == qid
    assert results[0].est == pytest.approx(1.0, abs=1e-9)
