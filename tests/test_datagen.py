"""Tests for the synthetic data generators (SBN §5.1, open-data-like
collections, long-format flattening)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.estimators import pearson
from repro.datagen.collection import collection_to_pandas_long, pair_id_of
from repro.datagen.opendata import make_collection, make_nyc_like, make_wbf_like
from repro.datagen.sbn import make_sbn_collection, make_sbn_pair


class TestSBN:
    def test_pair_shapes(self):
        p = make_sbn_pair(pair_id="p0", n=1000, r=0.5, join_prob=0.4, seed=0)
        assert len(p.table_x) == 1000
        assert len(p.table_y) == 400
        assert list(p.table_x.columns) == ["key", "x"]
        assert list(p.table_y.columns) == ["key", "y"]

    def test_keys_unique_and_joinable(self):
        p = make_sbn_pair(pair_id="p1", n=500, r=0.0, join_prob=0.5, seed=1)
        assert p.table_x["key"].is_unique
        assert p.table_y["key"].is_unique
        assert set(p.table_y["key"]).issubset(set(p.table_x["key"]))

    @pytest.mark.parametrize("r", [-0.9, -0.3, 0.0, 0.6, 0.95])
    def test_target_correlation_achieved(self, r):
        p = make_sbn_pair(pair_id="p2", n=20000, r=r, join_prob=1.0, seed=2)
        joined = p.table_x.merge(p.table_y, on="key")
        got = pearson(joined["x"].to_numpy(), joined["y"].to_numpy())
        assert got == pytest.approx(r, abs=0.03)

    def test_join_preserves_correlation(self):
        p = make_sbn_pair(pair_id="p3", n=20000, r=0.7, join_prob=0.3, seed=3)
        joined = p.table_x.merge(p.table_y, on="key")
        assert len(joined) == len(p.table_y)
        got = pearson(joined["x"].to_numpy(), joined["y"].to_numpy())
        assert got == pytest.approx(0.7, abs=0.05)

    def test_deterministic(self):
        a = make_sbn_pair(pair_id="p", n=100, r=0.2, join_prob=0.5, seed=9)
        b = make_sbn_pair(pair_id="p", n=100, r=0.2, join_prob=0.5, seed=9)
        pd.testing.assert_frame_equal(a.table_x, b.table_x)
        pd.testing.assert_frame_equal(a.table_y, b.table_y)

    def test_collection_parameter_ranges(self):
        pairs = make_sbn_collection(t=30, n_max=500, n_min=50, seed=0)
        assert len(pairs) == 30
        assert len({p.pair_id for p in pairs}) == 30
        for p in pairs:
            assert 50 <= p.n <= 500
            assert -1 <= p.r_target <= 1
            assert 0.05 <= p.join_prob <= 1.0


class TestOpenData:
    def test_nyc_shape(self):
        coll = make_nyc_like(n_tables=20, rows_scale=0.3, seed=0)
        assert len(coll.tables) == 20
        for name, df in coll.tables.items():
            assert df["key"].dtype == object
            assert len(df) >= 4
            assert 1 <= len(df.columns) - 1 <= 4
            assert coll.key_universe[name] in {"zip", "date", "station", "district"}

    def test_wbf_shape(self):
        coll = make_wbf_like(n_tables=10, rows_scale=0.3, seed=1)
        assert len(coll.tables) == 10
        for name in coll.tables:
            assert coll.key_universe[name] in {"country", "fiscal_year", "project"}

    def test_deterministic(self):
        a = make_nyc_like(n_tables=8, seed=5)
        b = make_nyc_like(n_tables=8, seed=5)
        for t in a.tables:
            pd.testing.assert_frame_equal(a.tables[t], b.tables[t])

    def test_column_pairs_enumeration(self):
        coll = make_nyc_like(n_tables=12, rows_scale=0.3, seed=2)
        pairs = coll.column_pairs()
        assert all(kc == "key" for _, kc, _ in pairs)
        n_numeric = sum(len(df.columns) - 1 for df in coll.tables.values())
        assert len(pairs) == n_numeric

    def test_tables_share_universes(self):
        """Tables in the same universe must overlap on keys, else no
        join-correlation query has candidates."""
        coll = make_nyc_like(n_tables=30, rows_scale=0.3, seed=3)
        by_uni = {}
        for t, u in coll.key_universe.items():
            by_uni.setdefault(u, []).append(t)
        some_overlap = False
        for u, ts in by_uni.items():
            for i in range(len(ts) - 1):
                a = set(coll.tables[ts[i]]["key"])
                b = set(coll.tables[ts[i + 1]]["key"])
                if len(a & b) >= 3:
                    some_overlap = True
        assert some_overlap

    def test_planted_correlations_exist(self):
        """Some cross-table joined column pairs must be well correlated
        (|r| > 0.5) and many near zero — the §4 needle-in-haystack shape."""
        coll = make_nyc_like(n_tables=40, rows_scale=0.5, seed=4)
        rs = []
        pairs = coll.column_pairs()
        for i in range(len(pairs)):
            t1, k1, v1 = pairs[i]
            for j in range(i + 1, len(pairs)):
                t2, k2, v2 = pairs[j]
                if t1 == t2 or coll.key_universe[t1] != coll.key_universe[t2]:
                    continue
                a = coll.tables[t1].groupby(k1)[v1].mean()
                b = coll.tables[t2].groupby(k2)[v2].mean()
                joined = pd.concat([a, b], axis=1, join="inner").dropna()
                if len(joined) >= 20:
                    r = pearson(joined.iloc[:, 0].to_numpy(), joined.iloc[:, 1].to_numpy())
                    if np.isfinite(r):
                        rs.append(abs(r))
        rs = np.array(rs)
        assert len(rs) > 50
        assert (rs > 0.5).sum() >= 5
        assert (rs < 0.3).mean() > 0.4

    def test_missing_values_present(self):
        coll = make_wbf_like(n_tables=25, seed=6)
        total_nan = sum(df.isna().to_numpy().sum() for df in coll.tables.values())
        assert total_nan > 0

    def test_bad_style_raises(self):
        with pytest.raises(ValueError):
            make_collection(style="mars", n_tables=3)


class TestLongFormat:
    def test_flatten_drops_missing(self):
        coll = make_wbf_like(n_tables=10, seed=7)
        long = collection_to_pandas_long(coll)
        assert list(long.columns) == ["pair_id", "key", "x"]
        assert long["x"].notna().all()
        assert np.isfinite(long["x"]).all()
        n_ids = len({pair_id_of(t, k, v) for t, k, v in coll.column_pairs()})
        assert long["pair_id"].nunique() == n_ids

    def test_flatten_row_counts(self):
        coll = make_nyc_like(n_tables=5, rows_scale=0.3, seed=8)
        long = collection_to_pandas_long(coll)
        for t, k, v in coll.column_pairs():
            df = coll.tables[t]
            expect = int(df[v].notna().sum())
            got = (long["pair_id"] == pair_id_of(t, k, v)).sum()
            assert got == expect

    def test_pair_id_format(self):
        assert pair_id_of("tab", "key", "v0") == "tab.key.v0"
