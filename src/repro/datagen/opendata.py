"""Synthetic open-data-portal collections standing in for the paper's NYC
Open Data and World Bank Finances snapshots (§5.1).

The real snapshots (Socrata, Sept 2019) are not redistributable or
downloadable in this offline container, so we generate collections that
reproduce the properties the evaluation depends on (DESIGN.md §3):

- tables join through a handful of shared **key universes** (zip codes,
  dates, station ids, …) with heterogeneous overlap — each table samples a
  random subset of its universe;
- numeric columns load on per-key **latent factors**, so columns from
  different tables that share a universe and a factor are genuinely
  correlated after a join, while most cross-table pairs are near zero
  ("needle in a haystack", paper §4);
- real-data messiness: repeated keys (Poisson multiplicities, so the mean
  aggregation matters), heavy-tailed/lognormal transforms, huge monetary
  scales (WBF), injected outliers, and missing values.

Everything is deterministic in ``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

N_FACTORS = 6


@dataclass(frozen=True)
class Universe:
    """A shared join-key domain plus its latent factor matrix (D × F)."""

    name: str
    keys: np.ndarray  # array of str, length D
    factors: np.ndarray  # float, shape (D, N_FACTORS)


@dataclass
class Collection:
    """A generated table collection."""

    name: str
    tables: dict[str, pd.DataFrame] = field(default_factory=dict)
    # table -> (key_col, universe name); every table has exactly one key col.
    key_universe: dict[str, str] = field(default_factory=dict)

    def column_pairs(self) -> list[tuple[str, str, str]]:
        """All ⟨table, key_col, numeric_col⟩ triples, the paper's
        ⟨K_X, X⟩ column pairs."""
        out = []
        for tname, df in self.tables.items():
            key_col = [c for c in df.columns if df[c].dtype == object][0]
            for c in df.columns:
                if c != key_col:
                    out.append((tname, key_col, c))
        return out


def _mk_universes(rng: np.random.Generator, style: str) -> list[Universe]:
    if style == "nyc":
        specs = [
            ("zip", [f"1{z:04d}" for z in range(1, 221)]),
            ("date", [str(d.date()) for d in pd.date_range("2017-01-01", periods=730)]),
            ("station", [f"st-{i:03d}" for i in range(400)]),
            ("district", [f"D{i:02d}" for i in range(60)]),
        ]
    elif style == "wbf":
        specs = [
            ("country", [f"C{i:03d}" for i in range(200)]),
            ("fiscal_year", [str(y) for y in range(1980, 2020)]),
            ("project", [f"P{i:05d}" for i in range(2500)]),
        ]
    else:
        raise ValueError(f"unknown style {style!r}")
    return [
        Universe(
            name=n,
            keys=np.array(keys),
            factors=rng.standard_normal((len(keys), N_FACTORS)),
        )
        for n, keys in specs
    ]


def _mk_column(
    rng: np.random.Generator,
    uni: Universe,
    key_idx: np.ndarray,
    style: str,
) -> np.ndarray:
    """One numeric column over rows whose keys are ``uni.keys[key_idx]``."""
    factor = int(rng.integers(0, N_FACTORS))
    w = float(rng.uniform(0.5, 2.0)) * (1 if rng.random() < 0.5 else -1)
    noise = float(rng.uniform(0.1, 1.5))
    vals = w * uni.factors[key_idx, factor] + noise * rng.standard_normal(len(key_idx))
    # Real-data transforms. WBF has large monetary values (paper §5.1).
    roll = rng.random()
    if roll < 0.25:
        vals = np.exp(vals)  # lognormal-ish, heavy right tail
    elif roll < 0.45:
        scale = 10 ** int(rng.integers(3, 9 if style == "wbf" else 5))
        vals = vals * scale
    elif roll < 0.6:
        vals = np.round(vals * 10)  # discretised counts
    if rng.random() < 0.3:  # outlier contamination
        n_out = max(1, int(0.005 * len(vals)))
        vals[rng.integers(0, len(vals), n_out)] *= 100
    miss_p = rng.uniform(0, 0.25 if style == "wbf" else 0.15)
    if miss_p > 0.02:
        vals = vals.copy()
        vals[rng.random(len(vals)) < miss_p] = np.nan
    return vals


def make_collection(
    *,
    style: str,
    n_tables: int,
    rows_scale: float = 1.0,
    seed: int = 0,
    name: str | None = None,
) -> Collection:
    """Generate a ``style`` ∈ {"nyc", "wbf"} collection of ``n_tables``
    tables. ``rows_scale`` multiplies per-table row counts (the SF knob:
    tests ≈ 0.2, benchmarks ≈ 1–3)."""
    rng = np.random.default_rng(seed)
    unis = _mk_universes(rng, style)
    coll = Collection(name=name or f"{style}-{n_tables}t-s{seed}")
    for t in range(n_tables):
        uni = unis[int(rng.integers(0, len(unis)))]
        d = len(uni.keys)
        frac = float(rng.uniform(0.3, 1.0))
        chosen = rng.choice(d, size=max(4, int(frac * d)), replace=False)
        # Multiplicity per key: 1 + Poisson(λ); λ mostly 0 → mostly unique.
        lam = float(rng.exponential(0.7))
        mult = 1 + rng.poisson(lam, size=len(chosen))
        mult = np.minimum(mult, max(1, int(8 * rows_scale)))
        key_idx = np.repeat(chosen, mult)
        target_rows = int(len(key_idx) * rows_scale)
        if target_rows and target_rows < len(key_idx):
            key_idx = key_idx[
                rng.choice(len(key_idx), size=target_rows, replace=False)
            ]
        elif target_rows > len(key_idx):
            # Scale up (rows_scale > 1): replicate key observations, then
            # trim to the target — more repeated measurements per key, the
            # realistic way open-data tables grow.
            reps = -(-target_rows // len(key_idx))  # ceil
            key_idx = np.tile(key_idx, reps)[
                rng.permutation(len(key_idx) * reps)[:target_rows]
            ]
        if len(key_idx) == 0:
            key_idx = chosen[:4]
        n_cols = int(rng.integers(1, 5))
        tname = f"{style}{t:04d}"
        df = pd.DataFrame({"key": uni.keys[key_idx]})
        for c in range(n_cols):
            df[f"v{c}"] = _mk_column(rng, uni, key_idx, style)
        coll.tables[tname] = df
        coll.key_universe[tname] = uni.name
    return coll


def make_nyc_like(*, n_tables: int = 100, rows_scale: float = 1.0, seed: int = 0) -> Collection:
    """NYC-Open-Data-like collection (paper: 1,505 tables; scaled down)."""
    return make_collection(style="nyc", n_tables=n_tables, rows_scale=rows_scale, seed=seed)


def make_wbf_like(*, n_tables: int = 64, rows_scale: float = 1.0, seed: int = 1) -> Collection:
    """World-Bank-Finances-like collection (paper: 64 tables)."""
    return make_collection(style="wbf", n_tables=n_tables, rows_scale=rows_scale, seed=seed)
