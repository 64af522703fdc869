"""Synthetic Bivariate Normal (SBN) dataset — paper §5.1.

The paper's construction, verbatim: ``t`` table pairs; each pair draws
``n`` tuples ``⟨k, x_k, y_k⟩`` with ``k`` a random unique string and
``(x_k, y_k)`` bivariate normal with mean 0 and covariance chosen so that
the Pearson correlation between X and Y is ≈ ``r_xy``. The pair becomes
two tables ``T_X = ⟨K_X, X⟩`` (all ``n`` rows) and ``T_Y = ⟨K_Y, Y⟩``
(a uniform subsample of size ``n' = n·c``, with ``c ~ U(0,1)`` acting as
the join probability).

Paper-scale parameters (t = 3000, n ~ U(0, 500000)) exceed the laptop
budget; defaults here are scaled down and configurable. All generation is
deterministic in ``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class SBNPair:
    """One generated table pair plus its generation parameters."""

    pair_id: str
    table_x: pd.DataFrame  # columns: key (str), x (float)
    table_y: pd.DataFrame  # columns: key (str), y (float)
    r_target: float  # requested population correlation
    n: int
    join_prob: float  # the subsampling rate c


def make_sbn_pair(
    *, pair_id: str, n: int, r: float, join_prob: float, seed: int
) -> SBNPair:
    """Generate one SBN table pair with target correlation ``r``."""
    rng = np.random.default_rng(seed)
    cov = np.array([[1.0, r], [r, 1.0]])
    xy = rng.multivariate_normal([0.0, 0.0], cov, size=n)
    # Random unique strings: a seeded permutation of distinct hex ids.
    ids = rng.permutation(n)
    keys = np.array([f"{pair_id}-{i:08x}" for i in ids])
    tx = pd.DataFrame({"key": keys, "x": xy[:, 0]})
    n_sub = max(1, int(round(n * join_prob)))
    sub = rng.choice(n, size=n_sub, replace=False)
    ty = pd.DataFrame({"key": keys[sub], "y": xy[sub, 1]})
    return SBNPair(
        pair_id=pair_id, table_x=tx, table_y=ty, r_target=r, n=n, join_prob=join_prob
    )


def make_sbn_collection(
    *, t: int = 100, n_max: int = 5000, n_min: int = 50, seed: int = 0
) -> list[SBNPair]:
    """Generate ``t`` SBN pairs with ``n ~ U(n_min, n_max)``,
    ``r ~ U(−1, 1)``, ``c ~ U(0.05, 1)`` (floor keeps joins non-empty at
    scaled-down n; the paper's c ~ U(0,1) at n up to 500k rarely yields
    empty joins)."""
    rng = np.random.default_rng(seed)
    pairs = []
    for i in range(t):
        pairs.append(
            make_sbn_pair(
                pair_id=f"sbn{i:04d}",
                n=int(rng.integers(n_min, n_max + 1)),
                r=float(rng.uniform(-1.0, 1.0)),
                join_prob=float(rng.uniform(0.05, 1.0)),
                seed=int(rng.integers(1 << 31)),
            )
        )
    return pairs
