"""Table 2 harness (paper §5.5, "Join-Correlation Estimation"): running
times of join + Pearson + Spearman over the full data vs. over sketches.

The paper's workload is NYC column pairs with heavy-tailed table sizes
(their percentiles span 0.2 ms – 4 s for full joins). We reproduce the
shape with SBN-style table pairs whose sizes follow a truncated lognormal
(DESIGN.md §3: both sides of the comparison run on the same in-process
numpy/pandas substrate, so the full-vs-sketch *ratio* is meaningful even
though absolute milliseconds differ from the authors' Java testbed).

Sketch construction is an offline indexing cost (the paper's Table 2
times query-side work only), so sketches are prebuilt before timing.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.estimators import pearson, spearman
from repro.core.sketch import CorrelationSketch, build_sketch, join_sketches

PAPER_TABLE2 = pd.DataFrame(
    {
        # milliseconds, paper Table 2 (full data vs sketch, NYC collection)
        "full_join": {"mean": 42.219, "std": 367.696, "75%": 0.231,
                      "90%": 7.038, "99%": 1360.605, "99.9%": 4021.838},
        "full_rs": {"mean": 8.494, "std": 134.357, "75%": 0.141,
                    "90%": 0.154, "99%": 29.583, "99.9%": 2731.154},
        "full_rp": {"mean": 0.240, "std": 9.314, "75%": 0.005,
                    "90%": 0.011, "99%": 0.385, "99.9%": 51.278},
        "sk_join": {"mean": 0.026, "std": 5.618, "75%": 0.003,
                    "90%": 0.006, "99%": 0.012, "99.9%": 0.021},
        "sk_rp": {"mean": 0.000, "std": 0.042, "75%": 0.000,
                  "90%": 0.001, "99%": 0.003, "99.9%": 0.007},
        "sk_rs": {"mean": 0.004, "std": 0.279, "75%": 0.002,
                  "90%": 0.004, "99%": 0.013, "99.9%": 0.033},
    }
)


@dataclass(frozen=True)
class Table2Config:
    n_pairs: int = 200
    size_median: float = 2000.0  # lognormal median rows per table
    size_sigma: float = 1.6  # lognormal σ — heavy tail
    max_rows: int = 400_000
    sketch_size: int = 256
    seed: int = 0


@dataclass
class TimedPair:
    """One workload pair: full tables + prebuilt sketches."""

    tx: pd.DataFrame
    ty: pd.DataFrame
    lx: CorrelationSketch
    ly: CorrelationSketch


def make_workload(cfg: Table2Config) -> list[TimedPair]:
    """Heavy-tailed table pairs sharing a key prefix, pre-sketched."""
    rng = np.random.default_rng(cfg.seed)
    pairs = []
    for i in range(cfg.n_pairs):
        n = int(np.clip(rng.lognormal(np.log(cfg.size_median), cfg.size_sigma),
                        20, cfg.max_rows))
        overlap = float(rng.uniform(0.2, 1.0))
        rho = float(rng.uniform(-1, 1))
        cov = [[1.0, rho], [rho, 1.0]]
        xy = rng.multivariate_normal([0, 0], cov, size=n)
        keys = np.array([f"p{i}-{j:08x}" for j in range(n)])
        tx = pd.DataFrame({"key": keys, "x": xy[:, 0]})
        sub = rng.choice(n, size=max(3, int(n * overlap)), replace=False)
        ty = pd.DataFrame({"key": keys[sub], "y": xy[sub, 1]})
        pairs.append(
            TimedPair(
                tx=tx, ty=ty,
                lx=build_sketch(tx["key"], tx["x"], n_max=cfg.sketch_size),
                ly=build_sketch(ty["key"], ty["y"], n_max=cfg.sketch_size),
            )
        )
    return pairs


def _ms(fn) -> tuple[float, object]:
    t0 = time.perf_counter()
    out = fn()
    return (time.perf_counter() - t0) * 1e3, out


def time_pair(p: TimedPair) -> dict[str, float]:
    """Time the six Table 2 operations for one pair (milliseconds)."""
    out: dict[str, float] = {}
    out["full_join"], joined = _ms(lambda: p.tx.merge(p.ty, on="key"))
    xv = joined["x"].to_numpy()
    yv = joined["y"].to_numpy()
    out["full_rp"], _ = _ms(lambda: pearson(xv, yv))
    out["full_rs"], _ = _ms(lambda: spearman(xv, yv))
    out["sk_join"], sk_joined = _ms(lambda: join_sketches(p.lx, p.ly))
    _, sx, sy = sk_joined
    out["sk_rp"], _ = _ms(lambda: pearson(sx, sy))
    out["sk_rs"], _ = _ms(lambda: spearman(sx, sy))
    return out


def run_table2(cfg: Table2Config = Table2Config()) -> pd.DataFrame:
    """Run the timing workload; returns the percentile table (columns as
    in the paper: join/r_s/r_p full vs sketch; rows mean/std/75/90/99/99.9)."""
    pairs = make_workload(cfg)
    # Warm up numpy/pandas code paths so first-call overhead doesn't land
    # in the tail percentiles.
    time_pair(pairs[0])
    rows = [time_pair(p) for p in pairs]
    df = pd.DataFrame(rows)
    out = pd.DataFrame(
        {
            col: {
                "mean": df[col].mean(),
                "std": df[col].std(),
                "75%": df[col].quantile(0.75),
                "90%": df[col].quantile(0.90),
                "99%": df[col].quantile(0.99),
                "99.9%": df[col].quantile(0.999),
            }
            for col in ["full_join", "full_rs", "full_rp", "sk_join", "sk_rp", "sk_rs"]
        }
    )
    return out


def format_table2(measured: pd.DataFrame) -> str:
    lines = ["Table 2 reproduction — running times in ms (measured | paper)"]
    header = f"  {'pct':<7}" + "".join(f"{c:>22}" for c in measured.columns)
    lines.append(header)
    for row in measured.index:
        cells = "".join(
            f"{measured.loc[row, c]:>11.3f}|{PAPER_TABLE2.loc[row, c]:>10.3f}"
            for c in measured.columns
        )
        lines.append(f"  {row:<7}{cells}")
    return "\n".join(lines)
