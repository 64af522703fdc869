"""Entrypoint for the Table 2 runtime comparison (no Spark needed: the
paper's Table 2 is a single-machine query-side timing microbenchmark).

Usage: python jobs/table2_runtime.py [--pairs N] [--max-rows M]
       [--sketch-size K] [--seed SEED]
"""
import argparse
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

from repro.exp.table2 import Table2Config, format_table2, run_table2  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--pairs", type=int, default=200)
    ap.add_argument("--max-rows", type=int, default=400_000)
    ap.add_argument("--sketch-size", type=int, default=256)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    table = run_table2(
        Table2Config(
            n_pairs=args.pairs,
            max_rows=args.max_rows,
            sketch_size=args.sketch_size,
            seed=args.seed,
        )
    )
    print(format_table2(table))


if __name__ == "__main__":
    main()
