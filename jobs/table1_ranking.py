"""spark-submit entrypoint for the Table 1 ranking evaluation.

Usage: spark-submit jobs/table1_ranking.py [--tables N] [--scale S]
       [--sketch-size K] [--seed SEED] [--no-pm1]
"""
import argparse

from _session import get_session

from repro.exp.table1 import Table1Config, format_table1, run_table1


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--tables", type=int, default=80)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--sketch-size", type=int, default=256)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--no-pm1", action="store_true")
    args = ap.parse_args()
    spark = get_session("table1-ranking")
    report = run_table1(
        spark,
        Table1Config(
            n_tables=args.tables,
            rows_scale=args.scale,
            sketch_size=args.sketch_size,
            seed=args.seed,
            with_pm1=not args.no_pm1,
        ),
    )
    print(format_table1(report))
    spark.stop()


if __name__ == "__main__":
    main()
