"""spark-submit entrypoint for the §5.5 query-evaluation latency study.

Usage: spark-submit jobs/query_eval.py [--tables N] [--scale S]
       [--sketch-size K] [--seed SEED]
"""
import argparse

from _session import get_session

from repro.exp.querytime import QueryTimeConfig, format_querytime, run_querytime


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--tables", type=int, default=80)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--sketch-size", type=int, default=1024)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_session("query-eval")
    stats = run_querytime(
        spark,
        QueryTimeConfig(
            n_tables=args.tables,
            rows_scale=args.scale,
            sketch_size=args.sketch_size,
            seed=args.seed,
        ),
    )
    print(format_querytime(stats))
    spark.stop()


if __name__ == "__main__":
    main()
