"""spark-submit entrypoint for the §5.2/§5.3 accuracy study (Fig. 3/4 as
RMSE tables).

Usage: spark-submit jobs/accuracy_rmse.py [--dataset sbn|nyc|wbf]
       [--sketch-sizes 64,256,1024] [--with-pm1] [--with-qn] [--seed S]
"""
import argparse

from _session import get_session

from repro.exp.accuracy import AccuracyConfig, format_accuracy, run_accuracy


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--dataset", choices=["sbn", "nyc", "wbf"], default="sbn")
    ap.add_argument("--sketch-sizes", default="64,256")
    ap.add_argument("--with-pm1", action="store_true")
    ap.add_argument("--with-qn", action="store_true")
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_session("accuracy-rmse")
    table = run_accuracy(
        spark,
        AccuracyConfig(
            dataset=args.dataset,
            sketch_sizes=tuple(int(s) for s in args.sketch_sizes.split(",")),
            with_pm1=args.with_pm1,
            with_qn=args.with_qn,
            seed=args.seed,
        ),
    )
    print(format_accuracy(table))
    spark.stop()


if __name__ == "__main__":
    main()
