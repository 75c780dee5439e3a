"""App. E.1: RDD backend vs Dataset (DataFrame/Catalyst) backend.

    spark-submit jobs/e1_rdd_vs_dataset.py --sf 0.02
"""
import argparse

from _common import emit, get_spark

from repro.bench import harness


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.02)
    ap.add_argument("--levels", type=int, nargs="+", default=[0, 1, 2, 3])
    args = ap.parse_args()
    spark = get_spark("e1")
    emit(harness.e1(spark, sf=args.sf, levels=tuple(args.levels)))


if __name__ == "__main__":
    main()
