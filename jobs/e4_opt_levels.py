"""App. E.4: optimization levels of the standard compilation route.

    spark-submit jobs/e4_opt_levels.py --sf 0.05
"""
import argparse

from _common import emit, get_spark

from repro.bench import harness


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.05)
    ap.add_argument("--levels", type=int, nargs="+", default=[0, 1, 2, 3])
    args = ap.parse_args()
    spark = get_spark("e4")
    emit(harness.e4(spark, sf=args.sf, levels=tuple(args.levels)))


if __name__ == "__main__":
    main()
