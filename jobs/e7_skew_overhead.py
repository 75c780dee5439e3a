"""App. E.7: overhead of skew-handling on non-skewed data.

    spark-submit jobs/e7_skew_overhead.py --sf 0.05
"""
import argparse

from _common import emit, get_spark

from repro.bench import harness


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.05)
    args = ap.parse_args()
    spark = get_spark("e7")
    emit(harness.e7(spark, sf=args.sf))


if __name__ == "__main__":
    main()
