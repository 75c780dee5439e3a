"""App. D: succinct-representation sharing microexperiment.

Counts the nested candidate tuples in the standard (flattened /
duplicated) result of MAF ⋈ VEP vs the shredded route's shared
first-level dictionary.

    spark-submit jobs/appd_sharing.py --samples 40
"""
import argparse

from _common import emit, get_spark

from repro.bench import harness


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--samples", type=int, default=40)
    args = ap.parse_args()
    spark = get_spark("appd")
    emit(harness.appd(spark, n_samples=args.samples))


if __name__ == "__main__":
    main()
