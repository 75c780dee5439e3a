"""Figure 12: clinical exploration queries C1–C3, small + large input.

    spark-submit jobs/fig12_clinical.py
"""
import argparse

from _common import emit, get_spark

from repro.bench import harness


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--small", type=int, default=10)
    ap.add_argument("--large", type=int, default=40)
    args = ap.parse_args()
    spark = get_spark("fig12")
    emit(
        harness.fig12(
            spark, sizes=(("small", args.small), ("large", args.large))
        )
    )


if __name__ == "__main__":
    main()
