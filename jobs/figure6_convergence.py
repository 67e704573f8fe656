#!/usr/bin/env python
"""spark-submit entry point for Figure 6 (MC visual stability).

Usage: spark-submit jobs/figure6_convergence.py [--low N] [--high N]
"""
import argparse

from repro.experiments import figure6
from repro.sparkutil import get_spark


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--low", type=int, default=1_000)
    ap.add_argument("--high", type=int, default=100_000)
    args = ap.parse_args()
    spark = get_spark("figure6")
    try:
        print(
            figure6.render(
                figure6.run(spark, low_iter=args.low, high_iter=args.high)
            )
        )
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
