#!/usr/bin/env python
"""spark-submit entry point for Figure 4 (satellites entropy histogram).

Usage: spark-submit jobs/figure4_histogram.py [--n-iter N]
"""
import argparse

from repro.experiments import figure4
from repro.sparkutil import get_spark


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n-iter", type=int, default=100_000)
    args = ap.parse_args()
    spark = get_spark("figure4")
    try:
        print(figure4.render(figure4.run(spark, n_iter=args.n_iter)))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
