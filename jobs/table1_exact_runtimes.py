#!/usr/bin/env python
"""spark-submit entry point for Table 1 (exact runtimes w/ and w/o opts).

Usage: spark-submit jobs/table1_exact_runtimes.py [--max-rows N] [--budget-bits B]
"""
import argparse

from repro.experiments import table1
from repro.sparkutil import get_spark


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--max-rows", type=int, default=8)
    ap.add_argument("--budget-bits", type=int, default=26)
    args = ap.parse_args()
    spark = get_spark("table1")
    try:
        table = table1.run(
            spark, max_rows=args.max_rows, budget_bits=args.budget_bits
        )
        print(table1.render(table))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
