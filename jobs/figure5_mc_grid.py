#!/usr/bin/env python
"""spark-submit entry point for Figure 5 (MC runtime grid).

Usage: spark-submit jobs/figure5_mc_grid.py \
    [--rows 10,50,100,150] [--iters 100,1000,10000]
"""
import argparse

from repro.experiments import figure5
from repro.sparkutil import get_spark


def _ints(csv: str) -> tuple[int, ...]:
    return tuple(int(x) for x in csv.split(",") if x)


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--rows", type=_ints, default=figure5.ROWS_GRID)
    ap.add_argument("--iters", type=_ints, default=figure5.ITER_GRID)
    ap.add_argument(
        "--spark-cells",
        action="store_true",
        help="fan per-cell MC out over the cluster instead of driver-local",
    )
    args = ap.parse_args()
    spark = get_spark("figure5")
    try:
        print(
            figure5.render(
                figure5.run(
                    spark, args.rows, args.iters, spark_cells=args.spark_cells
                )
            )
        )
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
