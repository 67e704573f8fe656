#!/usr/bin/env python
"""spark-submit entry point for Figure 3 (plaque tests on real-world data).

Usage: spark-submit jobs/figure3_real_world.py [--n-iter N] [--html-dir DIR]
"""
import argparse
import pathlib

from repro.experiments import figure3
from repro.sparkutil import get_spark


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--n-iter", type=int, default=10_000)
    ap.add_argument("--html-dir", type=str, default=None)
    args = ap.parse_args()
    spark = get_spark("figure3")
    try:
        table = figure3.run(spark, n_iter=args.n_iter)
        print(figure3.render(table))
        if args.html_dir:
            out = pathlib.Path(args.html_dir)
            out.mkdir(parents=True, exist_ok=True)
            for name, doc in figure3.html_reports(spark, n_iter=args.n_iter).items():
                (out / f"{name}.html").write_text(doc)
                print(f"wrote {out / f'{name}.html'}")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
