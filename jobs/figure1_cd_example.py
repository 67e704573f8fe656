#!/usr/bin/env python
"""spark-submit entry point for Figure 1 (CD example entropy matrices).

Usage: spark-submit jobs/figure1_cd_example.py [--html-dir DIR]
"""
import argparse
import pathlib

from repro.experiments import figure1
from repro.sparkutil import get_spark


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--html-dir", type=str, default=None)
    args = ap.parse_args()
    spark = get_spark("figure1")
    try:
        result = figure1.run(spark)
        print(figure1.render(result))
        if args.html_dir:
            out = pathlib.Path(args.html_dir)
            out.mkdir(parents=True, exist_ok=True)
            for name, doc in figure1.html(result).items():
                (out / f"{name}.html").write_text(doc)
                print(f"wrote {out / f'{name}.html'}")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
