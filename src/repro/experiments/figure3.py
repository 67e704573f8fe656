"""Figure 3 (RQ1): plaque tests on the five real-world dataset substitutes.

For each dataset: discover FDs with the profiling substrate, run the
plaque test, and report the summary quantities the paper states in the
subcaptions and discussion — rows analyzed, number of FDs, minimum
entropy, how many columns carry plaque, and per-dataset findings
(constant columns at ≈0 entropy, the education/education-num equality,
class-only plaque for iris, …).

The paper computes entropies by Monte Carlo with 100,000 iterations
(accuracy ≈ 0.01 at 99 % confidence); ``n_iter`` defaults to 10,000
(ε ≈ 0.033 at 99.9 %) to keep default wall time small — pass 100_000
to match the paper exactly.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..core.entropy import PlaqueResult, plaque_entropies
from ..core.plaque import to_html
from ..datasets import REAL_WORLD
from ..profiling import discover_fds

DATASETS = ("satellites", "adult", "echocardiogram", "ncvoter", "iris")

# Paper-reported values for EXPERIMENTS.md side-by-side comparison.
# min_entropy is None where the extracted text does not state a number
# (the subcaption values were not preserved in the source we work from);
# for satellites the histogram discussion puts the minimum "close to
# 0.6", and for echocardiogram/NCVoter a whole column is at ~0.
PAPER = {
    "satellites": {"rows": 150, "n_fds": 35, "min_entropy": 0.6},
    "adult": {"rows": 150, "n_fds": 78, "min_entropy": None},
    "echocardiogram": {"rows": 132, "n_fds": 538, "min_entropy": 0.0},
    "ncvoter": {"rows": 150, "n_fds": 758, "min_entropy": 0.0},
    "iris": {"rows": 150, "n_fds": 4, "min_entropy": None},
}


def run_one(
    spark: SparkSession,
    name: str,
    *,
    n_iter: int = 10_000,
    max_lhs: int = 2,
    method: str = "auto",
    seed: int = 0,
) -> tuple[pd.Series, PlaqueResult]:
    mod = REAL_WORLD[name]
    inst = mod.load(spark)
    fds = discover_fds(inst, max_lhs=max_lhs)
    res = plaque_entropies(
        inst, fds, method=method, n_iter=n_iter, seed=seed,
        do_validate=False,  # discovered FDs hold by construction
    )
    plaque = res.plaque_cells()
    summary = pd.Series(
        {
            "dataset": name,
            "rows": inst.n_rows,
            "cols": inst.n_attrs,
            "n_fds": len(fds),
            "n_cells": inst.n_positions,
            "n_plaque_cells": len(plaque),
            "frac_entropy_1": round(1 - len(plaque) / inst.n_positions, 4),
            "min_entropy": round(res.min_entropy, 4),
            "plaque_columns": ",".join(sorted(plaque["attr"].unique())),
        }
    )
    return summary, res


def run(
    spark: SparkSession, *, n_iter: int = 10_000, datasets=DATASETS, **kw
) -> pd.DataFrame:
    rows = []
    for name in datasets:
        summary, _ = run_one(spark, name, n_iter=n_iter, **kw)
        rows.append(summary)
    return pd.DataFrame(rows).reset_index(drop=True)


def render(table: pd.DataFrame) -> str:
    return table.to_string(index=False)


def html_reports(spark: SparkSession, *, n_iter: int = 10_000) -> dict[str, str]:
    """Per-dataset heat-map HTML (the visual analogue of Figure 3)."""
    out = {}
    for name in DATASETS:
        mod = REAL_WORLD[name]
        inst = mod.load(spark)
        _, res = run_one(spark, name, n_iter=n_iter)
        out[name] = to_html(res.matrix(inst), f"Plaque test - {name}")
    return out
