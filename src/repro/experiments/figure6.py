"""Figure 6 (RQ3): visual stability of the MC approximation.

The paper compares the satellites plaque test at 1,000 vs 1,000,000
iterations: the images are nearly identical — max per-cell entropy
difference ≈ 0.048, and of 117 cells with entropy < 1 only 9 differ by
more than 0.02.  We compare 1,000 vs 100,000 iterations (the paper's
RQ1 setting) and report the same statistics.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..core.entropy import plaque_entropies
from ..datasets import satellites
from ..profiling import discover_fds


def run(
    spark: SparkSession,
    *,
    low_iter: int = 1_000,
    high_iter: int = 100_000,
    max_lhs: int = 2,
    seed: int = 0,
) -> pd.Series:
    inst = satellites.load(spark)
    fds = discover_fds(inst, max_lhs=max_lhs)
    kw = dict(method="mc", do_validate=False, use_spark_cells=True)
    low = plaque_entropies(inst, fds, n_iter=low_iter, seed=seed, **kw)
    high = plaque_entropies(inst, fds, n_iter=high_iter, seed=seed + 1, **kw)
    lo = low.matrix(inst)
    hi = high.matrix(inst)
    diff = (lo - hi).abs()
    sub1 = (lo < 1) | (hi < 1)
    n_sub1 = int(sub1.sum().sum())
    return pd.Series(
        {
            "low_iter": low_iter,
            "high_iter": high_iter,
            "n_cells_entropy_below_1": n_sub1,
            "max_abs_diff": round(float(diff.max().max()), 4),
            "n_cells_diff_gt_0_02": int((diff.to_numpy() > 0.02).sum()),
            "mean_abs_diff_sub1": round(
                float(diff.to_numpy()[sub1.to_numpy()].mean()), 5
            ),
        }
    )


def render(result: pd.Series) -> str:
    return result.to_string()
