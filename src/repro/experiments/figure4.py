"""Figure 4: histogram of entropy values on the satellites dataset.

Paper findings to reproduce in shape: of 1,200 cells ~90 % have entropy
1, the lowest value is close to 0.6, and only ~5 % of cells are below
0.9; 1,083 cells are prunable by Prop 3.2 and 35 rows are fully unique,
reducing exact computation by a factor > 1e85.
"""
from __future__ import annotations

import math

import pandas as pd
from pyspark.sql import SparkSession

from ..core.entropy import plaque_entropies
from ..core.plaque import histogram
from ..core.reduce import reduce_instance
from ..datasets import satellites
from ..profiling import discover_fds


def run(
    spark: SparkSession, *, n_iter: int = 100_000, method: str = "auto"
) -> dict:
    inst = satellites.load(spark)
    fds = discover_fds(inst, max_lhs=2)
    res = plaque_entropies(
        inst, fds, method=method, n_iter=n_iter, do_validate=False
    )
    hist = histogram(res.long, bins=20)
    ent = res.long["entropy"]
    red = reduce_instance(inst, res.fds)
    n_cells = inst.n_positions
    cells_pruned = int((ent >= 1.0).sum())
    rows_dropped = inst.n_rows - len(red.rows)
    # Prop 3.3 shrinks every cell's subset space by 2^(dropped cells).
    dropped_cells = rows_dropped * inst.n_attrs + len(red.rows) * (
        inst.n_attrs - len(red.attrs)
    )
    return {
        "histogram": hist,
        "stats": pd.Series(
            {
                "n_cells": n_cells,
                "cells_at_entropy_1": cells_pruned,
                "frac_at_entropy_1": round(cells_pruned / n_cells, 4),
                "frac_below_0_9": round(float((ent < 0.9).mean()), 4),
                "min_entropy": round(float(ent.min()), 4),
                "rows_fully_unique": rows_dropped,
                "reduction_factor_log10": round(
                    dropped_cells * math.log10(2), 1
                ),
            }
        ),
    }


def render(result: dict) -> str:
    return (
        "Satellites entropy histogram (Figure 4):\n"
        + result["histogram"].to_string(index=False)
        + "\n\nStats:\n"
        + result["stats"].to_string()
    )
