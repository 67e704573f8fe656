"""Synthetic substitute for the UCI *iris* dataset.

The paper analyzes 150 rows (4 measurements + class); Metanome finds 4
FDs, all with ``class`` on the right-hand side, so only the ``class``
column shows plaque (Figure 3e) — "a class cannot uniquely define the
value of any other attribute".

The substitute keeps the causes: three classes of 50 rows whose
``petal_length`` and ``petal_width`` ranges are disjoint per class
(so ``petal_length -> class`` and ``petal_width -> class`` hold, with
coarse, much-repeated measurement values providing the redundancy),
while sepal measurements overlap freely across classes and all
measurement columns are mutually non-determining.  Measurements are
stored as integers (millimetres) so grouping compares exact values.

Any additional FDs a complete discovery emits are key-derived
(singleton LHS groups) and generate no witnesses, so the plaque-level
claim — colored cells occur only in ``class`` — is preserved and
asserted by the test suite.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.fd import FD
from ..core.instance import Instance

N_ROWS = 150

CLASSES = ["setosa", "versicolor", "virginica"]

# Disjoint per-class value ranges (lo, hi) for the petal columns.
_PETAL_LENGTH = {"setosa": (10, 20), "versicolor": (30, 45), "virginica": (48, 70)}
_PETAL_WIDTH = {"setosa": (1, 7), "versicolor": (10, 17), "virginica": (19, 26)}

ENGINEERED_FDS = {
    FD(["petal_length"], "class"),
    FD(["petal_width"], "class"),
}

PLAQUE_COLUMNS = {"class"}


def pandas_df(n_rows: int = N_ROWS, seed: int = 5) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    n = n_rows
    cls = [CLASSES[i % 3] for i in range(n)]
    pl = np.array([g.integers(*_PETAL_LENGTH[c]) for c in cls])
    pw = np.array([g.integers(*_PETAL_WIDTH[c]) for c in cls])
    pdf = pd.DataFrame(
        {
            "sepal_length": g.integers(43, 80, n),
            "sepal_width": g.integers(20, 45, n),
            "petal_length": pl,
            "petal_width": pw,
            "class": cls,
        }
    )
    return pdf


def load(spark: SparkSession, n_rows: int = N_ROWS, seed: int = 5) -> Instance:
    return Instance.from_pandas(spark, pandas_df(n_rows, seed))
