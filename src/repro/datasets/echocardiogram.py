"""Synthetic substitute for the UCI *echocardiogram* dataset.

The paper analyzes all 132 rows (13 columns); Metanome finds 538 FDs.
The striking finding (Figure 3c): the ``name`` column was anonymized to
a single global string constant, so *every* attribute functionally
determines it, and its plaque-test entropies are ~0 — "the column
literally has almost no informational value".  Other columns show
sparse plaque.

The substitute preserves the causes:

- ``name`` is the constant ``"name"`` → every other attribute is a
  valid (unary, left-reduced) LHS for it.  Binary/coarse columns
  (``still_alive``, ``pericardial_effusion``, ``age``, ``group``)
  have huge LHS groups, which drives the entropy of ``name`` cells to
  ≈ 0.
- Sparse plaque elsewhere: ``wall_motion_index`` is a bijection of
  ``wall_motion_score`` (cyclic FDs) and ``lvdd`` a bijection of
  ``epss``, where the base columns are unique except a handful of
  engineered collision pairs; ``alive_at_1`` is a threshold function
  of ``survival`` (near-unique with a few collisions).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.fd import FD
from ..core.instance import Instance

N_ROWS = 132

# Collision pairs: (kept row, row that copies the kept row's value).
_WMS_PAIRS = [(3, 17), (22, 40), (51, 77), (90, 111), (5, 125)]
_EPSS_PAIRS = [(8, 29), (33, 61), (70, 102), (2, 119)]
_SURV_PAIRS = [(11, 47), (58, 83), (95, 130)]

ENGINEERED_FDS = {
    FD(["wall_motion_score"], "wall_motion_index"),
    FD(["wall_motion_index"], "wall_motion_score"),
    FD(["epss"], "lvdd"),
    FD(["lvdd"], "epss"),
    FD(["survival"], "alive_at_1"),
}

CONSTANT_COLUMN = "name"

# Columns the plaque test may color (name deeply, the rest sparsely).
PLAQUE_COLUMNS = {
    "name",
    "wall_motion_score",
    "wall_motion_index",
    "epss",
    "lvdd",
    "alive_at_1",
}


def pandas_df(n_rows: int = N_ROWS, seed: int = 7) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    n = n_rows

    survival = (10 * np.arange(n) + 3).astype(np.int64)  # unique months*10
    for keep, copy in _SURV_PAIRS:
        if copy < n:
            survival[copy] = survival[min(keep, n - 1)]
    wms = (200 + 11 * np.arange(n)).astype(np.int64)
    for keep, copy in _WMS_PAIRS:
        if copy < n:
            wms[copy] = wms[min(keep, n - 1)]
    epss = (50 + 13 * np.arange(n)).astype(np.int64)
    for keep, copy in _EPSS_PAIRS:
        if copy < n:
            epss[copy] = epss[min(keep, n - 1)]

    still_alive = g.integers(0, 2, n)
    age = g.integers(45, 90, n)
    pericardial = g.integers(0, 2, n)
    group = g.integers(1, 4, n)
    # Engineered collision pairs must not be accidentally consistent on
    # the filler columns, or extra FDs (e.g. survival -> still_alive)
    # would hold; break consistency deterministically.
    for keep, copy in _SURV_PAIRS + _WMS_PAIRS + _EPSS_PAIRS:
        if copy < n:
            k = min(keep, n - 1)
            still_alive[copy] = 1 - still_alive[k]
            pericardial[copy] = 1 - pericardial[k]
            age[copy] = 45 + (age[k] - 45 + 1) % 45
            group[copy] = group[k] % 3 + 1

    pdf = pd.DataFrame(
        {
            "survival": survival,
            "still_alive": still_alive,
            "age_at_heart_attack": age,
            "pericardial_effusion": pericardial,
            "fractional_shortening": 1000 + 3 * np.arange(n),  # unique
            "epss": epss,
            "lvdd": epss * 2 + 9,              # bijection of epss
            "wall_motion_score": wms,
            "wall_motion_index": wms * 3 + 1,  # bijection of wms
            # coarse (11 values): a fifth wide-group determinant of the
            # constant name column, driving its entropy below 0.05
            # ("rounds to 0.0" as in the paper)
            "mult": 10 + np.arange(n) % 11,
            "name": ["name"] * n,              # anonymized constant
            "group": group,
            "alive_at_1": (survival >= 10 * n // 2).astype(np.int64),
        }
    )
    return pdf


def load(spark: SparkSession, n_rows: int = N_ROWS, seed: int = 7) -> Instance:
    return Instance.from_pandas(spark, pandas_df(n_rows, seed))
