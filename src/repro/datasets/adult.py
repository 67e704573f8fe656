"""Synthetic substitute for the UCI *adult* census dataset.

The paper analyzes the first 150 rows; Metanome finds 78 FDs, and the
plaque test colors exactly two columns — ``education`` and
``education-num`` — with *equal* entropy per row, caused by the cyclic
dependencies ``education -> education-num`` and ``education-num ->
education`` (a textbook 2NF-decomposition opportunity, Figure 3b).

The substitute preserves that structure: ``education`` cycles through
16 levels (so every group has multiple rows) and ``education_num`` is
its bijective numeric code; ``fnlwgt`` is a key; every other column is
seeded-random filler whose groups are globally inconsistent, so the
only witness-generating dependencies are the two cyclic ones.  The
witness structures of the two columns are mirror images, which makes
the per-row entropies provably equal — the effect the paper reports.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.fd import FD
from ..core.instance import Instance

N_ROWS = 150

EDUCATION = [
    "Preschool", "1st-4th", "5th-6th", "7th-8th", "9th", "10th", "11th",
    "12th", "HS-grad", "Some-college", "Assoc-voc", "Assoc-acdm",
    "Bachelors", "Masters", "Prof-school", "Doctorate",
]

ENGINEERED_FDS = {
    FD(["education"], "education_num"),
    FD(["education_num"], "education"),
}

PLAQUE_COLUMNS = {"education", "education_num"}


def pandas_df(n_rows: int = N_ROWS, seed: int = 42) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    n = n_rows
    edu_idx = np.arange(n) % len(EDUCATION)
    pdf = pd.DataFrame(
        {
            "age": g.integers(17, 90, n),
            "workclass": g.choice(
                ["Private", "Self-emp", "Federal-gov", "Local-gov",
                 "State-gov", "Without-pay", "Never-worked", "Other"], n),
            "fnlwgt": 10_000 + 7 * np.arange(n),
            "education": [EDUCATION[i] for i in edu_idx],
            "education_num": edu_idx + 1,
            "marital_status": g.choice(
                ["Married", "Divorced", "Never-married", "Separated",
                 "Widowed", "Spouse-absent", "AF-spouse"], n),
            "occupation": g.choice(
                [f"occ-{i}" for i in range(14)], n),
            "relationship": g.choice(
                ["Wife", "Husband", "Own-child", "Unmarried",
                 "Other-relative", "Not-in-family"], n),
            "race": g.choice(["White", "Black", "Asian", "Amer-Indian", "Other"], n),
            "sex": g.choice(["Female", "Male"], n),
            "hours_per_week": g.integers(1, 99, n),
            "native_country": g.choice([f"country-{i}" for i in range(20)], n),
        }
    )
    return pdf


def load(spark: SparkSession, n_rows: int = N_ROWS, seed: int = 42) -> Instance:
    return Instance.from_pandas(spark, pandas_df(n_rows, seed))
