"""Synthetic substitute for the *NCVoter* voter-registration dataset.

The paper analyzes the first 150 rows (19 columns); Metanome finds 758
FDs.  Key finding (Figure 3d): the ``state`` column is single-valued
("NC"), hence functionally dependent on every other attribute, and the
plaque test assigns it entropy ≈ 0 — no information content.  Plaque
elsewhere is sparse but touches many columns.

The substitute preserves:

- constant ``state`` column (every attribute a valid unary LHS, with
  coarse columns — gender, race, party, … — providing huge groups);
- a geographic FD chain with genuinely redundant groups:
  ``zip_code -> city``, ``city -> county``, ``zip_code -> precinct``,
  ``precinct -> ward``, ``city -> area_code`` (and their discovered
  transitive companions, e.g. ``zip_code -> county``), which colors
  several columns sparsely;
- unique ``voter_id``/``street_address``/``phone`` keys.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.fd import FD
from ..core.instance import Instance

N_ROWS = 150

CONSTANT_COLUMN = "state"

_CITIES = [f"city-{i}" for i in range(8)]
_COUNTIES = {f"city-{i}": f"county-{i % 4}" for i in range(8)}

ENGINEERED_FDS = {
    FD(["zip_code"], "city"),
    FD(["city"], "county"),
    FD(["zip_code"], "precinct"),
    FD(["precinct"], "ward"),
    FD(["city"], "area_code"),
}

# The discovered set also contains transitive/cyclic companions of the
# chain (e.g. area_code -> city, {county, precinct} -> zip_code), so
# zip_code itself can carry plaque.
PLAQUE_COLUMNS = {"state", "city", "county", "precinct", "ward", "area_code", "zip_code"}


def pandas_df(n_rows: int = N_ROWS, seed: int = 11) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    n = n_rows
    zip_idx = g.integers(0, 15, n)           # 15 zip codes
    city_of_zip = np.array([z % 8 for z in range(15)])
    city_idx = city_of_zip[zip_idx]
    precinct_of_zip = np.array([f"P-{z % 10}" for z in range(15)])
    ward_of_precinct = {f"P-{p}": f"W-{p % 5}" for p in range(10)}
    precinct = precinct_of_zip[zip_idx]
    pdf = pd.DataFrame(
        {
            "voter_id": 500_000 + 3 * np.arange(n),
            "last_name": g.choice([f"ln-{i}" for i in range(40)], n),
            "first_name": g.choice([f"fn-{i}" for i in range(40)], n),
            "middle_name": g.choice([f"mn-{i}" for i in range(26)], n),
            "birth_year": g.integers(1930, 2003, n),
            "gender": g.choice(["F", "M"], n),
            "race": g.choice(["W", "B", "A", "I", "O"], n),
            "ethnicity": g.choice(["HL", "NL", "UN"], n),
            "street_address": [f"{101 + 7 * i} main st" for i in range(n)],
            "city": [_CITIES[c] for c in city_idx],
            "state": ["NC"] * n,
            "zip_code": 27_000 + zip_idx,
            "area_code": [f"9{c}9" for c in city_idx],
            "phone": 7_000_000 + 13 * np.arange(n),
            "party": g.choice(["DEM", "REP", "UNA", "LIB"], n),
            "registration_year": g.integers(1990, 2023, n),
            "precinct": precinct,
            "ward": [ward_of_precinct[p] for p in precinct],
            "county": [_COUNTIES[_CITIES[c]] for c in city_idx],
        }
    )
    return pdf


def load(spark: SparkSession, n_rows: int = N_ROWS, seed: int = 11) -> Instance:
    return Instance.from_pandas(spark, pandas_df(n_rows, seed))
