"""The paper's running example (Figure 1a): a CD collection relation.

Five tuples over (ID, Album, Band, BYear, RYear, Track, Title), taken
verbatim from the German Wikipedia page on database normalization as
reprinted in the paper.  Two FD configurations are exercised:

- ``GENUINE_FDS`` — the six dependencies stated in Example 1.1
  (``ID -> Album, Band, BYear, RYear``; ``ID, Track -> Title``;
  ``Band -> BYear``), whose entropies are Figure 1b.
- the automatically discovered dependencies (Example 1.2; Metanome
  finds 23 = 20 unary + 3 binary left-reduced FDs on this instance —
  our profiler must find the same set), whose entropies are Figure 1c.

``FIG_1B`` / ``FIG_1C`` hold the paper's reported entropy matrices
(values rounded to one decimal) for exact comparison in tests and
EXPERIMENTS.md.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.fd import parse_fds
from ..core.instance import Instance

ATTRS = ["ID", "Album", "Band", "BYear", "RYear", "Track", "Title"]

_ROWS = [
    (1, "Not That Kind", "Anastacia", 1999, 2000, 1, "Not That Kind"),
    (1, "Not That Kind", "Anastacia", 1999, 2000, 2, "I'm Outta Love"),
    (1, "Not That Kind", "Anastacia", 1999, 2000, 3, "Cowboys"),
    (2, "Wish You Were Here", "Pink Floyd", 1965, 1975, 1, "Shine On You"),
    (3, "Freak of Nature", "Anastacia", 1999, 2001, 1, "Paid my Dues"),
]

GENUINE_FDS = parse_fds(
    [
        "ID->Album",
        "ID->Band",
        "ID->BYear",
        "ID->RYear",
        "ID,Track->Title",
        "Band->BYear",
    ]
)

# Figure 1b: entropies under the genuine FDs, rounded to one decimal.
FIG_1B = np.array(
    [
        [1, 0.8, 0.8, 0.6, 0.8, 1, 1],
        [1, 0.8, 0.8, 0.6, 0.8, 1, 1],
        [1, 0.8, 0.8, 0.6, 0.8, 1, 1],
        [1, 1.0, 1.0, 1.0, 1.0, 1, 1],
        [1, 1.0, 1.0, 0.7, 1.0, 1, 1],
    ],
    dtype=float,
)

# Figure 1c: entropies under the 23 discovered FDs, rounded to one decimal.
FIG_1C = np.array(
    [
        [0.6, 0.6, 0.4, 0.4, 0.6, 1, 1],
        [0.6, 0.6, 0.4, 0.4, 0.6, 1, 1],
        [0.6, 0.6, 0.4, 0.4, 0.6, 1, 1],
        [1.0, 1.0, 1.0, 1.0, 1.0, 1, 1],
        [1.0, 1.0, 0.7, 0.7, 1.0, 1, 1],
    ],
    dtype=float,
)

# Number of left-reduced FDs (|LHS| <= 2) Metanome reports (Example 1.2).
N_DISCOVERED_FDS = 23


def pandas_df() -> pd.DataFrame:
    return pd.DataFrame(_ROWS, columns=ATTRS)


def load(spark: SparkSession) -> Instance:
    """The Figure 1a instance, row order as printed."""
    return Instance.from_pandas(spark, pandas_df())
