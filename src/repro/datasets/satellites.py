"""Synthetic substitute for the WDC Web Table Corpus satellites dataset.

The paper analyzes the first 150 rows (8 columns, 1,200 cells) of a web
table about natural satellites; Metanome discovers 35 FDs and the
plaque test colors essentially only the ``Planet`` column plus a few
``Notes`` cells, with minimum entropy ≈ 0.56 and ~90 % of cells at
entropy 1 (Figures 3a/4, Tables 1, Figures 5/6).

This generator reproduces that redundancy structure deterministically
(no RNG — every collision is engineered, every other value unique):

- ``Name`` and ``OrbitalPeriod`` are keys.
- ``DiscoveredBy -> Planet`` holds with discoverer group sizes
  6,6,5,4,4,3,3,2,2,2 (37 rows in multi-row groups; the remaining 113
  discoverers are singletons), mirroring "moons of one planet were
  found by the same observer".
- ``MeanRadius -> Planet`` holds: radius 30 ("3.0") occurs six times,
  only for Saturn rows across four discoverers (the paper's zoom-in
  story — these are the minimum-entropy cells), radius 50 twice for
  Jupiter; all other radii are unique.
- ``DiscoveredBy, DiscoveryYear -> Notes`` holds: two (discoverer,
  year) pairs of rows share the note "retrograde"; extra "retrograde"
  rows with other discoverers/years break every other FD involving
  Notes, keeping the pair FD left-reduced and the Notes plaque at
  exactly 4 cells.
- A magnitude collision (rows 0/2, differing everywhere else) and a
  year collision (rows 1/98, same planet, different discoverers) kill
  all remaining accidental dependencies.

Row order is chosen so the paper's Table 1 "first *i* rows" experiment
reproduces: rows 0,1 share discoverer and radius (non-unique from
``i = 2``), rows 2-4 are fully unique, rows 5,6,8,9 extend the Cassini
group — so the Prop 3.3 reduction grows by one row at i = 6 and 7,
letting the optimized exact algorithm reach further than the
unoptimized one before the work budget aborts, exactly like the paper's
24-hour aborts.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from ..core.fd import FD
from ..core.instance import Instance

N_ROWS = 150
ATTRS = [
    "Name",
    "Planet",
    "MeanRadius",
    "DiscoveredBy",
    "DiscoveryYear",
    "OrbitalPeriod",
    "Notes",
    "Magnitude",
]

PLANETS = [
    "Jupiter",
    "Uranus",
    "Saturn",
    "Neptune",
    "Mars",
    "Pluto",
    "Earth",
    "Haumea",
]

# (discoverer, planet, row indices) — the engineered multi-row groups.
GROUPS: list[tuple[str, str, list[int]]] = [
    ("Cassini", "Saturn", [0, 1, 5, 6, 8, 9]),
    ("Herschel", "Uranus", [12, 13, 14, 15, 16, 17]),
    ("Galileo", "Jupiter", [18, 19, 20, 21, 22]),
    ("Kuiper", "Neptune", [23, 24, 25, 26]),
    ("Lassell", "Neptune", [27, 28, 29, 30]),
    ("Melotte", "Jupiter", [31, 32, 33]),
    ("Nicholson", "Jupiter", [34, 35, 36]),
    ("Perrine", "Jupiter", [37, 38]),
    ("Dollfus", "Saturn", [39, 40]),
    ("Pickering", "Saturn", [41, 42]),
]

# FDs whose LHS has a group of size > 1 — i.e. the dependencies that
# actually generate witnesses/plaque.  Everything else discovery finds
# is key-derived and contributes no redundancy.
ENGINEERED_FDS = {
    FD(["DiscoveredBy"], "Planet"),
    FD(["MeanRadius"], "Planet"),
    FD(["DiscoveredBy", "DiscoveryYear"], "Notes"),
}

PLAQUE_COLUMNS = {"Planet", "Notes"}


def pandas_df(n_rows: int = N_ROWS) -> pd.DataFrame:
    """Deterministic satellite table, first ``n_rows`` rows."""
    if not 1 <= n_rows <= N_ROWS:
        raise ValueError(f"n_rows must be in [1, {N_ROWS}]")
    n = N_ROWS
    discoverer = [f"Obs{i:03d}" for i in range(n)]
    planet = [PLANETS[i % 8] for i in range(n)]
    for d, p, rows in GROUPS:
        for i in rows:
            discoverer[i] = d
            planet[i] = p
    # Row 2 must differ from row 0 in every attribute but Magnitude.
    planet[2] = "Neptune"

    radius = [100 + 7 * i for i in range(n)]
    # "3.0" — Saturn only, four discoverers (Dollfus, Pickering and two
    # singleton observers).  These rows carry witnesses from both
    # DiscoveredBy -> Planet and MeanRadius -> Planet and are the
    # minimum-entropy cells (≈ 0.55), reproducing the paper's zoom-in:
    # "for tuples with a mean radius of 3.0, the entropy of the
    # attribute planet is the lowest".
    for i in (39, 40, 41, 42, 50, 58):
        radius[i] = 30
    for i in (18, 19):  # "5.0" — Jupiter, one discoverer, two years
        radius[i] = 50

    year = [1850 + (37 * i) % 97 for i in range(n)]
    overrides = {12: 1787, 13: 1787, 14: 1788, 18: 1610, 19: 1611, 20: 1611, 21: 1787}
    for i, y in overrides.items():
        year[i] = y

    notes = [f"note{i:03d}" for i in range(n)]
    # Rows 12/13 and 19/20 are the (discoverer, year) note collisions;
    # 14, 21 and 49 (a singleton-discoverer Uranus row) reuse the note
    # with other years/discoverers so no other FD involving Notes —
    # in particular {Planet, Notes} -> DiscoveredBy — can hold.
    for i in (12, 13, 14, 19, 20, 21, 49):
        notes[i] = "retrograde"

    magnitude = [500 + i for i in range(n)]
    magnitude[2] = 500  # collides with row 0, rows differ everywhere else

    pdf = pd.DataFrame(
        {
            "Name": [f"S{i:03d}" for i in range(n)],
            "Planet": planet,
            "MeanRadius": radius,
            "DiscoveredBy": discoverer,
            "DiscoveryYear": year,
            "OrbitalPeriod": [1000 + 17 * i for i in range(n)],
            "Notes": notes,
            "Magnitude": magnitude,
        }
    )
    return pdf.iloc[:n_rows].reset_index(drop=True)


def load(spark: SparkSession, n_rows: int = N_ROWS) -> Instance:
    return Instance.from_pandas(spark, pandas_df(n_rows))
