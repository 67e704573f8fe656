"""Optimization 1 (Prop 3.2): uniqueness pruning.

A cell ``p = (j, B)`` is *unique* w.r.t. ``F`` iff for every FD
``X -> B`` in ``F`` the LHS tuple of row ``j`` occurs in no other row.
Prop 3.2: ``INF_I(p | F) = 1`` iff ``p`` is unique — such cells can be
assigned entropy 1 without any enumeration.

Non-uniqueness is exactly "the cell has at least one witness set"
(DESIGN.md), so detection reuses the witness dataflow of
:mod:`repro.core.witnesses` (grouping-sets superkey pre-filter +
per-LHS self-joins) and projects distinct cells.  A window-scan
variant, :func:`nonunique_cells_window`, exists as an independent
Catalyst formulation used for cross-checking in tests.
"""
from __future__ import annotations

from typing import Iterable

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, Window

from .fd import FD, left_reduce, nontrivial
from .instance import ROW_ID, Instance
from .witnesses import witness_df


def nonunique_cells_df(inst: Instance, fds: Iterable[FD]) -> DataFrame:
    """Cells that are **not** unique w.r.t. ``fds`` (schema row_id, attr)."""
    return witness_df(inst, fds).select("row_id", "attr").distinct()


def nonunique_cells(inst: Instance, fds: Iterable[FD]) -> set[tuple[int, str]]:
    """Localized, deterministic set of non-unique cells."""
    pdf = nonunique_cells_df(inst, fds).toPandas()
    return {(int(r), a) for r, a in pdf.itertuples(index=False)}


def nonunique_rows(inst: Instance, fds: Iterable[FD]) -> list[int]:
    """``J0`` of Prop 3.3: rows containing at least one non-unique cell."""
    return sorted({r for r, _ in nonunique_cells(inst, fds)})


def nonunique_cells_window(inst: Instance, fds: Iterable[FD]) -> DataFrame:
    """Window-scan formulation of non-uniqueness (test cross-check).

    For each FD ``X -> B``, rows whose ``X``-partition has size > 1
    yield the non-unique cell ``(row, B)``.
    """
    fds = sorted(left_reduce(nontrivial(fds)))
    parts: list[DataFrame] = []
    for f in fds:
        w = Window.partitionBy(*[F.col(a) for a in f.lhs])
        parts.append(
            inst.df.withColumn("_grp", F.count(F.lit(1)).over(w))
            .where(F.col("_grp") > 1)
            .select(F.col(ROW_ID).alias("row_id"), F.lit(f.rhs).alias("attr"))
        )
    if not parts:
        schema = "row_id long, attr string"
        return inst.df.sparkSession.createDataFrame([], schema)
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out.distinct()
