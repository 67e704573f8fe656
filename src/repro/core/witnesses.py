"""Witness-set construction — the Spark scan layer of the plaque test.

DESIGN.md derives from Prop 2.9 + Def 2.4 that for a cell
``p = (j, B)`` and closed, left-reduced FDs ``F*``:

    INF_I(p | F) = Pr_Q[ every witness set of p intersects Q ],

where ``Q`` contains each other position independently with probability
1/2, and the witness sets of ``p`` are, for every FD ``X -> B`` in
``F*`` and every row ``j' != j`` agreeing with ``j`` on ``X``:

    W = {(j, A) : A in X} ∪ {(j', A) : A in X} ∪ {(j', B)}.

Witnesses are produced here as a distributed dataflow: one self-join
per FD on LHS equality (groups of rows sharing an LHS tuple), pairs
exploded into per-cell witness position arrays, then aggregated per
cell.  A cell with *no* witnesses is exactly a cell that is "unique
with respect to F" (Prop 3.2) and has entropy 1.

:func:`witnesses_local` is an independent brute-force builder used by
the test suite to cross-check the Spark dataflow.
"""
from __future__ import annotations

from typing import Iterable, Sequence

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from .fd import FD, left_reduce, nontrivial
from .instance import ROW_ID, Instance
from .scans import multivalued_lhs


def witness_df(inst: Instance, fds: Iterable[FD]) -> DataFrame:
    """All witness sets of all cells, one row per (cell, witness).

    Schema: ``row_id: long, attr: string, witness: array<long>`` with
    position ids encoded by :meth:`Instance.pos`.  ``fds`` must already
    be the closed, left-reduced set (``F*``); trivial/dominated FDs are
    defensively dropped here as their witnesses are redundant.

    Dataflow: FDs are grouped by LHS; a single grouping-sets scan drops
    LHSs that are superkeys (their groups are singletons, so they
    generate no witnesses — this prunes the many key-derived FDs a
    complete discovery emits), then one self-join per surviving LHS
    produces the within-group row pairs, emitting one witness array per
    RHS attribute of that LHS.
    """
    m = inst.n_attrs
    fds = sorted(left_reduce(nontrivial(fds)))
    by_lhs: dict[tuple[str, ...], list[str]] = {}
    for f in fds:
        by_lhs.setdefault(f.lhs, []).append(f.rhs)
    survivors = multivalued_lhs(inst, list(by_lhs)) if by_lhs else set()

    parts: list[DataFrame] = []
    for lhs in sorted(survivors):
        rhss = by_lhs[lhs]
        cols = sorted(set(lhs) | set(rhss))
        d = inst.df.select(ROW_ID, *cols)
        left, right = d.alias("l"), d.alias("r")
        cond = F.col(f"l.{ROW_ID}") != F.col(f"r.{ROW_ID}")
        for a in lhs:
            cond = cond & F.col(f"l.{a}").eqNullSafe(F.col(f"r.{a}"))
        lhs_pos = []
        for a in lhs:
            ai = inst.attr_index(a)
            lhs_pos.append(F.col(f"l.{ROW_ID}") * m + F.lit(ai))
            lhs_pos.append(F.col(f"r.{ROW_ID}") * m + F.lit(ai))
        pairs = left.join(right, cond)
        witness_cols = F.array(
            *(
                F.struct(
                    F.lit(b).alias("attr"),
                    F.sort_array(
                        F.array(
                            *lhs_pos,
                            F.col(f"r.{ROW_ID}") * m + F.lit(inst.attr_index(b)),
                        )
                    ).alias("witness"),
                )
                for b in rhss
            )
        )
        parts.append(
            pairs.select(
                F.col(f"l.{ROW_ID}").alias("row_id"),
                F.explode(witness_cols).alias("w"),
            ).select("row_id", F.col("w.attr").alias("attr"), F.col("w.witness").alias("witness"))
        )
    if not parts:
        schema = "row_id long, attr string, witness array<long>"
        return inst.df.sparkSession.createDataFrame([], schema)
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out


def cell_witnesses_df(inst: Instance, fds: Iterable[FD]) -> DataFrame:
    """Witnesses aggregated per cell.

    Schema: ``row_id, attr, witnesses: array<array<long>>``.  Only
    cells with at least one witness appear; every absent cell has
    entropy exactly 1 (Prop 3.2).
    """
    return (
        witness_df(inst, fds)
        .groupBy("row_id", "attr")
        .agg(F.collect_list("witness").alias("witnesses"))
    )


def collect_cell_witnesses(
    inst: Instance, fds: Iterable[FD]
) -> dict[tuple[int, str], list[tuple[int, ...]]]:
    """Localize :func:`cell_witnesses_df` into a deterministic dict.

    Witness lists are sorted so downstream computation (and seeding)
    does not depend on Spark task order.
    """
    pdf = cell_witnesses_df(inst, fds).toPandas()
    out: dict[tuple[int, str], list[tuple[int, ...]]] = {}
    for row_id, attr, ws in pdf.itertuples(index=False):
        out[(int(row_id), attr)] = sorted(tuple(int(p) for p in w) for w in ws)
    return out


def witnesses_local(
    codes: np.ndarray,
    fds: Iterable[FD],
    attrs: Sequence[str],
    row_ids: np.ndarray | None = None,
) -> dict[tuple[int, str], list[tuple[int, ...]]]:
    """Brute-force witness builder on a localized code matrix.

    Independent of the Spark dataflow (pairwise row loops); used as the
    test oracle for :func:`collect_cell_witnesses` and by the local
    exact/MC code paths on reduced subtables.
    """
    n, m = codes.shape
    if row_ids is None:
        row_ids = np.arange(n, dtype=np.int64)
    index = {a: k for k, a in enumerate(attrs)}
    fds = sorted(left_reduce(nontrivial(set(fds))))
    out: dict[tuple[int, str], list[tuple[int, ...]]] = {}
    for f in fds:
        lhs = [index[a] for a in f.lhs]
        rhs = index[f.rhs]
        for j in range(n):
            for j2 in range(n):
                if j == j2:
                    continue
                if all(codes[j, a] == codes[j2, a] for a in lhs):
                    w = sorted(
                        {int(row_ids[j]) * m + a for a in lhs}
                        | {int(row_ids[j2]) * m + a for a in lhs}
                        | {int(row_ids[j2]) * m + rhs}
                    )
                    out.setdefault((int(row_ids[j]), f.rhs), []).append(tuple(w))
    for cell in out:
        out[cell] = sorted(out[cell])
    return out


def witness_support(witnesses: Iterable[tuple[int, ...]]) -> list[int]:
    """Sorted union of all positions occurring in the witness sets."""
    support: set[int] = set()
    for w in witnesses:
        support.update(w)
    return sorted(support)


def cells_pandas(
    witness_map: dict[tuple[int, str], list[tuple[int, ...]]]
) -> pd.DataFrame:
    """Deterministically ordered (row_id, attr, witnesses) pandas frame."""
    rows = [
        {"row_id": r, "attr": a, "witnesses": ws}
        for (r, a), ws in sorted(witness_map.items())
    ]
    return pd.DataFrame(rows, columns=["row_id", "attr", "witnesses"])
