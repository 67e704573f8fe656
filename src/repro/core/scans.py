"""Shared Catalyst scan helpers for the profiling/plaque dataflows.

One ``GROUP BY GROUPING SETS`` scan evaluates statistics for many
candidate LHS attribute sets at once: per set, the maximum group size
and (optionally) the maximum number of distinct values of every other
attribute within a group.  Used by FD discovery (validity = max
distinct 1), key detection (max group size 1), and witness-construction
pre-filtering (an LHS whose groups are all singletons generates no
witness sets).

Grouping sets encode "not in this set" as NULL, so analyzed columns
must be NULL-free; :func:`check_no_nulls` enforces this contract.
"""
from __future__ import annotations

from typing import Sequence

import pyspark.sql.functions as F

from .instance import Instance

# Grouping sets per generated SQL statement (keeps plans small).
SETS_PER_SCAN = 48


def check_no_nulls(inst: Instance) -> None:
    """Raise unless every analyzed column is NULL-free."""
    exprs = [F.sum(F.col(a).isNull().cast("int")).alias(a) for a in inst.attrs]
    row = inst.df.agg(*exprs).collect()[0]
    bad = [a for a in inst.attrs if (row[a] or 0) > 0]
    if bad:
        raise ValueError(
            f"grouping-set scans require NULL-free columns, found NULLs in: {bad}"
        )


def lhs_group_stats(
    inst: Instance,
    lhs_sets: Sequence[tuple[str, ...]],
    *,
    count_distinct: bool = False,
) -> dict[tuple[str, ...], tuple[int, dict[str, int] | None]]:
    """Per LHS set: (max group size, optional {attr: max distinct per group}).

    Chunked into :data:`SETS_PER_SCAN`-sized grouping-sets scans.
    """
    out: dict[tuple[str, ...], tuple[int, dict[str, int] | None]] = {}
    for start in range(0, len(lhs_sets), SETS_PER_SCAN):
        out.update(
            _scan_chunk(inst, lhs_sets[start : start + SETS_PER_SCAN], count_distinct)
        )
    return out


def _scan_chunk(
    inst: Instance,
    lhs_sets: Sequence[tuple[str, ...]],
    count_distinct: bool,
) -> dict[tuple[str, ...], tuple[int, dict[str, int] | None]]:
    spark = inst.df.sparkSession
    # grouping_id() assigns one bit per grouping column in order of
    # first appearance in the GROUPING SETS clause (first column = most
    # significant bit, bit set iff aggregated) — verified empirically.
    group_cols: list[str] = []
    for X in lhs_sets:
        for a in X:
            if a not in group_cols:
                group_cols.append(a)
    view = "repro_grouping_scan"
    inst.df.select(*inst.attrs).createOrReplaceTempView(view)
    q = lambda a: f"`{a}`"  # noqa: E731
    sets_sql = ", ".join("(" + ", ".join(q(a) for a in X) + ")" for X in lhs_sets)
    cd_inner = cd_outer = ""
    if count_distinct:
        cd_inner = ", " + ", ".join(
            f"count(DISTINCT {q(b)}) AS cd_{i}" for i, b in enumerate(inst.attrs)
        )
        cd_outer = ", " + ", ".join(
            f"max(cd_{i}) AS mcd_{i}" for i in range(len(inst.attrs))
        )
    inner = (
        f"SELECT grouping_id() AS gid, count(*) AS cnt{cd_inner} "
        f"FROM {view} GROUP BY GROUPING SETS ({sets_sql})"
    )
    outer = f"SELECT gid, max(cnt) AS max_cnt{cd_outer} FROM ({inner}) GROUP BY gid"
    rows = {int(r["gid"]): r for r in spark.sql(outer).collect()}
    m = len(group_cols)
    out: dict[tuple[str, ...], tuple[int, dict[str, int] | None]] = {}
    for X in lhs_sets:
        # grouping_id(): one bit per GROUP BY column, first column most
        # significant; bit set iff the column is aggregated (not in X).
        gid = sum(1 << (m - 1 - i) for i, a in enumerate(group_cols) if a not in X)
        r = rows.get(gid)
        if r is None:
            # An empty instance yields no groups at all for this set.
            out[X] = (0, {b: 0 for b in inst.attrs} if count_distinct else None)
            continue
        mcd = (
            {b: int(r[f"mcd_{i}"]) for i, b in enumerate(inst.attrs)}
            if count_distinct
            else None
        )
        out[X] = (int(r["max_cnt"]), mcd)
    return out


def multivalued_lhs(
    inst: Instance, lhs_sets: Sequence[tuple[str, ...]]
) -> set[tuple[str, ...]]:
    """The LHS sets with at least one group of size > 1 (non-superkeys)."""
    stats = lhs_group_stats(inst, list(lhs_sets))
    return {X for X, (max_cnt, _) in stats.items() if max_cnt > 1}
