"""Table 1: exact-entropy runtimes with/without the Section 3.1 optimizations.

The paper computes exact entropies for the first *i* rows of the
satellites data; the unoptimized algorithm enumerates ``2^(#Pos − 1)``
subsets for every cell, the optimized one prunes unique cells
(Prop 3.2) and reduces to the relevant subtable (Prop 3.3) first.  Runs
exceeding 24 hours are reported as "-".

Our reproduction replaces the wall-clock timeout with a deterministic
work budget (``budget_bits``): a configuration whose subset space
exceeds ``2^budget_bits`` aborts.  Once a variant has aborted it stays
aborted for larger row counts (the subset space only grows), exactly as
in the paper's table.  FDs are discovered once on the full dataset, so
every prefix instance satisfies them.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..core.entropy import exact_entropy_table
from ..core.exact import ExactBudgetExceeded
from ..datasets import satellites
from ..profiling import discover_fds

ABORTED = "-"


def run(
    spark: SparkSession,
    max_rows: int = 8,
    budget_bits: int = 26,
    max_lhs: int = 2,
) -> pd.DataFrame:
    """Runtimes (seconds) per row count; aborted cells hold ``"-"``."""
    from ..core.entropy import prepare_fds
    from ..core.reduce import reduce_instance

    inst = satellites.load(spark)
    fds = discover_fds(inst, max_lhs=max_lhs)
    closed = prepare_fds(fds)
    records = []
    aborted = {False: False, True: False}
    for i in range(1, max_rows + 1):
        head = inst.head(i)
        red = reduce_instance(head, closed)
        row: dict = {
            "rows": i,
            # log2 of the per-cell subset space each variant enumerates
            # — the quantity that actually explodes (paper: 24 h aborts).
            "unopt_bits": i * inst.n_attrs - 1,
            "opt_bits": max(red.n_positions - 1, 0),
        }
        for optimized, col in ((False, "unoptimized_s"), (True, "optimized_s")):
            if aborted[optimized]:
                row[col] = ABORTED
                continue
            t0 = time.perf_counter()
            try:
                exact_entropy_table(
                    head, fds, optimized=optimized, budget_bits=budget_bits
                )
                row[col] = round(time.perf_counter() - t0, 3)
            except ExactBudgetExceeded:
                row[col] = ABORTED
                aborted[optimized] = True
        records.append(row)
    return pd.DataFrame(
        records,
        columns=["rows", "unopt_bits", "unoptimized_s", "opt_bits", "optimized_s"],
    )


def render(table: pd.DataFrame) -> str:
    lines = ["#Rows  2^bits(unopt)  Unoptimized  2^bits(opt)  Optimized"]
    for _, r in table.iterrows():
        lines.append(
            f"{r['rows']:>5}  {'2^' + str(r['unopt_bits']):>13}  "
            f"{str(r['unoptimized_s']):>11}  {'2^' + str(r['opt_bits']):>11}  "
            f"{str(r['optimized_s']):>9}"
        )
    return "\n".join(lines)
