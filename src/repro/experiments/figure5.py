"""Figure 5 (RQ3): Monte Carlo runtime grid — rows × iterations.

The paper's grid spans 10..150 rows and 1e3..1e6 iterations (150 rows ×
1e6 took ~4.5 h single-threaded).  The reproduction measures the same
sweep at a reduced default grid and verifies the *scaling shape*: for
reasonably large inputs runtime grows linearly with the iteration count
and superlinearly with the row count (more rows mean both more plaque
cells and more witnesses per cell).

Each measurement is the full pipeline on the first *n* rows: witness
construction (Spark scans) + per-cell MC (fanned out via mapInPandas
for the larger grids, locally below ``spark_cells_min``).
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from ..core.entropy import plaque_entropies
from ..datasets import satellites
from ..profiling import discover_fds

ROWS_GRID = (10, 50, 100, 150)
ITER_GRID = (1_000, 10_000, 100_000)


def run(
    spark: SparkSession,
    rows_grid=ROWS_GRID,
    iter_grid=ITER_GRID,
    *,
    max_lhs: int = 2,
    seed: int = 0,
    spark_cells: bool = False,
) -> pd.DataFrame:
    """Wall-clock seconds, rows = #rows analyzed, one column per n_iter.

    ``spark_cells=False`` (default) runs the per-cell sampling on the
    driver like the paper's single-threaded implementation, so the grid
    exhibits the same scaling shape; ``True`` fans cells out over the
    cluster (our parallelization of the paper's "future work").
    """
    inst = satellites.load(spark)
    fds = discover_fds(inst, max_lhs=max_lhs)
    records = []
    for n in rows_grid:
        head = inst.head(n)
        row: dict = {"rows": n}
        for it in iter_grid:
            t0 = time.perf_counter()
            plaque_entropies(
                head,
                fds,
                method="mc",
                n_iter=it,
                seed=seed,
                do_validate=False,
                use_spark_cells=spark_cells,
            )
            row[f"iter_{it}"] = round(time.perf_counter() - t0, 2)
        records.append(row)
    return pd.DataFrame(records)


def render(table: pd.DataFrame) -> str:
    return table.to_string(index=False)
