"""Exact entropy computation by (vectorized, optionally distributed) enumeration.

Given a cell's witness sets (see :mod:`repro.core.witnesses`), the
information content is the fraction of subsets ``Q`` of a position
universe for which every witness intersects ``Q`` (Prop 2.9 in
witness form).  This module enumerates that subset space:

- :func:`entropy_enumerate` — enumerate **all** ``2^|universe|``
  subsets, exactly like the paper's exact algorithms.  With
  ``universe = Pos \\ {p}`` this is the paper's *unoptimized* baseline;
  with the universe of the Prop 3.3-reduced subtable it is the paper's
  *optimized* exact algorithm.  Cost is honest: the full subset space
  is enumerated even when witnesses are few.
- :func:`entropy_exact_support` — our additional exact shortcut
  (documented in DESIGN.md): positions outside the union of witness
  sets contribute a factor 2 to both numerator and denominator of
  Prop 2.9, so enumeration may be restricted to the support.  Used as
  the fast exact path of the orchestrator and as a test oracle.

Subset spaces larger than ``2^budget_bits`` raise
:class:`ExactBudgetExceeded` — the reproduction of the paper's
"aborted after 24 hours" Table 1 cells, with CI-sized budgets.  When a
SparkSession is supplied, spaces above ``2^spark_bits`` are partitioned
across the cluster (each task enumerates a contiguous chunk of bitmask
space; only chunk ids travel through the shuffle).
"""
from __future__ import annotations

from typing import Iterable, Sequence

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import SparkSession

from .witnesses import witness_support

MAX_BITS = 62  # bitmask enumeration domain; budgets abort far earlier


class ExactBudgetExceeded(RuntimeError):
    """Subset space too large for the configured exact-work budget."""


def witness_masks(
    witnesses: Iterable[Sequence[int]], universe: Sequence[int]
) -> np.ndarray:
    """Encode witness sets as uint64 bitmasks over ``universe``.

    ``universe`` is the ordered list of position ids spanned by the
    enumeration; bit ``i`` of a subset bitmask means "position
    ``universe[i]`` is in ``Q``".
    """
    if len(universe) > MAX_BITS:
        raise ExactBudgetExceeded(
            f"universe of {len(universe)} positions exceeds {MAX_BITS}-bit masks"
        )
    bit = {p: i for i, p in enumerate(universe)}
    masks = []
    for w in witnesses:
        m = 0
        for p in w:
            if p not in bit:
                raise ValueError(f"witness position {p} outside universe")
            m |= 1 << bit[p]
        masks.append(m)
    return np.array(sorted(set(masks)), dtype=np.uint64)


def _count_chunk(start: int, size: int, masks: np.ndarray) -> int:
    qs = np.arange(start, start + size, dtype=np.uint64)
    sat = np.ones(size, dtype=bool)
    for m in masks:
        sat &= (qs & m) != 0
    return int(sat.sum())


def count_satisfying(
    masks: np.ndarray,
    k: int,
    *,
    chunk_bits: int = 20,
    spark: SparkSession | None = None,
    spark_bits: int = 24,
    lazy_empty: bool = True,
) -> int:
    """#{Q in [0, 2^k) : every mask intersects Q}.

    Local chunked NumPy below ``2^spark_bits``; above, the chunk space
    is fanned out with ``spark.range`` + ``mapInPandas`` so each task
    enumerates its own ``2^chunk_bits`` bitmasks.

    ``lazy_empty=False`` disables the no-witness shortcut and sweeps
    the subset space anyway — used by the Table 1 *unoptimized*
    baseline, which (like the paper's straightforward implementation)
    enumerates every subset for every cell, redundant or not.
    """
    if k < 0:
        raise ValueError("negative universe size")
    total = 1 << k
    if masks.size == 0 and lazy_empty:
        return total
    if spark is None or k <= spark_bits:
        chunk = min(total, 1 << chunk_bits)
        return sum(
            _count_chunk(start, min(chunk, total - start), masks)
            for start in range(0, total, chunk)
        )
    n_chunks = 1 << (k - chunk_bits)
    local_masks = np.asarray(masks)

    def counter(batches):
        for pdf in batches:
            counts = [
                _count_chunk(int(cid) << chunk_bits, 1 << chunk_bits, local_masks)
                for cid in pdf["id"]
            ]
            yield pd.DataFrame({"c": counts})

    parallelism = spark.sparkContext.defaultParallelism
    sdf = spark.range(0, n_chunks, 1, min(n_chunks, 4 * parallelism))
    row = sdf.mapInPandas(counter, "c long").agg(F.sum("c").alias("s")).collect()[0]
    return int(row["s"])


def entropy_enumerate(
    witnesses: Iterable[Sequence[int]],
    universe: Sequence[int],
    *,
    budget_bits: int = 26,
    chunk_bits: int = 20,
    spark: SparkSession | None = None,
    spark_bits: int = 24,
    lazy_empty: bool = True,
) -> float:
    """Paper-style exact entropy: enumerate all ``2^|universe|`` subsets."""
    k = len(universe)
    if k > budget_bits:
        raise ExactBudgetExceeded(
            f"2^{k} subsets exceed exact budget 2^{budget_bits}"
        )
    masks = witness_masks(witnesses, universe)
    return count_satisfying(
        masks,
        k,
        chunk_bits=chunk_bits,
        spark=spark,
        spark_bits=spark_bits,
        lazy_empty=lazy_empty,
    ) / (1 << k)


def entropy_exact_support(
    witnesses: Iterable[Sequence[int]],
    *,
    budget_bits: int = 26,
    chunk_bits: int = 20,
    spark: SparkSession | None = None,
    spark_bits: int = 24,
) -> float:
    """Exact entropy restricted to the witness support (fast exact path)."""
    witnesses = list(witnesses)
    if not witnesses:
        return 1.0
    return entropy_enumerate(
        witnesses,
        witness_support(witnesses),
        budget_bits=budget_bits,
        chunk_bits=chunk_bits,
        spark=spark,
        spark_bits=spark_bits,
    )
