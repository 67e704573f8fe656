"""Monte Carlo approximation of information content (Section 3.2).

Sample ``n`` subsets ``Q ⊆ Pos \\ {p}`` uniformly (every position
independently with probability 1/2) and average the 0/1 outcome
"every witness of ``p`` intersects ``Q``" (Lemma 2.8 reduces each
sample's information content to exactly 0 or 1; DESIGN.md's witness
reduction turns the model check into mask intersections).

Theorem 3.6 (Hoeffding): ``n >= 2 ln(2/δ) / ε²`` samples give accuracy
``ε`` with confidence ``1 − δ`` — :func:`required_iterations`.

Sampling is vectorized: the support positions of a cell are packed into
64-bit words, one `uint64`` draw yields 64 independent fair coins, and
witnesses are tested with bitwise AND.  Positions outside the support
never affect the outcome, so not sampling them is exact, not an
approximation.  :func:`mc_entropies_spark` fans the per-cell
computation out over the cluster with ``mapInPandas``.

Seeds are derived per cell from ``(seed, row_id, attr)`` so results are
reproducible and independent of execution order or partitioning.
"""
from __future__ import annotations

import math
import zlib
from typing import Iterable, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from .witnesses import witness_support


def required_iterations(eps: float, delta: float) -> int:
    """Smallest ``n`` with ``n >= 2 ln(2/δ)/ε²`` (Theorem 3.6)."""
    if not (0 < eps) or not (0 < delta < 1):
        raise ValueError("need eps > 0 and 0 < delta < 1")
    return math.ceil(2.0 * math.log(2.0 / delta) / (eps * eps))


def achieved_accuracy(n_iter: int, delta: float) -> float:
    """Inverse of :func:`required_iterations`: ε reached by ``n`` samples."""
    if n_iter <= 0 or not (0 < delta < 1):
        raise ValueError("need n_iter > 0 and 0 < delta < 1")
    return math.sqrt(2.0 * math.log(2.0 / delta) / n_iter)


def cell_rng(seed: int, row_id: int, attr: str) -> np.random.Generator:
    """Deterministic per-cell generator, stable across runs/partitions."""
    return np.random.default_rng(
        np.random.SeedSequence([seed, row_id, zlib.crc32(attr.encode())])
    )


def _packed_masks(
    witnesses: Sequence[Sequence[int]], support: Sequence[int]
) -> np.ndarray:
    """(n_witness, n_words) uint64 bitmasks over the packed support."""
    n_words = (len(support) + 63) // 64
    bit = {p: i for i, p in enumerate(support)}
    masks = np.zeros((len(witnesses), max(n_words, 1)), dtype=np.uint64)
    for wi, w in enumerate(witnesses):
        for p in w:
            i = bit[p]
            masks[wi, i >> 6] |= np.uint64(1 << (i & 63))
    return masks


def mc_entropy(
    witnesses: Iterable[Sequence[int]],
    n_iter: int,
    rng: np.random.Generator,
    chunk: int = 1 << 14,
) -> float:
    """Monte Carlo estimate of one cell's entropy from its witnesses."""
    witnesses = list(witnesses)
    if n_iter <= 0:
        raise ValueError("n_iter must be positive")
    if not witnesses:
        return 1.0
    support = witness_support(witnesses)
    masks = _packed_masks(witnesses, support)
    n_words = masks.shape[1]
    hits = 0
    done = 0
    while done < n_iter:
        c = min(chunk, n_iter - done)
        qs = rng.integers(0, 1 << 64, size=(c, n_words), dtype=np.uint64)
        sat = np.ones(c, dtype=bool)
        for m in masks:
            sat &= ((qs & m) != 0).any(axis=1)
            if not sat.any():
                break
        hits += int(sat.sum())
        done += c
    return hits / n_iter


def mc_entropies(
    witness_map: dict[tuple[int, str], list[tuple[int, ...]]],
    n_iter: int,
    seed: int = 0,
) -> dict[tuple[int, str], float]:
    """Local (driver-side) MC over all cells with witnesses."""
    return {
        (row_id, attr): mc_entropy(ws, n_iter, cell_rng(seed, row_id, attr))
        for (row_id, attr), ws in sorted(witness_map.items())
    }


def mc_entropies_spark(
    spark: SparkSession,
    witness_map: dict[tuple[int, str], list[tuple[int, ...]]],
    n_iter: int,
    seed: int = 0,
) -> dict[tuple[int, str], float]:
    """Cluster fan-out of the per-cell MC with ``mapInPandas``.

    Each cell's sampling is independent and deterministic in
    ``(seed, row_id, attr)``, so the result equals
    :func:`mc_entropies` regardless of partitioning.
    """
    cells = sorted(witness_map.items())
    if not cells:
        return {}
    rows = [
        (row_id, attr, [list(w) for w in ws])
        for (row_id, attr), ws in cells
    ]
    sdf = spark.createDataFrame(
        rows, "row_id long, attr string, witnesses array<array<long>>"
    )
    parallelism = spark.sparkContext.defaultParallelism
    sdf = sdf.repartition(min(len(rows), 2 * parallelism))

    def compute(batches):
        for pdf in batches:
            ent = [
                mc_entropy(
                    [tuple(int(p) for p in w) for w in ws],
                    n_iter,
                    cell_rng(seed, int(row_id), attr),
                )
                for row_id, attr, ws in pdf.itertuples(index=False)
            ]
            yield pd.DataFrame(
                {"row_id": pdf["row_id"], "attr": pdf["attr"], "entropy": ent}
            )

    out = sdf.mapInPandas(compute, "row_id long, attr string, entropy double")
    return {
        (int(r), a): float(e) for r, a, e in out.toPandas().itertuples(index=False)
    }
