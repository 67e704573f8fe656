"""End-to-end plaque-test orchestration.

``plaque_entropies`` is the public entry point: given an
:class:`~repro.core.instance.Instance` and a set of FDs it

1. closes the FD set (``F*``, Section 2.1) and left-reduces it,
2. validates ``I |= F`` via Spark groupBy scans (precondition of the
   framework),
3. builds all witness sets with the Spark dataflow of
   :mod:`repro.core.witnesses` — cells without witnesses get entropy 1
   (Prop 3.2; this subsumes the Prop 3.3 reduction, since enumeration
   is per-cell on the witness support),
4. computes each remaining cell exactly (support enumeration, budget
   permitting) or by Monte Carlo (Theorem 3.6), fanned out over the
   cluster.

``exact_entropy_table`` reproduces the paper's Table 1 algorithms
verbatim in cost: the *unoptimized* variant enumerates
``2^(#Pos − 1)`` subsets for every cell; the *optimized* variant
applies Prop 3.2 + Prop 3.3 and enumerates ``2^(#Pos' − 1)`` on the
reduced subtable.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Literal

import pandas as pd
from pyspark.sql import SparkSession

from .exact import ExactBudgetExceeded, entropy_enumerate, entropy_exact_support
from .fd import FD, fd_closure, left_reduce, nontrivial, validate
from .instance import ROW_ID, Instance


def _row_ids(inst: Instance) -> list[int]:
    """Row ids of the instance, ascending (dense for our datasets)."""
    return sorted(
        int(r) for (r,) in inst.df.select(ROW_ID).toPandas().itertuples(index=False)
    )
from .montecarlo import mc_entropies, mc_entropies_spark, required_iterations
from .reduce import reduce_instance
from .witnesses import collect_cell_witnesses

Method = Literal["auto", "exact", "mc"]


def prepare_fds(fds: Iterable[FD], close: bool = True) -> set[FD]:
    """Left-reduced nontrivial ``F*`` (or just left-reduced ``F``)."""
    fds = set(fds)
    return left_reduce(nontrivial(fd_closure(fds) if close else fds))


@dataclass
class PlaqueResult:
    """Per-cell entropies plus the configuration that produced them."""

    long: pd.DataFrame  # columns: row_id, attr, entropy, method
    fds: tuple[FD, ...]
    params: dict = field(default_factory=dict)

    def matrix(self, inst: Instance) -> pd.DataFrame:
        """rows x attributes entropy matrix in instance order."""
        mat = self.long.pivot(index="row_id", columns="attr", values="entropy")
        return mat.reindex(columns=inst.attrs).sort_index()

    @property
    def min_entropy(self) -> float:
        return float(self.long["entropy"].min())

    def plaque_cells(self, threshold: float = 1.0) -> pd.DataFrame:
        """Cells testing positive for plaque (entropy strictly below 1)."""
        return self.long[self.long["entropy"] < threshold].reset_index(drop=True)


def plaque_entropies(
    inst: Instance,
    fds: Iterable[FD],
    *,
    method: Method = "auto",
    n_iter: int | None = None,
    eps: float = 0.01,
    delta: float = 0.01,
    seed: int = 0,
    close: bool = True,
    do_validate: bool = True,
    exact_bits: int = 22,
    use_spark_cells: bool = True,
) -> PlaqueResult:
    """Compute the plaque test for every cell of ``inst``.

    ``method='auto'`` computes a cell exactly when its witness support
    fits ``2^exact_bits`` and falls back to Monte Carlo otherwise;
    ``'exact'`` raises :class:`ExactBudgetExceeded` instead of falling
    back; ``'mc'`` approximates every non-unique cell.  The MC sample
    count is ``n_iter`` or derived from ``(eps, delta)`` via
    Theorem 3.6.
    """
    closed = prepare_fds(fds, close=close)
    if do_validate:
        validate(inst.df, closed)
    witness_map = collect_cell_witnesses(inst, closed)
    if n_iter is None:
        n_iter = required_iterations(eps, delta)

    records: list[dict] = []
    mc_queue: dict[tuple[int, str], list[tuple[int, ...]]] = {}
    for row_id in _row_ids(inst):
        for attr in inst.attrs:
            cell = (row_id, attr)
            ws = witness_map.get(cell)
            if not ws:
                records.append(
                    {"row_id": row_id, "attr": attr, "entropy": 1.0, "method": "unique"}
                )
                continue
            if method in ("auto", "exact"):
                try:
                    e = entropy_exact_support(ws, budget_bits=exact_bits)
                    records.append(
                        {"row_id": row_id, "attr": attr, "entropy": e, "method": "exact"}
                    )
                    continue
                except ExactBudgetExceeded:
                    if method == "exact":
                        raise
            mc_queue[cell] = ws

    if mc_queue:
        spark = inst.df.sparkSession
        if use_spark_cells and len(mc_queue) > 1:
            mc = mc_entropies_spark(spark, mc_queue, n_iter, seed)
        else:
            mc = mc_entropies(mc_queue, n_iter, seed)
        for (row_id, attr), e in mc.items():
            records.append(
                {"row_id": row_id, "attr": attr, "entropy": e, "method": "mc"}
            )

    long = (
        pd.DataFrame(records, columns=["row_id", "attr", "entropy", "method"])
        .sort_values(["row_id", "attr"], kind="stable")
        .reset_index(drop=True)
    )
    return PlaqueResult(
        long=long,
        fds=tuple(sorted(closed)),
        params={
            "method": method,
            "n_iter": n_iter,
            "eps": eps,
            "delta": delta,
            "seed": seed,
            "exact_bits": exact_bits,
        },
    )


def exact_entropy_table(
    inst: Instance,
    fds: Iterable[FD],
    *,
    optimized: bool,
    budget_bits: int = 26,
    close: bool = True,
    do_validate: bool = False,
    spark: SparkSession | None = None,
    spark_bits: int = 24,
) -> pd.DataFrame:
    """Table 1 algorithms: exact entropies with/without Section 3.1 opts.

    Returns a long frame ``row_id, attr, entropy``.  Raises
    :class:`ExactBudgetExceeded` when the subset space exceeds
    ``2^budget_bits`` — the analogue of the paper's 24-hour aborts.
    """
    closed = prepare_fds(fds, close=close)
    if do_validate:
        validate(inst.df, closed)
    records: list[dict] = []
    row_ids = _row_ids(inst)
    if not optimized:
        witness_map = collect_cell_witnesses(inst, closed)
        positions = {
            (r, a): inst.pos(r, a) for r in row_ids for a in inst.attrs
        }
        all_pos = sorted(positions.values())
        for (r, a), p in sorted(positions.items()):
            universe = [q for q in all_pos if q != p]
            # lazy_empty=False: the unoptimized baseline sweeps the full
            # subset space for every cell, like the paper's straight-
            # forward implementation — no uniqueness shortcut.
            e = entropy_enumerate(
                witness_map.get((r, a), []),
                universe,
                budget_bits=budget_bits,
                spark=spark,
                spark_bits=spark_bits,
                lazy_empty=False,
            )
            records.append({"row_id": r, "attr": a, "entropy": e})
    else:
        red = reduce_instance(inst, closed)
        sub = red.sub
        witness_map = collect_cell_witnesses(sub, closed)
        sub_pos = {
            (r, a): sub.pos(r, a) for r in red.rows for a in sub.attrs
        }
        all_sub = sorted(sub_pos.values())
        computed: dict[tuple[int, str], float] = {}
        for (r, a), p in sorted(sub_pos.items()):
            ws = witness_map.get((r, a))
            if not ws:
                computed[(r, a)] = 1.0  # Prop 3.2 shortcut inside the subtable
                continue
            universe = [q for q in all_sub if q != p]
            computed[(r, a)] = entropy_enumerate(
                ws,
                universe,
                budget_bits=budget_bits,
                spark=spark,
                spark_bits=spark_bits,
            )
        for r in row_ids:
            for a in inst.attrs:
                records.append(
                    {
                        "row_id": r,
                        "attr": a,
                        "entropy": computed.get((r, a), 1.0),
                    }
                )
    return (
        pd.DataFrame(records, columns=["row_id", "attr", "entropy"])
        .sort_values(["row_id", "attr"], kind="stable")
        .reset_index(drop=True)
    )
