"""Optimization 2 (Prop 3.3): subtable reduction.

Entropies of positions inside ``Pos(J, K)`` may be computed on the
subinstance ``I(J, K)`` provided ``J ⊇ J0`` (rows containing at least
one non-unique cell) and ``K ⊇ K0`` (attributes mentioned by any FD).
Every position outside ``Pos(J0, K0)`` is unique w.r.t. ``F`` and has
entropy 1 by Prop 3.2, so the reduction loses nothing.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable

from .fd import FD, left_reduce, nontrivial
from .instance import Instance
from .prune import nonunique_rows


@dataclass(frozen=True)
class Reduction:
    """Result of Prop 3.3: the subtable and its row/attribute choice."""

    sub: Instance
    rows: tuple[int, ...]   # J0 (sorted)
    attrs: tuple[str, ...]  # K0 in original attribute order

    @property
    def n_positions(self) -> int:
        return len(self.rows) * len(self.attrs)


def relevant_attrs(inst: Instance, fds: Iterable[FD]) -> list[str]:
    """``K0``: attributes involved in any FD, in instance order."""
    mentioned: set[str] = set()
    for f in fds:
        mentioned |= f.attrs
    return [a for a in inst.attrs if a in mentioned]


def reduce_instance(inst: Instance, fds: Iterable[FD]) -> Reduction:
    """Compute ``I(J0, K0)`` for the given (closed) FD set."""
    fds = left_reduce(nontrivial(fds))
    j0 = nonunique_rows(inst, fds)
    k0 = relevant_attrs(inst, fds)
    return Reduction(
        sub=inst.restrict(j0, k0), rows=tuple(j0), attrs=tuple(k0)
    )
