"""Functional dependencies: model, satisfaction scans, and closures.

Implements Section 2.1 of the paper plus the machinery the paper assumes
as given:

- :class:`FD` — an immutable functional dependency ``A1,...,As -> B``
  with a single right-hand side attribute (the paper's Definition 2.3;
  all FD sets in the paper are left-reduced with unary RHS).
- :func:`holds` / :func:`validate` — the ``I |= f`` check as a Spark
  ``groupBy`` scan (an instance fulfills ``X -> B`` iff no ``X``-group
  contains two distinct ``B`` values).
- :func:`attribute_closure` — the classic ``X+`` fixpoint.
- :func:`fd_closure` — the *transitive closure* ``F*`` the paper assumes
  is provided ("we assume that the transitive closure of functional
  dependencies is provided", Section 2.1): a pseudo-transitivity
  fixpoint (``X -> A`` and ``Y u {A} -> B`` imply ``X u Y -> B``) with
  trivial-FD removal and subset-LHS domination pruning.
- :func:`left_reduce` — drop any FD whose LHS is a superset of another
  FD's LHS with the same RHS (the dominated FD's witness sets are
  supersets of the dominating FD's, hence redundant — see DESIGN.md).
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field
from typing import Iterable

import pyspark.sql.functions as F
from pyspark.sql import DataFrame


@dataclass(frozen=True, order=True)
class FD:
    """A functional dependency ``lhs -> rhs`` with unary right-hand side.

    ``lhs`` is stored as a sorted tuple so FDs are hashable, orderable
    and deterministic to iterate; construct with any iterable.
    """

    lhs: tuple[str, ...] = field()
    rhs: str = field()

    def __init__(self, lhs: Iterable[str], rhs: str) -> None:
        object.__setattr__(self, "lhs", tuple(sorted(set(lhs))))
        object.__setattr__(self, "rhs", str(rhs))

    @classmethod
    def parse(cls, text: str) -> "FD":
        """Parse ``"A,B->C"`` (whitespace-tolerant) into an FD."""
        left, sep, right = text.partition("->")
        if not sep:
            raise ValueError(f"not an FD (missing '->'): {text!r}")
        lhs = [a.strip() for a in left.split(",") if a.strip()]
        rhs = right.strip()
        if not lhs or not rhs:
            raise ValueError(f"FD needs a non-empty LHS and RHS: {text!r}")
        return cls(lhs, rhs)

    @property
    def attrs(self) -> frozenset[str]:
        """All attributes mentioned by this FD (LHS union RHS)."""
        return frozenset(self.lhs) | {self.rhs}

    @property
    def trivial(self) -> bool:
        """True iff the RHS already occurs on the LHS."""
        return self.rhs in self.lhs

    def __str__(self) -> str:
        return f"{','.join(self.lhs)}->{self.rhs}"


def parse_fds(texts: Iterable[str]) -> set[FD]:
    """Parse an iterable of ``"A,B->C"`` strings into a set of FDs."""
    return {FD.parse(t) for t in texts}


def nontrivial(fds: Iterable[FD]) -> set[FD]:
    """Drop trivial FDs (RHS contained in LHS)."""
    return {f for f in fds if not f.trivial}


def left_reduce(fds: Iterable[FD]) -> set[FD]:
    """Keep only FDs whose LHS is minimal (set-inclusion) per RHS.

    If ``X1 -> B`` and ``X2 -> B`` with ``X1 ⊂ X2`` are both present,
    every witness set of ``X2 -> B`` contains a witness set of
    ``X1 -> B`` for the same cell, so ``X2 -> B`` contributes no
    additional constraints (DESIGN.md, witness-set reduction).
    """
    fds = set(fds)
    out: set[FD] = set()
    for f in fds:
        dominated = any(
            g.rhs == f.rhs and set(g.lhs) < set(f.lhs) for g in fds
        )
        if not dominated:
            out.add(f)
    return out


def attribute_closure(attrs: Iterable[str], fds: Iterable[FD]) -> frozenset[str]:
    """Classic attribute-set closure ``X+`` under a set of FDs."""
    closure = set(attrs)
    fds = list(fds)
    changed = True
    while changed:
        changed = False
        for f in fds:
            if f.rhs not in closure and set(f.lhs) <= closure:
                closure.add(f.rhs)
                changed = True
    return frozenset(closure)


class ClosureBudgetExceeded(RuntimeError):
    """Raised when the pseudo-transitivity fixpoint grows past its cap."""


def fd_closure(fds: Iterable[FD], max_size: int = 100_000) -> set[FD]:
    """Transitive closure ``F*`` as a left-reduced set of nontrivial FDs.

    Pseudo-transitivity fixpoint: from ``X -> A`` and ``Y -> B`` with
    ``A ∈ Y`` derive ``X ∪ (Y \\ {A}) -> B``.  Derived trivial FDs are
    dropped and dominated (superset-LHS, same RHS) FDs pruned each
    round, so the result is left-reduced.  The paper's semantics
    ``I |= F  iff  I |= f for all f in F*`` (Section 2.1) is what the
    witness construction consumes.

    Note: for FD sets *discovered* completely (up to an LHS-size cap)
    from the instance itself, closing is a no-op up to domination —
    every derivable FD already has a left-reduced generalization in the
    discovered set.
    """
    current = left_reduce(nontrivial(fds))
    while True:
        derived: set[FD] = set()
        for f, g in itertools.product(current, current):
            if f.rhs not in g.lhs:
                continue
            lhs = set(f.lhs) | (set(g.lhs) - {f.rhs})
            if g.rhs in lhs:
                continue
            cand = FD(lhs, g.rhs)
            if cand in current:
                continue
            if any(h.rhs == cand.rhs and set(h.lhs) <= set(cand.lhs) for h in current):
                continue
            derived.add(cand)
        if not derived:
            return current
        current = left_reduce(current | derived)
        if len(current) > max_size:
            raise ClosureBudgetExceeded(
                f"FD closure exceeded {max_size} dependencies"
            )


# ---------------------------------------------------------------------------
# Satisfaction scans (Spark)
# ---------------------------------------------------------------------------

def holds(df: DataFrame, fd: FD) -> bool:
    """``I |= fd`` via a Catalyst groupBy scan.

    ``X -> B`` holds iff every ``X``-group has exactly one distinct
    ``B`` value, i.e. ``max(count_distinct(B)) == 1`` over groups.
    """
    if fd.trivial:
        return True
    row = (
        df.groupBy(*fd.lhs)
        .agg(F.countDistinct(fd.rhs).alias("cd"))
        .agg(F.max("cd").alias("mx"))
        .collect()[0]
    )
    return (row["mx"] or 0) <= 1


def violated(df: DataFrame, fds: Iterable[FD]) -> list[FD]:
    """Return the subset of ``fds`` the instance does not fulfill.

    Batched: one grouping-sets scan per ~48 distinct LHS sets instead
    of one groupBy job per FD.
    """
    from .instance import Instance  # local import to avoid a cycle
    from .scans import lhs_group_stats

    fds = sorted(set(fds))
    if not fds:
        return []
    inst = Instance.from_df(df)
    lhs_sets = sorted({f.lhs for f in fds})
    stats = lhs_group_stats(inst, lhs_sets, count_distinct=True)
    bad = []
    for f in fds:
        if f.trivial:
            continue
        _, mcd = stats[f.lhs]
        if mcd[f.rhs] > 1:
            bad.append(f)
    return bad


def validate(df: DataFrame, fds: Iterable[FD]) -> None:
    """Raise ``ValueError`` unless ``I |= F`` (precondition of Prop 2.9)."""
    bad = violated(df, fds)
    if bad:
        raise ValueError(
            "instance does not fulfill FDs: " + "; ".join(map(str, bad))
        )
