"""FD discovery substrate — the reproduction's stand-in for Metanome [11].

The paper obtains its dependency sets from the Metanome profiling tool
(left-reduced FDs with a single attribute on the right).  This module
implements the same contract from scratch as a level-wise lattice
search (TANE-style) whose validity checks are Catalyst scans:

- A candidate ``X -> B`` is valid iff every ``X``-group contains one
  distinct ``B`` value.  All candidates of one lattice level are
  checked in a single pass per chunk using ``GROUP BY GROUPING SETS``
  with ``grouping_id()`` to attribute aggregates back to candidates —
  one distributed scan instead of one job per LHS.
- Minimality (left-reduction): ``X -> B`` is only emitted if no proper
  subset of ``X`` determines ``B``.
- Key pruning: if ``X`` is a key (every group has one row), then
  ``X -> B`` holds for every ``B``; supersets of keys are never
  minimal, so the lattice is not expanded beyond keys.

``discover_fds_bruteforce`` is an independent pandas implementation of
the same semantics used as the test oracle.

Limitations (documented, asserted): analyzed columns must be NULL-free
(grouping sets use NULL as the "aggregated" marker), and the lattice is
cut off at ``max_lhs`` LHS attributes (the paper's datasets are
analyzed with small left-hand sides; see DESIGN.md).
"""
from __future__ import annotations

import itertools
from typing import Iterable

import pandas as pd

from ..core.fd import FD
from ..core.instance import Instance
from ..core.scans import SETS_PER_SCAN as _SETS_PER_SCAN
from ..core.scans import check_no_nulls, lhs_group_stats


def _scan_level(inst: Instance, lhs_sets):
    """Per LHS: (max group size, {attr: max distinct values per group})."""
    stats = lhs_group_stats(inst, list(lhs_sets), count_distinct=True)
    return {X: (cnt, mcd) for X, (cnt, mcd) in stats.items()}


def discover_fds(inst: Instance, max_lhs: int = 2) -> set[FD]:
    """All left-reduced FDs of the instance with ``|LHS| <= max_lhs``."""
    check_no_nulls(inst)
    attrs = inst.attrs
    found: set[FD] = set()
    determined: dict[str, list[frozenset[str]]] = {a: [] for a in attrs}
    keys: list[frozenset[str]] = []

    for level in range(1, max_lhs + 1):
        lhs_sets: list[tuple[str, ...]] = []
        rhs_cands: dict[tuple[str, ...], list[str]] = {}
        for X in itertools.combinations(attrs, level):
            xs = frozenset(X)
            if any(k <= xs for k in keys):
                continue  # superset of a key: nothing minimal left
            cands = [
                b
                for b in attrs
                if b not in xs and not any(lhs <= xs for lhs in determined[b])
            ]
            if cands:
                lhs_sets.append(X)
                rhs_cands[X] = cands
        for start in range(0, len(lhs_sets), _SETS_PER_SCAN):
            batch = lhs_sets[start : start + _SETS_PER_SCAN]
            stats = _scan_level(inst, batch)
            for X in batch:
                max_cnt, mcd = stats[X]
                if max_cnt <= 1:
                    keys.append(frozenset(X))
                for b in rhs_cands[X]:
                    if mcd[b] <= 1:
                        found.add(FD(X, b))
                        determined[b].append(frozenset(X))
    return found


def discover_keys(inst: Instance, max_size: int = 2) -> set[frozenset[str]]:
    """Minimal unique column combinations up to ``max_size`` attributes."""
    check_no_nulls(inst)
    n = inst.n_rows
    keys: set[frozenset[str]] = set()
    for level in range(1, max_size + 1):
        cands = [
            X
            for X in itertools.combinations(inst.attrs, level)
            if not any(k <= frozenset(X) for k in keys)
        ]
        for start in range(0, len(cands), _SETS_PER_SCAN):
            batch = cands[start : start + _SETS_PER_SCAN]
            stats = _scan_level(inst, batch)
            for X in batch:
                if stats[X][0] <= 1 and n > 0:
                    keys.add(frozenset(X))
    return keys


# ---------------------------------------------------------------------------
# Brute-force oracle (pandas) — independent implementation for tests
# ---------------------------------------------------------------------------

def _fd_holds_pandas(pdf: pd.DataFrame, lhs: Iterable[str], rhs: str) -> bool:
    return int(pdf.groupby(list(lhs), sort=False)[rhs].nunique().max()) <= 1


def discover_fds_bruteforce(pdf: pd.DataFrame, max_lhs: int = 2) -> set[FD]:
    """Reference discovery with identical semantics, no Spark."""
    attrs = [c for c in pdf.columns]
    found: set[FD] = set()
    determined: dict[str, list[frozenset[str]]] = {a: [] for a in attrs}
    keys: list[frozenset[str]] = []
    for level in range(1, max_lhs + 1):
        for X in itertools.combinations(attrs, level):
            xs = frozenset(X)
            if any(k <= xs for k in keys):
                continue
            if pdf.groupby(list(X), sort=False).size().max() <= 1:
                keys.append(xs)
            for b in attrs:
                if b in xs or any(lhs <= xs for lhs in determined[b]):
                    continue
                if _fd_holds_pandas(pdf, X, b):
                    found.add(FD(X, b))
                    determined[b].append(xs)
    return found
