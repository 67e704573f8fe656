"""Straightforward entropy computation — the paper's baseline.

Direct implementation of Proposition 2.9 with a *generic* model checker
for instances containing variables (Definition 2.4): for a position
``p``, enumerate every subset ``Q ⊆ Pos \\ {p}``, replace the positions
in ``Q`` by (distinct) variables and ``p`` by a fresh value, and check
whether the resulting instance fulfills all FDs of the provided closure
``F*``.  The information content is the fraction of subsets for which
it does.

This is exponential in the number of cells and exists for two reasons:
it is the "straightforward implementation [that] does not scale beyond
toy examples" the paper measures (Table 1, *unoptimized*), and it is
the reference oracle our optimized algorithms are tested against.

All functions work on localized integer-code matrices
(:meth:`repro.core.instance.Instance.codes`); callers pass FDs already
closed via :func:`repro.core.fd.fd_closure` (the paper assumes ``F*``
is provided).
"""
from __future__ import annotations

from typing import Iterable, Sequence

import numpy as np

from .fd import FD


def _fd_indices(fds: Iterable[FD], attrs: Sequence[str]) -> list[tuple[tuple[int, ...], int]]:
    """Translate FDs to (lhs column indices, rhs column index) pairs."""
    index = {a: k for k, a in enumerate(attrs)}
    out = []
    for f in sorted(set(fds)):
        missing = f.attrs - index.keys()
        if missing:
            raise KeyError(f"FD {f} mentions unknown attributes {sorted(missing)}")
        out.append((tuple(index[a] for a in f.lhs), index[f.rhs]))
    return out


def satisfies(codes: np.ndarray, var_mask: np.ndarray, lhs: tuple[int, ...], rhs: int) -> bool:
    """Definition 2.4 check of one FD on an instance with variables.

    A pair of rows violates ``lhs -> rhs`` iff both RHS cells are
    constants with different values while both LHS tuples are fully
    constant and equal.  (Distinct variables can always be assigned
    fresh values, so any variable on a LHS breaks the equality and any
    variable on a RHS can copy the required value.)
    """
    n = codes.shape[0]
    for j1 in range(n):
        if var_mask[j1, rhs] or any(var_mask[j1, a] for a in lhs):
            continue
        for j2 in range(j1 + 1, n):
            if var_mask[j2, rhs] or any(var_mask[j2, a] for a in lhs):
                continue
            if all(codes[j1, a] == codes[j2, a] for a in lhs):
                if codes[j1, rhs] != codes[j2, rhs]:
                    return False
    return True


def satisfies_all(
    codes: np.ndarray, var_mask: np.ndarray, fds: Iterable[FD], attrs: Sequence[str]
) -> bool:
    """``I |= F`` for an instance with variables, ``F`` already closed."""
    return all(
        satisfies(codes, var_mask, lhs, rhs)
        for lhs, rhs in _fd_indices(fds, attrs)
    )


def entropy_naive(
    codes: np.ndarray,
    fds: Iterable[FD],
    attrs: Sequence[str],
    row: int,
    col: int,
) -> float:
    """``INF_I(p | F)`` by full subset enumeration (Prop 2.9).

    ``row``/``col`` index into the ``codes`` matrix.  Exponential:
    ``2^(n_cells - 1)`` model checks — callers keep ``n_cells`` tiny.
    """
    n, m = codes.shape
    fd_idx = _fd_indices(fds, attrs)
    cells = [(r, c) for r in range(n) for c in range(m) if (r, c) != (row, col)]
    k = len(cells)
    if k > 24:
        raise ValueError(f"naive enumeration over 2^{k} subsets refused")
    work = codes.copy()
    work[row, col] = codes[:, col].max() + 1  # fresh value for this column
    satisfying = 0
    var_mask = np.zeros((n, m), dtype=bool)
    for q in range(1 << k):
        var_mask[:] = False
        for i in range(k):
            if q >> i & 1:
                var_mask[cells[i]] = True
        if all(satisfies(work, var_mask, lhs, rhs) for lhs, rhs in fd_idx):
            satisfying += 1
    return satisfying / (1 << k)


def entropy_matrix_naive(
    codes: np.ndarray, fds: Iterable[FD], attrs: Sequence[str]
) -> np.ndarray:
    """Entropy of every cell by naive enumeration (tests/toy sizes only)."""
    n, m = codes.shape
    out = np.empty((n, m), dtype=np.float64)
    for r in range(n):
        for c in range(m):
            out[r, c] = entropy_naive(codes, fds, attrs, r, c)
    return out
