"""Test helpers: deterministic tiny random instances with valid FD sets.

The central correctness argument of the reproduction is the chain

    naive Prop 2.9 enumeration  ==  witness-based exact enumeration
                                ==  support-restricted exact
                                ≈   Monte Carlo

checked on many small random instances.  ``tiny_cases`` yields
``(codes, attrs, fds)`` triples where ``fds`` is a (closed-under-
discovery) set of FDs *valid on the instance* — the framework's
precondition ``I |= F``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.fd import FD
from repro.profiling.discovery import discover_fds_bruteforce

ABC = ["A", "B", "C", "D", "E"]


def random_codes(rng: np.random.Generator, n_rows: int, n_cols: int, n_vals: int) -> np.ndarray:
    return rng.integers(0, n_vals, size=(n_rows, n_cols)).astype(np.int64)


def tiny_cases(n_cases: int = 20, max_rows: int = 3, max_cols: int = 3, seed: int = 0):
    """Deterministic stream of (codes, attrs, valid FD set) triples.

    FDs are all left-reduced dependencies (|LHS| <= 2) that actually
    hold on the instance, found by the brute-force discoverer — so
    ``I |= F`` by construction and the set is closure-complete up to
    the LHS cap.
    """
    rng = np.random.default_rng(seed)
    out = []
    while len(out) < n_cases:
        n = int(rng.integers(2, max_rows + 1))
        m = int(rng.integers(2, max_cols + 1))
        codes = random_codes(rng, n, m, n_vals=2)
        attrs = ABC[:m]
        pdf = pd.DataFrame(codes, columns=attrs)
        fds = discover_fds_bruteforce(pdf, max_lhs=2)
        mv = {
            f for f in fds if pdf.groupby(list(f.lhs)).size().max() > 1
        }
        if not mv:
            continue  # want at least one witness-generating dependency
        out.append((codes, attrs, fds))
    return out


def manual_case_334() -> tuple[np.ndarray, list[str], set[FD]]:
    """Example 3.4 of the paper: 3x4 instance, F = {A -> C}."""
    codes = np.array(
        [
            [7, 2, 8, 4],
            [5, 2, 8, 6],
            [7, 2, 8, 6],
        ],
        dtype=np.int64,
    )
    return codes, ["A", "B", "C", "D"], {FD(["A"], "C")}
