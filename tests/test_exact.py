"""Tests for vectorized exact enumeration, incl. the central equivalence:

    naive Prop 2.9 model-checking enumeration
        == witness-based full enumeration (entropy_enumerate)
        == support-restricted exact (entropy_exact_support)

on a battery of random tiny instances with valid FD sets.
"""
import numpy as np
import pytest

from repro.core.exact import (
    ExactBudgetExceeded,
    count_satisfying,
    entropy_enumerate,
    entropy_exact_support,
    witness_masks,
)
from repro.core.fd import fd_closure
from repro.core.naive import entropy_naive
from repro.core.witnesses import witness_support, witnesses_local

from .helpers import manual_case_334, tiny_cases

CASES = tiny_cases(n_cases=15)


class TestWitnessMasks:
    def test_basic(self):
        masks = witness_masks([(0, 2), (1,)], [0, 1, 2])
        assert set(int(m) for m in masks) == {0b101, 0b010}

    def test_dedup(self):
        masks = witness_masks([(0,), (0,)], [0, 1])
        assert masks.size == 1

    def test_position_outside_universe(self):
        with pytest.raises(ValueError):
            witness_masks([(5,)], [0, 1])

    def test_universe_too_large(self):
        with pytest.raises(ExactBudgetExceeded):
            witness_masks([(0,)], list(range(70)))


class TestCountSatisfying:
    def test_no_masks(self):
        assert count_satisfying(np.array([], dtype=np.uint64), 5) == 32

    def test_single_mask(self):
        # one witness {bit0}: satisfied iff bit0 set -> half the space
        masks = witness_masks([(0,)], [0, 1, 2])
        assert count_satisfying(masks, 3) == 4

    def test_two_disjoint(self):
        masks = witness_masks([(0,), (1,)], [0, 1])
        assert count_satisfying(masks, 2) == 1

    def test_chunked_equals_unchunked(self):
        masks = witness_masks([(0, 3), (1, 2)], [0, 1, 2, 3])
        a = count_satisfying(masks, 4, chunk_bits=1)
        b = count_satisfying(masks, 4, chunk_bits=20)
        assert a == b == 9

    def test_spark_path_matches_local(self, spark):
        masks = witness_masks([(0, 3), (1, 2), (4,)], list(range(6)))
        local = count_satisfying(masks, 6)
        dist = count_satisfying(masks, 6, spark=spark, spark_bits=2, chunk_bits=2)
        assert dist == local

    def test_negative_k(self):
        with pytest.raises(ValueError):
            count_satisfying(np.array([], dtype=np.uint64), -1)


class TestEntropyEnumerate:
    def test_example_3_4_value(self):
        codes, attrs, fds = manual_case_334()
        wm = witnesses_local(codes, fds, attrs)
        p = 0 * 4 + 2  # cell (0, C)
        universe = [q for q in range(12) if q != p]
        e = entropy_enumerate(wm[(0, "C")], universe)
        assert e == pytest.approx(7 / 8)

    def test_support_equals_full(self):
        codes, attrs, fds = manual_case_334()
        wm = witnesses_local(codes, fds, attrs)
        for cell, ws in wm.items():
            p = cell[0] * 4 + attrs.index(cell[1])
            universe = [q for q in range(12) if q != p]
            assert entropy_enumerate(ws, universe) == pytest.approx(
                entropy_exact_support(ws)
            )

    def test_budget_exceeded(self):
        with pytest.raises(ExactBudgetExceeded):
            entropy_enumerate([(0,)], list(range(30)), budget_bits=10)

    def test_no_witnesses_is_one(self):
        assert entropy_exact_support([]) == 1.0
        assert entropy_enumerate([], [0, 1, 2]) == 1.0


@pytest.mark.parametrize("case_idx", range(len(CASES)))
class TestNaiveEquivalence:
    """naive == witness enumeration == support exact, per cell."""

    def test_all_cells_match(self, case_idx):
        codes, attrs, fds = CASES[case_idx]
        closed = fd_closure(fds)
        n, m = codes.shape
        wm = witnesses_local(codes, closed, attrs)
        for r in range(n):
            for c, a in enumerate(attrs):
                expected = entropy_naive(codes, closed, attrs, r, c)
                ws = wm.get((r, a), [])
                p = r * m + c
                universe = [q for q in range(n * m) if q != p]
                assert entropy_enumerate(ws, universe) == pytest.approx(
                    expected
                ), f"cell ({r},{a}) codes=\n{codes}\nfds={sorted(map(str, closed))}"
                assert entropy_exact_support(ws) == pytest.approx(expected)


class TestWitnessSupport:
    def test_support_union(self):
        assert witness_support([(1, 3), (3, 5)]) == [1, 3, 5]

    def test_support_empty(self):
        assert witness_support([]) == []
