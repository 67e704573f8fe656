"""Tests for the naive Prop 2.9 reference implementation."""
import numpy as np
import pytest

from repro.core.fd import FD
from repro.core.naive import (
    entropy_matrix_naive,
    entropy_naive,
    satisfies,
    satisfies_all,
)

from .helpers import manual_case_334


class TestSatisfiesSemantics:
    """Definition 2.4: FD satisfaction on instances with variables."""

    codes = np.array([[1, 5], [1, 6]], dtype=np.int64)  # violates A->B

    def test_violation_detected(self):
        var = np.zeros((2, 2), dtype=bool)
        assert not satisfies(self.codes, var, (0,), 1)

    def test_var_on_rhs_removes_constraint(self):
        var = np.zeros((2, 2), dtype=bool)
        var[0, 1] = True
        assert satisfies(self.codes, var, (0,), 1)

    def test_var_on_lhs_removes_constraint(self):
        var = np.zeros((2, 2), dtype=bool)
        var[1, 0] = True
        assert satisfies(self.codes, var, (0,), 1)

    def test_satisfied_fd(self):
        codes = np.array([[1, 5], [1, 5]], dtype=np.int64)
        var = np.zeros((2, 2), dtype=bool)
        assert satisfies(codes, var, (0,), 1)

    def test_composite_lhs(self):
        codes = np.array([[1, 2, 9], [1, 3, 8]], dtype=np.int64)
        var = np.zeros((2, 3), dtype=bool)
        assert satisfies(codes, var, (0, 1), 2)  # LHS tuples differ

    def test_composite_lhs_violation(self):
        codes = np.array([[1, 2, 9], [1, 2, 8]], dtype=np.int64)
        var = np.zeros((2, 3), dtype=bool)
        assert not satisfies(codes, var, (0, 1), 2)

    def test_satisfies_all(self):
        codes = np.array([[1, 5], [1, 5]], dtype=np.int64)
        var = np.zeros((2, 2), dtype=bool)
        assert satisfies_all(codes, var, {FD(["A"], "B"), FD(["B"], "A")}, ["A", "B"])

    def test_satisfies_all_unknown_attr(self):
        codes = np.array([[1, 5]], dtype=np.int64)
        var = np.zeros((1, 2), dtype=bool)
        with pytest.raises(KeyError):
            satisfies_all(codes, var, {FD(["Z"], "B")}, ["A", "B"])


class TestEntropyNaive:
    def test_example_3_4_matrix(self):
        """The worked example: INF = 0.875 for the two redundant C cells."""
        codes, attrs, fds = manual_case_334()
        mat = entropy_matrix_naive(codes, fds, attrs)
        expected = np.array(
            [
                [1, 1, 0.875, 1],
                [1, 1, 1.0, 1],
                [1, 1, 0.875, 1],
            ]
        )
        np.testing.assert_allclose(mat, expected)

    def test_no_fds_all_one(self):
        codes = np.array([[1, 2], [1, 2]], dtype=np.int64)
        mat = entropy_matrix_naive(codes, set(), ["A", "B"])
        np.testing.assert_allclose(mat, 1.0)

    def test_unique_cell_is_one(self):
        codes = np.array([[1, 5], [2, 6]], dtype=np.int64)
        assert entropy_naive(codes, {FD(["A"], "B")}, ["A", "B"], 0, 1) == 1.0

    def test_redundant_pair(self):
        # Two rows agreeing on A and B; B redundant under A->B.
        # Witness {(other A), (own A), (other B)}: INF = 1 - 2^-3 = 7/8.
        codes = np.array([[1, 5], [1, 5]], dtype=np.int64)
        e = entropy_naive(codes, {FD(["A"], "B")}, ["A", "B"], 0, 1)
        assert e == pytest.approx(7 / 8)

    def test_refuses_large(self):
        codes = np.zeros((4, 7), dtype=np.int64)
        with pytest.raises(ValueError):
            entropy_naive(codes, set(), list("ABCDEFG"), 0, 0)

    def test_entropy_in_unit_interval(self):
        codes, attrs, fds = manual_case_334()
        mat = entropy_matrix_naive(codes, fds, attrs)
        assert np.all(mat >= 0) and np.all(mat <= 1)
