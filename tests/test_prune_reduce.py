"""Tests for Prop 3.2 (uniqueness pruning) and Prop 3.3 (reduction)."""
import pandas as pd
import pytest

from repro.core.entropy import prepare_fds
from repro.core.exact import entropy_exact_support
from repro.core.fd import FD
from repro.core.instance import Instance
from repro.core.naive import entropy_naive
from repro.core.prune import (
    nonunique_cells,
    nonunique_cells_window,
    nonunique_rows,
)
from repro.core.reduce import reduce_instance, relevant_attrs
from repro.core.witnesses import collect_cell_witnesses, witnesses_local
from repro.datasets import cd_example

from .helpers import tiny_cases

CASES = tiny_cases(n_cases=6, seed=11)


class TestNonuniqueCells:
    def test_cd_genuine(self, spark, cd):
        closed = prepare_fds(cd_example.GENUINE_FDS)
        cells = nonunique_cells(cd, closed)
        # Figure 1b: exactly the colored cells.
        expected = {
            (r, a)
            for r in (0, 1, 2)
            for a in ("Album", "Band", "BYear", "RYear")
        } | {(4, "BYear")}
        assert cells == expected

    def test_window_formulation_agrees(self, spark, cd, cd_discovered):
        closed = prepare_fds(cd_discovered)
        a = nonunique_cells(cd, closed)
        b = {
            (int(r), at)
            for r, at in nonunique_cells_window(cd, closed)
            .toPandas()
            .itertuples(index=False)
        }
        assert a == b

    def test_no_fds(self, spark, cd):
        assert nonunique_cells(cd, set()) == set()

    def test_rows(self, spark, cd):
        closed = prepare_fds(cd_example.GENUINE_FDS)
        assert nonunique_rows(cd, closed) == [0, 1, 2, 4]


class TestProp32:
    """INF = 1 iff the cell is unique (has no witnesses)."""

    @pytest.mark.parametrize("case_idx", range(len(CASES)))
    def test_iff_on_random_instances(self, case_idx):
        codes, attrs, fds = CASES[case_idx]
        closed = prepare_fds(fds)
        wm = witnesses_local(codes, closed, attrs)
        n, m = codes.shape
        for r in range(n):
            for c, a in enumerate(attrs):
                e = entropy_naive(codes, closed, attrs, r, c)
                if (r, a) in wm:
                    assert e < 1.0
                else:
                    assert e == 1.0


class TestRelevantAttrs:
    def test_k0(self, cd):
        assert relevant_attrs(cd, cd_example.GENUINE_FDS) == [
            "ID",
            "Album",
            "Band",
            "BYear",
            "RYear",
            "Track",
            "Title",
        ]

    def test_k0_subset(self, cd):
        assert relevant_attrs(cd, {FD(["Band"], "BYear")}) == ["Band", "BYear"]


class TestProp33Reduction:
    def test_cd_reduction_shape(self, spark, cd):
        red = reduce_instance(cd, prepare_fds({FD(["Band"], "BYear")}))
        # Band -> BYear: Anastacia rows 0,1,2,4 are non-unique on BYear.
        assert red.rows == (0, 1, 2, 4)
        assert red.attrs == ("Band", "BYear")
        assert red.n_positions == 8

    def test_entropies_invariant_under_reduction(self, spark, cd):
        """Prop 3.3: computing on I(J0, K0) gives the same entropies."""
        closed = prepare_fds({FD(["Band"], "BYear")})
        red = reduce_instance(cd, closed)
        full = collect_cell_witnesses(cd, closed)
        sub = collect_cell_witnesses(red.sub, closed)
        assert set(full) == set(sub)
        for cell in full:
            assert entropy_exact_support(full[cell]) == pytest.approx(
                entropy_exact_support(sub[cell])
            )

    @pytest.mark.parametrize("case_idx", range(len(CASES)))
    def test_reduction_invariance_random(self, spark, case_idx):
        codes, attrs, fds = CASES[case_idx]
        closed = prepare_fds(fds)
        inst = Instance.from_pandas(spark, pd.DataFrame(codes, columns=attrs))
        red = reduce_instance(inst, closed)
        full = collect_cell_witnesses(inst, closed)
        sub = collect_cell_witnesses(red.sub, closed)
        assert set(full) == set(sub)
        for cell in full:
            assert entropy_exact_support(full[cell]) == pytest.approx(
                entropy_exact_support(sub[cell])
            )

    def test_example_3_4_reduction(self, spark):
        """The paper's Example 3.4: 2^15 -> 2^3 subset-space reduction."""
        pdf = pd.DataFrame(
            {"A": [7, 5, 7], "B": [2, 2, 2], "C": [8, 8, 8], "D": [4, 6, 6]}
        )
        inst = Instance.from_pandas(spark, pdf)
        red = reduce_instance(inst, prepare_fds({FD(["A"], "C")}))
        assert red.rows == (0, 2)
        assert red.attrs == ("A", "C")
        assert red.n_positions == 4
