"""End-to-end tests for the plaque orchestrator and Table 1 algorithms."""
import numpy as np
import pandas as pd
import pytest

from repro.core.entropy import (
    PlaqueResult,
    exact_entropy_table,
    plaque_entropies,
    prepare_fds,
)
from repro.core.exact import ExactBudgetExceeded
from repro.core.fd import FD
from repro.core.instance import Instance
from repro.core.naive import entropy_matrix_naive
from repro.datasets import cd_example

from .helpers import tiny_cases

CASES = tiny_cases(n_cases=5, seed=31)


class TestFigure1:
    def test_fig_1b_exact(self, spark, cd):
        res = plaque_entropies(
            cd, cd_example.GENUINE_FDS, method="exact", use_spark_cells=False
        )
        mat = res.matrix(cd).to_numpy()
        np.testing.assert_allclose(np.round(mat, 1), cd_example.FIG_1B)

    def test_fig_1b_specific_values(self, spark, cd):
        res = plaque_entropies(
            cd, cd_example.GENUINE_FDS, method="exact", use_spark_cells=False
        )
        mat = res.matrix(cd)
        assert mat.loc[0, "Album"] == pytest.approx(25 / 32)
        assert mat.loc[0, "BYear"] == pytest.approx(583 / 1024)
        assert mat.loc[4, "BYear"] == pytest.approx(91 / 128)
        assert mat.loc[3, "Album"] == 1.0

    def test_fig_1c_exact(self, spark, cd, cd_discovered):
        res = plaque_entropies(
            cd, cd_discovered, method="exact", use_spark_cells=False
        )
        mat = res.matrix(cd).to_numpy()
        np.testing.assert_allclose(np.round(mat, 1), cd_example.FIG_1C)

    def test_more_fds_never_increase_entropy(self, spark, cd, cd_discovered):
        """Example 1.2: discovered FDs make the coloring darker."""
        a = plaque_entropies(
            cd, cd_example.GENUINE_FDS, method="exact", use_spark_cells=False
        ).matrix(cd)
        b = plaque_entropies(
            cd, cd_discovered, method="exact", use_spark_cells=False
        ).matrix(cd)
        assert (b.to_numpy() <= a.to_numpy() + 1e-12).all()

    def test_fig_1b_mc_close(self, spark, cd):
        res = plaque_entropies(
            cd,
            cd_example.GENUINE_FDS,
            method="mc",
            n_iter=40_000,
            use_spark_cells=True,
        )
        mat = res.matrix(cd).to_numpy()
        np.testing.assert_allclose(np.round(mat, 1), cd_example.FIG_1B, atol=0.1)


class TestPlaqueResult:
    @pytest.fixture(scope="class")
    def res(self, cd):
        return plaque_entropies(
            cd, cd_example.GENUINE_FDS, method="exact", use_spark_cells=False
        )

    def test_long_schema(self, res):
        assert list(res.long.columns) == ["row_id", "attr", "entropy", "method"]

    def test_all_cells_present(self, cd, res):
        assert len(res.long) == cd.n_positions

    def test_methods_recorded(self, res):
        assert set(res.long["method"]) <= {"unique", "exact", "mc"}
        assert (res.long["method"] == "unique").sum() == 22

    def test_min_entropy(self, res):
        assert res.min_entropy == pytest.approx(583 / 1024)

    def test_plaque_cells(self, res):
        pc = res.plaque_cells()
        assert len(pc) == 13
        assert (pc["entropy"] < 1).all()

    def test_params_recorded(self, res):
        assert res.params["method"] == "exact"

    def test_fds_closed_and_sorted(self, res):
        assert list(res.fds) == sorted(res.fds)


class TestOrchestration:
    def test_validation_rejects_invalid_fds(self, spark, cd):
        with pytest.raises(ValueError, match="does not fulfill"):
            plaque_entropies(cd, {FD(["Band"], "Album")})

    def test_validation_skippable(self, spark):
        pdf = pd.DataFrame({"A": [1, 1], "B": [2, 2]})
        inst = Instance.from_pandas(spark, pdf)
        res = plaque_entropies(inst, {FD(["A"], "B")}, do_validate=False,
                               method="exact", use_spark_cells=False)
        assert res.min_entropy == pytest.approx(7 / 8)

    def test_method_exact_raises_over_budget(self, spark):
        # 14 rows sharing one group -> support 2*13+2 = 28 > 4 bits
        pdf = pd.DataFrame({"A": [1] * 14, "B": [2] * 14})
        inst = Instance.from_pandas(spark, pdf)
        with pytest.raises(ExactBudgetExceeded):
            plaque_entropies(
                inst, {FD(["A"], "B")}, method="exact", exact_bits=4
            )

    def test_method_auto_falls_back_to_mc(self, spark):
        pdf = pd.DataFrame({"A": [1] * 14, "B": [2] * 14})
        inst = Instance.from_pandas(spark, pdf)
        res = plaque_entropies(
            inst,
            {FD(["A"], "B")},
            method="auto",
            exact_bits=4,
            n_iter=2_000,
            use_spark_cells=False,
        )
        assert set(res.long["method"]) == {"unique", "mc"}

    def test_mc_spark_equals_local(self, spark, cd):
        kw = dict(method="mc", n_iter=3_000, seed=5)
        a = plaque_entropies(cd, cd_example.GENUINE_FDS, use_spark_cells=False, **kw)
        b = plaque_entropies(cd, cd_example.GENUINE_FDS, use_spark_cells=True, **kw)
        pd.testing.assert_frame_equal(a.long, b.long)

    def test_n_iter_derived_from_eps_delta(self, spark, cd):
        res = plaque_entropies(
            cd, cd_example.GENUINE_FDS, method="exact", use_spark_cells=False,
            eps=0.05, delta=0.05,
        )
        assert res.params["n_iter"] == pytest.approx(2952, abs=1)

    @pytest.mark.parametrize("case_idx", range(len(CASES)))
    def test_matches_naive_on_random_instances(self, spark, case_idx):
        codes, attrs, fds = CASES[case_idx]
        closed = prepare_fds(fds)
        inst = Instance.from_pandas(spark, pd.DataFrame(codes, columns=attrs))
        res = plaque_entropies(inst, fds, method="exact", use_spark_cells=False)
        expected = entropy_matrix_naive(codes, closed, attrs)
        np.testing.assert_allclose(res.matrix(inst).to_numpy(), expected)


class TestExactEntropyTable:
    BAND_FD = {FD(["Band"], "BYear")}

    def test_variants_agree_small(self, spark, cd):
        unopt = exact_entropy_table(
            cd.head(3), self.BAND_FD, optimized=False, budget_bits=26
        )
        opt = exact_entropy_table(
            cd.head(3), self.BAND_FD, optimized=True, budget_bits=26
        )
        pd.testing.assert_frame_equal(unopt, opt)

    def test_agrees_with_orchestrator(self, spark, cd):
        # Band -> BYear reduces to a 4x2 subtable: cheap exact run.
        opt = exact_entropy_table(cd, self.BAND_FD, optimized=True, budget_bits=26)
        res = plaque_entropies(
            cd, self.BAND_FD, method="exact", use_spark_cells=False
        )
        merged = opt.merge(res.long, on=["row_id", "attr"], suffixes=("_t", "_r"))
        assert len(merged) == cd.n_positions
        np.testing.assert_allclose(merged["entropy_t"], merged["entropy_r"])

    def test_unoptimized_aborts_on_budget(self, spark, cd):
        with pytest.raises(ExactBudgetExceeded):
            exact_entropy_table(cd, self.BAND_FD, optimized=False, budget_bits=20)

    def test_optimized_survives_where_unoptimized_aborts(self, spark, cd):
        # full CD: 34-bit subset space unoptimized vs 7-bit reduced.
        opt = exact_entropy_table(cd, self.BAND_FD, optimized=True, budget_bits=20)
        assert len(opt) == cd.n_positions
        assert opt["entropy"].min() == pytest.approx(91 / 128)
        with pytest.raises(ExactBudgetExceeded):
            exact_entropy_table(cd, self.BAND_FD, optimized=False, budget_bits=20)
