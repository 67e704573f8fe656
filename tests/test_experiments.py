"""Tests for the per-artifact experiment harnesses (small parameters)."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments import figure1, figure2, figure3, figure4, figure5, figure6, table1


class TestTable1:
    @pytest.fixture(scope="class")
    def table(self, spark):
        return table1.run(spark, max_rows=4, budget_bits=20, max_lhs=1)

    def test_shape(self, table):
        assert list(table.columns) == [
            "rows",
            "unopt_bits",
            "unoptimized_s",
            "opt_bits",
            "optimized_s",
        ]
        assert list(table["rows"]) == [1, 2, 3, 4]
        assert list(table["unopt_bits"]) == [7, 15, 23, 31]

    def test_unoptimized_aborts_and_stays_aborted(self, table):
        # 8 columns: 3 rows -> 23-bit subset space > budget 20.
        assert table.loc[2, "unoptimized_s"] == table1.ABORTED
        assert table.loc[3, "unoptimized_s"] == table1.ABORTED

    def test_small_rows_complete(self, table):
        assert isinstance(table.loc[0, "unoptimized_s"], float)
        assert isinstance(table.loc[1, "unoptimized_s"], float)

    def test_optimized_reaches_further(self, table):
        """The paper's headline: optimizations extend the feasible range."""
        done_unopt = (table["unoptimized_s"] != table1.ABORTED).sum()
        done_opt = (table["optimized_s"] != table1.ABORTED).sum()
        assert done_opt > done_unopt

    def test_render(self, table):
        text = table1.render(table)
        assert "Unoptimized" in text and "-" in text


class TestFigure1:
    @pytest.fixture(scope="class")
    def result(self, spark):
        return figure1.run(spark)

    def test_matches_paper(self, result):
        assert result["fig_1b_matches_paper"] is True
        assert result["fig_1c_matches_paper"] is True

    def test_n_fds(self, result):
        assert result["n_discovered_fds"] == 23

    def test_render_and_html(self, result):
        assert "matches paper" in figure1.render(result)
        docs = figure1.html(result)
        assert set(docs) == {"fig_1b", "fig_1c"}
        assert all(d.startswith("<!doctype html>") for d in docs.values())


class TestFigure2:
    def test_grid(self):
        t = figure2.run()
        assert t.loc[0.001, "conf_0.999"] >= 1.52e7
        assert t.loc[0.01, "conf_0.999"] == pytest.approx(1.52e5, rel=0.01)
        assert 9_000 <= t.loc[0.04, "conf_0.999"] <= 10_000

    def test_monotone_in_eps(self):
        t = figure2.run()
        for col in t.columns:
            assert (np.diff(t[col].to_numpy()) <= 0).all()

    def test_render(self):
        assert "conf_0.999" in figure2.render(figure2.run())


class TestFigure3:
    def test_iris_summary(self, spark):
        summary, res = figure3.run_one(spark, "iris", n_iter=2_000)
        assert summary["rows"] == 150 and summary["cols"] == 5
        assert summary["plaque_columns"] == "class"
        assert 0 < summary["min_entropy"] < 1

    def test_adult_equal_entropies(self, spark):
        """Paper: education and education-num agree per row."""
        _, res = figure3.run_one(spark, "adult", n_iter=4_000, seed=1)
        from repro.datasets import adult as adult_mod

        inst = adult_mod.load(spark)
        mat = res.matrix(inst)
        plaque_cols = set(res.plaque_cells()["attr"])
        assert plaque_cols == {"education", "education_num"}
        np.testing.assert_allclose(
            mat["education"], mat["education_num"], atol=0.03
        )

    def test_echocardiogram_constant_column_near_zero(self, spark):
        _, res = figure3.run_one(spark, "echocardiogram", n_iter=2_000)
        name_cells = res.long[res.long["attr"] == "name"]["entropy"]
        assert float(name_cells.max()) < 0.05  # "rounds to 0.0"

    def test_ncvoter_state_zero(self, spark):
        _, res = figure3.run_one(spark, "ncvoter", n_iter=2_000)
        state = res.long[res.long["attr"] == "state"]["entropy"]
        assert float(state.max()) < 0.05
        plaque_cols = set(res.plaque_cells()["attr"])
        from repro.datasets import ncvoter as nc

        assert plaque_cols <= nc.PLAQUE_COLUMNS

    def test_satellites_sparse(self, spark, sat, sat_fds):
        summary, res = figure3.run_one(spark, "satellites", n_iter=2_000)
        assert summary["frac_entropy_1"] > 0.9  # paper: ~90 %
        assert set(res.plaque_cells()["attr"]) == {"Planet", "Notes"}

    def test_run_returns_all_rows(self, spark):
        t = figure3.run(spark, n_iter=500, datasets=("iris",))
        assert list(t["dataset"]) == ["iris"]


class TestFigure4:
    @pytest.fixture(scope="class")
    def result(self, spark):
        return figure4.run(spark, n_iter=2_000)

    def test_histogram_sums_to_cells(self, result):
        assert result["histogram"]["count"].sum() + (
            result["stats"]["cells_at_entropy_1"]
        ) >= 1200  # entropy==1.0 cells fall in the last bin edge

    def test_stats_shape_of_paper(self, result):
        s = result["stats"]
        assert s["n_cells"] == 1200
        assert s["frac_at_entropy_1"] > 0.9
        assert s["frac_below_0_9"] < 0.1
        assert 0.5 < s["min_entropy"] < 0.65
        assert s["reduction_factor_log10"] > 80  # paper: factor > 1e85

    def test_render(self, result):
        assert "min_entropy" in figure4.render(result)


class TestFigure5:
    def test_tiny_grid(self, spark):
        t = figure5.run(spark, rows_grid=(10, 20), iter_grid=(100, 400))
        assert list(t.columns) == ["rows", "iter_100", "iter_400"]
        assert (t["iter_100"] >= 0).all()

    def test_render(self, spark):
        t = pd.DataFrame([{"rows": 10, "iter_100": 0.5}])
        assert "iter_100" in figure5.render(t)


class TestFigure6:
    def test_stability(self, spark):
        s = figure6.run(spark, low_iter=1_000, high_iter=8_000)
        assert s["n_cells_entropy_below_1"] == 43
        assert s["max_abs_diff"] < 0.1
        assert s["n_cells_diff_gt_0_02"] <= 43

    def test_render(self):
        s = pd.Series({"max_abs_diff": 0.01})
        assert "max_abs_diff" in figure6.render(s)
