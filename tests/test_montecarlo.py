"""Tests for the Monte Carlo approximation (Section 3.2 / Theorem 3.6)."""
import math

import numpy as np
import pytest

from repro.core.entropy import prepare_fds
from repro.core.exact import entropy_exact_support
from repro.core.montecarlo import (
    achieved_accuracy,
    cell_rng,
    mc_entropies,
    mc_entropies_spark,
    mc_entropy,
    required_iterations,
)
from repro.core.witnesses import witnesses_local

from .helpers import manual_case_334, tiny_cases

CASES = tiny_cases(n_cases=6, seed=21)


class TestRequiredIterations:
    def test_example_3_7_high_accuracy(self):
        """ε = δ = 0.001 needs ≥ 1.52e7 samples (paper Example 3.7)."""
        n = required_iterations(1e-3, 1e-3)
        assert n >= 1.52e7
        assert n == math.ceil(2 * math.log(2 / 1e-3) / 1e-6)

    def test_example_3_7_low_accuracy(self):
        """ε = 0.01: a factor 100 fewer, ≈ 1.52e5 (paper Example 3.7)."""
        n = required_iterations(1e-2, 1e-3)
        assert 1.52e5 <= n <= 1.53e5
        assert required_iterations(1e-3, 1e-3) / n == pytest.approx(100, rel=0.01)

    def test_figure_2_spot_value(self):
        """Accuracy 0.04 at 99.9% confidence needs ~10,000 iterations."""
        n = required_iterations(0.04, 1e-3)
        assert 9_000 <= n <= 10_000

    def test_paper_rq1_setting(self):
        """100,000 iterations give accuracy ≈ 0.01 at 99% confidence."""
        assert required_iterations(0.0103, 0.01) <= 100_000
        assert achieved_accuracy(100_000, 0.01) == pytest.approx(0.0103, abs=5e-4)

    def test_monotonicity(self):
        assert required_iterations(0.01, 0.01) > required_iterations(0.02, 0.01)
        assert required_iterations(0.01, 0.01) > required_iterations(0.01, 0.05)

    def test_invalid_args(self):
        with pytest.raises(ValueError):
            required_iterations(0, 0.5)
        with pytest.raises(ValueError):
            required_iterations(0.1, 1.5)
        with pytest.raises(ValueError):
            achieved_accuracy(0, 0.5)

    def test_inverse_relationship(self):
        n = required_iterations(0.03, 0.05)
        assert achieved_accuracy(n, 0.05) <= 0.03


class TestMcEntropy:
    def test_no_witnesses(self):
        assert mc_entropy([], 100, np.random.default_rng(0)) == 1.0

    def test_invalid_iterations(self):
        with pytest.raises(ValueError):
            mc_entropy([(0,)], 0, np.random.default_rng(0))

    def test_single_witness_half(self):
        # one witness of one position: hit with probability 1/2
        e = mc_entropy([(5,)], 40_000, np.random.default_rng(1))
        assert e == pytest.approx(0.5, abs=0.02)

    def test_three_position_witness(self):
        # P(hit) = 1 - 2^-3 = 0.875 (Example 3.4 / redundant pair)
        e = mc_entropy([(1, 2, 3)], 40_000, np.random.default_rng(2))
        assert e == pytest.approx(0.875, abs=0.02)

    def test_chunking_invariant(self):
        ws = [(0, 1), (2,), (1, 3)]
        a = mc_entropy(ws, 9_999, np.random.default_rng(7), chunk=100)
        b = mc_entropy(ws, 9_999, np.random.default_rng(7), chunk=1 << 14)
        assert a == pytest.approx(b)

    def test_many_positions_packing(self):
        # support of 67 positions exercises multi-word packing; the wide
        # witness is hit almost surely, the narrow one with prob 3/4.
        ws = [tuple(range(65)), (65, 66)]
        e = mc_entropy(ws, 40_000, np.random.default_rng(3))
        assert e == pytest.approx(0.75, abs=0.02)

    def test_deterministic_in_rng(self):
        ws = [(0, 1, 2), (3, 4)]
        a = mc_entropy(ws, 1_000, np.random.default_rng(9))
        b = mc_entropy(ws, 1_000, np.random.default_rng(9))
        assert a == b

    @pytest.mark.parametrize("case_idx", range(len(CASES)))
    def test_converges_to_exact(self, case_idx):
        codes, attrs, fds = CASES[case_idx]
        closed = prepare_fds(fds)
        wm = witnesses_local(codes, closed, attrs)
        rng = np.random.default_rng(100 + case_idx)
        for cell, ws in wm.items():
            exact = entropy_exact_support(ws)
            approx = mc_entropy(ws, 30_000, rng)
            assert approx == pytest.approx(exact, abs=0.02), cell

    def test_example_3_4_convergence(self):
        codes, attrs, fds = manual_case_334()
        wm = witnesses_local(codes, prepare_fds(fds), attrs)
        e = mc_entropy(wm[(0, "C")], 50_000, np.random.default_rng(4))
        assert e == pytest.approx(0.875, abs=0.01)


class TestCellRng:
    def test_stable(self):
        a = cell_rng(0, 3, "Planet").integers(0, 1 << 30, 5)
        b = cell_rng(0, 3, "Planet").integers(0, 1 << 30, 5)
        assert list(a) == list(b)

    def test_distinct_cells_differ(self):
        a = cell_rng(0, 3, "Planet").integers(0, 1 << 30, 5)
        b = cell_rng(0, 4, "Planet").integers(0, 1 << 30, 5)
        c = cell_rng(0, 3, "Notes").integers(0, 1 << 30, 5)
        assert list(a) != list(b) and list(a) != list(c)


class TestBatchMc:
    def test_local_batch(self):
        wm = {(0, "B"): [(0, 2, 3)], (1, "B"): [(0, 1, 2)]}
        out = mc_entropies(wm, 20_000, seed=0)
        assert set(out) == set(wm)
        for v in out.values():
            assert v == pytest.approx(0.875, abs=0.02)

    def test_spark_matches_local(self, spark):
        wm = {
            (0, "B"): [(0, 2, 3)],
            (1, "B"): [(0, 1, 2)],
            (2, "C"): [(4, 5), (6,)],
        }
        local = mc_entropies(wm, 5_000, seed=3)
        dist = mc_entropies_spark(spark, wm, 5_000, seed=3)
        assert dist == local

    def test_spark_empty(self, spark):
        assert mc_entropies_spark(spark, {}, 100, seed=0) == {}
