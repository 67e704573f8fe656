"""Benchmarks for Figure 5: Monte Carlo runtime vs rows and iterations.

End-to-end plaque-test pipeline (witness scans + per-cell MC) at grid
points of the paper's sweep, plus the pure sampling kernel whose linear
scaling in the iteration count underlies the figure's columns.
"""
import numpy as np
import pytest

from repro.core.entropy import plaque_entropies
from repro.core.montecarlo import mc_entropy


@pytest.mark.parametrize(
    "rows,n_iter", [(50, 1_000), (150, 1_000), (150, 5_000)]
)
def test_fig5_pipeline(benchmark, sat, sat_fds, rows, n_iter):
    head = sat.head(rows)
    benchmark.pedantic(
        lambda: plaque_entropies(
            head,
            sat_fds,
            method="mc",
            n_iter=n_iter,
            do_validate=False,
            use_spark_cells=rows * n_iter >= 100_000,
        ),
        rounds=1,
        iterations=1,
    )


@pytest.mark.parametrize("n_iter", [10_000, 100_000])
def test_fig5_mc_kernel(benchmark, n_iter):
    """Sampling kernel alone: must scale linearly in n_iter."""
    witnesses = [(0, 2 * j + 1, 2 * j + 2) for j in range(9)]
    rng = np.random.default_rng(0)
    benchmark(lambda: mc_entropy(witnesses, n_iter, rng))
