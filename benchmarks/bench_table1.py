"""Benchmarks for Table 1: exact entropies w/ and w/o Section 3.1 opts.

Regenerates the feasible (non-aborted) cells of the paper's Table 1 on
the satellites substitute: the unoptimized algorithm enumerates
``2^(8i − 1)`` subsets per cell of the first *i* rows, the optimized
one first prunes unique cells and reduces the table (Prop 3.2/3.3).
The full table (including the "-" aborts) is produced by
``jobs/table1_exact_runtimes.py``; here pytest-benchmark measures the
completing configurations.
"""
import pytest

from repro.core.entropy import exact_entropy_table


@pytest.mark.parametrize("rows", [1, 2, 3])
def test_table1_unoptimized(benchmark, sat, sat_fds, rows):
    head = sat.head(rows)
    benchmark.pedantic(
        lambda: exact_entropy_table(head, sat_fds, optimized=False, budget_bits=26),
        rounds=2,
        iterations=1,
    )


@pytest.mark.parametrize("rows", [1, 2, 3, 4, 5, 6])
def test_table1_optimized(benchmark, sat, sat_fds, rows):
    head = sat.head(rows)
    benchmark.pedantic(
        lambda: exact_entropy_table(head, sat_fds, optimized=True, budget_bits=26),
        rounds=2,
        iterations=1,
    )
