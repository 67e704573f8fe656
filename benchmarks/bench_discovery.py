"""Benchmarks for the FD-discovery substrate (Metanome substitute).

Not a paper table by itself (the paper uses Metanome offline), but the
substrate every Figure 3 / Table 1 run depends on; measured per dataset
at the evaluation's LHS cap of 2.
"""
import pytest

from repro.datasets import REAL_WORLD
from repro.profiling import discover_fds


@pytest.mark.parametrize("name", sorted(REAL_WORLD))
def test_discovery(benchmark, spark, name):
    inst = REAL_WORLD[name].load(spark)
    inst.df.cache().count()
    benchmark.pedantic(lambda: discover_fds(inst, max_lhs=2), rounds=1, iterations=1)
