"""Benchmark fixtures: instances + discovered FDs, computed once."""
import pytest

from repro.datasets import satellites
from repro.profiling import discover_fds


@pytest.fixture(scope="session")
def sat(spark):
    return satellites.load(spark)


@pytest.fixture(scope="session")
def sat_fds(sat):
    return discover_fds(sat, max_lhs=2)
