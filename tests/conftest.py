"""Shared fixtures: datasets and discovered FD sets, computed once."""
import pytest

from repro.datasets import adult, cd_example, echocardiogram, iris, ncvoter, satellites
from repro.profiling import discover_fds


@pytest.fixture(scope="session")
def cd(spark):
    return cd_example.load(spark)


@pytest.fixture(scope="session")
def cd_discovered(cd):
    return discover_fds(cd, max_lhs=2)


@pytest.fixture(scope="session")
def sat(spark):
    return satellites.load(spark)


@pytest.fixture(scope="session")
def sat_fds(sat):
    return discover_fds(sat, max_lhs=2)


@pytest.fixture(scope="session")
def adult_inst(spark):
    return adult.load(spark)


@pytest.fixture(scope="session")
def echo_inst(spark):
    return echocardiogram.load(spark)


@pytest.fixture(scope="session")
def ncvoter_inst(spark):
    return ncvoter.load(spark)


@pytest.fixture(scope="session")
def iris_inst(spark):
    return iris.load(spark)
