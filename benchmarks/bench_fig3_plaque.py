"""Benchmarks for Figure 3: end-to-end plaque tests on the five datasets.

One benchmark per real-world substitute: FD discovery is done once in
the fixture (its cost is benchmarked separately in bench_discovery);
the measured body is the plaque pipeline at 1,000 MC iterations.
"""
import pytest

from repro.core.entropy import plaque_entropies
from repro.datasets import REAL_WORLD
from repro.profiling import discover_fds

_FD_CACHE = {}


@pytest.fixture(params=sorted(REAL_WORLD), ids=str)
def dataset(request, spark):
    name = request.param
    if name not in _FD_CACHE:
        inst = REAL_WORLD[name].load(spark)
        _FD_CACHE[name] = (inst, discover_fds(inst, max_lhs=2))
    return _FD_CACHE[name]


def test_fig3_plaque(benchmark, dataset):
    inst, fds = dataset
    benchmark.pedantic(
        lambda: plaque_entropies(
            inst, fds, method="mc", n_iter=1_000, do_validate=False
        ),
        rounds=1,
        iterations=1,
    )
