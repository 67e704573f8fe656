"""Tests for the FD-discovery substrate (Metanome substitute)."""
import pandas as pd
import pytest

from repro.core.fd import FD, holds
from repro.core.instance import Instance
from repro.profiling import discover_fds, discover_fds_bruteforce, discover_keys
from repro.datasets import cd_example

from .helpers import tiny_cases

CASES = tiny_cases(n_cases=10, seed=41, max_rows=3, max_cols=3)


class TestCdExample:
    """Example 1.2: Metanome discovers 23 dependencies on Figure 1a."""

    def test_23_fds(self, cd_discovered):
        assert len(cd_discovered) == cd_example.N_DISCOVERED_FDS == 23

    def test_matches_bruteforce(self, cd_discovered):
        bf = discover_fds_bruteforce(cd_example.pandas_df(), max_lhs=2)
        assert cd_discovered == bf

    def test_cyclic_band_byear(self, cd_discovered):
        """The paper highlights the cyclic pair Band <-> BYear."""
        assert FD(["Band"], "BYear") in cd_discovered
        assert FD(["BYear"], "Band") in cd_discovered

    def test_key_title(self, cd_discovered):
        # Title is unique, so Title -> every other attribute.
        for b in ("ID", "Album", "Band", "BYear", "RYear", "Track"):
            assert FD(["Title"], b) in cd_discovered

    def test_binary_fds(self, cd_discovered):
        binary = {f for f in cd_discovered if len(f.lhs) == 2}
        assert binary == {
            FD(["ID", "Track"], "Title"),
            FD(["Album", "Track"], "Title"),
            FD(["RYear", "Track"], "Title"),
        }

    def test_unary_count(self, cd_discovered):
        assert sum(len(f.lhs) == 1 for f in cd_discovered) == 20

    def test_all_hold(self, cd, cd_discovered):
        for f in sorted(cd_discovered):
            assert holds(cd.df, f), f

    def test_left_reduced(self, cd_discovered):
        for f in cd_discovered:
            for g in cd_discovered:
                assert not (g.rhs == f.rhs and set(g.lhs) < set(f.lhs))

    def test_max_lhs_respected(self, cd):
        fds1 = discover_fds(cd, max_lhs=1)
        assert all(len(f.lhs) == 1 for f in fds1)
        assert len(fds1) == 20


class TestRandomInstances:
    @pytest.mark.parametrize("case_idx", range(len(CASES)))
    def test_spark_matches_bruteforce(self, spark, case_idx):
        codes, attrs, fds = CASES[case_idx]
        pdf = pd.DataFrame(codes, columns=attrs)
        inst = Instance.from_pandas(spark, pdf)
        assert discover_fds(inst, max_lhs=2) == fds

    @pytest.mark.parametrize("case_idx", range(3))
    def test_every_discovered_fd_holds(self, spark, case_idx):
        codes, attrs, _ = CASES[case_idx]
        pdf = pd.DataFrame(codes, columns=attrs)
        inst = Instance.from_pandas(spark, pdf)
        for f in discover_fds(inst, max_lhs=2):
            assert holds(inst.df, f)

    def test_completeness_unary(self, spark):
        """Every valid non-dominated unary FD must be found."""
        pdf = pd.DataFrame({"A": [1, 1, 2], "B": [4, 4, 5], "C": [7, 8, 9]})
        inst = Instance.from_pandas(spark, pdf)
        found = discover_fds(inst, max_lhs=1)
        assert FD(["A"], "B") in found
        assert FD(["B"], "A") in found
        # C is a key
        assert FD(["C"], "A") in found and FD(["C"], "B") in found
        assert FD(["A"], "C") not in found


class TestKeys:
    def test_cd_keys(self, cd):
        keys = discover_keys(cd, max_size=2)
        assert frozenset({"Title"}) in keys
        assert frozenset({"ID", "Track"}) in keys
        # no superset of a minimal key is reported
        assert all(
            not any(k2 < k1 for k2 in keys) for k1 in keys
        )

    def test_no_keys(self, spark):
        pdf = pd.DataFrame({"A": [1, 1], "B": [2, 2]})
        inst = Instance.from_pandas(spark, pdf)
        assert discover_keys(inst, max_size=2) == set()


class TestNullHandling:
    def test_discovery_rejects_nulls(self, spark):
        pdf = pd.DataFrame({"A": [1.0, None], "B": [1, 2]})
        inst = Instance.from_pandas(spark, pdf)
        with pytest.raises(ValueError):
            discover_fds(inst)


class TestBruteforce:
    def test_duplicate_rows_no_fd_spam(self):
        pdf = pd.DataFrame({"A": [1, 1], "B": [2, 2]})
        found = discover_fds_bruteforce(pdf, max_lhs=2)
        assert found == {FD(["A"], "B"), FD(["B"], "A")}

    def test_constant_column(self):
        pdf = pd.DataFrame({"A": [1, 2, 3], "B": ["x", "x", "x"]})
        found = discover_fds_bruteforce(pdf, max_lhs=2)
        # A is a key; B is constant and determined by A.
        assert FD(["A"], "B") in found
        assert FD(["B"], "A") not in found
