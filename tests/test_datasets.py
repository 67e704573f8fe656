"""Tests for the synthetic dataset substitutes (DESIGN.md §3)."""
import pandas as pd
import pytest

from repro.core.fd import validate
from repro.datasets import (
    REAL_WORLD,
    adult,
    cd_example,
    echocardiogram,
    iris,
    ncvoter,
    satellites,
)
from repro.profiling.discovery import discover_fds_bruteforce


def _multivalued(pdf: pd.DataFrame, lhs) -> bool:
    return pdf.groupby(list(lhs)).size().max() > 1


def _witness_bearing(pdf: pd.DataFrame, max_lhs: int = 2):
    fds = discover_fds_bruteforce(pdf, max_lhs=max_lhs)
    return fds, {f for f in fds if _multivalued(pdf, f.lhs)}


class TestCdExampleData:
    def test_shape(self):
        pdf = cd_example.pandas_df()
        assert pdf.shape == (5, 7)
        assert list(pdf.columns) == cd_example.ATTRS

    def test_verbatim_values(self):
        pdf = cd_example.pandas_df()
        assert pdf.loc[0, "Album"] == "Not That Kind"
        assert pdf.loc[3, "Band"] == "Pink Floyd"
        assert pdf.loc[4, "RYear"] == 2001

    def test_genuine_fds_hold(self, cd):
        validate(cd.df, cd_example.GENUINE_FDS)

    def test_fig_matrices_shape(self):
        assert cd_example.FIG_1B.shape == (5, 7)
        assert cd_example.FIG_1C.shape == (5, 7)


class TestDeterminism:
    @pytest.mark.parametrize("name", sorted(REAL_WORLD))
    def test_two_generations_identical(self, name):
        mod = REAL_WORLD[name]
        pd.testing.assert_frame_equal(mod.pandas_df(), mod.pandas_df())

    @pytest.mark.parametrize("name", sorted(REAL_WORLD))
    def test_no_nulls(self, name):
        assert not REAL_WORLD[name].pandas_df().isna().any().any()


class TestSatellites:
    pdf = satellites.pandas_df()

    def test_shape_1200_cells(self):
        assert self.pdf.shape == (150, 8)  # 1,200 cells as in the paper

    def test_engineered_fds_are_exactly_the_witness_bearing_ones(self):
        fds, mv = _witness_bearing(self.pdf)
        assert mv == satellites.ENGINEERED_FDS
        # FD count is the same order of magnitude as Metanome's 35.
        assert 30 <= len(fds) <= 120

    def test_keys(self):
        assert self.pdf["Name"].is_unique
        assert self.pdf["OrbitalPeriod"].is_unique

    def test_radius_30_only_saturn(self):
        sub = self.pdf[self.pdf["MeanRadius"] == 30]
        assert len(sub) == 6
        assert set(sub["Planet"]) == {"Saturn"}
        assert sub["DiscoveredBy"].nunique() == 4

    def test_discoverer_determines_planet(self):
        assert _multivalued(self.pdf, ["DiscoveredBy"])
        assert (self.pdf.groupby("DiscoveredBy")["Planet"].nunique() == 1).all()

    def test_notes_collisions(self):
        grp = self.pdf.groupby(["DiscoveredBy", "DiscoveryYear"])["Notes"]
        assert (grp.nunique() == 1).all()
        assert (grp.size() > 1).sum() == 2  # exactly two colliding pairs

    def test_head_prefix_of_full(self):
        pd.testing.assert_frame_equal(
            satellites.pandas_df(10), self.pdf.iloc[:10].reset_index(drop=True)
        )

    def test_table1_row_ordering(self):
        """J0(head(i)) growth required by the Table 1 reproduction."""
        d = self.pdf["DiscoveredBy"]
        assert d[0] == d[1] == d[5] == d[6] == "Cassini"
        assert d[2:5].nunique() == 3 and not d[2:5].isin(["Cassini"]).any()

    def test_invalid_n_rows(self):
        with pytest.raises(ValueError):
            satellites.pandas_df(0)


class TestAdult:
    pdf = adult.pandas_df()

    def test_shape(self):
        assert self.pdf.shape == (150, 12)

    def test_education_bijection(self):
        assert (
            self.pdf.groupby("education")["education_num"].nunique() == 1
        ).all()
        assert (
            self.pdf.groupby("education_num")["education"].nunique() == 1
        ).all()

    def test_education_groups_multivalued(self):
        assert self.pdf.groupby("education").size().min() >= 2

    def test_only_cyclic_pair_bears_witnesses(self):
        _, mv = _witness_bearing(self.pdf)
        assert mv == adult.ENGINEERED_FDS

    def test_fnlwgt_key(self):
        assert self.pdf["fnlwgt"].is_unique


class TestEchocardiogram:
    pdf = echocardiogram.pandas_df()

    def test_shape(self):
        assert self.pdf.shape == (132, 13)  # all 132 rows as in the paper

    def test_name_constant(self):
        assert self.pdf["name"].nunique() == 1

    def test_every_attr_determines_name(self):
        for a in self.pdf.columns:
            if a != "name":
                assert (self.pdf.groupby(a)["name"].nunique() == 1).all()

    def test_engineered_fds_hold(self):
        for f in echocardiogram.ENGINEERED_FDS:
            assert (
                self.pdf.groupby(list(f.lhs))[f.rhs].nunique() == 1
            ).all(), f

    def test_binary_columns_have_huge_groups(self):
        assert self.pdf.groupby("still_alive").size().min() > 30

    def test_witness_bearing_covers_engineered(self):
        _, mv = _witness_bearing(self.pdf)
        assert echocardiogram.ENGINEERED_FDS <= mv
        # every witness-bearing FD is engineered or targets the
        # anonymized constant column
        extra = {
            f
            for f in mv
            if f not in echocardiogram.ENGINEERED_FDS
            and f.rhs != echocardiogram.CONSTANT_COLUMN
        }
        assert extra == set()


class TestNCVoter:
    pdf = ncvoter.pandas_df()

    def test_shape(self):
        assert self.pdf.shape == (150, 19)

    def test_state_constant(self):
        assert set(self.pdf["state"]) == {"NC"}

    def test_geo_chain_holds(self):
        for f in ncvoter.ENGINEERED_FDS:
            assert (
                self.pdf.groupby(list(f.lhs))[f.rhs].nunique() == 1
            ).all(), f

    def test_geo_groups_multivalued(self):
        assert self.pdf.groupby("city").size().min() >= 2
        assert self.pdf.groupby("zip_code").size().min() >= 2

    def test_witness_rhs_confined(self):
        _, mv = _witness_bearing(self.pdf)
        assert {f.rhs for f in mv} <= ncvoter.PLAQUE_COLUMNS

    def test_keys(self):
        assert self.pdf["voter_id"].is_unique
        assert self.pdf["phone"].is_unique


class TestIris:
    pdf = iris.pandas_df()

    def test_shape(self):
        assert self.pdf.shape == (150, 5)

    def test_class_balance(self):
        assert (self.pdf["class"].value_counts() == 50).all()

    def test_petal_ranges_disjoint(self):
        for col, ranges in (
            ("petal_length", iris._PETAL_LENGTH),
            ("petal_width", iris._PETAL_WIDTH),
        ):
            spans = {
                c: (g.min(), g.max()) for c, g in self.pdf.groupby("class")[col]
            }
            for c1 in spans:
                for c2 in spans:
                    if c1 < c2:
                        lo1, hi1 = spans[c1]
                        lo2, hi2 = spans[c2]
                        assert hi1 < lo2 or hi2 < lo1

    def test_petal_determines_class(self):
        for col in ("petal_length", "petal_width"):
            assert (self.pdf.groupby(col)["class"].nunique() == 1).all()
            assert _multivalued(self.pdf, [col])

    def test_witness_bearing_rhs_is_class_only(self):
        _, mv = _witness_bearing(self.pdf)
        assert mv == iris.ENGINEERED_FDS
        assert {f.rhs for f in mv} == {"class"}


class TestLoadedInstances:
    """Spark-side load() round-trips."""

    @pytest.mark.parametrize("name", sorted(REAL_WORLD))
    def test_load_matches_pandas(self, spark, name):
        mod = REAL_WORLD[name]
        inst = mod.load(spark)
        got = inst.to_pandas().reset_index(drop=True)
        pd.testing.assert_frame_equal(got, mod.pandas_df(), check_dtype=False)
