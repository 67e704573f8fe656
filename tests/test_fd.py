"""Unit tests for the FD model, closures and satisfaction scans."""
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.fd import (
    FD,
    attribute_closure,
    fd_closure,
    holds,
    left_reduce,
    nontrivial,
    parse_fds,
    validate,
    violated,
)
from repro.core.instance import Instance
from repro.oracle import assert_equivalent


class TestFDModel:
    def test_parse_simple(self):
        f = FD.parse("A->B")
        assert f.lhs == ("A",) and f.rhs == "B"

    def test_parse_composite(self):
        f = FD.parse("B, A -> C")
        assert f.lhs == ("A", "B") and f.rhs == "C"

    def test_parse_whitespace(self):
        assert FD.parse("  A ,  B->  C ") == FD(["A", "B"], "C")

    def test_parse_missing_arrow(self):
        with pytest.raises(ValueError):
            FD.parse("A,B")

    def test_parse_empty_lhs(self):
        with pytest.raises(ValueError):
            FD.parse("->B")

    def test_parse_empty_rhs(self):
        with pytest.raises(ValueError):
            FD.parse("A->")

    def test_lhs_sorted_deduped(self):
        assert FD(["C", "A", "C"], "B").lhs == ("A", "C")

    def test_equality_and_hash(self):
        assert FD(["A", "B"], "C") == FD(["B", "A"], "C")
        assert len({FD(["A"], "B"), FD(["A"], "B")}) == 1

    def test_attrs(self):
        assert FD(["A", "B"], "C").attrs == {"A", "B", "C"}

    def test_trivial(self):
        assert FD(["A", "B"], "A").trivial
        assert not FD(["A"], "B").trivial

    def test_str_roundtrip(self):
        f = FD(["A", "B"], "C")
        assert FD.parse(str(f)) == f

    def test_parse_fds(self):
        fds = parse_fds(["A->B", "B->C"])
        assert len(fds) == 2

    def test_ordering_deterministic(self):
        fds = sorted({FD(["B"], "C"), FD(["A"], "C"), FD(["A"], "B")})
        assert fds == [FD(["A"], "B"), FD(["A"], "C"), FD(["B"], "C")]


class TestNontrivialLeftReduce:
    def test_nontrivial_drops(self):
        assert nontrivial({FD(["A"], "A"), FD(["A"], "B")}) == {FD(["A"], "B")}

    def test_left_reduce_drops_superset(self):
        fds = {FD(["A"], "C"), FD(["A", "B"], "C")}
        assert left_reduce(fds) == {FD(["A"], "C")}

    def test_left_reduce_keeps_incomparable(self):
        fds = {FD(["A"], "C"), FD(["B"], "C")}
        assert left_reduce(fds) == fds

    def test_left_reduce_different_rhs_untouched(self):
        fds = {FD(["A"], "C"), FD(["A", "B"], "D")}
        assert left_reduce(fds) == fds

    def test_left_reduce_empty(self):
        assert left_reduce(set()) == set()


class TestAttributeClosure:
    def test_reflexive(self):
        assert attribute_closure({"A"}, []) == {"A"}

    def test_chain(self):
        fds = parse_fds(["A->B", "B->C"])
        assert attribute_closure({"A"}, fds) == {"A", "B", "C"}

    def test_composite_needs_all(self):
        fds = parse_fds(["A,B->C"])
        assert attribute_closure({"A"}, fds) == {"A"}
        assert attribute_closure({"A", "B"}, fds) == {"A", "B", "C"}

    def test_cycle(self):
        fds = parse_fds(["A->B", "B->A"])
        assert attribute_closure({"B"}, fds) == {"A", "B"}


class TestFDClosure:
    def test_transitivity(self):
        fds = parse_fds(["A->B", "B->C"])
        assert FD(["A"], "C") in fd_closure(fds)

    def test_pseudo_transitivity(self):
        fds = parse_fds(["A->B", "B,D->C"])
        closed = fd_closure(fds)
        assert FD(["A", "D"], "C") in closed

    def test_closure_is_left_reduced(self):
        fds = parse_fds(["A->B", "B->C", "A->C"])
        closed = fd_closure(fds)
        # A->C present, and no dominated variant like A,B->C
        assert FD(["A"], "C") in closed
        assert all(
            not (set(g.lhs) > set(f.lhs) and g.rhs == f.rhs)
            for f in closed
            for g in closed
        )

    def test_no_trivial_in_closure(self):
        closed = fd_closure(parse_fds(["A->B", "B->A"]))
        assert all(not f.trivial for f in closed)

    def test_cd_genuine_closure_adds_nothing_new(self):
        from repro.datasets import cd_example

        closed = fd_closure(cd_example.GENUINE_FDS)
        # Band->BYear and ID->Band imply ID->BYear which is already given.
        assert closed == left_reduce(nontrivial(cd_example.GENUINE_FDS))

    def test_closure_idempotent(self):
        fds = parse_fds(["A->B", "B,D->C", "C->E"])
        once = fd_closure(fds)
        assert fd_closure(once) == once

    @given(
        st.sets(
            st.tuples(
                st.frozensets(st.sampled_from("ABCD"), min_size=1, max_size=2),
                st.sampled_from("ABCD"),
            ),
            max_size=6,
        )
    )
    @settings(max_examples=50, deadline=None)
    def test_closure_contains_original_nontrivial_minimal(self, raw):
        fds = {FD(lhs, rhs) for lhs, rhs in raw}
        base = left_reduce(nontrivial(fds))
        closed = fd_closure(fds)
        for f in base:
            assert any(
                g.rhs == f.rhs and set(g.lhs) <= set(f.lhs) for g in closed
            )

    @given(
        st.sets(
            st.tuples(
                st.frozensets(st.sampled_from("ABCD"), min_size=1, max_size=2),
                st.sampled_from("ABCD"),
            ),
            max_size=6,
        )
    )
    @settings(max_examples=50, deadline=None)
    def test_closure_sound_wrt_attribute_closure(self, raw):
        fds = {FD(lhs, rhs) for lhs, rhs in raw}
        for g in fd_closure(fds):
            assert g.rhs in attribute_closure(g.lhs, fds)

    @given(
        st.sets(
            st.tuples(
                st.frozensets(st.sampled_from("ABCDE"), min_size=1, max_size=2),
                st.sampled_from("ABCDE"),
            ),
            max_size=7,
        ),
        st.sets(st.sampled_from("ABCDE"), min_size=1, max_size=4),
    )
    @settings(max_examples=60, deadline=None)
    def test_closure_complete_wrt_attribute_closure(self, raw, x):
        """For every derivable X -> B there is a dominating FD in F*.

        This is the property the witness construction relies on: any
        derivable dependency must be represented (up to LHS domination)
        in the closed set, or redundancy would be missed.
        """
        fds = {FD(lhs, rhs) for lhs, rhs in raw}
        closed = fd_closure(fds)
        for b in attribute_closure(x, fds) - x:
            assert any(
                g.rhs == b and set(g.lhs) <= set(x) for g in closed
            ), f"X={sorted(x)} -> {b} not represented in closure"


class TestHoldsValidate:
    @pytest.fixture(scope="class")
    def df(self, spark):
        pdf = pd.DataFrame(
            {"A": [1, 1, 2, 2], "B": [5, 5, 6, 6], "C": [1, 2, 3, 4]}
        )
        return Instance.from_pandas(spark, pdf).df

    def test_holds_valid(self, df):
        assert holds(df, FD(["A"], "B"))

    def test_holds_invalid(self, df):
        assert not holds(df, FD(["A"], "C"))

    def test_holds_trivial(self, df):
        assert holds(df, FD(["A", "C"], "A"))

    def test_holds_key_lhs(self, df):
        assert holds(df, FD(["C"], "A"))

    def test_violated_batch(self, df):
        bad = violated(df, [FD(["A"], "B"), FD(["A"], "C"), FD(["B"], "A")])
        assert bad == [FD(["A"], "C")]

    def test_validate_raises(self, df):
        with pytest.raises(ValueError, match="A->C"):
            validate(df, [FD(["A"], "C")])

    def test_validate_passes(self, df):
        validate(df, [FD(["A"], "B"), FD(["B"], "A")])

    def test_holds_oracle(self, spark, df):
        """The groupBy scan behind ``holds`` against the DuckDB oracle."""
        import pyspark.sql.functions as F

        scan = (
            df.groupBy("A")
            .agg(F.countDistinct("C").alias("cd"))
            .select(F.col("A").alias("a"), F.col("cd").alias("cd"))
        )
        assert_equivalent(
            scan,
            "SELECT A AS a, count(DISTINCT C) AS cd FROM t GROUP BY A",
            t=df.select("A", "C"),
        )
