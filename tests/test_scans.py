"""Tests for the shared grouping-sets scan helpers."""
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.core.instance import Instance
from repro.core.scans import check_no_nulls, lhs_group_stats, multivalued_lhs
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def inst(spark):
    pdf = pd.DataFrame(
        {
            "A": [1, 1, 2, 2, 3],
            "B": [5, 5, 6, 7, 8],
            "C": [0, 1, 2, 3, 4],
        }
    )
    return Instance.from_pandas(spark, pdf)


class TestGroupStats:
    def test_max_group_size(self, inst):
        stats = lhs_group_stats(inst, [("A",), ("B",), ("C",)])
        assert stats[("A",)][0] == 2
        assert stats[("B",)][0] == 2
        assert stats[("C",)][0] == 1

    def test_count_distinct(self, inst):
        stats = lhs_group_stats(inst, [("A",)], count_distinct=True)
        _, mcd = stats[("A",)]
        assert mcd["B"] == 2  # A=2 group has B in {6,7}
        assert mcd["C"] == 2
        assert mcd["A"] == 1

    def test_composite_lhs(self, inst):
        stats = lhs_group_stats(inst, [("A", "B")], count_distinct=True)
        max_cnt, mcd = stats[("A", "B")]
        assert max_cnt == 2  # (1,5) twice
        assert mcd["C"] == 2

    def test_many_sets_chunked(self, inst):
        # more sets than SETS_PER_SCAN chunk boundary logic still correct
        sets = [("A",), ("B",), ("C",), ("A", "B"), ("A", "C"), ("B", "C")]
        stats = lhs_group_stats(inst, sets)
        assert stats[("B", "C")][0] == 1

    def test_oracle_group_sizes(self, inst):
        """groupBy group sizes against DuckDB."""
        scan = inst.df.groupBy("A").agg(F.count(F.lit(1)).alias("n"))
        assert_equivalent(
            scan,
            "SELECT A, count(*) AS n FROM t GROUP BY A",
            t=inst.df.select("A"),
        )

    def test_oracle_grouping_sets(self, spark, inst):
        """The two-stage grouping-sets dataflow against a plain-SQL oracle.

        Spark's grouping_id() for sets ((A),(B)) over columns (A,B) is
        0b01 for the (A) set and 0b10 for the (B) set; the oracle
        computes the same per-set max group sizes with two GROUP BYs.
        """
        inst.df.select("A", "B", "C").createOrReplaceTempView("scan_t")
        got = spark.sql(
            "SELECT gid, max(cnt) AS max_cnt FROM ("
            " SELECT grouping_id() AS gid, count(*) AS cnt"
            " FROM scan_t GROUP BY GROUPING SETS ((A),(B))"
            ") GROUP BY gid"
        )
        assert_equivalent(
            got,
            """
            SELECT 1 AS gid, max(cnt) AS max_cnt
              FROM (SELECT count(*) AS cnt FROM t GROUP BY A)
            UNION ALL
            SELECT 2 AS gid, max(cnt) AS max_cnt
              FROM (SELECT count(*) AS cnt FROM t GROUP BY B)
            """,
            t=inst.df.select("A", "B", "C"),
        )


class TestMultivaluedLhs:
    def test_detects(self, inst):
        mv = multivalued_lhs(inst, [("A",), ("C",), ("A", "B")])
        assert mv == {("A",), ("A", "B")}

    def test_empty(self, inst):
        assert multivalued_lhs(inst, []) == set()


class TestNullGuard:
    def test_clean_passes(self, inst):
        check_no_nulls(inst)

    def test_nulls_rejected(self, spark):
        pdf = pd.DataFrame({"A": [1.0, None], "B": [1, 2]})
        inst = Instance.from_pandas(spark, pdf)
        with pytest.raises(ValueError, match="A"):
            check_no_nulls(inst)
