"""Tests for witness-set construction: Spark dataflow vs brute force."""
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.core.entropy import prepare_fds
from repro.core.fd import FD
from repro.core.instance import Instance
from repro.core.witnesses import (
    cell_witnesses_df,
    cells_pandas,
    collect_cell_witnesses,
    witness_df,
    witness_support,
    witnesses_local,
)
from repro.datasets import cd_example
from repro.oracle import assert_equivalent

from .helpers import tiny_cases

CASES = tiny_cases(n_cases=8, seed=3)


class TestLocalWitnesses:
    def test_simple_pair(self):
        import numpy as np

        codes = np.array([[1, 5], [1, 5]], dtype=np.int64)
        wm = witnesses_local(codes, {FD(["A"], "B")}, ["A", "B"])
        # cell (0,B): {(0,A),(1,A),(1,B)} = positions {0, 2, 3}
        assert wm[(0, "B")] == [(0, 2, 3)]
        assert wm[(1, "B")] == [(0, 1, 2)]

    def test_no_witness_for_unique(self):
        import numpy as np

        codes = np.array([[1, 5], [2, 5]], dtype=np.int64)
        wm = witnesses_local(codes, {FD(["A"], "B")}, ["A", "B"])
        assert wm == {}

    def test_composite_lhs_positions(self):
        import numpy as np

        codes = np.array([[1, 2, 9], [1, 2, 7]], dtype=np.int64)
        # I must satisfy the FD for witnesses to be meaningful; use C
        # values equal instead.
        codes[1, 2] = 9
        wm = witnesses_local(codes, {FD(["A", "B"], "C")}, ["A", "B", "C"])
        assert wm[(0, "C")] == [(0, 1, 3, 4, 5)]


class TestSparkMatchesLocal:
    def test_cd_genuine(self, spark, cd):
        closed = prepare_fds(cd_example.GENUINE_FDS)
        codes, row_ids = cd.codes()
        local = witnesses_local(codes, closed, cd.attrs, row_ids)
        dist = collect_cell_witnesses(cd, closed)
        assert dist == local

    def test_cd_discovered(self, spark, cd, cd_discovered):
        closed = prepare_fds(cd_discovered)
        codes, row_ids = cd.codes()
        local = witnesses_local(codes, closed, cd.attrs, row_ids)
        dist = collect_cell_witnesses(cd, closed)
        assert dist == local

    @pytest.mark.parametrize("case_idx", range(len(CASES)))
    def test_random_instances(self, spark, case_idx):
        codes, attrs, fds = CASES[case_idx]
        closed = prepare_fds(fds)
        inst = Instance.from_pandas(spark, pd.DataFrame(codes, columns=attrs))
        local = witnesses_local(codes, closed, attrs)
        dist = collect_cell_witnesses(inst, closed)
        assert dist == local


class TestWitnessDataflow:
    def test_witness_count_oracle(self, spark, cd):
        """Within-group ordered pair counts against a DuckDB self-join."""
        wdf = (
            witness_df(cd, {FD(["ID"], "Album")})
            .groupBy("row_id")
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            wdf,
            """
            SELECT l._row_id AS row_id, count(*) AS n
            FROM t l JOIN t r
              ON l.ID = r.ID AND l._row_id <> r._row_id
            GROUP BY l._row_id
            """,
            t=cd.df,
        )

    def test_no_fds_empty(self, spark, cd):
        assert witness_df(cd, set()).count() == 0

    def test_superkey_lhs_filtered(self, spark, cd):
        # Title is a key: Title -> Band yields no witnesses.
        assert witness_df(cd, {FD(["Title"], "Band")}).count() == 0

    def test_cell_witnesses_schema(self, spark, cd):
        df = cell_witnesses_df(cd, cd_example.GENUINE_FDS)
        assert set(df.columns) == {"row_id", "attr", "witnesses"}

    def test_witness_excludes_own_cell(self, spark, cd):
        closed = prepare_fds(cd_example.GENUINE_FDS)
        wm = collect_cell_witnesses(cd, closed)
        for (r, a), ws in wm.items():
            p = cd.pos(r, a)
            assert all(p not in w for w in ws)

    def test_witness_positions_valid(self, spark, cd):
        wm = collect_cell_witnesses(cd, cd_example.GENUINE_FDS)
        for ws in wm.values():
            for w in ws:
                for p in w:
                    r, a = cd.pos_to_cell(p)
                    assert 0 <= r < cd.n_rows and a in cd.attrs


class TestCellsPandas:
    def test_ordering(self):
        wm = {(1, "B"): [(0,)], (0, "A"): [(1,)], (0, "B"): [(2,)]}
        pdf = cells_pandas(wm)
        assert list(zip(pdf["row_id"], pdf["attr"])) == [
            (0, "A"),
            (0, "B"),
            (1, "B"),
        ]

    def test_empty(self):
        assert len(cells_pandas({})) == 0


def test_witness_support_sorted_unique():
    assert witness_support([(3, 1), (1, 9)]) == [1, 3, 9]
