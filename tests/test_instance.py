"""Unit tests for the ordered relation-instance wrapper."""
import numpy as np
import pandas as pd
import pytest

from repro.core.instance import ROW_ID, Instance


@pytest.fixture(scope="module")
def inst(spark):
    pdf = pd.DataFrame(
        {"A": [1, 1, 2], "B": ["x", "y", "x"], "C": [0.5, 0.5, 1.5]}
    )
    return Instance.from_pandas(spark, pdf)


class TestConstruction:
    def test_attrs(self, inst):
        assert inst.attrs == ["A", "B", "C"]

    def test_row_ids_dense(self, inst):
        ids = [r[ROW_ID] for r in inst.df.select(ROW_ID).collect()]
        assert sorted(ids) == [0, 1, 2]

    def test_from_df_attaches_row_id(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"A": [10, 20, 30]}))
        inst2 = Instance.from_df(df)
        pdf = inst2.to_pandas()
        assert list(pdf.index) == [0, 1, 2]
        assert list(pdf["A"]) == [10, 20, 30]

    def test_from_df_preserves_existing_row_id(self, spark):
        pdf = pd.DataFrame({ROW_ID: [5, 7], "A": [1, 2]})
        inst2 = Instance.from_df(spark.createDataFrame(pdf))
        assert sorted(r[ROW_ID] for r in inst2.df.collect()) == [5, 7]

    def test_missing_row_id_rejected(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"A": [1]}))
        with pytest.raises(ValueError):
            Instance(df)

    def test_unknown_attrs_rejected(self, spark, inst):
        with pytest.raises(ValueError):
            Instance(inst.df, attrs=["A", "Z"])


class TestShape:
    def test_n_rows(self, inst):
        assert inst.n_rows == 3

    def test_n_attrs(self, inst):
        assert inst.n_attrs == 3

    def test_n_positions(self, inst):
        assert inst.n_positions == 9


class TestPositions:
    def test_pos_roundtrip(self, inst):
        for r in range(3):
            for a in inst.attrs:
                assert inst.pos_to_cell(inst.pos(r, a)) == (r, a)

    def test_pos_values(self, inst):
        assert inst.pos(0, "A") == 0
        assert inst.pos(1, "A") == 3
        assert inst.pos(2, "C") == 8

    def test_pos_unknown_attr(self, inst):
        with pytest.raises(KeyError):
            inst.pos(0, "Z")

    def test_pos_negative_row(self, inst):
        with pytest.raises(ValueError):
            inst.pos(-1, "A")


class TestDerived:
    def test_head(self, inst):
        h = inst.head(2)
        assert h.n_rows == 2
        assert list(h.to_pandas().index) == [0, 1]

    def test_head_keeps_attrs(self, inst):
        assert inst.head(1).attrs == inst.attrs

    def test_restrict_rows_and_attrs(self, inst):
        sub = inst.restrict([0, 2], ["C", "A"])
        assert sub.attrs == ["A", "C"]  # original attribute order kept
        assert sorted(sub.to_pandas().index) == [0, 2]

    def test_restrict_empty(self, inst):
        sub = inst.restrict([], ["A"])
        assert sub.n_rows == 0


class TestLocalization:
    def test_to_pandas_ordered(self, inst):
        pdf = inst.to_pandas()
        assert list(pdf.index) == [0, 1, 2]
        assert list(pdf["A"]) == [1, 1, 2]

    def test_codes_equality_faithful(self, inst):
        codes, row_ids = inst.codes()
        assert codes.shape == (3, 3)
        assert list(row_ids) == [0, 1, 2]
        # A: rows 0,1 equal, row 2 different
        assert codes[0, 0] == codes[1, 0] != codes[2, 0]
        # B: rows 0,2 equal ("x"), row 1 different
        assert codes[0, 1] == codes[2, 1] != codes[1, 1]
        # C: rows 0,1 equal (0.5)
        assert codes[0, 2] == codes[1, 2] != codes[2, 2]

    def test_codes_dtype(self, inst):
        codes, _ = inst.codes()
        assert codes.dtype == np.int64
