"""Ordered relation instances over Spark DataFrames.

The paper's instance model (Definition 2.1) is a *partial map* from row
indices to tuples: tuple order matters (it identifies cells) and
duplicate tuples are allowed.  A plain Spark DataFrame has neither
property, so :class:`Instance` pins an explicit ``_row_id`` column
(0-based, dense) to every row and carries the attribute list.

Positions (Definition 2.4) are encoded as ``pos = row_id * n_attrs +
attr_index`` — a single long that round-trips through Spark arrays.

For the exponential exact algorithms the instance is localized to an
integer-coded NumPy matrix (:meth:`Instance.codes`); the paper assumes
``Dom(A) = N`` and all algorithms only compare values for equality, so
per-column integer codes are value-faithful.
"""
from __future__ import annotations

from functools import cached_property

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession, Window

ROW_ID = "_row_id"


class Instance:
    """A relation instance: Spark DataFrame + row order + attributes."""

    def __init__(self, df: DataFrame, attrs: list[str] | None = None) -> None:
        if ROW_ID not in df.columns:
            raise ValueError(f"instance DataFrame must carry a {ROW_ID} column")
        self.attrs: list[str] = list(attrs or [c for c in df.columns if c != ROW_ID])
        unknown = set(self.attrs) - set(df.columns)
        if unknown:
            raise ValueError(f"attributes not in DataFrame: {sorted(unknown)}")
        self.df: DataFrame = df.select(ROW_ID, *self.attrs)

    # -- construction -------------------------------------------------------

    @classmethod
    def from_df(cls, df: DataFrame) -> "Instance":
        """Attach a dense 0-based ``_row_id`` preserving current order.

        Order is taken from ``monotonically_increasing_id`` which is
        stable for a DataFrame created from a local (pandas) source —
        all datasets in this repo are created that way.
        """
        if ROW_ID in df.columns:
            return cls(df)
        w = Window.orderBy(F.monotonically_increasing_id())
        return cls(df.withColumn(ROW_ID, F.row_number().over(w) - F.lit(1)))

    @classmethod
    def from_pandas(cls, spark: SparkSession, pdf: pd.DataFrame) -> "Instance":
        """Create an instance from a pandas frame, row order preserved."""
        pdf = pdf.reset_index(drop=True).copy()
        pdf.insert(0, ROW_ID, np.arange(len(pdf), dtype=np.int64))
        return cls(spark.createDataFrame(pdf))

    # -- shape --------------------------------------------------------------

    @cached_property
    def n_rows(self) -> int:
        return self.df.count()

    @property
    def n_attrs(self) -> int:
        return len(self.attrs)

    @property
    def n_positions(self) -> int:
        """``#Pos`` — total number of cells."""
        return self.n_rows * self.n_attrs

    # -- positions ----------------------------------------------------------

    def attr_index(self, attr: str) -> int:
        try:
            return self.attrs.index(attr)
        except ValueError:
            raise KeyError(f"unknown attribute {attr!r}") from None

    def pos(self, row_id: int, attr: str) -> int:
        """Encode a (row, attribute) cell as a single position id."""
        if not 0 <= row_id:
            raise ValueError(f"negative row id {row_id}")
        return row_id * self.n_attrs + self.attr_index(attr)

    def pos_to_cell(self, pos: int) -> tuple[int, str]:
        """Decode a position id back to ``(row_id, attribute)``."""
        return pos // self.n_attrs, self.attrs[pos % self.n_attrs]

    # -- derived instances ---------------------------------------------------

    def head(self, n: int) -> "Instance":
        """First ``n`` rows by ``_row_id`` (the paper's "first i rows")."""
        return Instance(self.df.where(F.col(ROW_ID) < n), self.attrs)

    def restrict(self, row_ids: list[int], attrs: list[str]) -> "Instance":
        """Subinstance ``I(J, K)`` of Prop 3.3 — rows ``J``, attributes ``K``.

        Row ids and position encoding are inherited from the *parent*
        instance only in the sense of row identity; positions are
        re-encoded against the restricted attribute list by callers via
        this instance's own :meth:`pos`.
        """
        keep = sorted(set(row_ids))
        kept_attrs = [a for a in self.attrs if a in set(attrs)]
        return Instance(
            self.df.where(F.col(ROW_ID).isin(keep)), kept_attrs
        )

    # -- localization --------------------------------------------------------

    def to_pandas(self) -> pd.DataFrame:
        """Collect, ordered by row id, ``_row_id`` as the index."""
        pdf = self.df.orderBy(ROW_ID).toPandas()
        return pdf.set_index(ROW_ID)

    def codes(self) -> tuple[np.ndarray, np.ndarray]:
        """Integer-code the instance for the local exact algorithms.

        Returns ``(codes, row_ids)`` where ``codes`` is an
        ``n_rows x n_attrs`` int64 matrix (per-column dense codes; two
        cells hold equal codes iff they hold equal values) and
        ``row_ids`` maps matrix rows back to instance row ids.
        """
        pdf = self.to_pandas()
        mat = np.empty((len(pdf), self.n_attrs), dtype=np.int64)
        for k, a in enumerate(self.attrs):
            mat[:, k] = pd.factorize(pdf[a], use_na_sentinel=False)[0]
        return mat, pdf.index.to_numpy(dtype=np.int64)
