"""Tests for the plaque renderers (normalized color scale, Fig 4 histogram)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.plaque import color_hex, histogram, normalize, to_ansi, to_html


class TestNormalize:
    def test_entropy_one_is_white(self):
        assert normalize(1.0, 0.4) == 0.0

    def test_min_entropy_is_deepest(self):
        assert normalize(0.4, 0.4) == pytest.approx(1.0)

    def test_midpoint(self):
        assert normalize(0.7, 0.4) == pytest.approx(0.5)

    def test_all_white_table(self):
        assert normalize(1.0, 1.0) == 0.0


class TestColorHex:
    def test_white_for_one(self):
        assert color_hex(1.0, 0.5) == "#ffffff"

    def test_deep_blue_for_min(self):
        assert color_hex(0.5, 0.5) == "#08306b"

    def test_format(self):
        c = color_hex(0.75, 0.5)
        assert c.startswith("#") and len(c) == 7
        int(c[1:], 16)

    def test_monotone_darker(self):
        # lower entropy -> smaller red channel
        reds = [int(color_hex(v, 0.2)[1:3], 16) for v in (1.0, 0.8, 0.5, 0.2)]
        assert reds == sorted(reds, reverse=True)


class TestRenderers:
    mat = pd.DataFrame(
        [[1.0, 0.8], [0.6, 1.0]], columns=["A", "B"], index=[0, 1]
    )

    def test_html_contains_values(self):
        html = to_html(self.mat, title="t")
        assert "0.80" in html and "0.60" in html
        assert "<table>" in html and "min entropy = 0.600" in html

    def test_html_escapes_title(self):
        assert "<x>" not in to_html(self.mat, title="<x>")

    def test_ansi_has_colors(self):
        s = to_ansi(self.mat)
        assert "\x1b[48;5;" in s
        assert len(s.splitlines()) == 3  # header + 2 rows


class TestHistogram:
    def test_counts_sum(self):
        long = pd.DataFrame({"entropy": [1.0, 1.0, 0.55, 0.95]})
        h = histogram(long, bins=20)
        assert h["count"].sum() == 4

    def test_figure4_style_binning(self):
        long = pd.DataFrame({"entropy": [1.0] * 90 + [0.6] * 10})
        h = histogram(long, bins=10)
        assert h.loc[h["lo"] >= 0.899, "count"].sum() == 90
        assert int(h.loc[(h["lo"] <= 0.6) & (h["hi"] > 0.6), "count"].iloc[0]) == 10

    def test_edges(self):
        h = histogram(pd.DataFrame({"entropy": [0.0, 1.0]}), bins=4)
        assert h["lo"].iloc[0] == 0.0 and h["hi"].iloc[-1] == 1.0
