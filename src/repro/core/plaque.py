"""Plaque rendering: entropy matrices as normalized blue heat maps.

Matches the paper's presentation: cells with entropy 1 stay white ("no
plaque"); lower entropies are deeper blue, and the color scale is
normalized per table to ``[min entropy, 1]`` ("the color scale is
normalized individually with respect to the minimum entropy").

Figures as images are out of scope for this reproduction (DESIGN.md);
these renderers exist so jobs can emit human-inspectable HTML/ANSI
artifacts alongside the numeric tables recorded in EXPERIMENTS.md.
"""
from __future__ import annotations

import html as _html

import numpy as np
import pandas as pd

# Deep plaque blue -> white, interpolated linearly in RGB.
_DEEP = (8, 48, 107)
_WHITE = (255, 255, 255)


def normalize(value: float, vmin: float) -> float:
    """Map entropy to [0, 1] plaque intensity (1 = deepest plaque)."""
    if value >= 1.0 or vmin >= 1.0:
        return 0.0
    return (1.0 - value) / (1.0 - vmin)


def color_hex(value: float, vmin: float) -> str:
    """CSS hex color for an entropy under the table's normalization."""
    t = normalize(value, vmin)
    rgb = tuple(
        int(round(w + (d - w) * t)) for w, d in zip(_WHITE, _DEEP)
    )
    return "#{:02x}{:02x}{:02x}".format(*rgb)


def to_html(matrix: pd.DataFrame, title: str = "plaque test") -> str:
    """Standalone HTML heat map of an entropy matrix."""
    vmin = float(np.nanmin(matrix.to_numpy(dtype=float)))
    head = "".join(f"<th>{_html.escape(str(c))}</th>" for c in matrix.columns)
    body = []
    for _, row in matrix.iterrows():
        tds = []
        for v in row:
            fg = "#ffffff" if normalize(float(v), vmin) > 0.6 else "#000000"
            tds.append(
                f'<td style="background:{color_hex(float(v), vmin)};'
                f'color:{fg};text-align:right">{float(v):.2f}</td>'
            )
        body.append("<tr>" + "".join(tds) + "</tr>")
    return (
        "<!doctype html><html><head><meta charset='utf-8'>"
        f"<title>{_html.escape(title)}</title>"
        "<style>table{border-collapse:collapse;font-family:monospace}"
        "td,th{border:1px solid #999;padding:2px 6px}</style></head>"
        f"<body><h1>{_html.escape(title)}</h1>"
        f"<p>min entropy = {vmin:.3f}; white = 1 (no plaque)</p>"
        f"<table><tr>{head}</tr>{''.join(body)}</table></body></html>"
    )


def to_ansi(matrix: pd.DataFrame, digits: int = 2) -> str:
    """Terminal rendering with 256-color blue backgrounds."""
    vmin = float(np.nanmin(matrix.to_numpy(dtype=float)))
    width = digits + 3
    lines = [" ".join(f"{str(c)[:width]:>{width}}" for c in matrix.columns)]
    for _, row in matrix.iterrows():
        cells = []
        for v in row:
            t = normalize(float(v), vmin)
            # 231 (white) down toward 17 (dark blue) on the xterm cube.
            shade = [231, 189, 147, 105, 62, 18][min(5, int(t * 5.999))]
            fg = 15 if t > 0.5 else 16
            cells.append(
                f"\x1b[48;5;{shade}m\x1b[38;5;{fg}m{v:>{width}.{digits}f}\x1b[0m"
            )
        lines.append(" ".join(cells))
    return "\n".join(lines)


def histogram(long: pd.DataFrame, bins: int = 20) -> pd.DataFrame:
    """Entropy histogram (Figure 4): bin edges and cell counts."""
    counts, edges = np.histogram(
        long["entropy"].to_numpy(dtype=float), bins=bins, range=(0.0, 1.0)
    )
    return pd.DataFrame(
        {"lo": edges[:-1], "hi": edges[1:], "count": counts.astype(int)}
    )
