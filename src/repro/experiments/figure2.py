"""Figure 2: Monte Carlo iterations required for accuracy ε at confidence 1−δ.

Pure closed form (Theorem 3.6): ``n = ceil(2 ln(2/δ) / ε²)``.  The grid
reproduces the figure's axes; Example 3.7's spot values appear as rows.
"""
from __future__ import annotations

import pandas as pd

from ..core.montecarlo import required_iterations

EPS_GRID = (0.001, 0.005, 0.01, 0.02, 0.04, 0.05, 0.1)
DELTA_GRID = (0.001, 0.01, 0.05, 0.1)


def run(spark=None) -> pd.DataFrame:
    """Iteration counts; rows = ε, columns = confidence 1−δ.

    ``spark`` is accepted (and ignored) for job-wrapper uniformity —
    the computation is a closed form.
    """
    data = {
        f"conf_{1 - d:g}": [required_iterations(e, d) for e in EPS_GRID]
        for d in DELTA_GRID
    }
    return pd.DataFrame(data, index=pd.Index(EPS_GRID, name="eps"))


def render(table: pd.DataFrame) -> str:
    return table.to_string()
