"""Figure 1: the CD-collection plaque tests (intro example).

(b) entropies under the six genuine dependencies of Example 1.1,
(c) entropies under the automatically discovered dependencies of
Example 1.2 (Metanome finds 23; so does our profiler).  Both matrices
are computed exactly and must reproduce the paper's values after
rounding to one decimal.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..core.entropy import plaque_entropies
from ..core.plaque import to_html
from ..datasets import cd_example
from ..profiling import discover_fds


def run(spark: SparkSession) -> dict[str, pd.DataFrame]:
    """Both entropy matrices plus agreement flags vs the paper."""
    inst = cd_example.load(spark)
    genuine = plaque_entropies(
        inst, cd_example.GENUINE_FDS, method="exact", use_spark_cells=False
    ).matrix(inst)
    discovered_fds = discover_fds(inst, max_lhs=2)
    discovered = plaque_entropies(
        inst, discovered_fds, method="exact", use_spark_cells=False
    ).matrix(inst)
    return {
        "fig_1b": genuine,
        "fig_1c": discovered,
        "n_discovered_fds": len(discovered_fds),
        "fig_1b_matches_paper": bool(
            np.allclose(np.round(genuine.to_numpy(), 1), cd_example.FIG_1B)
        ),
        "fig_1c_matches_paper": bool(
            np.allclose(np.round(discovered.to_numpy(), 1), cd_example.FIG_1C)
        ),
    }


def render(result: dict) -> str:
    out = [
        f"discovered FDs: {result['n_discovered_fds']} (paper: 23)",
        "",
        "Figure 1b (genuine FDs):",
        result["fig_1b"].round(4).to_string(),
        f"matches paper (1-decimal rounding): {result['fig_1b_matches_paper']}",
        "",
        "Figure 1c (discovered FDs):",
        result["fig_1c"].round(4).to_string(),
        f"matches paper (1-decimal rounding): {result['fig_1c_matches_paper']}",
    ]
    return "\n".join(out)


def html(result: dict) -> dict[str, str]:
    return {
        "fig_1b": to_html(result["fig_1b"], "Figure 1b - genuine FDs"),
        "fig_1c": to_html(result["fig_1c"], "Figure 1c - discovered FDs"),
    }
