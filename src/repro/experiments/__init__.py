"""Experiment harnesses, one per evaluation artifact (DESIGN.md §4).

Each module exposes ``run(spark, ...) -> pandas.DataFrame`` (plus
helpers) and is wrapped by a ``jobs/<name>.py`` spark-submit entry
point.  The returned tables print the same rows the paper reports;
EXPERIMENTS.md records paper-vs-measured values.
"""
from . import figure1, figure2, figure3, figure4, figure5, figure6, table1

__all__ = [
    "figure1",
    "figure2",
    "figure3",
    "figure4",
    "figure5",
    "figure6",
    "table1",
]
