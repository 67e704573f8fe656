"""Dataset substitutes (see DESIGN.md §3 for the substitution table)."""
from . import adult, cd_example, echocardiogram, iris, ncvoter, satellites

REAL_WORLD = {
    "satellites": satellites,
    "adult": adult,
    "echocardiogram": echocardiogram,
    "ncvoter": ncvoter,
    "iris": iris,
}

__all__ = ["adult", "cd_example", "echocardiogram", "iris", "ncvoter", "satellites", "REAL_WORLD"]
