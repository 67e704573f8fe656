"""Core of the reproduction: the plaque test (cell entropies under FDs)."""
from .exact import ExactBudgetExceeded, entropy_enumerate, entropy_exact_support
from .entropy import PlaqueResult, exact_entropy_table, plaque_entropies, prepare_fds
from .fd import FD, attribute_closure, fd_closure, holds, left_reduce, parse_fds, validate
from .instance import ROW_ID, Instance
from .montecarlo import achieved_accuracy, mc_entropy, required_iterations

__all__ = [
    "FD",
    "Instance",
    "ROW_ID",
    "PlaqueResult",
    "ExactBudgetExceeded",
    "attribute_closure",
    "achieved_accuracy",
    "entropy_enumerate",
    "entropy_exact_support",
    "exact_entropy_table",
    "fd_closure",
    "holds",
    "left_reduce",
    "mc_entropy",
    "parse_fds",
    "plaque_entropies",
    "prepare_fds",
    "required_iterations",
    "validate",
]
