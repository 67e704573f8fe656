"""Profiling substrate: FD discovery (Metanome substitute)."""
from .discovery import discover_fds, discover_fds_bruteforce, discover_keys

__all__ = ["discover_fds", "discover_fds_bruteforce", "discover_keys"]
