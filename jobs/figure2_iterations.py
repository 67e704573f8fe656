#!/usr/bin/env python
"""Entry point for Figure 2 (required MC iterations; closed form).

Usage: python jobs/figure2_iterations.py
"""
from repro.experiments import figure2


def main() -> None:
    print(figure2.render(figure2.run()))


if __name__ == "__main__":
    main()
