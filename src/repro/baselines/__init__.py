"""Simulated equivalents of the systems the paper compares against.

Every comparator is the *algorithm it embodies* re-implemented over the
shared peeling core (DESIGN.md §4), so runtime comparisons measure
schedules and work, not host-language differences:

- :mod:`spade`  — incremental sequential peeling (suffix re-peel model)
- :mod:`gbbs`   — bucket-based parallel peeling (edge metrics)
- :mod:`pkmc`   — core-decomposition-style λ-sweep DSD
- :mod:`fwa`    — Frank–Wolfe convex DSD
- :mod:`alenex` — near-optimal parallel peeling (tiny ε + ordering work)
- :mod:`kclist` — clique enumeration + sequential clique peeling
- :mod:`pbbs`   — bucketed parallel clique peeling
"""
from repro.baselines.alenex import alenex_run
from repro.baselines.fwa import fwa_run
from repro.baselines.gbbs import gbbs_run
from repro.baselines.kclist import kclist_run
from repro.baselines.pbbs import pbbs_run
from repro.baselines.pkmc import pkmc_run
from repro.baselines.spade import spade_run

__all__ = [
    "alenex_run",
    "fwa_run",
    "gbbs_run",
    "kclist_run",
    "pbbs_run",
    "pkmc_run",
    "spade_run",
]
