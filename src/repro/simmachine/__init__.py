"""Parallel-machine cost simulator.

Stands in for the hardware the paper measured on (128-thread Xeon X5650;
EPYC 7742) and for billion-edge scale: engines emit work/span logs, this
package prices them in seconds under a machine profile and extrapolates
synthetic-scale logs to paper-scale graphs (DESIGN.md §5).
"""
from repro.simmachine.machine import (
    EPYC_7742,
    TIME_LIMIT_S,
    X5650,
    MachineProfile,
    aggregates,
    clique_exponent,
    extrapolate,
    simulate,
)

__all__ = [
    "MachineProfile",
    "X5650",
    "EPYC_7742",
    "TIME_LIMIT_S",
    "aggregates",
    "clique_exponent",
    "simulate",
    "extrapolate",
]
