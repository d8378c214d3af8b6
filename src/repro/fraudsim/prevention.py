"""Latency → prevention-ratio mapping (Table 9's R column).

A community becomes *detectable* once a fraction of its burst has landed
(the subgraph must be dense enough to flag); a detector with latency L
then blocks everything arriving after ``t_detectable + L``. R is the
blocked fraction of all fraud edges. TLE latencies prevent nothing.
"""
from __future__ import annotations

import numpy as np

from repro.fraudsim.stream import FraudStream
from repro.simmachine.machine import TIME_LIMIT_S

DETECTABLE_FRACTION = 0.05  # burst fraction needed before the community is dense


def prevention_ratio(
    stream: FraudStream,
    latency_s: float,
    detectable_fraction: float = DETECTABLE_FRACTION,
) -> float:
    """Fraction of fraud edges blocked given detection latency.

    Monotonically non-increasing in ``latency_s``; returns 0 for TLE.
    """
    if latency_s >= TIME_LIMIT_S:
        return 0.0
    t_detectable = (
        stream.burst_start_s + detectable_fraction * stream.burst_dur_s
    )
    t_block = t_detectable[stream.community] + latency_s
    prevented = stream.arrival_s > t_block
    return float(prevented.mean()) if stream.n_edges else 0.0
