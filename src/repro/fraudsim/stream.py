"""Synthetic fraud-burst transaction stream.

Each fraud community transacts in one burst: edges arrive uniformly over
a duration drawn from a heavy-tailed lognormal (most collusion runs for
minutes, some for hours — consistent with the load pattern in Figure 1a
and with the spread of prevention ratios the paper reports across
latencies from seconds to thousands of seconds).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

# burst-duration distribution (seconds): median ~5.5 min, heavy tail
BURST_MEDIAN_S = 330.0
BURST_SIGMA = 1.6


@dataclass
class FraudStream:
    """Edge arrival times for fraudulent communities.

    ``community[i]`` and ``arrival_s[i]`` describe fraud edge ``i``;
    ``burst_start_s`` / ``burst_dur_s`` are per-community.
    """

    community: np.ndarray
    arrival_s: np.ndarray
    burst_start_s: np.ndarray
    burst_dur_s: np.ndarray

    @property
    def n_edges(self) -> int:
        return int(self.community.size)


def generate_stream(
    n_communities: int = 400,
    edges_per_community: int = 200,
    horizon_s: float = 86_400.0,
    seed: int = 0,
) -> FraudStream:
    """A day of fraud bursts (deterministic in ``seed``)."""
    rng = np.random.default_rng(seed)
    dur = np.exp(rng.normal(np.log(BURST_MEDIAN_S), BURST_SIGMA, n_communities))
    start = rng.random(n_communities) * horizon_s
    comm = np.repeat(np.arange(n_communities), edges_per_community)
    u = rng.random(comm.size)
    arrival = start[comm] + u * dur[comm]
    return FraudStream(
        community=comm,
        arrival_s=arrival,
        burst_start_s=start,
        burst_dur_s=dur,
    )
