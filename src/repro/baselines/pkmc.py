"""PKMC stand-in: core-decomposition-style densest-subgraph discovery.

Luo et al. (ICDE'23) approximate DSD through scalable (k,Ψ)-core style
decompositions. We model the family's essential behaviour: sweep a grid
of weight levels λ; at each level, repeatedly strip every vertex with
peeling weight ≤ λ until stable (a generalized core), and snapshot the
density only at level boundaries. The coarse snapshot granularity is why
PKMC's densities trail the greedy peelers (Table 7), and the many
strip-rounds per level are why it is slower than GBBS (Table 5).
"""
from __future__ import annotations

import numpy as np

from repro.core.graph import LocalGraph
from repro.core.local_engine import TOL, PeelResult, make_state
from repro.core.metrics import Metric
from repro.core.worklog import WorkLog

N_LEVELS = 32


def pkmc_run(graph: LocalGraph, metric: Metric, n_levels: int = N_LEVELS) -> PeelResult:
    """λ-grid core sweep; returns the densest core-boundary snapshot."""
    n = graph.n
    state = make_state(graph, metric)
    log = WorkLog(n=n, m=graph.m)
    if metric.kind == "clique":
        log.init_work = float(state.cliques.size)
    stamp = np.zeros(n, dtype=np.int64)
    alive_count = n
    step = 0
    g0 = state.f / n
    densities = [g0]
    best_g, best_step = g0, 0
    # λ grid over the initial weight distribution (quantiles, ascending)
    grid = np.unique(
        np.quantile(state.w, np.linspace(0.0, 1.0, n_levels + 1)[1:])
    )
    rounds = 0
    for lam in grid:
        while alive_count > 0:
            alive = stamp == 0
            batch_mask = alive & (state.w <= lam + TOL)
            n_batch = int(batch_mask.sum())
            if n_batch == 0:
                break
            batch = np.flatnonzero(batch_mask)
            step += 1
            rounds += 1
            stamp[batch] = step
            updates = state.remove(batch, stamp, step)
            # PKMC recomputes the core structure each strip round: charge
            # a full edge pass on top of the vertex scan.
            log.add(alive_count + graph.m, updates, n_batch, phase="peel")
            alive_count -= n_batch
            densities.append(state.f / alive_count if alive_count else 0.0)
        if alive_count == 0:
            break
        # snapshot only at the stabilized core boundary (the coarse step)
        g_here = state.f / alive_count
        if g_here > best_g + TOL:
            best_g, best_step = g_here, step
    best_set = np.flatnonzero((stamp > best_step) | (stamp == 0))
    return PeelResult(
        best_set=best_set,
        best_density=best_g,
        densities=densities,
        n_rounds=rounds,
        n_trim_rounds=0,
        long_tail_peeled=0,
        sparse_trimmed=0,
        worklog=log,
        peel_stamp=stamp,
    )
