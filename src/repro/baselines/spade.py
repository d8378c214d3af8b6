"""Spade stand-in: incremental sequential peeling on an evolving graph.

Spade (VLDB'23 / Spade+) maintains the sequential peeling *sequence* of
the current graph and, when a batch ΔG of edges arrives, reorders it from
the first affected rank onward. Its per-batch cost is therefore the
re-peel of the suffix starting at ``r0 = min rank(endpoints(ΔG))`` —
small for edges landing among early-peeled (benign) vertices, huge when
activity touches the dense tail (fraudsters), which is the paper's
explanation for Spade's latency on fraud-heavy batches.

This module reproduces both facets:

- ``spade_run``: final detection result (exact sequential peeling of the
  full graph — what incremental maintenance converges to) plus a
  work/span log whose per-batch sequential segments follow the
  suffix-re-peel cost model above. Table 5/6 report the average per-batch
  cost, matching the paper's measurement protocol (1K-edge batches).
- ``stale_weight_error``: for FD, Spade assumes static edge weights, but
  inserts change object degrees and hence ``1/log(deg+c)``; the resulting
  density drift is the case-study error the paper plots in Figure 12.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.graph import LocalGraph, from_edges
from repro.core.local_engine import PeelResult, peel_local
from repro.core.metrics import FD_LOG_OFFSET, Metric
from repro.core.schedules import sequential

BATCH_SIZE = 1_000


@dataclass
class SpadeResult:
    """Final peeling result + incremental per-batch work accounting."""

    result: PeelResult
    batch_work: list[float]  # sequential ops charged per batch

    @property
    def avg_batch_work(self) -> float:
        return float(np.mean(self.batch_work)) if self.batch_work else 0.0


def spade_run(
    graph: LocalGraph,
    metric: Metric,
    batch_size: int = BATCH_SIZE,
    n_batches: int = 16,
    seed: int = 7,
) -> SpadeResult:
    """Run the incremental protocol: peel once, then charge suffix re-peels.

    The last ``n_batches × batch_size`` edges (random arrival order) play
    the role of ΔG. The peeling sequence of the final graph gives each
    vertex a rank; a batch touching minimum rank ``r0`` forces a re-peel
    of every vertex ranked ≥ ``r0`` (cost: their count plus incident
    updates), which we charge as span-bound sequential work.
    """
    res = peel_local(graph, metric, sequential())
    if metric.kind == "clique":
        # Spade's initial triangle/k-clique counting is span-bound (the
        # paper's stated bottleneck) and re-lists rather than decrements.
        res.worklog.init_sequential += res.worklog.init_work * 15
        res.worklog.init_work = 0.0
    # rank = removal order (1-based stamps from the sequential engine)
    rank = res.peel_stamp.astype(np.int64)
    deg = graph.degrees()
    order = np.argsort(rank, kind="stable")
    # suffix_cost[r] = Σ_{v: rank(v) >= r} (1 + deg(v)) — via reverse cumsum
    costs = 1.0 + deg[order].astype(np.float64)
    suffix = np.concatenate([np.cumsum(costs[::-1])[::-1], [0.0]])

    rng = np.random.default_rng(seed)
    m = graph.m
    n_batches = max(1, min(n_batches, m // max(batch_size, 1) or 1))
    batch_edges = rng.integers(0, m, size=(n_batches, max(1, batch_size)))
    batch_work: list[float] = []
    for b in range(n_batches):
        eids = batch_edges[b]
        touched = np.unique(
            np.concatenate([graph.src[eids], graph.dst[eids]])
        )
        r0 = int(rank[touched].min())
        batch_work.append(float(suffix[r0 - 1]))
    # charge the incremental maintenance into the log as sequential spans
    for w in batch_work:
        res.worklog.add(
            scanned=int(w), updates=0, peeled=0, phase="peel", sequential=True
        )
    return SpadeResult(result=res, batch_work=batch_work)


def stale_weight_error(
    base: LocalGraph,
    inserted_src: np.ndarray,
    inserted_dst: np.ndarray,
    inserted_amount: np.ndarray,
) -> float:
    """Relative FD-density error from Spade's static-weight assumption.

    Builds the post-insertion graph twice: once with FD edge weights
    frozen at base-time degrees (Spade's view) and once recomputed on the
    true degrees. Returns ``|g_stale - g_true| / g_true`` for the densest
    subgraph under the true weights.
    """
    n = base.n
    new = from_edges(
        n,
        np.concatenate([base.src, inserted_src]),
        np.concatenate([base.dst, inserted_dst]),
        np.concatenate([base.edge_weight, inserted_amount]),
        vertex_weight=base.vertex_weight,
    )
    deg_old = np.zeros(n, dtype=np.int64)
    np.add.at(deg_old, base.src, 1)
    np.add.at(deg_old, base.dst, 1)
    deg_new = new.degrees()

    def fd_density(best: np.ndarray, deg: np.ndarray) -> float:
        mask = np.zeros(n, dtype=bool)
        mask[best] = True
        inside = mask[new.src] & mask[new.dst]
        obj = np.maximum(deg[new.src], deg[new.dst]).astype(np.float64)
        c = 1.0 / np.log(obj + FD_LOG_OFFSET)
        f = float(new.vertex_weight[best].sum() + c[inside].sum())
        return f / best.size if best.size else 0.0

    from repro.core.metrics import FD

    true_res = peel_local(new, FD, sequential())
    best = true_res.best_set
    g_true = fd_density(best, deg_new)
    g_stale = fd_density(best, np.maximum(deg_old, 1))
    return abs(g_stale - g_true) / g_true if g_true > 0 else 0.0
