"""Exact DSD by exhaustive subset search — the test oracle for tiny graphs.

Used to verify the approximation guarantees (Theorems 2.1, 2.2, 4.2) on
graphs with |V| <= ~14, where 2^|V| enumeration is feasible.
"""
from __future__ import annotations

from itertools import combinations

import numpy as np

from repro.cliques.local import enumerate_cliques
from repro.core.graph import LocalGraph
from repro.core.metrics import CliqueWeights, EdgeWeights, Metric


def optimal_density(graph: LocalGraph, metric: Metric) -> tuple[float, frozenset]:
    """``(g(S*), S*)`` over all non-empty subsets (ties -> first found)."""
    if graph.n > 20:
        raise ValueError("brute force limited to small graphs")
    w = metric.build(graph)
    best, best_set = -np.inf, frozenset()
    verts = range(graph.n)
    if isinstance(w, EdgeWeights):
        edges = list(zip(graph.src.tolist(), graph.dst.tolist(), w.c.tolist()))
        for size in range(1, graph.n + 1):
            for S in combinations(verts, size):
                sset = set(S)
                f = sum(w.a[list(S)])
                f += sum(c for u, v, c in edges if u in sset and v in sset)
                g = f / size
                if g > best + 1e-12:
                    best, best_set = g, frozenset(S)
        return float(best), best_set
    assert isinstance(w, CliqueWeights)
    cl = [frozenset(row) for row in w.cliques.tolist()]
    for size in range(1, graph.n + 1):
        for S in combinations(verts, size):
            sset = frozenset(S)
            f = sum(1 for c in cl if c <= sset)
            g = f / size
            if g > best + 1e-12:
                best, best_set = g, sset
    return float(best), best_set


def density_of(graph: LocalGraph, metric: Metric, members) -> float:
    """``g(S)`` for an explicit vertex set under ``metric``."""
    members = sorted(int(v) for v in members)
    if not members:
        return 0.0
    w = metric.build(graph)
    sset = set(members)
    if isinstance(w, EdgeWeights):
        f = float(np.sum(w.a[members]))
        inside = np.fromiter(
            (u in sset and v in sset for u, v in zip(graph.src, graph.dst)),
            dtype=bool,
            count=graph.m,
        )
        f += float(w.c[inside].sum()) if graph.m else 0.0
        return f / len(members)
    cl = w.cliques
    if cl.size == 0:
        return 0.0
    mask = np.zeros(graph.n, dtype=bool)
    mask[members] = True
    inside = mask[cl].all(axis=1)
    return float(inside.sum()) / len(members)
