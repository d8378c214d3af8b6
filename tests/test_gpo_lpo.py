"""Tests for Algorithms 3 (GPO) and 4 (LPO) — threshold and bucket regimes."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import DG, DW, FD, from_edges, peel_local
from repro.core.brute import density_of, optimal_density
from repro.core.schedules import (
    bucket,
    bucket_gpo,
    bucket_lpo,
    dupin,
    gpo,
    lpo,
)


def _random_graph(seed, n_lo=4, n_hi=9):
    rng = np.random.default_rng(seed)
    n = int(rng.integers(n_lo, n_hi))
    m = int(rng.integers(3, 2 * n))
    return from_edges(
        n, rng.integers(0, n, m), rng.integers(0, n, m),
        rng.random(m) + 0.05, vertex_weight=rng.random(n) * 0.2,
    )


@settings(max_examples=20, deadline=None)
@given(st.integers(0, 10_000))
def test_gpo_preserves_approximation(seed):
    g = _random_graph(seed)
    for metric in (DG, DW, FD):
        opt, _ = optimal_density(g, metric)
        r = peel_local(g, metric, gpo(0.1))
        assert r.best_density >= opt / (metric.k * 1.1) - 1e-9


@settings(max_examples=20, deadline=None)
@given(st.integers(0, 10_000))
def test_lpo_preserves_approximation(seed):
    """Lemma 5.3: LPO trimming never removes the bound-critical vertex."""
    g = _random_graph(seed)
    for metric in (DG, DW, FD):
        opt, _ = optimal_density(g, metric)
        r = peel_local(g, metric, lpo(0.1))
        assert r.best_density >= opt / (metric.k * 1.1) - 1e-9


def test_gpo_never_more_rounds_than_dupin():
    for seed in range(6):
        rng = np.random.default_rng(100 + seed)
        n = 150
        g = from_edges(n, rng.integers(0, n, 600), rng.integers(0, n, 600),
                       rng.random(600) + 0.01)
        base = peel_local(g, DW, dupin(0.1))
        opt = peel_local(g, DW, gpo(0.1))
        assert opt.n_rounds <= base.n_rounds


def test_lpo_density_at_least_dupin():
    """LPO trims sparse fragments, so its best density dominates Dupin's
    (paper §6.3 reports 7–26% denser subgraphs). The effect needs a graph
    with planted dense structure plus a sparse background — exactly the
    fraud-community shape of the paper's datasets."""
    from repro.graphgen import chung_lu_with_communities

    wins = 0
    for seed in range(4):
        g = chung_lu_with_communities(
            400, 2000, n_communities=2, community_size=20, seed=300 + seed
        )
        base = peel_local(g, DW, dupin(0.3))
        opt = peel_local(g, DW, lpo(0.3))
        assert opt.best_density >= base.best_density - 1e-9
        wins += opt.best_density > base.best_density + 1e-9
    # trimming should actually help on at least some instances
    assert wins >= 1


def test_lemma52_trim_increases_density():
    """Lemma 5.2: removing u with w_u(S) < g(S) strictly increases g."""
    rng = np.random.default_rng(33)
    g = from_edges(30, rng.integers(0, 30, 90), rng.integers(0, 30, 90),
                   rng.random(90) + 0.01)
    from repro.core.local_engine import make_state
    from repro.core import DW as DWm

    state = make_state(g, DWm)
    gv = state.f / g.n
    victims = np.flatnonzero(state.w < gv - 1e-12)
    if victims.size:
        u = victims[0]
        stamp = np.zeros(g.n, dtype=np.int64)
        stamp[u] = 1
        state.remove(np.array([u]), stamp, 1)
        assert state.f / (g.n - 1) > gv - 1e-12


def test_lpo_tracks_trim_counters():
    rng = np.random.default_rng(44)
    n = 200
    g = from_edges(n, rng.integers(0, n, 500), rng.integers(0, n, 500),
                   rng.random(500) + 0.01)
    r = peel_local(g, DW, lpo(0.5))
    assert r.sparse_trimmed >= 0
    assert r.n_trim_rounds >= 0
    trim_rounds = [x for x in r.worklog.rounds if x.phase == "trim"]
    assert len(trim_rounds) == r.n_trim_rounds
    assert sum(x.peeled for x in trim_rounds) == r.sparse_trimmed


# ---- bucket-granularity regime (the Table 3 experiment) ----------------

@pytest.fixture(scope="module")
def tail_graph():
    rng = np.random.default_rng(55)
    n = 400
    return from_edges(n, rng.integers(0, n, 2500), rng.integers(0, n, 2500),
                      rng.random(2500) + 0.01)


def test_bucket_gpo_reduces_rounds(tail_graph):
    base = peel_local(tail_graph, DW, bucket())
    opt = peel_local(tail_graph, DW, bucket_gpo(0.1))
    assert opt.n_rounds <= base.n_rounds
    assert opt.long_tail_peeled > 0  # the global threshold actually fired


def test_bucket_lpo_reduces_rounds_dramatically(tail_graph):
    base = peel_local(tail_graph, DW, bucket())
    opt = peel_local(tail_graph, DW, bucket_lpo(0.1))
    total = opt.n_rounds + opt.n_trim_rounds
    assert total < base.n_rounds
    assert opt.sparse_trimmed > 0


def test_bucket_gpo_density_not_worse(tail_graph):
    base = peel_local(tail_graph, DW, bucket())
    opt = peel_local(tail_graph, DW, bucket_gpo(0.1))
    # GPO only fast-forwards provably long-tail vertices
    assert opt.best_density >= 0.9 * base.best_density


def test_bucket_lpo_best_set_density_consistent(tail_graph):
    r = peel_local(tail_graph, DW, bucket_lpo(0.1))
    assert density_of(tail_graph, DW, r.best_set) == pytest.approx(
        r.best_density, abs=1e-6
    )


def test_bucket_equals_sequential_result_on_distinct_weights():
    """With all-distinct weights every bucket is a singleton, so bucket
    peeling follows the exact sequential order."""
    rng = np.random.default_rng(66)
    n = 40
    g = from_edges(n, rng.integers(0, n, 120), rng.integers(0, n, 120),
                   rng.random(120) + 0.01)
    from repro.core.schedules import sequential

    b = peel_local(g, DW, bucket())
    s = peel_local(g, DW, sequential())
    assert b.best_density == pytest.approx(s.best_density, abs=1e-9)
    assert set(b.best_set.tolist()) == set(s.best_set.tolist())
