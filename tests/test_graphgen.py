"""Tests for the synthetic graph substrate."""
import numpy as np
import pytest

from repro.core import DW, dupin, peel_local
from repro.graphgen import bipartite_fraud_graph, chung_lu_with_communities


def test_chung_lu_deterministic():
    a = chung_lu_with_communities(300, 1500, seed=1)
    b = chung_lu_with_communities(300, 1500, seed=1)
    assert np.array_equal(a.src, b.src)
    assert np.allclose(a.edge_weight, b.edge_weight)


def test_chung_lu_different_seeds_differ():
    a = chung_lu_with_communities(300, 1500, seed=1)
    b = chung_lu_with_communities(300, 1500, seed=2)
    assert not (a.m == b.m and np.array_equal(a.src, b.src))


def test_chung_lu_sizes():
    g = chung_lu_with_communities(500, 2500, seed=3)
    assert g.n == 500
    assert 0 < g.m <= 2500 + 500 * 30  # dedup may shrink; communities add
    assert (g.vertex_weight >= 0).all()


def test_chung_lu_labels_mark_communities():
    g = chung_lu_with_communities(
        400, 1200, n_communities=3, community_size=15, seed=4
    )
    comm = g.labels["fraud_community"]
    assert comm.shape == (400,)
    assert set(np.unique(comm)) <= {-1, 0, 1, 2}
    for j in range(3):
        assert (comm == j).sum() == 15


def test_planted_community_is_denser_than_background():
    g = chung_lu_with_communities(
        600, 2400, n_communities=1, community_size=25, seed=5
    )
    comm = np.flatnonzero(g.labels["fraud_community"] == 0)
    mask = np.zeros(g.n, bool)
    mask[comm] = True
    inside = mask[g.src] & mask[g.dst]
    internal_density = g.edge_weight[inside].sum() / comm.size
    overall = g.edge_weight.sum() / g.n
    assert internal_density > 3 * overall


def test_dsd_recovers_planted_community():
    g = chung_lu_with_communities(
        600, 2400, n_communities=1, community_size=25, seed=6
    )
    plant = set(np.flatnonzero(g.labels["fraud_community"] == 0).tolist())
    r = peel_local(g, DW, dupin(0.1))
    found = set(r.best_set.tolist())
    assert len(found & plant) / len(plant) >= 0.8


def test_bipartite_has_no_intra_side_edges():
    g = bipartite_fraud_graph(200, 60, 1500, seed=7)
    is_m = g.labels["is_merchant"]
    assert not (is_m[g.src] & is_m[g.dst]).any()
    assert not (~is_m[g.src] & ~is_m[g.dst]).any()


def test_bipartite_fraud_blocks_labelled():
    g = bipartite_fraud_graph(
        200, 60, 1500, n_fraud_blocks=2, block_customers=8,
        block_merchants=4, seed=8,
    )
    comm = g.labels["fraud_community"]
    for j in range(2):
        assert (comm == j).sum() == 12  # 8 customers + 4 merchants


def test_bipartite_fraud_block_is_dense():
    g = bipartite_fraud_graph(300, 80, 2000, seed=9)
    block = np.flatnonzero(g.labels["fraud_community"] == 0)
    mask = np.zeros(g.n, bool)
    mask[block] = True
    inside = mask[g.src] & mask[g.dst]
    per_member = g.edge_weight[inside].sum() / block.size
    overall = g.edge_weight.sum() / g.n
    assert per_member > 1.5 * overall


def test_bipartite_deterministic():
    a = bipartite_fraud_graph(150, 40, 900, seed=10)
    b = bipartite_fraud_graph(150, 40, 900, seed=10)
    assert np.array_equal(a.src, b.src)
    assert np.allclose(a.edge_weight, b.edge_weight)


def test_weights_positive():
    g = chung_lu_with_communities(200, 800, seed=11)
    assert (g.edge_weight > 0).all()
