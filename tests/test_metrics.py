"""Tests for repro.core.metrics — the five density metrics + custom API."""
import numpy as np
import pytest

from repro.core import DG, DW, FD, TDS, custom_metric, kclids
from repro.core.graph import from_edges
from repro.core.metrics import (
    FD_LOG_OFFSET,
    CliqueWeights,
    EdgeWeights,
    by_name,
)


@pytest.fixture
def tri_graph():
    # triangle 0-1-2 plus pendant 3
    return from_edges(
        4, [0, 1, 0, 2], [1, 2, 2, 3], [1.0, 2.0, 3.0, 4.0],
        vertex_weight=[0.1, 0.2, 0.3, 0.4],
    )


def test_dg_builder_unit_weights(tri_graph):
    w = DG.build(tri_graph)
    assert isinstance(w, EdgeWeights)
    assert np.allclose(w.c, 1.0)
    assert np.allclose(w.a, 0.0)


def test_dw_builder_uses_edge_weights(tri_graph):
    w = DW.build(tri_graph)
    assert np.allclose(w.c, tri_graph.edge_weight)
    assert np.allclose(w.a, 0.0)


def test_fd_builder_formula(tri_graph):
    w = FD.build(tri_graph)
    deg = tri_graph.degrees()
    for i, (u, v) in enumerate(zip(tri_graph.src, tri_graph.dst)):
        x = max(deg[u], deg[v])
        assert w.c[i] == pytest.approx(1.0 / np.log(x + FD_LOG_OFFSET))
    assert np.allclose(w.a, tri_graph.vertex_weight)


def test_fd_weights_decrease_with_object_degree():
    # a hub with many neighbours -> lower per-edge suspiciousness
    star = from_edges(11, [0] * 10, list(range(1, 11)))
    pair = from_edges(2, [0], [1])
    assert FD.build(star).c[0] < FD.build(pair).c[0]


def test_tds_builder_counts_triangles(tri_graph):
    w = TDS.build(tri_graph)
    assert isinstance(w, CliqueWeights)
    assert w.cliques.shape == (1, 3)
    assert sorted(w.cliques[0].tolist()) == [0, 1, 2]


def test_kclids_builder_k4():
    # K4: exactly one 4-clique, four triangles
    g = from_edges(4, [0, 0, 0, 1, 1, 2], [1, 2, 3, 2, 3, 3])
    k4 = kclids(4).build(g)
    assert k4.cliques.shape == (1, 4)
    t = TDS.build(g)
    assert t.cliques.shape[0] == 4


def test_kclids_requires_k_at_least_3():
    with pytest.raises(ValueError):
        kclids(2)


def test_metric_k_constants():
    assert DG.k == DW.k == FD.k == 2
    assert TDS.k == 3
    assert kclids(5).k == 5


def test_by_name_resolves_all():
    for name in ("DG", "DW", "FD", "TDS"):
        assert by_name(name).name == name
    assert by_name("kCLiDS", 4).k == 4
    with pytest.raises(KeyError):
        by_name("nope")


def test_custom_metric_listing1_style(tri_graph):
    # the paper's Listing 1: constant vsusp, log esusp
    m = custom_metric(
        "fd-like",
        vsusp=lambda u, g: g.vertex_weight[u],
        esusp=lambda u, v, w, g: 1.0 / np.log(g.degrees()[v] + 5.0),
    )
    ew = m.build(tri_graph)
    assert (ew.a >= 0).all() and (ew.c > 0).all()
    assert m.k == 2 and m.kind == "edge"


def test_property_31_rejects_negative_weights(tri_graph):
    bad = custom_metric("bad", lambda u, g: -1.0, lambda u, v, w, g: 1.0)
    with pytest.raises(ValueError, match="Property 3.1"):
        bad.build(tri_graph)
    bad_edge = custom_metric("bad2", lambda u, g: 0.0, lambda u, v, w, g: -w)
    with pytest.raises(ValueError, match="Property 3.1"):
        bad_edge.build(tri_graph)


def test_tds_weight_function_equals_triangle_count():
    """f(S) = Σ a_i with a_i = t_i/3 counts each triangle once (paper §2.1)."""
    rng = np.random.default_rng(5)
    g = from_edges(8, rng.integers(0, 8, 20), rng.integers(0, 8, 20))
    w = TDS.build(g)
    counts = np.zeros(g.n)
    if w.cliques.size:
        np.add.at(counts, w.cliques.ravel(), 1.0)
    assert counts.sum() / 3 == pytest.approx(w.cliques.shape[0])


def test_bipartite_graph_has_no_triangles():
    # bipartite: left {0,1}, right {2,3}
    g = from_edges(4, [0, 0, 1, 1], [2, 3, 2, 3])
    assert TDS.build(g).cliques.shape[0] == 0
    assert kclids(4).build(g).cliques.shape[0] == 0
