"""Tests for the brute-force DSD oracle itself."""
import numpy as np
import pytest

from repro.core import DG, DW, TDS, from_edges
from repro.core.brute import density_of, optimal_density


def test_single_edge_dg():
    g = from_edges(2, [0], [1])
    opt, s = optimal_density(g, DG)
    assert opt == pytest.approx(0.5)
    assert s == frozenset({0, 1})


def test_triangle_dg():
    g = from_edges(3, [0, 1, 0], [1, 2, 2])
    opt, s = optimal_density(g, DG)
    assert opt == pytest.approx(1.0)
    assert s == frozenset({0, 1, 2})


def test_k4_tds():
    g = from_edges(4, [0, 0, 0, 1, 1, 2], [1, 2, 3, 2, 3, 3])
    opt, s = optimal_density(g, TDS)
    assert opt == pytest.approx(1.0)  # 4 triangles / 4 vertices
    assert s == frozenset({0, 1, 2, 3})


def test_weighted_pair_beats_triangle():
    # heavy pair (w=10) vs light triangle (w=1 each): pair density 5 > 1
    g = from_edges(5, [0, 2, 3, 2], [1, 3, 4, 4], [10.0, 1.0, 1.0, 1.0])
    opt, s = optimal_density(g, DW)
    assert opt == pytest.approx(5.0)
    assert s == frozenset({0, 1})


def test_vertex_weights_matter():
    g = from_edges(3, [0], [1], [1.0], vertex_weight=[0.0, 0.0, 9.0])
    opt, s = optimal_density(g, DW)
    # DW ignores vertex weights: best is the edge pair
    assert opt == pytest.approx(0.5)


def test_density_of_matches_optimal():
    rng = np.random.default_rng(1)
    g = from_edges(7, rng.integers(0, 7, 12), rng.integers(0, 7, 12),
                   rng.random(12))
    for metric in (DG, DW, TDS):
        opt, s = optimal_density(g, metric)
        assert density_of(g, metric, s) == pytest.approx(opt, abs=1e-9)


def test_density_of_empty_set():
    g = from_edges(2, [0], [1])
    assert density_of(g, DG, []) == 0.0


def test_brute_force_size_guard():
    g = from_edges(25, [0], [1])
    with pytest.raises(ValueError):
        optimal_density(g, DG)
