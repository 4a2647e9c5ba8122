"""Tests for the synthetic bipartite generators."""
import numpy as np
import pytest

from repro.bipartite.generators import (
    erdos_renyi_bipartite,
    powerlaw_bipartite,
    random_bipartite_gnp,
)


def test_er_sizes_and_density():
    g = erdos_renyi_bipartite(n_vertices=1000, density=5, seed=0)
    assert g.n_left + g.n_right == 1000
    # duplicates collapse, so realized edges <= requested but close
    assert 0.9 * 5000 <= g.n_edges <= 5000


def test_er_left_fraction():
    g = erdos_renyi_bipartite(n_vertices=100, density=2, left_fraction=0.3, seed=1)
    assert g.n_left == 30
    assert g.n_right == 70


def test_er_deterministic():
    a = erdos_renyi_bipartite(n_vertices=200, density=3, seed=5)
    b = erdos_renyi_bipartite(n_vertices=200, density=3, seed=5)
    assert a.edges() == b.edges()


def test_er_different_seeds_differ():
    a = erdos_renyi_bipartite(n_vertices=200, density=3, seed=5)
    b = erdos_renyi_bipartite(n_vertices=200, density=3, seed=6)
    assert a.edges() != b.edges()


def test_er_rejects_tiny():
    with pytest.raises(ValueError):
        erdos_renyi_bipartite(n_vertices=1, density=1)


def test_powerlaw_sizes():
    g = powerlaw_bipartite(n_left=500, n_right=300, n_edges=2000, seed=2)
    assert g.n_left == 500
    assert g.n_right == 300
    # Zipf hubs collide a lot; realized edges are well below requested.
    assert 0.4 * 2000 <= g.n_edges <= 2000


def test_powerlaw_skew_increases_with_alpha():
    flat = powerlaw_bipartite(n_left=400, n_right=400, n_edges=3000, alpha=0.1, seed=3)
    skew = powerlaw_bipartite(n_left=400, n_right=400, n_edges=3000, alpha=1.3, seed=3)
    max_flat = max(flat.degree_left(v) for v in range(400))
    max_skew = max(skew.degree_left(v) for v in range(400))
    assert max_skew > max_flat


def test_powerlaw_per_side_alpha():
    g = powerlaw_bipartite(
        n_left=400, n_right=400, n_edges=3000, alpha=0.1, alpha_right=1.4, seed=4
    )
    max_l = max(g.degree_left(v) for v in range(400))
    max_r = max(g.degree_right(u) for u in range(400))
    assert max_r > 2 * max_l


def test_gnp_density():
    g = random_bipartite_gnp(n_left=50, n_right=50, p=0.2, seed=7)
    realized = g.n_edges / 2500
    assert 0.12 <= realized <= 0.28


def test_gnp_extremes():
    empty = random_bipartite_gnp(n_left=5, n_right=5, p=0.0, seed=0)
    full = random_bipartite_gnp(n_left=5, n_right=5, p=1.0, seed=0)
    assert empty.n_edges == 0
    assert full.n_edges == 25


def test_gnp_deterministic():
    a = random_bipartite_gnp(n_left=20, n_right=20, p=0.3, seed=9)
    b = random_bipartite_gnp(n_left=20, n_right=20, p=0.3, seed=9)
    assert a.edges() == b.edges()
