"""Tests for the brute-force oracles themselves (hand-checked cases)."""
import pytest

from repro.bipartite.bruteforce import (
    all_kbiplexes,
    all_maximal_bicliques,
    all_maximal_kbiplexes,
    all_maximal_kplexes,
    is_kplex,
)
from repro.bipartite.graph import BipartiteGraph
from repro.bipartite.predicates import is_maximal_kbiplex


def test_complete_bipartite_single_mbp():
    g = BipartiteGraph.from_biadjacency([[1, 1], [1, 1]])
    assert all_maximal_kbiplexes(g, 1) == {((0, 1), (0, 1))}


def test_mbps_cover_all_kbiplexes():
    # Every k-biplex must be a subgraph of some MBP (hereditary property).
    g = BipartiteGraph.from_biadjacency([[1, 1, 0], [0, 1, 1], [1, 0, 1]])
    mbps = all_maximal_kbiplexes(g, 1)
    for lk, rk in all_kbiplexes(g, 1):
        assert any(
            set(lk) <= set(ml) and set(rk) <= set(mr) for ml, mr in mbps
        )


def test_mbps_are_maximal():
    g = BipartiteGraph.from_biadjacency([[1, 0, 1], [1, 1, 0], [0, 1, 1]])
    for lk, rk in all_maximal_kbiplexes(g, 1):
        assert is_maximal_kbiplex(g, lk, rk, 1)


def test_mbps_distinct_k():
    g = BipartiteGraph.from_biadjacency([[1, 1, 0], [1, 0, 0]])
    m1 = all_maximal_kbiplexes(g, 1)
    m2 = all_maximal_kbiplexes(g, 2)
    # k=2 tolerates more misses; here the whole graph becomes one MBP.
    assert ((0, 1), (0, 1, 2)) in m2
    assert ((0, 1), (0, 1, 2)) not in m1


def test_too_large_graph_rejected():
    g = BipartiteGraph.from_edges([], n_left=16, n_right=16)
    with pytest.raises(ValueError):
        all_maximal_kbiplexes(g, 1)


def test_maximal_bicliques_simple():
    g = BipartiteGraph.from_biadjacency([[1, 1], [1, 0]])
    got = all_maximal_bicliques(g)
    assert got == {((0,), (0, 1)), ((0, 1), (0,))}


def test_maximal_bicliques_thresholds():
    g = BipartiteGraph.from_biadjacency([[1, 1], [1, 0]])
    assert all_maximal_bicliques(g, min_left=2) == {((0, 1), (0,))}
    assert all_maximal_bicliques(g, min_right=2) == {((0,), (0, 1))}


def test_is_kplex_convention():
    # Triangle minus one edge: path 0-1-2.
    adj = [frozenset({1}), frozenset({0, 2}), frozenset({1})]
    assert is_kplex(adj, frozenset({0, 1, 2}), 2)  # 0 misses {0,2} -> 2
    assert not is_kplex(adj, frozenset({0, 1, 2}), 1)
    assert is_kplex(adj, frozenset({0, 1}), 1)


def test_maximal_kplexes_triangle_free():
    adj = [frozenset({1}), frozenset({0, 2}), frozenset({1})]
    assert all_maximal_kplexes(adj, 1) == {(0, 1), (1, 2)}
    assert all_maximal_kplexes(adj, 2) == {(0, 1, 2)}


def test_maximal_kplexes_isolated_vertices():
    adj = [frozenset(), frozenset()]
    # k=1: singletons; k=2: the pair {0,1} (each misses itself + other).
    assert all_maximal_kplexes(adj, 1) == {(0,), (1,)}
    assert all_maximal_kplexes(adj, 2) == {(0, 1)}
