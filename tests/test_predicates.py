"""Tests for the k-biplex ground-truth predicates."""
import pytest

from repro.bipartite.generators import random_bipartite_gnp
from repro.bipartite.graph import BipartiteGraph
from repro.bipartite.predicates import (
    can_add_left,
    can_add_right,
    is_kbiplex,
    is_maximal_kbiplex,
)


@pytest.fixture()
def g():
    # Complete 3x3 minus the diagonal: every vertex misses exactly one
    # vertex of the other side, so the whole graph is a 1-biplex.
    return BipartiteGraph.from_biadjacency([[0, 1, 1], [1, 0, 1], [1, 1, 0]])


def test_full_graph_is_1biplex(g):
    assert is_kbiplex(g, range(3), range(3), 1)


def test_biclique_is_0miss(g):
    # {v0,v1} x {u2} is complete.
    assert is_kbiplex(g, [0, 1], [2], 1)


def test_not_kbiplex_when_misses_exceed():
    g = BipartiteGraph.from_biadjacency([[1, 0, 0], [1, 1, 1]])
    # v0 misses u1 and u2 -> 2 misses > k=1.
    assert not is_kbiplex(g, [0, 1], [0, 1, 2], 1)
    assert is_kbiplex(g, [0, 1], [0, 1, 2], 2)


def test_empty_sides_are_kbiplexes(g):
    assert is_kbiplex(g, [], [], 1)
    assert is_kbiplex(g, [], range(3), 1)
    assert is_kbiplex(g, range(3), [], 1)


def test_hereditary_property():
    # Lemma 2.2: every subgraph of a k-biplex is a k-biplex.
    g = random_bipartite_gnp(n_left=5, n_right=5, p=0.7, seed=7)
    base_l, base_r = frozenset({0, 1, 2}), frozenset({0, 1, 3})
    if is_kbiplex(g, base_l, base_r, 2):
        for lsub in ([0, 1], [2], []):
            for rsub in ([0, 3], [1], []):
                assert is_kbiplex(g, lsub, rsub, 2)


def test_can_add_left_matches_definition():
    g = random_bipartite_gnp(n_left=5, n_right=5, p=0.5, seed=3)
    k = 1
    sol = (frozenset({0}), frozenset({0, 1}))
    assert is_kbiplex(g, *sol, k)
    for v in range(g.n_left):
        if v in sol[0]:
            continue
        assert can_add_left(g, sol, v, k) == is_kbiplex(
            g, sol[0] | {v}, sol[1], k
        )


def test_can_add_right_matches_definition():
    g = random_bipartite_gnp(n_left=5, n_right=5, p=0.5, seed=4)
    k = 2
    sol = (frozenset({0, 1}), frozenset({2}))
    assert is_kbiplex(g, *sol, k)
    for u in range(g.n_right):
        if u in sol[1]:
            continue
        assert can_add_right(g, sol, u, k) == is_kbiplex(
            g, sol[0], sol[1] | {u}, k
        )


def test_maximal_requires_kbiplex():
    g = BipartiteGraph.from_biadjacency([[1, 0, 0], [1, 1, 1]])
    assert not is_maximal_kbiplex(g, [0, 1], [0, 1, 2], 1)


def test_maximal_whole_graph(g):
    assert is_maximal_kbiplex(g, range(3), range(3), 1)


def test_non_maximal_subgraph(g):
    assert not is_maximal_kbiplex(g, [0, 1], [2], 1)


def test_full_right_initial_is_kbiplex():
    g = random_bipartite_gnp(n_left=6, n_right=4, p=0.4, seed=1)
    assert is_kbiplex(g, [], range(g.n_right), 3)


@pytest.mark.parametrize("k", [1, 2, 3])
def test_trivial_small_sets_always_kbiplex(k):
    # Any (L, R) with |L| <= k and |R| <= k is a k-biplex regardless of edges.
    g = BipartiteGraph.from_edges([], n_left=4, n_right=4)
    assert is_kbiplex(g, range(k), range(k), k)
    assert not is_kbiplex(g, range(k + 1), range(k + 1), k)
