"""Tests for (α, β)-core — local peeling, Spark peeling, and the oracle."""
import pytest

from repro.bipartite.core_decomp import (
    alpha_beta_core,
    alpha_beta_core_edges,
    theta_k_core,
)
from repro.bipartite.generators import powerlaw_bipartite, random_bipartite_gnp
from repro.bipartite.graph import BipartiteGraph
from repro.bipartite.spark_graph import edges_to_spark


def brute_core(g, alpha, beta):
    """Fixpoint by repeated full rescans — the obviously-correct version."""
    left = set(range(g.n_left))
    right = set(range(g.n_right))
    changed = True
    while changed:
        changed = False
        for v in list(left):
            if len(g.adj_l[v] & right) < alpha:
                left.discard(v)
                changed = True
        for u in list(right):
            if len(g.adj_r[u] & left) < beta:
                right.discard(u)
                changed = True
    return left, right


@pytest.mark.parametrize("alpha,beta", [(1, 1), (2, 2), (2, 3), (3, 1), (4, 4)])
@pytest.mark.parametrize("seed", [0, 1, 2])
def test_local_core_matches_brute(alpha, beta, seed):
    g = random_bipartite_gnp(n_left=12, n_right=10, p=0.3, seed=seed)
    assert alpha_beta_core(g, alpha, beta) == brute_core(g, alpha, beta)


def test_core_is_maximal_fixpoint():
    g = powerlaw_bipartite(n_left=30, n_right=30, n_edges=120, seed=5)
    left, right = alpha_beta_core(g, 2, 2)
    for v in left:
        assert len(g.adj_l[v] & right) >= 2
    for u in right:
        assert len(g.adj_r[u] & left) >= 2


def test_core_monotone_in_thresholds():
    g = powerlaw_bipartite(n_left=30, n_right=30, n_edges=150, seed=7)
    l1, r1 = alpha_beta_core(g, 1, 1)
    l2, r2 = alpha_beta_core(g, 2, 2)
    l3, r3 = alpha_beta_core(g, 3, 3)
    assert l3 <= l2 <= l1 and r3 <= r2 <= r1


def test_zero_thresholds_keep_everything():
    g = random_bipartite_gnp(n_left=5, n_right=5, p=0.3, seed=0)
    assert alpha_beta_core(g, 0, 0) == (set(range(5)), set(range(5)))


def test_theta_k_core_is_symmetric_core():
    g = random_bipartite_gnp(n_left=10, n_right=10, p=0.4, seed=3)
    assert theta_k_core(g, theta=4, k=1) == alpha_beta_core(g, 3, 3)
    # θ <= k degenerates to "no constraint".
    assert theta_k_core(g, theta=1, k=2) == alpha_beta_core(g, 0, 0)


@pytest.mark.parametrize("alpha,beta", [(1, 1), (2, 2), (3, 2)])
def test_spark_core_matches_local(spark, alpha, beta):
    g = powerlaw_bipartite(n_left=40, n_right=35, n_edges=220, seed=11)
    want_l, want_r = alpha_beta_core(g, alpha, beta)
    want_edges = sorted(
        (v, u) for v, u in g.edges() if v in want_l and u in want_r
    )
    got = alpha_beta_core_edges(edges_to_spark(spark, g), alpha, beta)
    got_edges = sorted(
        (int(r["src"]), int(r["dst"])) for r in got.collect()
    )
    assert got_edges == want_edges


def test_spark_core_empty_result(spark):
    g = random_bipartite_gnp(n_left=6, n_right=6, p=0.2, seed=2)
    got = alpha_beta_core_edges(edges_to_spark(spark, g), 50, 50)
    assert got.count() == 0


def test_spark_core_keeps_dense_block(spark):
    # Complete 4x4 block + pendant edges; (3,3)-core is exactly the block.
    edges = [(v, u) for v in range(4) for u in range(4)]
    edges += [(4, 0), (5, 1)]
    g = BipartiteGraph.from_edges(edges, n_left=6, n_right=5)
    got = alpha_beta_core_edges(edges_to_spark(spark, g), 3, 3)
    got_edges = sorted((int(r["src"]), int(r["dst"])) for r in got.collect())
    assert got_edges == [(v, u) for v in range(4) for u in range(4)]
