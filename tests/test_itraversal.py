"""Differential tests for the reverse-search traversal engine.

The decisive property: every configuration (bTraversal, each iTraversal
ablation, every EnumAlmostSat variant, both exclusion modes) enumerates
*exactly* the set of maximal k-biplexes that brute force finds — on many
random graphs, including hypothesis-generated ones. This is also how we
validate the exclusion-strategy rule, whose proof lives in the paper's
offline technical report (see module docstring of itraversal.py).
"""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.bipartite.bruteforce import all_maximal_kbiplexes
from repro.bipartite.generators import random_bipartite_gnp
from repro.bipartite.graph import BipartiteGraph, solution_key
from repro.core.itraversal import (
    VARIANTS,
    TraversalStats,
    btraversal,
    itraversal,
    traverse,
)


def keys(it):
    return {solution_key(s) for s in it}


CONFIGS = {
    "bTraversal": dict(left_anchored=False, right_shrinking=False, exclusion=None),
    "iTraversal-ES-RS": dict(left_anchored=True, right_shrinking=False, exclusion=None),
    "iTraversal-ES": dict(left_anchored=True, right_shrinking=True, exclusion=None),
    "iTraversal(candidate)": dict(
        left_anchored=True, right_shrinking=True, exclusion="candidate"
    ),
    "iTraversal(link)": dict(
        left_anchored=True, right_shrinking=True, exclusion="link"
    ),
}


@pytest.mark.parametrize("name,cfg", CONFIGS.items(), ids=list(CONFIGS))
@pytest.mark.parametrize("k", [1, 2])
@pytest.mark.parametrize("seed,p", [(0, 0.5), (1, 0.35), (2, 0.65), (3, 0.5)])
def test_configs_match_bruteforce(name, cfg, k, seed, p):
    g = random_bipartite_gnp(n_left=5, n_right=5, p=p, seed=seed)
    want = all_maximal_kbiplexes(g, k)
    got = keys(traverse(g, k, **cfg))
    assert got == want, f"{name} diverged from brute force"


@pytest.mark.parametrize("local_enum", ["l1r1", "l1r2", "l2r1", "l2r2", "inflation"])
@pytest.mark.parametrize("k", [1, 2])
def test_local_enum_variants_complete(local_enum, k):
    g = random_bipartite_gnp(n_left=5, n_right=4, p=0.5, seed=5)
    want = all_maximal_kbiplexes(g, k)
    assert keys(itraversal(g, k, local_enum=local_enum)) == want


@pytest.mark.parametrize("k", [1, 2])
def test_btraversal_inflation_complete(k):
    g = random_bipartite_gnp(n_left=4, n_right=5, p=0.45, seed=8)
    want = all_maximal_kbiplexes(g, k)
    assert keys(btraversal(g, k)) == want
    assert keys(btraversal(g, k, local_enum="l2r2")) == want


def test_no_duplicates():
    g = random_bipartite_gnp(n_left=6, n_right=5, p=0.5, seed=2)
    out = [solution_key(s) for s in itraversal(g, 1)]
    assert len(out) == len(set(out))


def test_alternating_output_same_set():
    g = random_bipartite_gnp(n_left=5, n_right=5, p=0.5, seed=4)
    a = keys(itraversal(g, 1, alternate_output=True))
    b = keys(itraversal(g, 1, alternate_output=False))
    assert a == b


def test_lazy_first_n():
    g = random_bipartite_gnp(n_left=6, n_right=6, p=0.5, seed=6)
    import itertools

    full = list(itraversal(g, 1))
    first3 = list(itertools.islice(itraversal(g, 1), 3))
    assert first3 == full[:3]


@pytest.mark.parametrize("k", [1, 2])
def test_link_counts_monotone_sparsification(k):
    """Fig 3/11: |links(𝒢)| >= |links(𝒢_L)| >= |links(𝒢_R)| >= |links(𝒢_E)|."""
    g = random_bipartite_gnp(n_left=5, n_right=5, p=0.55, seed=10)
    counts = {}
    for name, make in VARIANTS.items():
        st_ = TraversalStats()
        list(make(g, k, stats=st_))
        counts[name] = st_.links
    assert (
        counts["bTraversal"]
        >= counts["iTraversal-ES-RS"]
        >= counts["iTraversal-ES"]
        >= counts["iTraversal"]
    )
    assert counts["iTraversal"] < counts["bTraversal"]


def test_stats_populated():
    g = random_bipartite_gnp(n_left=5, n_right=5, p=0.5, seed=1)
    st_ = TraversalStats()
    n = len(list(itraversal(g, 1, stats=st_)))
    assert st_.solutions == n
    assert st_.expansions >= 1
    assert st_.links >= n - 1  # a DFS tree alone has n-1 links
    d = st_.as_dict()
    assert d["solutions"] == n


def test_invalid_configs_rejected():
    g = random_bipartite_gnp(n_left=3, n_right=3, p=0.5, seed=0)
    with pytest.raises(ValueError):
        list(traverse(g, 0))
    with pytest.raises(ValueError):
        list(traverse(g, 1, left_anchored=False, right_shrinking=True))
    with pytest.raises(ValueError):
        list(traverse(g, 1, left_anchored=False, exclusion="link",
                      right_shrinking=False))
    with pytest.raises(ValueError):
        list(traverse(g, 1, exclusion="bogus"))
    with pytest.raises(ValueError):
        list(traverse(g, 1, local_enum="l3r9"))
    with pytest.raises(ValueError):
        list(
            traverse(g, 1, theta=2, right_shrinking=False, left_anchored=True,
                     exclusion=None)
        )


def test_edge_cases_tiny_graphs():
    for k in (1, 2):
        g = BipartiteGraph.from_edges([], n_left=2, n_right=2)
        assert keys(itraversal(g, k)) == all_maximal_kbiplexes(g, k)
        g2 = BipartiteGraph.from_biadjacency([[1]])
        assert keys(itraversal(g2, k)) == all_maximal_kbiplexes(g2, k)


def test_star_graph():
    g = BipartiteGraph.from_edges([(0, u) for u in range(5)], n_left=4, n_right=5)
    for k in (1, 2):
        assert keys(itraversal(g, k)) == all_maximal_kbiplexes(g, k)
        assert keys(btraversal(g, k)) == all_maximal_kbiplexes(g, k)


@settings(max_examples=60, deadline=None)
@given(
    bits=st.integers(min_value=0, max_value=2**20 - 1),
    k=st.integers(min_value=1, max_value=2),
)
def test_hypothesis_itraversal_complete(bits, k):
    rows = [[(bits >> (i * 5 + j)) & 1 for j in range(5)] for i in range(4)]
    g = BipartiteGraph.from_biadjacency(rows)
    want = all_maximal_kbiplexes(g, k)
    assert keys(itraversal(g, k)) == want
    assert keys(itraversal(g, k, exclusion="candidate")) == want
    assert keys(itraversal(g, k, exclusion=None)) == want


@settings(max_examples=25, deadline=None)
@given(bits=st.integers(min_value=0, max_value=2**20 - 1))
def test_hypothesis_btraversal_complete(bits):
    rows = [[(bits >> (i * 5 + j)) & 1 for j in range(5)] for i in range(4)]
    g = BipartiteGraph.from_biadjacency(rows)
    assert keys(btraversal(g, 1, local_enum="l2r2")) == all_maximal_kbiplexes(g, 1)
