"""Synthetic bipartite graph generators (local, numpy-based).

These produce deterministic edge arrays; `repro.bipartite.spark_graph`
lifts them into Spark DataFrames for the distributed pipelines. Two
families are needed by the paper's evaluation:

* Erdős–Rényi bipartite graphs (§6 "synthetic datasets"): ``n`` vertices
  split across the two sides, ``density * n`` random edges, where density
  is |E|/(|L|+|R|) exactly as the paper defines it.
* Power-law (Zipf-degree) bipartite graphs: stand-ins for the konect.cc
  real datasets of Table 1, which are unavailable offline. Real
  affiliation/authorship networks are heavy-tailed, and degree skew is
  what drives the enumerators' behaviour, so the stand-ins match each
  dataset's |L|, |R|, |E| (possibly scaled) and use Zipf-ish degrees.
"""
from __future__ import annotations

import numpy as np

from .graph import BipartiteGraph


def erdos_renyi_bipartite(
    *,
    n_vertices: int,
    density: float,
    left_fraction: float = 0.5,
    seed: int = 0,
) -> BipartiteGraph:
    """ER bipartite graph with |E| = round(density * n_vertices).

    Edge endpoints are uniform on each side; duplicate edges collapse (so
    realized |E| can be slightly lower at high density, matching how the
    paper's generator "randomly creates a certain number of edges").
    """
    if n_vertices < 2:
        raise ValueError("need at least one vertex per side")
    n_left = max(1, int(n_vertices * left_fraction))
    n_right = max(1, n_vertices - n_left)
    n_edges = int(round(density * n_vertices))
    g = np.random.default_rng(seed)
    src = g.integers(0, n_left, n_edges)
    dst = g.integers(0, n_right, n_edges)
    return BipartiteGraph.from_edges(
        zip(src.tolist(), dst.tolist()), n_left=n_left, n_right=n_right
    )


def powerlaw_bipartite(
    *,
    n_left: int,
    n_right: int,
    n_edges: int,
    alpha: float = 1.2,
    alpha_right: float | None = None,
    seed: int = 0,
) -> BipartiteGraph:
    """Bipartite graph with Zipf-skewed endpoint popularity.

    Both endpoints of each edge are drawn from independent Zipf-weighted
    distributions over their side (exponent ``alpha`` on the left,
    ``alpha_right`` — defaulting to ``alpha`` — on the right; real
    review graphs have very different skew per side), then vertex ids are
    shuffled so the hubs are not clustered at id 0. Duplicates collapse.
    """
    rng = np.random.default_rng(seed)

    def zipf_draw(n: int, size: int, a: float) -> np.ndarray:
        w = 1.0 / np.arange(1, n + 1, dtype=np.float64) ** a
        w /= w.sum()
        ranks = rng.choice(n, size=size, p=w)
        perm = rng.permutation(n)
        return perm[ranks]

    src = zipf_draw(n_left, n_edges, alpha)
    dst = zipf_draw(n_right, n_edges, alpha if alpha_right is None else alpha_right)
    return BipartiteGraph.from_edges(
        zip(src.tolist(), dst.tolist()), n_left=n_left, n_right=n_right
    )


def random_bipartite_gnp(
    *, n_left: int, n_right: int, p: float, seed: int = 0
) -> BipartiteGraph:
    """G(n_left, n_right, p): each of the n_left*n_right edges i.i.d.

    Used by the differential tests (small, dense-ish graphs where MBPs
    abound) and by the fraud-block injector.
    """
    rng = np.random.default_rng(seed)
    mask = rng.random((n_left, n_right)) < p
    src, dst = np.nonzero(mask)
    return BipartiteGraph.from_edges(
        zip(src.tolist(), dst.tolist()), n_left=n_left, n_right=n_right
    )
