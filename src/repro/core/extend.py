"""Deterministic extension to maximal k-biplexes and initial solutions.

Paper §3.1 Step 3 requires each local solution to extend to exactly *one*
maximal k-biplex via "a pre-set order on all vertices"; §3.2 defines the
initial solution H0 = (L0, R) of iTraversal. Both live here.

A single ascending pass is sufficient for maximality: addability is
monotone — once a vertex cannot be added to the current solution, growing
the solution only increases miss-counts, so it can never become addable
later. Tests assert the results against `is_maximal_kbiplex`.
"""
from __future__ import annotations

from ..bipartite.graph import BipartiteGraph, Solution
from ..bipartite.predicates import can_add_left, can_add_right


def extend_to_maximal(
    g: BipartiteGraph,
    left: frozenset[int],
    right: frozenset[int],
    k: int,
    *,
    allow_right: bool = True,
) -> Solution:
    """Grow (left, right) to a maximal k-biplex in ascending vertex order.

    With ``allow_right=False`` only left vertices are considered — used by
    iTraversal's right-shrinking mode (Algorithm 2 line 8), where the
    input is already right-maximal so the result is still a global MBP.
    """
    # Mutable sets during the pass (a frozenset copy per addition would be
    # quadratic on graphs with tens of thousands of vertices), and a
    # counting pre-filter: v can only join if δ(v, R) ≥ |R| − k, which is
    # read off a neighbour count over R's adjacency lists instead of
    # probing all |𝓛| vertices. The accepted set — hence the pre-set-order
    # determinism — is unchanged: skipped vertices fail `can_add_*` anyway.
    from collections import Counter

    lcur: set[int] = set(left)
    rcur: set[int] = set(right)
    cur = (lcur, rcur)  # predicates only read the sets

    def grow_pass(grow: set[int], fixed: set[int], adj_grow, adj_fixed,
                  n_grow: int, can_add) -> None:
        """One ascending pass adding vertices to ``grow`` (``fixed`` is
        the other side, constant during the pass)."""
        if not fixed:
            # Nothing constrains: every vertex joins (e.g. extending a
            # local solution whose right side is empty).
            grow.update(range(n_grow))
            return
        if len(fixed) <= k:
            # Every candidate passes its own miss bound (≤ |fixed| ≤ k);
            # only the fixed side's misses constrain, tracked
            # incrementally. Per candidate: one C-level subset test
            # against the current capacity-saturated ("tight") vertices.
            # Once every fixed vertex is tight, only common neighbours of
            # the whole fixed side can still join — iterate exactly those.
            miss = {y: len(grow) - len(adj_fixed[y] & grow) for y in fixed}
            tight = frozenset(y for y in fixed if miss[y] >= k)
            candidates: "object" = range(n_grow)
            restricted = False
            while True:
                for x in candidates:
                    if x in grow or not tight <= adj_grow[x]:
                        continue
                    bad = [y for y in fixed if y not in adj_grow[x]]
                    grow.add(x)
                    newly_tight = False
                    for y in bad:
                        miss[y] += 1
                        newly_tight |= miss[y] == k
                    if not newly_tight:
                        continue
                    tight = frozenset(y for y in fixed if miss[y] >= k)
                    if not restricted and len(tight) == len(fixed) and fixed:
                        # Resume after x on the sorted common-neighbour
                        # set; determinism is preserved since all skipped
                        # ids are non-addable from here on.
                        common = frozenset.intersection(
                            *(adj_fixed[y] for y in fixed)
                        )
                        candidates = sorted(c for c in common if c > x)
                        restricted = True
                        break
                else:
                    return
        # General case: x can only join if δ(x, fixed) ≥ |fixed| − k, read
        # off a neighbour count over the fixed side's adjacency lists
        # instead of probing all n_grow vertices.
        cnt: Counter[int] = Counter()
        for y in fixed:
            cnt.update(adj_fixed[y])
        need = len(fixed) - k
        for x in sorted(c for c, n in cnt.items() if n >= need and c not in grow):
            if can_add(g, cur, x, k):
                grow.add(x)

    grow_pass(lcur, rcur, g.adj_l, g.adj_r, g.n_left, can_add_left)
    if allow_right:
        grow_pass(rcur, lcur, g.adj_r, g.adj_l, g.n_right, can_add_right)
    return (frozenset(lcur), frozenset(rcur))


def initial_solution_left(g: BipartiteGraph, k: int) -> Solution:
    """iTraversal's H0 = (L0, R): start from (∅, R), greedily add left
    vertices in ascending order while the k-biplex property holds (§3.2).

    (∅, R) is always a k-biplex, and the result is right-full hence a
    global MBP."""
    return extend_to_maximal(g, frozenset(), frozenset(range(g.n_right)), k,
                             allow_right=False)


def initial_solution_any(g: BipartiteGraph, k: int) -> Solution:
    """bTraversal's arbitrary H0: greedy extension of the empty biplex."""
    return extend_to_maximal(g, frozenset(), frozenset(), k)
