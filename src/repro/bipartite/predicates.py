"""k-biplex predicates (paper §2).

These are the *ground truth* checks: deliberately simple and used by the
brute-force oracle and by tests to validate the optimized enumerators.
"""
from __future__ import annotations

from typing import Iterable

from .graph import BipartiteGraph, Solution


def is_kbiplex(g: BipartiteGraph, left: Iterable[int], right: Iterable[int], k: int) -> bool:
    """Definition 2.1: every v∈L misses ≤ k of R, every u∈R misses ≤ k of L."""
    lset, rset = frozenset(left), frozenset(right)
    return all(g.miss_l(v, rset) <= k for v in lset) and all(
        g.miss_r(u, lset) <= k for u in rset
    )


def can_add_left(g: BipartiteGraph, sol: Solution, v: int, k: int) -> bool:
    """Is (L∪{v}, R) still a k-biplex, given (L, R) already is one?

    Only two kinds of constraint can break: v's own misses against R, and
    the misses of right vertices *disconnected from v* (each gains one).
    """
    left, right = sol
    adj = g.adj_l[v]
    if len(right) - len(adj & right) > k:
        return False
    for u in right:
        if u not in adj and len(left) - len(g.adj_r[u] & left) > k - 1:
            return False
    return True


def can_add_right(g: BipartiteGraph, sol: Solution, u: int, k: int) -> bool:
    """Is (L, R∪{u}) still a k-biplex, given (L, R) already is one?"""
    left, right = sol
    adj = g.adj_r[u]
    if len(left) - len(adj & left) > k:
        return False
    for v in left:
        if v not in adj and len(right) - len(g.adj_l[v] & right) > k - 1:
            return False
    return True


def is_maximal_kbiplex(
    g: BipartiteGraph, left: Iterable[int], right: Iterable[int], k: int
) -> bool:
    """Definition 2.3: a k-biplex not extendable by any single vertex.

    For hereditary properties, non-extendability by one vertex is exactly
    subset-maximality: any strictly larger k-biplex would (hereditarily)
    yield a one-vertex extension.
    """
    sol = (frozenset(left), frozenset(right))
    if not is_kbiplex(g, sol[0], sol[1], k):
        return False
    for v in range(g.n_left):
        if v not in sol[0] and can_add_left(g, sol, v, k):
            return False
    for u in range(g.n_right):
        if u not in sol[1] and can_add_right(g, sol, u, k):
            return False
    return True
