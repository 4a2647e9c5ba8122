"""The EnumAlmostSat procedure (paper §4).

Given a maximal k-biplex H = (L, R) and a vertex v outside H, the
almost-satisfying graph G[H ∪ v] is not a k-biplex but becomes one if v
is dropped. `enum_almost_sat` enumerates all *local solutions*: induced
subgraphs of G[H ∪ v] that contain v, are k-biplexes, and are maximal
within G[H ∪ v].

Four refined-enumeration variants (Fig 12) are selected by flags:

* ``r2=False`` → R 1.0 (§4.1): enumerate every R'' ⊆ R_enum, |R''| ≤ k.
* ``r2=True``  → R 2.0 (§4.2): additionally prune (Lemma 4.2) every R''
  with |R''| < k that leaves some vertex of R¹_enum unchosen.
* ``l2=False`` → L 1.0 (§4.3): enumerate removal sets L̄' ⊆ L_remo with
  |L̄'| ≤ |R²''| in ascending size.
* ``l2=True``  → L 2.0 (§4.4): additionally prune supersets of removal
  sets that already produced a local solution.

All four variants return the same set of local solutions (the prunes only
skip candidates that provably fail), which the tests assert against the
brute-force reference `enum_almost_sat_brute`.

`enum_almost_sat_inflation` is the baseline implementation used by
bTraversal and by Fig 12's "Inflation" bar: inflate the almost-satisfying
graph into a general graph and enumerate maximal (k+1)-plexes containing v.
"""
from __future__ import annotations

from itertools import combinations
from typing import Iterator

from ..baselines.kplex import enum_maximal_kplexes, inflate
from ..bipartite.graph import BipartiteGraph, Solution
from ..bipartite.predicates import can_add_left, can_add_right, is_kbiplex


def _enum_left(
    g: BipartiteGraph,
    left: frozenset[int],
    right: frozenset[int],
    v: int,
    k: int,
    *,
    l2: bool,
    r2: bool,
    r_min: int = 0,
) -> Iterator[Solution]:
    """Local solutions of the almost-satisfying graph (L ∪ {v}, R), v ∈ 𝓛.

    Precondition: (left, right) is a k-biplex of ``g``.
    ``r_min`` prunes enumerations whose right side would end below the
    threshold (large-MBP "local solution pruning", §5).
    """
    adjv = g.adj_l[v]
    r_keep = right & adjv          # Lemma 4.1: in every local solution
    r_enum = right - adjv
    # §4.2 partition of R_enum by slack against L.
    r1 = sorted(u for u in r_enum if g.miss_r(u, left) <= k - 1)
    r2_part = sorted(u for u in r_enum if g.miss_r(u, left) >= k)
    n_r1 = len(r1)

    for t1 in range(min(k, n_r1) + 1):
        for r1_pick in combinations(r1, t1):
            for t2 in range(min(k - t1, len(r2_part)) + 1):
                total = t1 + t2
                if r2 and total < k and t1 < n_r1:
                    # Lemma 4.2: some u ∈ R¹_enum \ R''₁ could always be
                    # added, so no candidate with this R' is maximal.
                    continue
                if len(r_keep) + total < r_min:
                    continue
                for r2_pick in combinations(r2_part, t2):
                    r2_set = frozenset(r2_pick)
                    r_extra = frozenset(r1_pick) | r2_set
                    r_prime = r_keep | r_extra
                    yield from _enum_removals(
                        g, left, v, k, r_prime, r_extra, r2_set, r_enum, l2
                    )


def _enum_removals(
    g: BipartiteGraph,
    left: frozenset[int],
    v: int,
    k: int,
    r_prime: frozenset[int],
    r_extra: frozenset[int],
    r2_set: frozenset[int],
    r_enum: frozenset[int],
    l2: bool,
) -> Iterator[Solution]:
    """§4.3/4.4: enumerate minimal removal sets L̄' ⊆ L_remo for one R'."""
    # Only vertices disconnected from some u ∈ R²'' can be in a minimal
    # removal set (§4.3; every other removed vertex stays re-addable).
    l_remo = sorted(x for x in left if r2_set - g.adj_l[x])
    max_rm = len(r2_set)
    minimal_hits: list[frozenset[int]] = []
    for t in range(min(max_rm, len(l_remo)) + 1):
        for rm_pick in combinations(l_remo, t):
            rm = frozenset(rm_pick)
            if l2 and any(hit <= rm for hit in minimal_hits):
                continue  # §4.4: supersets of a success are non-maximal
            # Feasibility: each u ∈ R²'' sits at k+1 misses in
            # (L ∪ {v}, R'); removing one of its non-neighbours fixes it.
            if any(rm <= g.adj_r[u] for u in r2_set):
                continue
            l_prime = left - rm
            cand: Solution = (l_prime | {v}, r_prime)
            if _locally_maximal(g, k, cand, rm, r_enum - r_extra, len(r_extra)):
                if l2:
                    minimal_hits.append(rm)
                yield cand


def _locally_maximal(
    g: BipartiteGraph,
    k: int,
    cand: Solution,
    removed_left: frozenset[int],
    leftover_right: frozenset[int],
    v_misses: int,
) -> bool:
    """Maximality of ``cand`` within the almost-satisfying graph.

    The only vertices of the almost-satisfying graph outside ``cand`` are
    the removed left vertices and the unchosen R_enum vertices.
    """
    for x in removed_left:
        if can_add_left(g, cand, x, k):
            return False
    if v_misses < k:  # otherwise v blocks every leftover right vertex
        for u in leftover_right:
            if can_add_right(g, cand, u, k):
                return False
    return True


def enum_almost_sat(
    g: BipartiteGraph,
    sol: Solution,
    v: int,
    k: int,
    *,
    side: str = "L",
    l2: bool = True,
    r2: bool = True,
    r_min: int = 0,
) -> Iterator[Solution]:
    """Enumerate local solutions of G[H ∪ v]; ``side`` is v's side.

    For ``side='R'`` the procedure runs on the transposed graph (the
    refinement lemmas are side-symmetric) and results are swapped back.
    """
    left, right = sol
    if side == "L":
        yield from _enum_left(g, left, right, v, k, l2=l2, r2=r2, r_min=r_min)
    elif side == "R":
        if r_min:
            raise ValueError("r_min (θ pruning) is defined for side='L' only")
        gt = g.transpose()
        for a, b in _enum_left(gt, right, left, v, k, l2=l2, r2=r2):
            yield (b, a)
    else:
        raise ValueError(f"side must be 'L' or 'R', got {side!r}")


def enum_almost_sat_inflation(
    g: BipartiteGraph, sol: Solution, v: int, k: int, *, side: str = "L"
) -> Iterator[Solution]:
    """Inflation-based EnumAlmostSat (bTraversal's implementation, §6).

    Build the inflated general graph of the almost-satisfying graph and
    enumerate maximal (k+1)-plexes containing v; each corresponds 1:1 to
    a local solution (a k-biplex on the bipartite graph is a (k+1)-plex
    on the inflation and vice versa).
    """
    left, right = sol
    if side == "L":
        lv = sorted(left | {v})
        rv = sorted(right)
        anchor_left = True
    elif side == "R":
        lv = sorted(left)
        rv = sorted(right | {v})
        anchor_left = False
    else:
        raise ValueError(f"side must be 'L' or 'R', got {side!r}")
    l_pos = {x: i for i, x in enumerate(lv)}
    r_pos = {u: j for j, u in enumerate(rv)}
    cross = [
        frozenset(r_pos[u] for u in g.adj_l[x] if u in r_pos) for x in lv
    ]
    adj = inflate(len(lv), len(rv), cross)
    seed = l_pos[v] if anchor_left else len(lv) + r_pos[v]
    for plex in enum_maximal_kplexes(adj, k + 1, require=seed):
        lp = frozenset(lv[i] for i in plex if i < len(lv))
        rp = frozenset(rv[i - len(lv)] for i in plex if i >= len(lv))
        yield (lp, rp)


def enum_almost_sat_brute(
    g: BipartiteGraph, sol: Solution, v: int, k: int, *, side: str = "L"
) -> set[tuple[tuple[int, ...], tuple[int, ...]]]:
    """Reference implementation by subset enumeration. Tests only."""
    from ..bipartite.graph import solution_key

    left, right = sol
    if side == "L":
        all_left, all_right = left | {v}, right
    else:
        all_left, all_right = left, right | {v}
    ls = sorted(all_left)
    rs = sorted(all_right)
    cands = []
    for lm in range(1 << len(ls)):
        lsub = frozenset(x for i, x in enumerate(ls) if lm >> i & 1)
        if (side == "L") and v not in lsub:
            continue
        for rm_ in range(1 << len(rs)):
            rsub = frozenset(u for j, u in enumerate(rs) if rm_ >> j & 1)
            if (side == "R") and v not in rsub:
                continue
            if is_kbiplex(g, lsub, rsub, k):
                cands.append((lsub, rsub))
    out = set()
    for lsub, rsub in cands:
        maximal = True
        for x in all_left - lsub:
            if can_add_left(g, (lsub, rsub), x, k):
                maximal = False
                break
        if maximal:
            for u in all_right - rsub:
                if can_add_right(g, (lsub, rsub), u, k):
                    maximal = False
                    break
        if maximal:
            out.add(solution_key((lsub, rsub)))
    return out
