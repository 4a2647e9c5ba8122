"""Connected components of a bipartite graph — local BFS and Spark
label propagation.

Used by the partition-parallel large-MBP enumerator
(`repro.distributed.partition`): for θ ≥ 2k+1 every large MBP is
connected (each left vertex touches ≥ |R|−k > |R|/2 right vertices, so
any two left vertices share a neighbour), hence confined to one
component and enumerable per-component independently.
"""
from __future__ import annotations

from collections import deque

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .graph import BipartiteGraph


def connected_components(g: BipartiteGraph) -> tuple[list[int], list[int]]:
    """Component label per vertex: (labels_left, labels_right).

    Labels are dense ints 0..c-1 in order of discovery from ascending
    left ids; isolated vertices get their own components.
    """
    label_l = [-1] * g.n_left
    label_r = [-1] * g.n_right
    comp = 0
    for start_side, start, labels in (
        *((("L", v, label_l)) for v in range(g.n_left)),
        *((("R", u, label_r)) for u in range(g.n_right)),
    ):
        if labels[start] != -1:
            continue
        queue: deque[tuple[str, int]] = deque([(start_side, start)])
        labels[start] = comp
        while queue:
            side, x = queue.popleft()
            if side == "L":
                for u in g.adj_l[x]:
                    if label_r[u] == -1:
                        label_r[u] = comp
                        queue.append(("R", u))
            else:
                for v in g.adj_r[x]:
                    if label_l[v] == -1:
                        label_l[v] = comp
                        queue.append(("L", v))
        comp += 1
    return label_l, label_r


def connected_components_edges(
    edges: DataFrame, *, max_rounds: int = 100
) -> DataFrame:
    """Distributed min-label propagation over the edge DataFrame.

    Returns edges annotated with a ``component`` column (the minimum
    vertex key reachable from the edge). Vertex keys: left v → 2v,
    right u → 2u+1, so the two id spaces never collide. Converges in
    O(diameter) rounds; each round re-materializes via localCheckpoint.
    """
    cur = edges.select(
        "src",
        "dst",
        F.least(2 * F.col("src"), 2 * F.col("dst") + 1).alias("component"),
    ).localCheckpoint(eager=True)
    for _ in range(max_rounds):
        min_l = cur.groupBy("src").agg(F.min("component").alias("cl"))
        min_r = cur.groupBy("dst").agg(F.min("component").alias("cr"))
        nxt = (
            cur.join(min_l, "src")
            .join(min_r, "dst")
            .select(
                "src",
                "dst",
                F.least("component", "cl", "cr").alias("component"),
            )
        ).localCheckpoint(eager=True)
        changed = (
            nxt.alias("n")
            .join(
                cur.alias("c"),
                (F.col("n.src") == F.col("c.src"))
                & (F.col("n.dst") == F.col("c.dst")),
            )
            .where(F.col("n.component") != F.col("c.component"))
            .limit(1)
            .count()
        )
        cur = nxt
        if changed == 0:
            return cur
    raise RuntimeError(f"label propagation did not converge in {max_rounds} rounds")
