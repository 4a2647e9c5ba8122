"""Synthetic review data + random camouflage attack (Fig 13 workload).

The paper uses the Amazon Review "software" category (375,147 users ×
21,663 products, 459,436 reviews) and injects a FRAUDAR-style random
camouflage fraud block [21]: 2K fake users × 2K fake products, 200K fake
comments among them plus 200K camouflage comments toward real products,
with each fake user posting equally many fake and camouflage comments.

That dataset is not available offline, so this module generates the
closest synthetic equivalent: a power-law real review graph plus the same
injection procedure, with all sizes scaled down (defaults ≈ 1/20 on
users/products) while preserving the property the detectors key on — the
fraud block is much denser than the organic background, and camouflage
edges blur the fake users' profile toward real products. Scaling both
block density and background density together preserves which structures
(biclique / k-biplex / core / δ-QB) separate the block, which is what
Fig 13 measures.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from ..bipartite.generators import powerlaw_bipartite
from ..bipartite.graph import BipartiteGraph


@dataclass
class FraudScenario:
    """A review graph with an injected fraud block.

    Left vertices are users, right vertices are products. Ids
    ``>= n_real_users`` / ``>= n_real_products`` are the injected fakes.
    """

    graph: BipartiteGraph
    n_real_users: int
    n_real_products: int
    fake_users: frozenset[int] = field(repr=False)
    fake_products: frozenset[int] = field(repr=False)

    @property
    def fake_items(self) -> frozenset[tuple[str, int]]:
        """Ground truth as (side, id) pairs."""
        return frozenset(
            {("L", v) for v in self.fake_users}
            | {("R", u) for u in self.fake_products}
        )


def camouflage_attack(
    *,
    n_real_users: int = 1200,
    n_real_products: int = 900,
    n_real_reviews: int = 2200,
    n_fake_users: int = 30,
    n_fake_products: int = 30,
    n_fake_comments: int = 360,
    n_camouflage: int = 360,
    background_alpha: float = 0.75,
    background_alpha_right: float = 0.4,
    n_heavy_users: int = 80,
    n_popular_products: int = 150,
    n_heavy_reviews: int = 800,
    seed: int = 0,
) -> FraudScenario:
    """Build the scenario: organic power-law reviews + injected block.

    Fake comments connect random (fake user, fake product) pairs; the
    camouflage comments connect random (fake user, real product) pairs —
    each fake user gets exactly ``n_fake_comments/n_fake_users`` of the
    former and ``n_camouflage/n_fake_users`` of the latter, mirroring the
    paper's "each fake user has an equal number of fake comments and
    camouflage ones".
    """
    if n_fake_comments % n_fake_users or n_camouflage % n_fake_users:
        raise ValueError("comment counts must divide evenly among fake users")
    rng = np.random.default_rng(seed)
    real = powerlaw_bipartite(
        n_left=n_real_users,
        n_right=n_real_products,
        n_edges=n_real_reviews,
        alpha=background_alpha,
        alpha_right=background_alpha_right,
        seed=seed + 1,
    )
    edges = list(real.edges())
    # Enthusiast sub-population: a sparse uniform block of heavy users x
    # bestseller products (~3% density). Real review data has exactly
    # this second population; it is what keeps the (α,β)-core comparator
    # honest (the core flags these organic heavy vertices, tanking its
    # precision as in the paper) while staying far too sparse to contain
    # near-complete blocks like k-biplexes or bicliques.
    heavy_u = rng.choice(n_real_users, size=n_heavy_users, replace=False)
    popular_p = rng.choice(n_real_products, size=n_popular_products, replace=False)
    edges.extend(
        (int(heavy_u[a]), int(popular_p[b]))
        for a, b in zip(
            rng.integers(0, n_heavy_users, n_heavy_reviews),
            rng.integers(0, n_popular_products, n_heavy_reviews),
        )
    )
    per_user_fake = n_fake_comments // n_fake_users
    per_user_cam = n_camouflage // n_fake_users
    for i in range(n_fake_users):
        user = n_real_users + i
        targets = rng.choice(n_fake_products, size=per_user_fake, replace=False)
        edges.extend((user, n_real_products + int(t)) for t in targets)
        cam = rng.choice(n_real_products, size=per_user_cam, replace=False)
        edges.extend((user, int(t)) for t in cam)
    g = BipartiteGraph.from_edges(
        edges,
        n_left=n_real_users + n_fake_users,
        n_right=n_real_products + n_fake_products,
    )
    return FraudScenario(
        graph=g,
        n_real_users=n_real_users,
        n_real_products=n_real_products,
        fake_users=frozenset(range(n_real_users, n_real_users + n_fake_users)),
        fake_products=frozenset(
            range(n_real_products, n_real_products + n_fake_products)
        ),
    )
