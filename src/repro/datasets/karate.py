"""Zachary's Karate Club as an uncertain graph.

Topology: the standard 34-node / 78-edge network (Zachary 1977, public
domain). Ground-truth split: the Mr. Hi vs Officer factions. Edge
probabilities follow the paper's model p = 1 − e^(−t/μ) with μ = 20
where t is the number of communications; absent the original
communication counts we simulate t ~ 1 + Poisson(2 + 4·cn(u,v)) where
cn is the number of common neighbors — members embedded in the same
clique interact more. This heterogeneity is what gives sampled worlds
a clear unique densest subgraph (Table VIII: #densest quartiles
{1,1,1}); homogeneous probabilities at the paper's stated mean put most
worlds in a degenerate matching regime with 2^k − 1 ties. Resulting
stats: mean ≈ .35, quartiles ≈ {.22, .33, .47} (paper reports .25 /
{.18, .26, .33}).
"""
from __future__ import annotations

import numpy as np

from ..core.uncertain import UncertainGraph

# fmt: off
_EDGES = [
    (0, 1), (0, 2), (0, 3), (0, 4), (0, 5), (0, 6), (0, 7), (0, 8),
    (0, 10), (0, 11), (0, 12), (0, 13), (0, 17), (0, 19), (0, 21),
    (0, 31), (1, 2), (1, 3), (1, 7), (1, 13), (1, 17), (1, 19), (1, 21),
    (1, 30), (2, 3), (2, 7), (2, 8), (2, 9), (2, 13), (2, 27), (2, 28),
    (2, 32), (3, 7), (3, 12), (3, 13), (4, 6), (4, 10), (5, 6), (5, 10),
    (5, 16), (6, 16), (8, 30), (8, 32), (8, 33), (9, 33), (13, 33),
    (14, 32), (14, 33), (15, 32), (15, 33), (18, 32), (18, 33), (19, 33),
    (20, 32), (20, 33), (22, 32), (22, 33), (23, 25), (23, 27), (23, 29),
    (23, 32), (23, 33), (24, 25), (24, 27), (24, 31), (25, 31), (26, 29),
    (26, 33), (27, 33), (28, 31), (28, 33), (29, 32), (29, 33), (30, 32),
    (30, 33), (31, 32), (31, 33), (32, 33),
]
_MR_HI = {0, 1, 2, 3, 4, 5, 6, 7, 8, 10, 11, 12, 13, 16, 17, 19, 21}
# fmt: on


def karate_club(seed: int = 42, mu: float = 20.0) -> UncertainGraph:
    """The Karate Club uncertain graph (34 nodes, 78 edges)."""
    g = np.random.default_rng(seed)
    adj: dict[int, set[int]] = {}
    for u, v in _EDGES:
        adj.setdefault(u, set()).add(v)
        adj.setdefault(v, set()).add(u)
    cn = np.array([len(adj[u] & adj[v]) for u, v in _EDGES])
    t = 1 + g.poisson(2.0 + 4.0 * cn)
    probs = 1.0 - np.exp(-t / mu)
    communities = {v: (0 if v in _MR_HI else 1) for v in range(34)}
    return UncertainGraph.from_edges(
        _EDGES, probs, n=34,
        meta={"name": "karate", "communities": communities},
    )
