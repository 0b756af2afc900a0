"""LastFM-like uncertain social graph (6 899 nodes, ~23 696 edges).

Topology: Barabási–Albert preferential attachment at the paper's size.
Edge probabilities use the paper's own LastFM model: the reciprocal of
the larger endpoint degree (Ke et al. TKDE'22), so hub edges are
unreliable and peripheral cliques are relatively strong.
"""
from __future__ import annotations

import numpy as np

from ..core.uncertain import UncertainGraph
from ..synth_data import ba_edges


def lastfm(seed: int = 11, n: int = 6_899, scale: float = 1.1) -> UncertainGraph:
    """``scale`` multiplies the reciprocal-degree probabilities.

    scale = 1.1 is calibrated so sampled worlds sit in the paper's
    LastFM regime: maximum density 1 with a handful of node-disjoint
    density-1 components whose unions make the number of densest
    subgraphs per world explode combinatorially — Table VIII reports
    quartiles {15, 127, 1023} = 2^k − 1 shapes and mean ≈ 2613; at this
    scale we measure mean ≈ 2640 with quartiles {5, 63, 242}.
    """
    edges = ba_edges(n=n, m_attach=3, seed=seed, extra_triads=0.15)
    deg = np.zeros(n, dtype=np.int64)
    np.add.at(deg, edges[:, 0], 1)
    np.add.at(deg, edges[:, 1], 1)
    probs = np.clip(
        scale / np.maximum(deg[edges[:, 0]], deg[edges[:, 1]]), 0.001, 0.95
    )
    return UncertainGraph.from_edges(
        edges, probs, n=n, meta={"name": "lastfm"}
    )
