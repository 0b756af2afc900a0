"""Synthetic ABIDE-like brain networks for the §VI-F case study.

116 ROI nodes mimicking the AAL atlas; nodes are paired L/R hemispheres
(even = left, odd = right) and partitioned into region groups. Two
uncertain graphs are planted so that the *discriminative* phenomenon of
the paper holds:

* ASD: a 3-clique-dense high-probability cluster entirely inside the
  occipital lobe, almost hemisphere-symmetric (exactly one node without
  its contralateral counterpart).
* TD: a cluster mostly occipital but reaching into the temporal lobe and
  the cerebellum, with two unpaired nodes (less symmetric).

Background co-activation edges are random with low probabilities, plus a
diffuse moderately-probable mesh so that the expected-density baseline
(EDS) spreads over many regions — reproducing the paper's finding that
EDS fails to discriminate ASD from TD while MPDS succeeds.
"""
from __future__ import annotations

import numpy as np

from ..core.uncertain import UncertainGraph

N_ROI = 116
REGIONS = {
    "occipital": range(0, 14),
    "temporal": range(14, 30),
    "cerebellum": range(30, 46),
    "other": range(46, 116),
}


def region_of(v: int) -> str:
    for name, rng in REGIONS.items():
        if v in rng:
            return name
    raise ValueError(v)


def _planted(seed: int, cluster: list[int]) -> UncertainGraph:
    g = np.random.default_rng(seed)
    probs: dict[tuple[int, int], float] = {}
    # background sparse noise
    for _ in range(900):
        u, v = int(g.integers(N_ROI)), int(g.integers(N_ROI))
        if u != v:
            probs[(min(u, v), max(u, v))] = float(g.uniform(0.02, 0.15))
    # diffuse mesh over many regions: a complete 20-ROI subgraph of
    # medium-probability co-activations. Its *expected* 3-clique density
    # slightly exceeds the planted cluster's, so the EDS latches onto it
    # (sprawling across regions, like the paper's Figures 10-11), but a
    # given world rarely realizes the exact mesh as the densest set.
    mesh = sorted(int(x) for x in g.choice(N_ROI, size=20, replace=False))
    for i, u in enumerate(mesh):
        for v in mesh[i + 1 :]:
            probs[(min(u, v), max(u, v))] = float(g.uniform(0.36, 0.42))
    # planted cluster: near-clique with strong co-activation
    for i, u in enumerate(cluster):
        for v in cluster[i + 1 :]:
            if g.random() < 0.92:
                probs[(min(u, v), max(u, v))] = float(g.uniform(0.75, 0.95))
    edges = sorted(probs)
    return UncertainGraph.from_edges(
        edges, [probs[e] for e in edges], n=N_ROI, meta={}
    )


def brain_networks(seed: int = 33) -> tuple[UncertainGraph, UncertainGraph]:
    """Return (G_TD, G_ASD)."""
    # ASD cluster: 7 occipital nodes = 3 L/R pairs (0,1), (2,3), (4,5)
    # plus the unpaired 6.
    asd_cluster = [0, 1, 2, 3, 4, 5, 6]
    # TD cluster: 5 occipital + 1 temporal (14) + 1 cerebellum (31):
    # pairs (0,1), (2,3); unpaired 4 (occ-L), 14 (temp-L), 31 (crbl-R)
    td_cluster = [0, 1, 2, 3, 4, 14, 31]
    g_td = _planted(seed, td_cluster)
    g_asd = _planted(seed + 1, asd_cluster)
    g_td.meta.update({"name": "brain_td", "cluster": td_cluster})
    g_asd.meta.update({"name": "brain_asd", "cluster": asd_cluster})
    return g_td, g_asd
