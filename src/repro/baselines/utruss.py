"""Probabilistic (k, γ)-truss decomposition (Huang et al., SIGMOD 2016).

The γ-support of an edge e=(u,v) is the largest s such that
Pr[e exists ∧ e participates in ≥ s triangles] ≥ γ; the triangle count
is Poisson-binomial over the common neighbors w with success prob
p(u,w)·p(v,w), conditioned on e existing (factor p(e)). Peeling edges by
minimum γ-support (k = support + 2) yields truss numbers; the innermost
γ-truss is the node set of the max-truss-number edges.
"""
from __future__ import annotations

import heapq

import numpy as np

from ..core.uncertain import UncertainGraph


def _gamma_support(pe: float, tri_probs: list[float], gamma: float) -> int:
    """max s with pe · Pr[PoisBin(tri_probs) ≥ s] ≥ γ (−1 if pe < γ)."""
    if pe < gamma:
        return -1
    dist = np.array([1.0])
    for p in tri_probs:
        nxt = np.zeros(len(dist) + 1)
        nxt[: len(dist)] += dist * (1 - p)
        nxt[1:] += dist * p
        dist = nxt
    tail = np.cumsum(dist[::-1])[::-1] * pe
    ks = np.flatnonzero(tail >= gamma)
    return int(ks.max()) if len(ks) else -1


def gamma_truss_numbers(
    ug: UncertainGraph, gamma: float = 0.1
) -> dict[tuple[int, int], int]:
    """γ-truss number per edge (k = 2 + peeled min support)."""
    adj: list[dict[int, float]] = [dict() for _ in range(ug.n)]
    p_of: dict[tuple[int, int], float] = {}
    for (u, v), p in zip(ug.edges, ug.probs):
        u, v = int(u), int(v)
        adj[u][v] = float(p)
        adj[v][u] = float(p)
        p_of[(u, v)] = float(p)
    alive = set(p_of)

    def support(e: tuple[int, int]) -> int:
        u, v = e
        tri = [
            adj[u][w] * adj[v][w]
            for w in set(adj[u]) & set(adj[v])
        ]
        return _gamma_support(p_of[e], tri, gamma)

    sup = {e: support(e) for e in alive}
    heap = [(s, e) for e, s in sup.items()]
    heapq.heapify(heap)
    truss: dict[tuple[int, int], int] = {}
    k = -1  # support −1 (pe < γ) maps to truss number 1
    while heap:
        s, e = heapq.heappop(heap)
        if e not in alive or s != sup[e]:
            continue
        alive.discard(e)
        k = max(k, s)
        truss[e] = k + 2
        u, v = e
        del adj[u][v]
        del adj[v][u]
        for w in set(adj[u]) & set(adj[v]):
            for f in ((min(u, w), max(u, w)), (min(v, w), max(v, w))):
                if f in alive:
                    ns = support(f)
                    if ns != sup[f]:
                        sup[f] = ns
                        heapq.heappush(heap, (ns, f))
    return truss


def innermost_gamma_truss(
    ug: UncertainGraph, gamma: float = 0.1
) -> frozenset[int]:
    """Node set of the innermost (max-k) γ-truss; empty if no edge
    clears the probability threshold at all."""
    truss = gamma_truss_numbers(ug, gamma)
    if not truss:
        return frozenset()
    kmax = max(truss.values())
    if kmax <= 1:  # only edges with pe < γ (support −1 → k = 1)
        return frozenset()
    return frozenset(
        v for e, t in truss.items() if t == kmax for v in e
    )
