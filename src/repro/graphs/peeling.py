"""Peeling algorithms: Charikar edge peel and instance-based peels.

``charikar_peel`` gives the classic 1/2-approximation for edge density —
used as the lower bound ρ̃ that prunes each sampled world to its
⌈ρ̃⌉-core before the exact flow computation (Algorithm 1, Line 5).

``instance_peel`` generalizes to h-clique / pattern density: instances
are node tuples (the h-cliques or ψ-instances); the density of a node
set is (#instances fully inside) / |set|. It also powers the
(k, h)-core / (k, ψ)-core (``instance_core``) and the heuristic
dense-subgraph method of §III-C.
"""
from __future__ import annotations

import heapq
from fractions import Fraction

import numpy as np

from .graph import degrees


def charikar_peel(edges: np.ndarray, n: int) -> tuple[Fraction, set[int]]:
    """Greedy min-degree peel; returns (best density, best suffix node set).

    The returned density is an *achieved* density, hence a valid lower
    bound ρ̃ ≤ ρ*; it is also ≥ ρ*/2 (Charikar 2000).
    """
    deg = degrees(edges, n)
    alive = deg > 0
    n_alive = int(alive.sum())
    m_alive = len(edges)
    if m_alive == 0:
        return Fraction(0), set()
    adj: list[list[int]] = [[] for _ in range(n)]
    for u, v in edges:
        adj[u].append(int(v))
        adj[v].append(int(u))
    heap = [(int(deg[v]), int(v)) for v in range(n) if alive[v]]
    heapq.heapify(heap)
    best = Fraction(m_alive, n_alive)
    removal_order: list[int] = []
    cur_deg = deg.copy()
    removed = np.zeros(n, dtype=bool)
    while n_alive > 0 and heap:
        d, v = heapq.heappop(heap)
        if removed[v] or (not alive[v]) or d != cur_deg[v]:
            continue
        removed[v] = True
        removal_order.append(v)
        n_alive -= 1
        m_alive -= int(cur_deg[v])
        for w in adj[v]:
            if alive[w] and not removed[w]:
                cur_deg[w] -= 1
                heapq.heappush(heap, (int(cur_deg[w]), int(w)))
        if n_alive > 0:
            dens = Fraction(m_alive, n_alive)
            if dens > best:
                best = dens
    # Reconstruct the best suffix: the alive set right before density peaked.
    # Cheap second pass: replay removals tracking density.
    deg2 = degrees(edges, n)
    alive_set = {v for v in range(n) if deg2[v] > 0}
    m2 = len(edges)
    best_set = set(alive_set)
    best2 = Fraction(m2, len(alive_set))
    cur = deg2.copy()
    for v in removal_order:
        alive_set.discard(v)
        m2 -= int(cur[v])
        for w in adj[v]:
            if w in alive_set:
                cur[w] -= 1
        cur[v] = 0
        if alive_set:
            dens = Fraction(m2, len(alive_set))
            if dens > best2:
                best2 = dens
                best_set = set(alive_set)
    assert best2 == best
    return best, best_set


def instance_peel(
    instances: list[tuple[int, ...]], n: int
) -> tuple[Fraction, set[int], list[int], list[Fraction], list[int]]:
    """Min-instance-degree peel for clique/pattern density.

    Returns ``(best_density, best_suffix_set, removal_order,
    density_after_each_removal, degree_at_each_removal)``. The degree
    trace gives core numbers for free: cn(v) = running max of the popped
    degree up to v's removal (Batagelj–Zaversnik). Nodes not in any
    instance are treated as removed up front (they can never be in a
    densest subgraph with positive density).
    """
    inst_of: list[list[int]] = [[] for _ in range(n)]
    for i, inst in enumerate(instances):
        for v in inst:
            inst_of[v].append(i)
    deg = np.array([len(inst_of[v]) for v in range(n)], dtype=np.int64)
    alive = deg > 0
    n_alive = int(alive.sum())
    if not instances or n_alive == 0:
        return Fraction(0), set(), [], [], []
    inst_alive = np.ones(len(instances), dtype=bool)
    n_inst = len(instances)
    heap = [(int(deg[v]), int(v)) for v in range(n) if alive[v]]
    heapq.heapify(heap)
    best = Fraction(n_inst, n_alive)
    best_set = {v for v in range(n) if alive[v]}
    cur_set = set(best_set)
    removal_order: list[int] = []
    densities: list[Fraction] = []
    pop_degrees: list[int] = []
    removed = np.zeros(n, dtype=bool)
    while n_alive > 0 and heap:
        d, v = heapq.heappop(heap)
        if removed[v] or d != deg[v]:
            continue
        removed[v] = True
        removal_order.append(v)
        pop_degrees.append(int(d))
        cur_set.discard(v)
        n_alive -= 1
        for i in inst_of[v]:
            if inst_alive[i]:
                inst_alive[i] = False
                n_inst -= 1
                for w in instances[i]:
                    if w != v and not removed[w]:
                        deg[w] -= 1
                        heapq.heappush(heap, (int(deg[w]), int(w)))
        if n_alive > 0:
            dens = Fraction(n_inst, n_alive)
            densities.append(dens)
            if dens > best:
                best = dens
                best_set = set(cur_set)
        else:
            densities.append(Fraction(0))
    return best, best_set, removal_order, densities, pop_degrees


def instance_core(
    instances: list[tuple[int, ...]], n: int, k: int
) -> set[int]:
    """(k, ·)-core w.r.t. instance degree: maximal node set where every
    node is contained in ≥ k surviving instances (instances count only
    if all their nodes survive)."""
    inst_of: list[list[int]] = [[] for _ in range(n)]
    for i, inst in enumerate(instances):
        for v in inst:
            inst_of[v].append(i)
    deg = np.array([len(inst_of[v]) for v in range(n)], dtype=np.int64)
    alive = deg > 0
    inst_alive = np.ones(len(instances), dtype=bool)
    queue = [v for v in range(n) if alive[v] and deg[v] < k]
    for v in queue:
        alive[v] = False
    while queue:
        v = queue.pop()
        for i in inst_of[v]:
            if inst_alive[i]:
                inst_alive[i] = False
                for w in instances[i]:
                    if w != v and alive[w]:
                        deg[w] -= 1
                        if deg[w] < k:
                            alive[w] = False
                            queue.append(w)
    return {v for v in range(n) if alive[v]}
