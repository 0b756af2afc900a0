"""k-core computation and degeneracy-style peeling on compact graphs.

These run per sampled possible world inside Spark tasks, so they are
written for small-to-medium graphs with numpy degree bookkeeping.
"""
from __future__ import annotations

import numpy as np

from .graph import degrees


def k_core_nodes(edges: np.ndarray, n: int, k: int) -> np.ndarray:
    """Node ids (compact) of the k-core; empty array if none survive."""
    if k <= 0:
        return np.arange(n, dtype=np.int64)
    deg = degrees(edges, n)
    adj: list[list[int]] = [[] for _ in range(n)]
    for u, v in edges:
        adj[u].append(int(v))
        adj[v].append(int(u))
    alive = deg > 0  # isolated nodes are never in a k-core for k >= 1
    queue = [v for v in range(n) if alive[v] and deg[v] < k]
    for v in queue:
        alive[v] = False
    while queue:
        v = queue.pop()
        for w in adj[v]:
            if alive[w]:
                deg[w] -= 1
                if deg[w] < k:
                    alive[w] = False
                    queue.append(w)
    return np.flatnonzero(alive).astype(np.int64)


def core_numbers(edges: np.ndarray, n: int) -> np.ndarray:
    """Core number per node (Batagelj–Zaversnik bucket peeling)."""
    deg = degrees(edges, n)
    adj: list[list[int]] = [[] for _ in range(n)]
    for u, v in edges:
        adj[u].append(int(v))
        adj[v].append(int(u))
    order = np.argsort(deg, kind="stable")
    # bucket-queue peel
    import heapq

    core = np.zeros(n, dtype=np.int64)
    heap = [(int(deg[v]), int(v)) for v in order]
    heapq.heapify(heap)
    removed = np.zeros(n, dtype=bool)
    cur_deg = deg.copy()
    k = 0
    while heap:
        d, v = heapq.heappop(heap)
        if removed[v] or d != cur_deg[v]:
            continue
        k = max(k, d)
        core[v] = k
        removed[v] = True
        for w in adj[v]:
            if not removed[w]:
                cur_deg[w] -= 1
                heapq.heappush(heap, (int(cur_deg[w]), int(w)))
    return core
