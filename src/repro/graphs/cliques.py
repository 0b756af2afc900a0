"""h-clique listing (kClist-style, degeneracy ordering) and clique degrees.

Used by Algorithm 2 (all clique-densest subgraphs): the flow network has
one node per (h−1)-clique contained in an h-clique, and clique degrees
drive the (k, h)-core pruning.
"""
from __future__ import annotations

import numpy as np

from .graph import degrees


def degeneracy_order(edges: np.ndarray, n: int) -> np.ndarray:
    """Peel order (min-degree first); position[v] gives v's rank."""
    import heapq

    deg = degrees(edges, n)
    adj: list[list[int]] = [[] for _ in range(n)]
    for u, v in edges:
        adj[u].append(int(v))
        adj[v].append(int(u))
    heap = [(int(deg[v]), int(v)) for v in range(n)]
    heapq.heapify(heap)
    removed = np.zeros(n, dtype=bool)
    cur = deg.copy()
    order = []
    while heap:
        d, v = heapq.heappop(heap)
        if removed[v] or d != cur[v]:
            continue
        removed[v] = True
        order.append(v)
        for w in adj[v]:
            if not removed[w]:
                cur[w] -= 1
                heapq.heappush(heap, (int(cur[w]), int(w)))
    return np.array(order, dtype=np.int64)


def list_cliques(edges: np.ndarray, n: int, h: int) -> list[tuple[int, ...]]:
    """All h-cliques as sorted node tuples. h >= 2; h=2 returns edges.

    kClist-style: orient edges along the degeneracy order and extend
    candidate sets by intersection, so work is bounded by the degeneracy.
    """
    if h < 2:
        raise ValueError("h must be >= 2")
    if edges.size == 0:
        return []
    if h == 2:
        return [tuple(sorted((int(u), int(v)))) for u, v in edges]
    order = degeneracy_order(edges, n)
    rank = np.empty(n, dtype=np.int64)
    rank[order] = np.arange(len(order))
    fwd: list[list[int]] = [[] for _ in range(n)]  # neighbors later in order
    for u, v in edges:
        u, v = int(u), int(v)
        if rank[u] < rank[v]:
            fwd[u].append(v)
        else:
            fwd[v].append(u)
    fwd_sets = [set(f) for f in fwd]
    out: list[tuple[int, ...]] = []

    def extend(base: list[int], cand: list[int]) -> None:
        if len(base) == h:
            out.append(tuple(sorted(base)))
            return
        for i, v in enumerate(cand):
            # cand is within the forward-neighborhood closure; adjacency
            # between v, w must be checked in either orientation.
            nxt = [w for w in cand[i + 1 :] if w in fwd_sets[v] or v in fwd_sets[w]]
            extend(base + [v], nxt)

    for u in range(n):
        extend([u], fwd[u])
    return out


def clique_degrees(
    cliques: list[tuple[int, ...]], n: int
) -> np.ndarray:
    """deg_G(v, h): number of listed cliques containing each node."""
    deg = np.zeros(n, dtype=np.int64)
    for cl in cliques:
        for v in cl:
            deg[v] += 1
    return deg


def sub_cliques(cliques: list[tuple[int, ...]]) -> list[tuple[int, ...]]:
    """Λ: distinct (h−1)-cliques contained in the given h-cliques."""
    seen: set[tuple[int, ...]] = set()
    for cl in cliques:
        for i in range(len(cl)):
            seen.add(cl[:i] + cl[i + 1 :])
    return sorted(seen)
