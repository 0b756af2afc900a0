"""Compact deterministic-graph helpers over numpy edge arrays.

An (undirected, simple) graph is represented as an ``(m, 2)`` int64 array
of edges with ``u != v``. Node ids are arbitrary non-negative ints; most
kernels first :func:`relabel` to a compact ``0..n-1`` space.
"""
from __future__ import annotations

import numpy as np


def canonical_edges(edges: np.ndarray) -> np.ndarray:
    """Return edges with u < v per row, duplicates and self-loops removed.

    Output is sorted lexicographically, so it is a canonical form: two
    edge lists describing the same simple graph canonicalize identically.
    """
    e = np.asarray(edges, dtype=np.int64).reshape(-1, 2)
    if e.size == 0:
        return e.reshape(0, 2)
    e = e[e[:, 0] != e[:, 1]]
    lo = np.minimum(e[:, 0], e[:, 1])
    hi = np.maximum(e[:, 0], e[:, 1])
    e = np.unique(np.stack([lo, hi], axis=1), axis=0)
    return e


def nodes_of(edges: np.ndarray) -> np.ndarray:
    """Sorted unique node ids appearing in ``edges``."""
    e = np.asarray(edges, dtype=np.int64)
    if e.size == 0:
        return np.empty(0, dtype=np.int64)
    return np.unique(e)


def relabel(edges: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Relabel node ids to ``0..n-1``.

    Returns ``(compact_edges, id_map)`` where ``id_map[i]`` is the
    original id of compact node ``i``.
    """
    ids = nodes_of(edges)
    if ids.size == 0:
        return np.empty((0, 2), dtype=np.int64), ids
    compact = np.searchsorted(ids, edges)
    return compact.astype(np.int64), ids


def degrees(edges: np.ndarray, n: int) -> np.ndarray:
    """Degree vector for compact node ids ``0..n-1``."""
    deg = np.zeros(n, dtype=np.int64)
    if edges.size:
        np.add.at(deg, edges[:, 0], 1)
        np.add.at(deg, edges[:, 1], 1)
    return deg


def adjacency(edges: np.ndarray, n: int) -> list[np.ndarray]:
    """Sorted neighbor arrays per compact node (for set-intersections)."""
    adj: list[list[int]] = [[] for _ in range(n)]
    for u, v in edges:
        adj[u].append(v)
        adj[v].append(u)
    return [np.array(sorted(a), dtype=np.int64) for a in adj]


def adjacency_sets(edges: np.ndarray, n: int) -> list[set[int]]:
    """Neighbor sets per compact node (for membership tests)."""
    adj: list[set[int]] = [set() for _ in range(n)]
    for u, v in edges:
        adj[u].add(int(v))
        adj[v].add(int(u))
    return adj


def induced_edge_count(edges: np.ndarray, node_set: set[int] | frozenset[int]) -> int:
    """Number of edges with both endpoints in ``node_set``."""
    cnt = 0
    for u, v in edges:
        if int(u) in node_set and int(v) in node_set:
            cnt += 1
    return cnt


def induced_subgraph(edges: np.ndarray, node_set: set[int] | frozenset[int]) -> np.ndarray:
    """Edges with both endpoints in ``node_set`` (original labels kept)."""
    if len(node_set) == 0 or edges.size == 0:
        return np.empty((0, 2), dtype=np.int64)
    keep = np.fromiter(
        ((int(u) in node_set and int(v) in node_set) for u, v in edges),
        dtype=bool,
        count=len(edges),
    )
    return edges[keep]
