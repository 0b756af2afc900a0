"""Brute-force references for tiny graphs — test oracles only.

Enumerates all node subsets (2^n) to find every densest subgraph for a
density notion. Used by the test-suite to validate the flow-based exact
pipelines, and by `repro.core.exact`'s unit tests.
"""
from __future__ import annotations

from fractions import Fraction
from itertools import combinations

import numpy as np

from .cliques import list_cliques
from .graph import canonical_edges, nodes_of
from .patterns import enumerate_instances


def _instances_for(edges: np.ndarray, n: int, notion: str) -> list[tuple[int, ...]]:
    if notion == "edge":
        return [tuple(sorted((int(u), int(v)))) for u, v in edges]
    if notion.startswith("clique:"):
        return list_cliques(edges, n, int(notion.split(":")[1]))
    return enumerate_instances(edges, n, notion)


def brute_all_densest(
    edges: np.ndarray, notion: str = "edge"
) -> tuple[Fraction, list[frozenset[int]]]:
    """(ρ*, all densest node sets) by enumerating every node subset.

    Follows the paper's accounting: if the graph has no instance of the
    density object at all (no edge / clique / pattern), ρ* = 0 and NO set
    is densest.
    """
    e = canonical_edges(edges)
    nodes = [int(v) for v in nodes_of(e)]
    n_max = (max(nodes) + 1) if nodes else 0
    instances = _instances_for(e, n_max, notion)
    if not instances:
        return Fraction(0), []
    inst_sets = [frozenset(t) for t in instances]
    best = Fraction(0)
    best_sets: list[frozenset[int]] = []
    for r in range(1, len(nodes) + 1):
        for sub in combinations(nodes, r):
            S = frozenset(sub)
            cnt = sum(1 for t in inst_sets if t <= S)
            d = Fraction(cnt, r)
            if d > best:
                best = d
                best_sets = [S]
            elif d == best and d > 0:
                best_sets.append(S)
    return best, sorted(best_sets, key=lambda s: (len(s), sorted(s)))
