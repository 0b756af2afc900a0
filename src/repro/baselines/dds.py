"""Deterministic densest subgraph (DDS) baseline — Table VII.

The densest subgraph of the deterministic version of the uncertain
graph (probabilities dropped). Returns the maximum-sized densest
subgraph so the comparison is well-defined.
"""
from __future__ import annotations

from fractions import Fraction

from ..core.uncertain import UncertainGraph
from ..graphs.alldense import all_densest


def deterministic_densest(
    ug: UncertainGraph, notion: str = "edge"
) -> tuple[frozenset[int], Fraction]:
    """(max-sized densest node set of the deterministic version, ρ*)."""
    res = all_densest(ug.deterministic(), notion, max_enum=1)
    return res.max_sized, res.rho
