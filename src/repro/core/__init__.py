"""The paper's primary contribution: MPDS / NDS over uncertain graphs.

Distributed layout: possible worlds are rows of a Spark DataFrame; each
task samples its worlds and runs the exact per-world densest-subgraph
kernels from ``repro.graphs``; candidate frequencies are aggregated with
DataFrame groupBy (Catalyst).
"""
from .uncertain import UncertainGraph

__all__ = ["UncertainGraph"]
