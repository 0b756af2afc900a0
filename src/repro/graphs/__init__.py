"""Deterministic-graph substrate: per-possible-world kernels.

Everything in this package operates on plain numpy edge arrays / Python
adjacency structures so it can run *inside* Spark executors (via
``mapInPandas``) on the tiny pruned cores of sampled possible worlds.
"""
