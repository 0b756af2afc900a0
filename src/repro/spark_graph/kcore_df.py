"""Iterative distributed k-core on the DataFrame API.

The DataFrame analogue of a GraphX/Pregel vertex program: repeat
(compute degrees → drop nodes below k → drop dangling edges) until the
edge count is stable. Localized checkpointing keeps the plan from
growing unboundedly across iterations.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .ops import degrees_df


def k_core_df(edges: DataFrame, k: int, max_iter: int = 100) -> DataFrame:
    """Edge DataFrame of the k-core subgraph (same schema as input)."""
    cols = edges.columns
    cur = edges
    prev_count = cur.count()
    for _ in range(max_iter):
        deg = degrees_df(cur).filter(F.col("degree") >= k)
        keep = deg.select(F.col("node"))
        cur = (
            cur.join(keep.withColumnRenamed("node", "u"), on="u")
            .join(keep.withColumnRenamed("node", "v"), on="v")
            .select(*cols)
        )
        cur = cur.localCheckpoint(eager=True)
        cnt = cur.count()
        if cnt == prev_count:
            break
        prev_count = cnt
    return cur
