"""Unweighted multi-source BFS as iterative DataFrame joins.

This is the *global* (non-partitioned) shortest-path engine used by the
baseline methods and by UA-GPNM-NoPar: each BFS level is one
frontier⋈edges join plus an anti-join against settled pairs, i.e. a pure
Catalyst dataflow. Lineage is cut with ``localCheckpoint`` every level so
plans stay constant-size across the (diameter-many) iterations.

The paper uses Dijkstra; on unit-weight social graphs BFS *is* Dijkstra.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def bfs_from_sources(
    edges: DataFrame, sources: DataFrame, *, max_iters: int = 64
) -> DataFrame:
    """All finite shortest-path rows ``(src, dst, dist)`` from every source.

    ``edges``: (src, dst); ``sources``: (id). Includes the ``dist=0``
    self rows — SLen's diagonal, needed by the relax/compose rules.
    """
    e = edges.select(F.col("src").alias("e_src"), F.col("dst").alias("e_dst"))
    frontier = sources.select(
        F.col("id").alias("src"), F.col("id").alias("dst"), F.lit(0).alias("dist")
    ).localCheckpoint(eager=True)
    # Settled pairs are kept as a lazy union of the (materialized) level
    # frontiers, so each BFS level runs exactly one job: expand + anti-join
    # + checkpoint. Nothing already settled is ever rewritten.
    levels = [frontier]
    for _ in range(max_iters):
        settled = levels[0] if len(levels) == 1 else reduce_union(levels)
        grown = (
            # edge lists here are dimension-sized (≤ tens of thousands of
            # rows); broadcasting avoids reshuffling the frontier per level
            frontier.join(F.broadcast(e), frontier.dst == e.e_src)
            .select(
                F.col("src"),
                F.col("e_dst").alias("dst"),
                (F.col("dist") + 1).alias("dist"),
            )
            .groupBy("src", "dst")
            .agg(F.min("dist").alias("dist"))
        )
        frontier = grown.join(settled, ["src", "dst"], "left_anti").localCheckpoint(
            eager=True
        )
        if frontier.isEmpty():
            break
        levels.append(frontier)
    return reduce_union(levels)


def reduce_union(dfs: list[DataFrame]) -> DataFrame:
    """Balanced unionByName over a list of DataFrames."""
    while len(dfs) > 1:
        dfs = [
            dfs[i].unionByName(dfs[i + 1]) if i + 1 < len(dfs) else dfs[i]
            for i in range(0, len(dfs), 2)
        ]
    return dfs[0]


def apsp(nodes: DataFrame, edges: DataFrame, *, max_iters: int = 64) -> DataFrame:
    """All-pairs shortest path lengths (finite entries) = BFS from all nodes."""
    return bfs_from_sources(edges, nodes.select("id"), max_iters=max_iters)
