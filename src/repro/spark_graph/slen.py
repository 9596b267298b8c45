"""SLen maintenance: the paper's shortest-path-length matrix, kept sparse.

``SLen`` is a DataFrame ``(src, dst, dist)`` holding only *finite*
entries (the paper's Hybrid-format compression argument, §IV-B Remark).
This module provides the incremental maintenance primitives that the
GPNM methods compose:

* ``relax_edge_insert`` — exact single-edge-insert update:
  ``d'(u,v) = min(d(u,v), d(u,a) + 1 + d(b,v))`` (one join, no BFS).
* ``changed_pairs_edge_insert`` — the strictly-improved pairs (DER-II's
  affected pairs for an insertion) without materializing SLen_new.
* ``affected_sources_edge_delete`` — sources whose shortest-path tree may
  use edge (a,b): ``{u : d(u,b) = d(u,a)+1}``; deletion re-runs BFS from
  exactly these (the paper's "Dijkstra for the affected nodes").
* ``recompute_sources`` — splice re-BFS'd rows for a source set into SLen.
* ``slen_changed_nodes`` — Aff_N via full-outer diff of two SLen frames.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.spark_graph.bfs import apsp, bfs_from_sources

SLEN_SCHEMA = T.StructType(
    [
        T.StructField("src", T.LongType(), False),
        T.StructField("dst", T.LongType(), False),
        T.StructField("dist", T.LongType(), False),
    ]
)


def build_slen(nodes: DataFrame, edges: DataFrame) -> DataFrame:
    """Construct SLen from scratch with the global BFS engine."""
    return apsp(nodes, edges)


def relax_edge_insert(slen: DataFrame, a: int, b: int) -> DataFrame:
    """SLen after inserting edge ``(a, b)``; exact for a single insertion.

    Uses only old distances: any new shortest path decomposes as
    ``u ⇝ a → b ⇝ v`` with both segments avoiding the new edge.
    The ``dist=0`` diagonal rows make the pure ``(u,b)`` / ``(a,v)``
    cases fall out of the same join.
    """
    to_a = slen.filter(F.col("dst") == a).select(
        F.col("src").alias("u"), F.col("dist").alias("d_ua")
    )
    from_b = slen.filter(F.col("src") == b).select(
        F.col("dst").alias("v"), F.col("dist").alias("d_bv")
    )
    via = to_a.crossJoin(F.broadcast(from_b)).select(
        F.col("u").alias("src"),
        F.col("v").alias("dst"),
        (F.col("d_ua") + 1 + F.col("d_bv")).alias("dist"),
    )
    return (
        slen.unionByName(via)
        .groupBy("src", "dst")
        .agg(F.min("dist").alias("dist"))
    )


def changed_pairs_edge_insert(slen: DataFrame, a: int, b: int) -> DataFrame:
    """Pairs ``(src, dst, old_dist, new_dist)`` strictly improved by edge (a,b).

    ``old_dist`` is null for pairs that become reachable for the first
    time. This is DER-II's affected-pair set for an insertion, computed
    without a BFS.
    """
    to_a = slen.filter(F.col("dst") == a).select(
        F.col("src").alias("u"), F.col("dist").alias("d_ua")
    )
    from_b = slen.filter(F.col("src") == b).select(
        F.col("dst").alias("v"), F.col("dist").alias("d_bv")
    )
    via = to_a.crossJoin(F.broadcast(from_b)).select(
        F.col("u").alias("src"),
        F.col("v").alias("dst"),
        (F.col("d_ua") + 1 + F.col("d_bv")).alias("new_dist"),
    ).groupBy("src", "dst").agg(F.min("new_dist").alias("new_dist"))
    joined = via.join(
        slen.withColumnRenamed("dist", "old_dist"), ["src", "dst"], "left"
    )
    return joined.filter(
        F.col("old_dist").isNull() | (F.col("new_dist") < F.col("old_dist"))
    ).select("src", "dst", "old_dist", "new_dist")


def affected_sources_edge_delete(slen: DataFrame, a: int, b: int) -> DataFrame:
    """Sources ``(id)`` possibly using edge (a,b) on some shortest path.

    ``u`` qualifies iff ``d(u,b) == d(u,a) + 1`` — a conservative,
    complete superset of the sources whose rows can change when (a,b)
    is removed.
    """
    d_a = slen.filter(F.col("dst") == a).select(
        F.col("src").alias("id"), F.col("dist").alias("d_ua")
    )
    d_b = slen.filter(F.col("dst") == b).select(
        F.col("src").alias("id"), F.col("dist").alias("d_ub")
    )
    return (
        d_a.join(F.broadcast(d_b), "id")
        .filter(F.col("d_ub") == F.col("d_ua") + 1)
        .select("id")
    )


def recompute_sources(
    slen: DataFrame, edges_new: DataFrame, sources: DataFrame
) -> DataFrame:
    """Replace the SLen rows of ``sources`` with fresh BFS rows on ``edges_new``."""
    kept = slen.join(
        sources.withColumnRenamed("id", "src"), ["src"], "left_anti"
    )
    fresh = bfs_from_sources(edges_new, sources)
    return kept.unionByName(fresh)


def slen_changed_nodes(old: DataFrame, new: DataFrame) -> DataFrame:
    """Aff_N(U_Di): distinct endpoints of pairs whose distance differs.

    Pairs present on one side only (reachability gained/lost) count as
    changed, matching the paper's Example 8 (∞ → finite).
    """
    o = old.select("src", "dst", F.col("dist").alias("old_dist"))
    n = new.select("src", "dst", F.col("dist").alias("new_dist"))
    diff = o.join(n, ["src", "dst"], "full_outer").filter(
        F.col("old_dist").isNull()
        | F.col("new_dist").isNull()
        | (F.col("old_dist") != F.col("new_dist"))
    )
    return (
        diff.select(F.col("src").alias("id"))
        .unionByName(diff.select(F.col("dst").alias("id")))
        .distinct()
    )
