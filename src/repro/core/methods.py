"""The four GPNM methods compared in §VII: INC-GPNM, EH-GPNM,
UA-GPNM-NoPar, and UA-GPNM (Algorithm 6).

All four receive the same inputs as the paper's Updates-Aware GPNM
problem (§III-C): original ``G_D``/``G_P``, a cached ``SLen``, the
IQuery matching result, and the update sequences ΔG_D/ΔG_P. All four
return the identical, exact SQuery (verified against from-scratch GPNM
in the tests) — they differ in how much work they do:

* **INC-GPNM** [13]: per update — identify the affected area, update
  SLen incrementally, run a regional matching pass. 2k SLen/refine passes.
* **EH-GPNM** [14]: DER-II over ΔG_D + an EH-Tree over data updates:
  regional passes only for *uneliminated* data updates, but still one
  pass per pattern update, and per-update SLen maintenance.
* **UA-GPNM-NoPar**: DER-I+II+III over all updates, full EH-Tree (cross
  relationships included), ONE batched SLen rebuild, regional passes only
  for EH-Tree roots.
* **UA-GPNM**: identical, but every shortest-path computation (batch
  rebuild) runs on the label-partitioned engine of §V.

Exactness: each method ends with a consolidation fixpoint over the full
label-candidate universe of the updated graphs (identical cost across
methods — see DESIGN.md §5), so eliminations can never corrupt results;
they only remove intermediate passes, which is precisely the effect the
paper measures.
"""
from __future__ import annotations

import time
from contextlib import contextmanager
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.der import (
    affected_nodes_data_update,
    candidate_nodes_pattern_update,
    detect_cross_eliminations,
)
from repro.core.ehtree import build_ehtree, eliminated_uids, root_uids
from repro.core.matching import label_candidates, match_fixpoint
from repro.graphs.datagraph import DataGraph
from repro.graphs.pattern import PatternGraph
from repro.graphs.updates import Update, apply_updates_pattern
from repro.partition.partitioned_slen import (
    partitioned_apsp,
    partitioned_bfs_from_sources,
)
from repro.spark_graph.bfs import apsp, bfs_from_sources
from repro.spark_graph.slen import (
    affected_sources_edge_delete,
    relax_edge_insert,
)


@dataclass
class RunStats:
    """Instrumentation for one SQuery: wall time per phase + pass counters."""

    method: str
    n_updates: int = 0
    n_slen_passes: int = 0
    n_refine_passes: int = 0
    n_eliminated: int = 0
    phase_seconds: dict[str, float] = field(default_factory=dict)

    @property
    def total_seconds(self) -> float:
        return sum(self.phase_seconds.values())

    @contextmanager
    def phase(self, name: str):
        t0 = time.perf_counter()
        try:
            yield
        finally:
            self.phase_seconds[name] = self.phase_seconds.get(name, 0.0) + (
                time.perf_counter() - t0
            )


# ---------------------------------------------------------------------------
# Shared plumbing
# ---------------------------------------------------------------------------


def apply_data_updates_spark(
    spark: SparkSession, dg: DataGraph, updates: list[Update]
) -> DataGraph:
    """``G_D_new`` via DataFrame set operations (union / anti-join)."""
    d_updates = [u for u in updates if u.graph == "D"]
    ins_nodes = [(u.node, u.label) for u in d_updates if u.kind == "node_ins"]
    del_nodes = [(u.node,) for u in d_updates if u.kind == "node_del"]
    ins_edges = [(u.src, u.dst) for u in d_updates if u.kind == "edge_ins"]
    for u in d_updates:
        if u.kind == "node_ins":
            ins_edges += list(u.attach_edges)
    del_edges = [(u.src, u.dst) for u in d_updates if u.kind == "edge_del"]

    nodes = dg.nodes
    edges = dg.edges
    if ins_nodes:
        nodes = nodes.unionByName(
            spark.createDataFrame(ins_nodes, schema="id long, label string")
        )
    if del_nodes:
        dn = spark.createDataFrame(del_nodes, schema="id long")
        nodes = nodes.join(dn, "id", "left_anti")
        edges = edges.join(dn.withColumnRenamed("id", "src"), "src", "left_anti").join(
            dn.withColumnRenamed("id", "dst"), "dst", "left_anti"
        )
    if ins_edges:
        edges = edges.unionByName(
            spark.createDataFrame(ins_edges, schema="src long, dst long")
        ).distinct()
    if del_edges:
        de = spark.createDataFrame(del_edges, schema="src long, dst long")
        edges = edges.join(de, ["src", "dst"], "left_anti")
    return DataGraph(
        nodes=nodes.select("id", "label").localCheckpoint(eager=True),
        edges=edges.select("src", "dst").localCheckpoint(eager=True),
    )


def _slen_step(
    spark: SparkSession,
    slen: DataFrame,
    dg_cur: DataGraph,
    u: Update,
    *,
    partitioned: bool,
) -> tuple[DataFrame, DataGraph]:
    """One per-update incremental SLen maintenance pass (INC/EH style).

    Returns (SLen after ``u``, graph after ``u``); the result SLen is
    eagerly checkpointed so the caller's timer sees the real cost.
    """
    dg_new = apply_data_updates_spark(spark, dg_cur, [u])

    def recompute(cur: DataFrame, sources: DataFrame) -> DataFrame:
        kept = cur.join(sources.withColumnRenamed("id", "src"), ["src"], "left_anti")
        if partitioned:
            fresh = partitioned_bfs_from_sources(dg_new.nodes, dg_new.edges, sources)
        else:
            fresh = bfs_from_sources(dg_new.edges, sources)
        return kept.unionByName(fresh)

    if u.kind == "edge_ins":
        out = relax_edge_insert(slen, u.src, u.dst)
    elif u.kind == "edge_del":
        sources = affected_sources_edge_delete(slen, u.src, u.dst)
        out = recompute(slen, sources)
    elif u.kind == "node_ins":
        self_row = spark.createDataFrame(
            [(u.node, u.node, 0)], schema="src long, dst long, dist long"
        )
        out = slen.unionByName(self_row)
        for a, b in u.attach_edges:
            out = relax_edge_insert(out, a, b).localCheckpoint(eager=True)
    elif u.kind == "node_del":
        x = u.node
        sources = (
            slen.filter((F.col("dst") == x) & (F.col("src") != x))
            .select(F.col("src").alias("id"))
            .distinct()
        )
        trimmed = slen.filter((F.col("src") != x) & (F.col("dst") != x))
        out = recompute(trimmed, sources)
    else:
        raise ValueError(f"unknown data update kind {u.kind}")
    return out.localCheckpoint(eager=True), dg_new


def _regional_universe(
    spark: SparkSession,
    gp: PatternGraph,
    nodes: DataFrame,
    prev_matches: DataFrame,
    region: DataFrame,
) -> DataFrame:
    """Universe for a regional pass: previous matches ∪ label pairs in region."""
    region_pairs = label_candidates(spark, gp, nodes.join(F.broadcast(region), "id"))
    return prev_matches.unionByName(region_pairs).distinct()


def _detect_set(df: DataFrame) -> frozenset[int]:
    return frozenset(int(r["id"]) for r in df.collect())


# ---------------------------------------------------------------------------
# INC-GPNM [13]
# ---------------------------------------------------------------------------


def inc_gpnm(
    spark: SparkSession,
    dg: DataGraph,
    gp: PatternGraph,
    slen: DataFrame,
    iquery: DataFrame,
    updates: list[Update],
) -> tuple[DataFrame, RunStats]:
    """Per-update incremental GPNM: one affected-area identification, one
    SLen maintenance pass and one regional matching pass *per update*."""
    stats = RunStats(method="INC-GPNM", n_updates=len(updates))
    dg_cur, gp_cur, slen_cur, matches = dg, gp, slen, iquery
    for u in updates:
        with stats.phase("affected_area"):
            if u.graph == "D":
                region = affected_nodes_data_update(spark, u, slen_cur)
            else:
                region = candidate_nodes_pattern_update(
                    spark, u, gp_cur, slen_cur, matches, dg_cur.nodes
                )
            region = region.localCheckpoint(eager=True)
        if u.graph == "D":
            with stats.phase("slen"):
                slen_cur, dg_cur = _slen_step(
                    spark, slen_cur, dg_cur, u, partitioned=False
                )
            stats.n_slen_passes += 1
        else:
            gp_cur = apply_updates_pattern(gp_cur, [u])
        with stats.phase("refine"):
            universe = _regional_universe(spark, gp_cur, dg_cur.nodes, matches, region)
            matches = match_fixpoint(spark, gp_cur, slen_cur, dg_cur.nodes, universe)
        stats.n_refine_passes += 1
    with stats.phase("consolidate"):
        final = match_fixpoint(spark, gp_cur, slen_cur, dg_cur.nodes)
    return final, stats


# ---------------------------------------------------------------------------
# EH-GPNM [14]
# ---------------------------------------------------------------------------


def eh_gpnm(
    spark: SparkSession,
    dg: DataGraph,
    gp: PatternGraph,
    slen: DataFrame,
    iquery: DataFrame,
    updates: list[Update],
) -> tuple[DataFrame, RunStats]:
    """Single-graph elimination over ΔG_D only: skips regional passes for
    eliminated data updates; every pattern update still gets its own pass."""
    stats = RunStats(method="EH-GPNM", n_updates=len(updates))
    updates_d = [u for u in updates if u.graph == "D"]
    updates_p = [u for u in updates if u.graph == "P"]

    with stats.phase("detect"):
        aff_sets = {
            u.uid: _detect_set(affected_nodes_data_update(spark, u, slen))
            for u in updates_d
        }
        roots = build_ehtree([(uid, "D", s) for uid, s in aff_sets.items()])
        d_roots = root_uids(roots)
        stats.n_eliminated = len(eliminated_uids(roots))

    dg_cur, slen_cur, matches = dg, slen, iquery
    for u in updates_d:
        with stats.phase("slen"):
            slen_cur, dg_cur = _slen_step(spark, slen_cur, dg_cur, u, partitioned=False)
        stats.n_slen_passes += 1
        if u.uid in d_roots:
            with stats.phase("refine"):
                region = spark.createDataFrame(
                    [(i,) for i in sorted(aff_sets[u.uid])] or [], schema="id long"
                )
                universe = _regional_universe(spark, gp, dg_cur.nodes, matches, region)
                matches = match_fixpoint(spark, gp, slen_cur, dg_cur.nodes, universe)
            stats.n_refine_passes += 1

    gp_cur = gp
    for u in updates_p:
        with stats.phase("affected_area"):
            region = candidate_nodes_pattern_update(
                spark, u, gp_cur, slen_cur, matches, dg_cur.nodes
            ).localCheckpoint(eager=True)
        gp_cur = apply_updates_pattern(gp_cur, [u])
        with stats.phase("refine"):
            universe = _regional_universe(spark, gp_cur, dg_cur.nodes, matches, region)
            matches = match_fixpoint(spark, gp_cur, slen_cur, dg_cur.nodes, universe)
        stats.n_refine_passes += 1

    with stats.phase("consolidate"):
        final = match_fixpoint(spark, gp_cur, slen_cur, dg_cur.nodes)
    return final, stats


# ---------------------------------------------------------------------------
# UA-GPNM / UA-GPNM-NoPar (Algorithm 6)
# ---------------------------------------------------------------------------


def ua_gpnm(
    spark: SparkSession,
    dg: DataGraph,
    gp: PatternGraph,
    slen: DataFrame,
    iquery: DataFrame,
    updates: list[Update],
    *,
    partitioned: bool = True,
) -> tuple[DataFrame, RunStats]:
    """Updates-aware GPNM: full DER detection, EH-Tree, one batched SLen
    rebuild, regional passes only for EH-Tree roots.

    ``partitioned=False`` is the paper's UA-GPNM-NoPar ablation (same
    algorithm, global BFS engine for the rebuild).
    """
    stats = RunStats(
        method="UA-GPNM" if partitioned else "UA-GPNM-NoPar", n_updates=len(updates)
    )
    updates_d = [u for u in updates if u.graph == "D"]
    updates_p = [u for u in updates if u.graph == "P"]

    with stats.phase("detect"):
        aff_sets = {
            u.uid: _detect_set(affected_nodes_data_update(spark, u, slen))
            for u in updates_d
        }
        can_sets = {
            u.uid: _detect_set(
                candidate_nodes_pattern_update(spark, u, gp, slen, iquery, dg.nodes)
            )
            for u in updates_p
        }
        cross = detect_cross_eliminations(
            spark, updates_p, updates_d, can_sets, aff_sets, gp, slen, iquery, dg
        )
        entries = [(uid, "D", s) for uid, s in aff_sets.items()] + [
            (uid, "P", s) for uid, s in can_sets.items()
        ]
        roots = build_ehtree(entries, cross)
        stats.n_eliminated = len(eliminated_uids(roots))

    with stats.phase("slen"):
        dg_new = apply_data_updates_spark(spark, dg, updates)
        if partitioned:
            slen_new = partitioned_apsp(dg_new.nodes, dg_new.edges)
        else:
            slen_new = apsp(dg_new.nodes, dg_new.edges)
        slen_new = slen_new.localCheckpoint(eager=True)
    stats.n_slen_passes = 1

    gp_new = apply_updates_pattern(gp, updates)
    matches = iquery
    all_sets = {**aff_sets, **can_sets}
    for uid in root_uids(roots):
        with stats.phase("refine"):
            region = spark.createDataFrame(
                [(i,) for i in sorted(all_sets[uid])] or [], schema="id long"
            )
            universe = _regional_universe(spark, gp_new, dg_new.nodes, matches, region)
            matches = match_fixpoint(spark, gp_new, slen_new, dg_new.nodes, universe)
        stats.n_refine_passes += 1

    with stats.phase("consolidate"):
        final = match_fixpoint(spark, gp_new, slen_new, dg_new.nodes)
    return final, stats


METHODS = {
    "INC-GPNM": inc_gpnm,
    "EH-GPNM": eh_gpnm,
    "UA-GPNM-NoPar": lambda *a, **k: ua_gpnm(*a, partitioned=False, **k),
    "UA-GPNM": lambda *a, **k: ua_gpnm(*a, partitioned=True, **k),
}
