"""Incremental SLen maintenance vs from-scratch reference recomputation."""
import pytest
from pyspark.sql import functions as F

from repro.graphs.datagraph import DataGraph
from repro.graphs.updates import Update, apply_updates_data
from repro.core.methods import _slen_step
from repro.reference import ref_apsp
from repro.spark_graph.bfs import apsp
from repro.spark_graph.slen import (
    affected_sources_edge_delete,
    changed_pairs_edge_insert,
    relax_edge_insert,
    slen_changed_nodes,
)
from tests.util import tiny_graph

SEEDS = [0, 1, 2]


@pytest.fixture(scope="module")
def inst(spark):
    labels, edges = tiny_graph(0, n=35, e=100)
    dg = DataGraph.from_edge_list(spark, labels, edges).cache()
    slen = apsp(dg.nodes, dg.edges).localCheckpoint(eager=True)
    return labels, edges, dg, slen


def _slen_dict(df):
    return {(r.src, r.dst): r.dist for r in df.collect()}


def _nonedge(labels, edges, seed):
    import numpy as np

    rng = np.random.default_rng(seed)
    ids = sorted(labels)
    eset = set(edges)
    while True:
        a, b = rng.choice(ids, 2, replace=False)
        if (int(a), int(b)) not in eset:
            return int(a), int(b)


class TestEdgeInsert:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_relax_exact(self, spark, inst, seed):
        labels, edges, dg, slen = inst
        a, b = _nonedge(labels, edges, seed)
        got = _slen_dict(relax_edge_insert(slen, a, b))
        assert got == ref_apsp(sorted(labels), edges + [(a, b)])

    @pytest.mark.parametrize("seed", SEEDS)
    def test_changed_pairs_are_exact_diff(self, spark, inst, seed):
        labels, edges, dg, slen = inst
        a, b = _nonedge(labels, edges, seed + 50)
        old = ref_apsp(sorted(labels), edges)
        new = ref_apsp(sorted(labels), edges + [(a, b)])
        expected = {
            k for k in new if old.get(k) is None or new[k] < old[k]
        }
        got = {
            (r.src, r.dst) for r in changed_pairs_edge_insert(slen, a, b).collect()
        }
        assert got == expected

    def test_insert_existing_shortcut_changes_nothing(self, spark, inst):
        labels, edges, dg, slen = inst
        # inserting an edge parallel to an existing one: no pair changes
        a, b = edges[0]
        assert changed_pairs_edge_insert(slen, a, b).isEmpty()


class TestEdgeDelete:
    @pytest.mark.parametrize("idx", [0, 5, 11])
    def test_affected_sources_complete(self, spark, inst, idx):
        """Every source whose row truly changes is in the affected set."""
        labels, edges, dg, slen = inst
        a, b = edges[idx]
        new_edges = [e for e in edges if e != (a, b)]
        old = ref_apsp(sorted(labels), edges)
        new = ref_apsp(sorted(labels), new_edges)
        truly_changed = {
            k[0] for k in set(old) | set(new) if old.get(k) != new.get(k)
        }
        got = {r.id for r in affected_sources_edge_delete(slen, a, b).collect()}
        assert truly_changed <= got

    @pytest.mark.parametrize("idx", [0, 5, 11])
    def test_delete_step_exact(self, spark, inst, idx):
        labels, edges, dg, slen = inst
        a, b = edges[idx]
        u = Update(graph="D", kind="edge_del", src=a, dst=b)
        out, dg_new = _slen_step(spark, slen, dg, u, partitioned=False)
        new_edges = [e for e in edges if e != (a, b)]
        assert _slen_dict(out) == ref_apsp(sorted(labels), new_edges)


class TestNodeUpdates:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_node_insert_step_exact(self, spark, inst, seed):
        labels, edges, dg, slen = inst
        nid = max(labels) + 1
        anchor = sorted(labels)[seed]
        u = Update(
            graph="D",
            kind="node_ins",
            node=nid,
            label="A",
            attach_edges=((anchor, nid), (nid, sorted(labels)[seed + 3])),
        )
        out, _ = _slen_step(spark, slen, dg, u, partitioned=False)
        new_labels, new_edges = apply_updates_data(labels, edges, [u])
        assert _slen_dict(out) == ref_apsp(sorted(new_labels), new_edges)

    @pytest.mark.parametrize("seed", SEEDS)
    def test_node_delete_step_exact(self, spark, inst, seed):
        labels, edges, dg, slen = inst
        x = sorted(labels)[seed * 7 + 2]
        u = Update(graph="D", kind="node_del", node=x)
        out, _ = _slen_step(spark, slen, dg, u, partitioned=False)
        new_labels, new_edges = apply_updates_data(labels, edges, [u])
        assert _slen_dict(out) == ref_apsp(sorted(new_labels), new_edges)

    @pytest.mark.parametrize("partitioned", [False, True])
    def test_delete_step_both_engines_agree(self, spark, inst, partitioned):
        labels, edges, dg, slen = inst
        a, b = edges[3]
        u = Update(graph="D", kind="edge_del", src=a, dst=b)
        out, _ = _slen_step(spark, slen, dg, u, partitioned=partitioned)
        assert _slen_dict(out) == ref_apsp(
            sorted(labels), [e for e in edges if e != (a, b)]
        )


class TestSlenDiff:
    def test_changed_nodes_matches_reference(self, spark, inst):
        labels, edges, dg, slen = inst
        a, b = _nonedge(labels, edges, 99)
        new = relax_edge_insert(slen, a, b)
        got = {r.id for r in slen_changed_nodes(slen, new).collect()}
        old_d = ref_apsp(sorted(labels), edges)
        new_d = ref_apsp(sorted(labels), edges + [(a, b)])
        expected = set()
        for k in set(old_d) | set(new_d):
            if old_d.get(k) != new_d.get(k):
                expected.update(k)
        assert got == expected

    def test_no_change_empty(self, spark, inst):
        _, _, _, slen = inst
        assert slen_changed_nodes(slen, slen).isEmpty()
