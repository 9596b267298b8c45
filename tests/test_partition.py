"""Label partition (§V): bridge nodes, quotient closure, partitioned APSP."""
import pytest

from repro.graphs.datagraph import DataGraph
from repro.partition.label_partition import (
    inner_bridge_nodes,
    outer_bridge_nodes,
    partition_of_nodes,
    quotient_edges,
    reach_closure,
)
from repro.partition.partitioned_slen import (
    partitioned_apsp,
    partitioned_bfs_from_sources,
)
from repro.reference import ref_apsp
from repro.synth_graph import fig4_example
from tests.util import tiny_graph

SEEDS = [0, 1, 2, 3]


@pytest.fixture(scope="module")
def fig4(spark):
    ex = fig4_example()
    dg = DataGraph.from_edge_list(spark, ex["labels"], ex["edges"]).cache()
    return ex, dg


class TestBridgeNodes:
    def test_partition_ids_are_labels(self, spark, fig4):
        ex, dg = fig4
        got = {(r.id, r.pid) for r in partition_of_nodes(dg.nodes).collect()}
        assert got == {(i, l) for i, l in ex["labels"].items()}

    def test_fig4_inner_bridges_of_pse(self, spark, fig4):
        """Example 12: IB(P_SE) = {SE1, SE2}."""
        ex, dg = fig4
        ib = {r.id for r in inner_bridge_nodes(dg.nodes, dg.edges).collect()
              if r.pid == "SE"}
        assert ib == ex["ib_pse"]

    def test_fig4_outer_bridges_of_pse(self, spark, fig4):
        """Example 13: OB(P_SE) = {PM1, TE1}."""
        ex, dg = fig4
        ob = {r.id for r in outer_bridge_nodes(dg.nodes, dg.edges).collect()
              if r.pid == "SE"}
        assert ob == ex["ob_pse"]

    def test_fig4_pte_has_no_outer_bridge(self, spark, fig4):
        """Example 14: OB(P_TE) = ∅ (its edges stay inside)."""
        _, dg = fig4
        ob = [r for r in outer_bridge_nodes(dg.nodes, dg.edges).collect()
              if r.pid == "TE"]
        assert ob == []

    @pytest.mark.parametrize("seed", SEEDS)
    def test_bridges_match_python_definition(self, spark, seed):
        labels, edges = tiny_graph(seed)
        dg = DataGraph.from_edge_list(spark, labels, edges)
        ib_exp, ob_exp = set(), set()
        for s, d in edges:
            if labels[s] != labels[d]:
                ib_exp.add((labels[s], s))
                ob_exp.add((labels[s], d))
        assert {(r.pid, r.id) for r in inner_bridge_nodes(dg.nodes, dg.edges).collect()} == ib_exp
        assert {(r.pid, r.id) for r in outer_bridge_nodes(dg.nodes, dg.edges).collect()} == ob_exp


class TestQuotientClosure:
    def test_fig4_quotient(self, spark, fig4):
        _, dg = fig4
        q = {(r.src_pid, r.dst_pid) for r in quotient_edges(dg.nodes, dg.edges).collect()}
        assert q == {("SE", "PM"), ("PM", "SE"), ("SE", "TE")}

    def test_fig4_closure(self, spark, fig4):
        """P_SE must absorb P_PM and P_TE; P_TE only itself (Example 14)."""
        _, dg = fig4
        cl: dict[str, set[str]] = {}
        for r in reach_closure(dg.nodes, dg.edges).collect():
            cl.setdefault(r.pid, set()).add(r.member_pid)
        assert cl["SE"] == {"SE", "PM", "TE"}
        assert cl["TE"] == {"TE"}
        assert cl["PM"] == {"PM", "SE", "TE"}

    @pytest.mark.parametrize("seed", SEEDS)
    def test_closure_reflexive_and_transitive(self, spark, seed):
        labels, edges = tiny_graph(seed)
        dg = DataGraph.from_edge_list(spark, labels, edges)
        cl: dict[str, set[str]] = {}
        for r in reach_closure(dg.nodes, dg.edges).collect():
            cl.setdefault(r.pid, set()).add(r.member_pid)
        q = [(r.src_pid, r.dst_pid) for r in quotient_edges(dg.nodes, dg.edges).collect()]
        for p, members in cl.items():
            assert p in members
            for m in members:  # transitivity
                assert cl[m] <= members
        for a, b in q:  # one-step reachability included
            assert b in cl[a]


class TestPartitionedAPSP:
    def test_fig4_tables_8_and_9(self, spark, fig4):
        ex, dg = fig4
        got = {(r.src, r.dst): r.dist for r in partitioned_apsp(dg.nodes, dg.edges).collect()}
        for k, v in ex["table8"].items():
            assert got[k] == v, f"Table VIII mismatch at {k}"
        for k, v in ex["table9"].items():
            assert got[k] == v, f"Table IX mismatch at {k}"
        pse = [ex["nid"][n] for n in ("SE1", "SE2", "SE3", "SE4")]
        pte = [ex["nid"][n] for n in ("TE1", "TE2", "TE3")]
        # ∞ entries of Tables VIII/IX are exactly the absent pairs
        for a in pse:
            for b in pse + pte:
                if (a, b) not in ex["table8"] and (a, b) not in ex["table9"]:
                    assert (a, b) not in got

    @pytest.mark.parametrize("seed", SEEDS)
    def test_equals_reference_apsp(self, spark, seed):
        """Theorem 3: the partitioned computation is exact."""
        labels, edges = tiny_graph(seed, n=40, e=120, n_labels=5)
        dg = DataGraph.from_edge_list(spark, labels, edges)
        got = {(r.src, r.dst): r.dist for r in partitioned_apsp(dg.nodes, dg.edges).collect()}
        assert got == ref_apsp(sorted(labels), edges)

    def test_partitioned_bfs_subset_sources(self, spark):
        labels, edges = tiny_graph(7, n=30, e=90)
        dg = DataGraph.from_edge_list(spark, labels, edges)
        srcs = sorted(labels)[::6]
        sources = spark.createDataFrame([(s,) for s in srcs], schema="id long")
        got = {
            (r.src, r.dst): r.dist
            for r in partitioned_bfs_from_sources(dg.nodes, dg.edges, sources).collect()
        }
        full = ref_apsp(sorted(labels), edges)
        assert got == {(s, d): v for (s, d), v in full.items() if s in srcs}

    def test_isolated_partition_distances_stay_internal(self, spark):
        """OB(P_i)=∅ ⇒ no finite distance leaves the partition (Alg. 5 line 3)."""
        labels = {0: "A", 1: "A", 2: "B"}
        edges = [(0, 1)]  # partition A never reaches B
        dg = DataGraph.from_edge_list(spark, labels, edges)
        got = {(r.src, r.dst) for r in partitioned_apsp(dg.nodes, dg.edges).collect()}
        assert (0, 2) not in got and (1, 2) not in got
