"""All four GPNM methods on randomized instances: exactness + cost accounting."""
import pytest

from repro.core.matching import match_fixpoint, matches_to_dict
from repro.core.methods import (
    METHODS,
    apply_data_updates_spark,
    eh_gpnm,
    inc_gpnm,
    ua_gpnm,
)
from repro.graphs.datagraph import DataGraph
from repro.graphs.pattern import PatternGraph
from repro.graphs.updates import (
    Update,
    apply_updates_data,
    apply_updates_pattern,
    generate_data_updates,
    generate_pattern_updates,
)
from repro.reference import ref_gpnm
from repro.spark_graph.bfs import apsp
from tests.util import tiny_graph

SEEDS = [0]

_instance_cache: dict[int, tuple] = {}


def _mk_instance(spark, seed, n=32, e=100):
    if seed in _instance_cache:
        return _instance_cache[seed]
    _instance_cache[seed] = _build_instance(spark, seed, n, e)
    return _instance_cache[seed]


def _build_instance(spark, seed, n=32, e=100):
    labels, edges = tiny_graph(seed, n=n, e=e, n_labels=4)
    dg = DataGraph.from_edge_list(spark, labels, edges).cache()
    slen = apsp(dg.nodes, dg.edges).localCheckpoint(eager=True)
    vocab = sorted(set(labels.values()))
    gp = PatternGraph.of(
        {0: vocab[0], 1: vocab[1], 2: vocab[2]}, [(0, 1, 3), (1, 2, 3)]
    )
    iq = match_fixpoint(spark, gp, slen, dg.nodes).localCheckpoint(eager=True)
    updates = generate_data_updates(labels, edges, m_g=1, n_g=1, seed=seed) + (
        generate_pattern_updates(gp, vocab, m_p=1, n_p=1, seed=seed)
    )
    return labels, edges, dg, slen, gp, iq, updates


def _expected(labels, edges, gp, updates):
    labels_new, edges_new = apply_updates_data(labels, edges, updates)
    gp_new = apply_updates_pattern(gp, updates)
    return gp_new, ref_gpnm(gp_new, labels_new, edges_new)


@pytest.mark.parametrize("seed", SEEDS)
@pytest.mark.parametrize("method", list(METHODS))
def test_method_exact_on_random_instance(spark, seed, method):
    labels, edges, dg, slen, gp, iq, updates = _mk_instance(spark, seed)
    gp_new, expected = _expected(labels, edges, gp, updates)
    res, stats = METHODS[method](spark, dg, gp, slen, iq, updates)
    got = matches_to_dict(res)
    assert {p: got.get(p, set()) for p in gp_new.nodes} == expected
    assert stats.method == method


@pytest.mark.parametrize("method", list(METHODS))
def test_data_only_updates(spark, method):
    labels, edges, dg, slen, gp, iq, _ = _mk_instance(spark, 3)
    updates = generate_data_updates(labels, edges, m_g=2, n_g=2, seed=3)
    gp_new, expected = _expected(labels, edges, gp, updates)
    res, _ = METHODS[method](spark, dg, gp, slen, iq, updates)
    got = matches_to_dict(res)
    assert {p: got.get(p, set()) for p in gp_new.nodes} == expected


@pytest.mark.parametrize("method", list(METHODS))
def test_pattern_only_updates(spark, method):
    labels, edges, dg, slen, gp, iq, _ = _mk_instance(spark, 4)
    vocab = sorted(set(labels.values()))
    updates = generate_pattern_updates(gp, vocab, m_p=2, n_p=2, seed=4)
    gp_new, expected = _expected(labels, edges, gp, updates)
    res, _ = METHODS[method](spark, dg, gp, slen, iq, updates)
    got = matches_to_dict(res)
    assert {p: got.get(p, set()) for p in gp_new.nodes} == expected


@pytest.mark.parametrize("method", list(METHODS))
def test_empty_update_list(spark, method):
    labels, edges, dg, slen, gp, iq, _ = _mk_instance(spark, 5)
    res, stats = METHODS[method](spark, dg, gp, slen, iq, [])
    assert matches_to_dict(res) == matches_to_dict(iq)


class TestCostAccounting:
    def test_inc_counts_one_pass_per_update(self, spark):
        labels, edges, dg, slen, gp, iq, updates = _mk_instance(spark, 6)
        _, stats = inc_gpnm(spark, dg, gp, slen, iq, updates)
        assert stats.n_refine_passes == len(updates)
        assert stats.n_slen_passes == len([u for u in updates if u.graph == "D"])

    def test_eh_refines_at_most_inc(self, spark):
        labels, edges, dg, slen, gp, iq, updates = _mk_instance(spark, 6)
        _, inc_stats = inc_gpnm(spark, dg, gp, slen, iq, updates)
        _, eh_stats = eh_gpnm(spark, dg, gp, slen, iq, updates)
        assert eh_stats.n_refine_passes <= inc_stats.n_refine_passes
        # EH still pays one SLen maintenance pass per data update
        assert eh_stats.n_slen_passes == inc_stats.n_slen_passes

    def test_ua_single_slen_pass_and_fewest_refines(self, spark):
        labels, edges, dg, slen, gp, iq, updates = _mk_instance(spark, 6)
        _, eh_stats = eh_gpnm(spark, dg, gp, slen, iq, updates)
        _, ua_stats = ua_gpnm(spark, dg, gp, slen, iq, updates)
        assert ua_stats.n_slen_passes == 1
        assert ua_stats.n_refine_passes <= eh_stats.n_refine_passes + len(
            [u for u in updates if u.graph == "P"]
        )
        assert ua_stats.n_refine_passes == len(updates) - ua_stats.n_eliminated

    def test_nopar_and_par_same_counters(self, spark):
        labels, edges, dg, slen, gp, iq, updates = _mk_instance(spark, 7)
        _, a = ua_gpnm(spark, dg, gp, slen, iq, updates, partitioned=False)
        _, b = ua_gpnm(spark, dg, gp, slen, iq, updates, partitioned=True)
        assert (a.n_refine_passes, a.n_eliminated) == (b.n_refine_passes, b.n_eliminated)

    def test_phase_timings_recorded(self, spark):
        labels, edges, dg, slen, gp, iq, updates = _mk_instance(spark, 8)
        _, stats = ua_gpnm(spark, dg, gp, slen, iq, updates)
        assert {"detect", "slen", "refine", "consolidate"} <= set(stats.phase_seconds)
        assert stats.total_seconds > 0


class TestApplyDataUpdatesSpark:
    def test_matches_python_application(self, spark):
        labels, edges = tiny_graph(9, n=25, e=70)
        dg = DataGraph.from_edge_list(spark, labels, edges)
        updates = generate_data_updates(labels, edges, m_g=2, n_g=2, seed=9)
        dg_new = apply_data_updates_spark(spark, dg, updates)
        exp_labels, exp_edges = apply_updates_data(labels, edges, updates)
        got_labels, got_edges = dg_new.to_python()
        assert got_labels == exp_labels
        assert sorted(got_edges) == sorted(exp_edges)

    def test_ignores_pattern_updates(self, spark):
        labels, edges = tiny_graph(10, n=20, e=50)
        dg = DataGraph.from_edge_list(spark, labels, edges)
        dg_new = apply_data_updates_spark(
            spark, dg, [Update(graph="P", kind="node_del", node=0)]
        )
        assert dg_new.counts() == (len(labels), len(edges))


class TestEliminationEffectiveness:
    def test_overlapping_workload_yields_eliminations(self, spark):
        """The workload generator's overlap bias must produce real
        elimination relationships (otherwise UA degenerates to INC)."""
        labels, edges = tiny_graph(11, n=40, e=140, n_labels=4)
        dg = DataGraph.from_edge_list(spark, labels, edges).cache()
        slen = apsp(dg.nodes, dg.edges).localCheckpoint(eager=True)
        vocab = sorted(set(labels.values()))
        gp = PatternGraph.of({0: vocab[0], 1: vocab[1]}, [(0, 1, 3)])
        iq = match_fixpoint(spark, gp, slen, dg.nodes).localCheckpoint(eager=True)
        updates = generate_data_updates(
            labels, edges, m_g=3, n_g=3, seed=11, overlap=0.9
        )
        _, stats = ua_gpnm(spark, dg, gp, slen, iq, updates)
        assert stats.n_eliminated >= 1
