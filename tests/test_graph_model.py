"""DataGraph / PatternGraph model and driver-side update application."""
import pytest

from repro.graphs.pattern import STAR, PatternGraph
from repro.graphs.updates import Update, apply_updates_data, apply_updates_pattern


def _gp():
    return PatternGraph.of({0: "A", 1: "B", 2: "C"}, [(0, 1, 2), (1, 2, 3)])


class TestPatternGraph:
    def test_with_edge(self):
        gp = _gp().with_edge(0, 2, 1)
        assert (0, 2, 1) in gp.edges

    def test_without_edge(self):
        gp = _gp().without_edge(0, 1)
        assert all((e[0], e[1]) != (0, 1) for e in gp.edges)

    def test_without_missing_edge_raises(self):
        with pytest.raises(KeyError):
            _gp().without_edge(2, 0)

    def test_with_node(self):
        gp = _gp().with_node(3, "D")
        assert gp.nodes[3] == "D"

    def test_with_duplicate_node_raises(self):
        with pytest.raises(KeyError):
            _gp().with_node(0, "X")

    def test_without_node_drops_incident_edges(self):
        gp = _gp().without_node(1)
        assert 1 not in gp.nodes
        assert gp.edges == ()

    def test_without_missing_node_raises(self):
        with pytest.raises(KeyError):
            _gp().without_node(9)

    def test_edge_references_unknown_node_raises(self):
        with pytest.raises(ValueError):
            PatternGraph.of({0: "A"}, [(0, 1, 1)])

    def test_bad_bound_raises(self):
        with pytest.raises(ValueError):
            PatternGraph.of({0: "A", 1: "B"}, [(0, 1, 0)])

    def test_star_bound_allowed(self):
        gp = PatternGraph.of({0: "A", 1: "B"}, [(0, 1, STAR)])
        assert gp.edges[0][2] == STAR

    def test_out_edges_and_in_neighbors(self):
        gp = _gp()
        assert gp.out_edges(0) == [(0, 1, 2)]
        assert gp.in_neighbors(2) == [1]

    def test_immutability(self):
        gp = _gp()
        gp.with_edge(0, 2, 1)
        assert len(gp.edges) == 2  # original untouched


class TestApplyUpdates:
    def test_pattern_edge_ins(self):
        gp = apply_updates_pattern(_gp(), [Update(graph="P", kind="edge_ins", src=0, dst=2, bound=1)])
        assert (0, 2, 1) in gp.edges

    def test_pattern_edge_ins_default_bound_star(self):
        gp = apply_updates_pattern(_gp(), [Update(graph="P", kind="edge_ins", src=0, dst=2)])
        assert (0, 2, STAR) in gp.edges

    def test_pattern_node_ops(self):
        ups = [
            Update(graph="P", kind="node_ins", node=3, label="D"),
            Update(graph="P", kind="node_del", node=2),
        ]
        gp = apply_updates_pattern(_gp(), ups)
        assert 3 in gp.nodes and 2 not in gp.nodes

    def test_pattern_ignores_data_updates(self):
        gp = apply_updates_pattern(_gp(), [Update(graph="D", kind="edge_ins", src=0, dst=1)])
        assert gp == _gp()

    def test_data_edge_ins_and_del(self):
        labels = {0: "A", 1: "B"}
        edges = [(0, 1)]
        ups = [
            Update(graph="D", kind="edge_del", src=0, dst=1),
            Update(graph="D", kind="edge_ins", src=1, dst=0),
        ]
        new_labels, new_edges = apply_updates_data(labels, edges, ups)
        assert new_labels == labels
        assert new_edges == [(1, 0)]

    def test_data_node_ins_with_attach_edges(self):
        labels = {0: "A"}
        ups = [Update(graph="D", kind="node_ins", node=5, label="B", attach_edges=((0, 5),))]
        new_labels, new_edges = apply_updates_data(labels, [], ups)
        assert new_labels[5] == "B"
        assert (0, 5) in new_edges

    def test_data_node_del_removes_incident_edges(self):
        labels = {0: "A", 1: "B", 2: "C"}
        edges = [(0, 1), (1, 2), (2, 0)]
        new_labels, new_edges = apply_updates_data(
            labels, edges, [Update(graph="D", kind="node_del", node=1)]
        )
        assert 1 not in new_labels
        assert new_edges == [(2, 0)]

    def test_uid_is_stable_and_descriptive(self):
        u = Update(graph="D", kind="edge_ins", src=3, dst=7)
        assert u.uid == "U_D:edge_ins:3->7"
        assert Update(graph="P", kind="node_del", node=2).uid == "U_P:node_del:2"

    def test_is_insertion(self):
        assert Update(graph="D", kind="edge_ins", src=0, dst=1).is_insertion
        assert Update(graph="D", kind="node_ins", node=9, label="A").is_insertion
        assert not Update(graph="D", kind="edge_del", src=0, dst=1).is_insertion
        assert not Update(graph="D", kind="node_del", node=0).is_insertion
