"""Synthetic graph / pattern generators and the update-workload generator."""
import pytest

from repro.graphs.pattern import STAR
from repro.graphs.updates import (
    apply_updates_data,
    generate_data_updates,
    generate_pattern_updates,
)
from repro.synth_graph import (
    DATASETS,
    dataset_graph,
    pattern_graph,
    social_graph,
)

SEEDS = list(range(6))


class TestSocialGraph:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_deterministic(self, seed):
        a = social_graph(n_nodes=60, n_edges=200, n_labels=5, seed=seed)
        b = social_graph(n_nodes=60, n_edges=200, n_labels=5, seed=seed)
        assert a == b

    def test_sizes(self):
        labels, edges = social_graph(n_nodes=100, n_edges=400, n_labels=6, seed=0)
        assert len(labels) == 100
        assert len(edges) == 400

    def test_no_self_loops_or_duplicates(self):
        _, edges = social_graph(n_nodes=80, n_edges=300, n_labels=5, seed=1)
        assert all(s != d for s, d in edges)
        assert len(set(edges)) == len(edges)

    def test_label_clustering(self):
        """A clear majority of edges should stay inside a label block."""
        labels, edges = social_graph(n_nodes=200, n_edges=800, n_labels=8, seed=2)
        intra = sum(1 for s, d in edges if labels[s] == labels[d])
        assert intra / len(edges) > 0.55

    def test_every_label_block_weakly_connected_by_ring(self):
        labels, edges = social_graph(n_nodes=50, n_edges=120, n_labels=5, seed=3)
        eset = set(edges)
        by_label: dict[str, list[int]] = {}
        for n, l in labels.items():
            by_label.setdefault(l, []).append(n)
        for members in by_label.values():
            ms = sorted(members)
            for i in range(len(ms)):
                assert (ms[i], ms[(i + 1) % len(ms)]) in eset

    @pytest.mark.parametrize("name", list(DATASETS))
    def test_dataset_specs_respected(self, name):
        spec = DATASETS[name]
        labels, edges = dataset_graph(name)
        assert len(labels) == spec.n_nodes
        assert len(edges) == spec.n_edges
        assert len(set(labels.values())) == spec.n_labels

    def test_dataset_size_ordering_matches_paper(self):
        """Relative ordering of Table X preserved by the analogues."""
        sizes = [(DATASETS[n].paper_nodes, DATASETS[n].n_nodes) for n in DATASETS]
        paper_sorted = sorted(sizes, key=lambda t: t[0])
        assert [s[1] for s in paper_sorted] == sorted(s[1] for s in sizes)


class TestPatternGenerator:
    @pytest.mark.parametrize("seed", SEEDS)
    @pytest.mark.parametrize("n", [6, 8, 10])
    def test_shape(self, seed, n):
        gp = pattern_graph(n_nodes=n, labels=["A", "B", "C"], seed=seed)
        assert len(gp.nodes) == n
        assert len(gp.edges) == n
        for pu, pv, bound in gp.edges:
            assert pu != pv
            assert 1 <= bound <= 3 or bound == STAR

    @pytest.mark.parametrize("seed", SEEDS)
    def test_weakly_connected(self, seed):
        gp = pattern_graph(n_nodes=8, labels=["A", "B"], seed=seed)
        adj: dict[int, set[int]] = {p: set() for p in gp.nodes}
        for pu, pv, _ in gp.edges:
            adj[pu].add(pv)
            adj[pv].add(pu)
        seen, stack = {0}, [0]
        while stack:
            for nxt in adj[stack.pop()]:
                if nxt not in seen:
                    seen.add(nxt)
                    stack.append(nxt)
        assert seen == set(gp.nodes)

    def test_no_duplicate_directed_edges(self):
        gp = pattern_graph(n_nodes=10, n_edges=14, labels=["A", "B", "C"], seed=4)
        pairs = [(e[0], e[1]) for e in gp.edges]
        assert len(set(pairs)) == len(pairs)


class TestWorkloadGenerator:
    @pytest.fixture()
    def graph(self):
        return social_graph(n_nodes=80, n_edges=300, n_labels=5, seed=7)

    @pytest.mark.parametrize("seed", SEEDS)
    def test_counts(self, graph, seed):
        labels, edges = graph
        ups = generate_data_updates(labels, edges, m_g=3, n_g=3, seed=seed)
        kinds = [u.kind for u in ups]
        assert kinds.count("edge_del") == 3
        assert kinds.count("node_del") == 3
        assert kinds.count("edge_ins") == 3
        assert kinds.count("node_ins") == 3

    @pytest.mark.parametrize("seed", SEEDS)
    def test_each_update_applicable_to_original(self, graph, seed):
        """Independence: every single update applies cleanly to the
        original graph (required by Theorems 1–2 order-independence)."""
        labels, edges = graph
        eset = set(edges)
        ups = generate_data_updates(labels, edges, m_g=4, n_g=4, seed=seed)
        for u in ups:
            if u.kind == "edge_del":
                assert (u.src, u.dst) in eset
            elif u.kind == "edge_ins":
                assert (u.src, u.dst) not in eset
                assert u.src in labels and u.dst in labels
            elif u.kind == "node_del":
                assert u.node in labels
            elif u.kind == "node_ins":
                assert u.node not in labels
                for a, b in u.attach_edges:
                    assert u.node in (a, b)
                    other = b if a == u.node else a
                    assert other in labels

    @pytest.mark.parametrize("seed", SEEDS)
    def test_whole_batch_applies(self, graph, seed):
        labels, edges = graph
        ups = generate_data_updates(labels, edges, m_g=3, n_g=3, seed=seed)
        new_labels, new_edges = apply_updates_data(labels, edges, ups)
        for s, d in new_edges:  # no dangling edges after the batch
            assert s in new_labels and d in new_labels

    def test_deterministic(self, graph):
        labels, edges = graph
        a = generate_data_updates(labels, edges, m_g=2, n_g=2, seed=5)
        b = generate_data_updates(labels, edges, m_g=2, n_g=2, seed=5)
        assert a == b

    @pytest.mark.parametrize("seed", SEEDS)
    def test_pattern_updates_applicable(self, graph, seed):
        labels, _ = graph
        gp = pattern_graph(n_nodes=8, labels=sorted(set(labels.values())), seed=seed)
        ups = generate_pattern_updates(
            gp, sorted(set(labels.values())), m_p=3, n_p=3, seed=seed
        )
        assert len([u for u in ups if u.graph == "P"]) == len(ups)
        from repro.graphs.updates import apply_updates_pattern

        gp_new = apply_updates_pattern(gp, ups)  # must not raise
        assert gp_new.nodes

    @pytest.mark.parametrize("seed", SEEDS)
    def test_pattern_update_counts(self, graph, seed):
        labels, _ = graph
        vocab = sorted(set(labels.values()))
        gp = pattern_graph(n_nodes=8, labels=vocab, seed=seed)
        ups = generate_pattern_updates(gp, vocab, m_p=2, n_p=2, seed=seed)
        dels = [u for u in ups if u.kind in ("edge_del", "node_del")]
        inss = [u for u in ups if u.kind in ("edge_ins", "node_ins")]
        assert len(dels) == 2
        assert len(inss) == 2
