"""Synthetic social graphs, pattern graphs, and the paper's worked examples.

The paper evaluates on five SNAP graphs (Table X) which cannot be
downloaded in this offline container; ``social_graph`` generates
label-clustered directed graphs that stand in for them at ~1/400–1/2500
scale (DESIGN.md §3). Clustering by label matches the observation the
paper's partition method relies on (§V: "people with the same role
usually connect with each other closely" [36]).

``fig1_example`` / ``fig4_example`` encode the paper's running examples;
the Fig. 1(c)/2(a) edge set was reconstructed from the published SLen
matrix (Table III) and reproduces it exactly (verified in
``tests/test_paper_examples.py``).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.pattern import PatternGraph
from repro.graphs.updates import Update

# ---------------------------------------------------------------------------
# Dataset registry: synthetic analogues of the paper's Table X (scaled)
# ---------------------------------------------------------------------------


@dataclass(frozen=True)
class DatasetSpec:
    """Generator parameters for one synthetic SNAP-analogue graph."""

    name: str
    paper_name: str
    paper_nodes: int
    paper_edges: int
    n_nodes: int
    n_edges: int
    n_labels: int
    seed: int


DATASETS: dict[str, DatasetSpec] = {
    "email-lite": DatasetSpec("email-lite", "email-EU-core", 1_005, 25_571, 250, 2_000, 8, 11),
    "dblp-lite": DatasetSpec("dblp-lite", "DBLP", 317_080, 1_049_866, 600, 2_000, 10, 13),
    "amazon-lite": DatasetSpec("amazon-lite", "Amazon", 334_863, 925_872, 650, 1_800, 10, 17),
    "youtube-lite": DatasetSpec("youtube-lite", "Youtube", 1_134_890, 2_987_624, 900, 2_400, 12, 19),
    "livejournal-lite": DatasetSpec(
        "livejournal-lite", "LiveJournal", 3_997_962, 34_681_189, 1_200, 9_600, 12, 23
    ),
}

#: Job-title-style label vocabulary (Fig. 1 uses PM/SE/TE/S/DB).
LABELS = ["PM", "SE", "TE", "S", "DB", "QA", "BA", "UX", "OPS", "HR", "FIN", "ML"]


def social_graph(
    *,
    n_nodes: int,
    n_edges: int,
    n_labels: int = 8,
    intra_frac: float = 0.7,
    seed: int = 0,
) -> tuple[dict[int, str], list[tuple[int, int]]]:
    """Directed label-clustered social graph.

    Nodes are split into ``n_labels`` blocks; each block gets a directed
    ring backbone (every same-label community is weakly connected, small
    diameter once chords are added), ``intra_frac`` of the remaining
    edges land inside a block and the rest cross blocks.
    """
    if n_labels > len(LABELS):
        raise ValueError(f"at most {len(LABELS)} labels supported")
    rng = np.random.default_rng(seed)
    node_ids = np.arange(n_nodes)
    block = node_ids * n_labels // n_nodes  # contiguous, near-equal blocks
    labels = {int(i): LABELS[int(b)] for i, b in zip(node_ids, block)}

    edges: set[tuple[int, int]] = set()
    for b in range(n_labels):
        members = node_ids[block == b]
        for i in range(len(members)):  # ring backbone
            edges.add((int(members[i]), int(members[(i + 1) % len(members)])))

    def sample_pair(intra: bool) -> tuple[int, int]:
        if intra:
            b = int(rng.integers(0, n_labels))
            members = node_ids[block == b]
            s, d = rng.choice(members, size=2, replace=False)
        else:
            s, d = rng.choice(node_ids, size=2, replace=False)
        return int(s), int(d)

    tries = 0
    while len(edges) < n_edges and tries < 50 * n_edges:
        tries += 1
        e = sample_pair(rng.random() < intra_frac)
        if e[0] != e[1]:
            edges.add(e)
    return labels, sorted(edges)


def dataset_graph(name: str) -> tuple[dict[int, str], list[tuple[int, int]]]:
    """Generate the named synthetic dataset from :data:`DATASETS`."""
    spec = DATASETS[name]
    return social_graph(
        n_nodes=spec.n_nodes,
        n_edges=spec.n_edges,
        n_labels=spec.n_labels,
        seed=spec.seed,
    )


# ---------------------------------------------------------------------------
# Pattern graph generator (socnetv substitute, §VII-A)
# ---------------------------------------------------------------------------


def pattern_graph(
    *,
    n_nodes: int,
    n_edges: int | None = None,
    labels: list[str],
    max_bound: int = 3,
    seed: int = 0,
) -> PatternGraph:
    """Random pattern graph: 6–10 nodes/edges, bounds in 1..``max_bound``.

    Weakly connected (spanning-tree base), no duplicate directed edges,
    labels drawn from the data graph's vocabulary.
    """
    rng = np.random.default_rng(seed)
    n_edges = n_nodes if n_edges is None else n_edges
    nodes = {pid: labels[int(rng.integers(0, len(labels)))] for pid in range(n_nodes)}
    edges: list[tuple[int, int, int]] = []
    seen: set[tuple[int, int]] = set()
    for pid in range(1, n_nodes):  # spanning tree for weak connectivity
        other = int(rng.integers(0, pid))
        pu, pv = (other, pid) if rng.random() < 0.5 else (pid, other)
        edges.append((pu, pv, int(rng.integers(1, max_bound + 1))))
        seen.add((pu, pv))
    tries = 0
    while len(edges) < n_edges and tries < 100 * n_edges:
        tries += 1
        pu, pv = rng.choice(n_nodes, size=2, replace=False)
        pu, pv = int(pu), int(pv)
        if (pu, pv) in seen:
            continue
        seen.add((pu, pv))
        edges.append((pu, pv, int(rng.integers(1, max_bound + 1))))
    return PatternGraph.of(nodes, edges)


# ---------------------------------------------------------------------------
# Paper worked examples
# ---------------------------------------------------------------------------


def fig1_example() -> dict:
    """Fig. 1/2 running example.

    Edge set reconstructed from the published SLen matrix (Table III);
    every one of its 64 entries is reproduced by this graph. Pattern
    edges follow Example 1/7: PM→SE(3), PM→S(3), SE→TE(3).
    Returns a dict with the graph, pattern, updates and published tables.
    """
    names = ["PM1", "PM2", "SE1", "SE2", "S1", "TE1", "TE2", "DB1"]
    nid = {n: i for i, n in enumerate(names)}
    labels = {nid[n]: n.rstrip("0123456789") for n in names}
    edges_named = [
        ("PM1", "SE2"), ("PM1", "DB1"),
        ("PM2", "SE1"),
        ("SE1", "PM2"), ("SE1", "SE2"), ("SE1", "S1"),
        ("SE2", "TE1"), ("SE2", "DB1"),
        ("S1", "DB1"),
        ("TE1", "SE2"),
        ("TE2", "S1"),
        ("DB1", "SE1"),
    ]
    edges = [(nid[a], nid[b]) for a, b in edges_named]

    pattern = PatternGraph.of(
        {0: "PM", 1: "SE", 2: "S", 3: "TE"},
        [(0, 1, 3), (0, 2, 3), (1, 3, 3)],
    )
    # Example 5 text: PM1 *and* PM2 match PM (Table I's row is truncated
    # in the published PDF; Example 7 confirms PM2 ∈ IQuery).
    iquery = {
        0: {nid["PM1"], nid["PM2"]},
        1: {nid["SE1"], nid["SE2"]},
        2: {nid["S1"]},
        3: {nid["TE1"], nid["TE2"]},
    }
    updates = {
        "U_P1": Update(graph="P", kind="edge_ins", src=0, dst=3, bound=2),
        "U_P2": Update(graph="P", kind="edge_ins", src=2, dst=3, bound=4),
        "U_D1": Update(graph="D", kind="edge_ins", src=nid["SE1"], dst=nid["TE2"]),
        "U_D2": Update(graph="D", kind="edge_ins", src=nid["DB1"], dst=nid["S1"]),
    }
    # Table III (rows = source): finite entries only.
    slen_table3 = {
        ("PM1", "PM1"): 0, ("PM1", "PM2"): 3, ("PM1", "SE1"): 2, ("PM1", "SE2"): 1,
        ("PM1", "S1"): 3, ("PM1", "TE1"): 2, ("PM1", "DB1"): 1,
        ("PM2", "PM2"): 0, ("PM2", "SE1"): 1, ("PM2", "SE2"): 2, ("PM2", "S1"): 2,
        ("PM2", "TE1"): 3, ("PM2", "DB1"): 3,
        ("SE1", "PM2"): 1, ("SE1", "SE1"): 0, ("SE1", "SE2"): 1, ("SE1", "S1"): 1,
        ("SE1", "TE1"): 2, ("SE1", "DB1"): 2,
        ("SE2", "PM2"): 3, ("SE2", "SE1"): 2, ("SE2", "SE2"): 0, ("SE2", "S1"): 3,
        ("SE2", "TE1"): 1, ("SE2", "DB1"): 1,
        ("S1", "PM2"): 3, ("S1", "SE1"): 2, ("S1", "SE2"): 3, ("S1", "S1"): 0,
        ("S1", "TE1"): 4, ("S1", "DB1"): 1,
        ("TE1", "PM2"): 4, ("TE1", "SE1"): 3, ("TE1", "SE2"): 1, ("TE1", "S1"): 4,
        ("TE1", "TE1"): 0, ("TE1", "DB1"): 2,
        ("TE2", "PM2"): 4, ("TE2", "SE1"): 3, ("TE2", "SE2"): 4, ("TE2", "S1"): 1,
        ("TE2", "TE1"): 5, ("TE2", "TE2"): 0, ("TE2", "DB1"): 2,
        ("DB1", "PM2"): 2, ("DB1", "SE1"): 1, ("DB1", "SE2"): 2, ("DB1", "S1"): 2,
        ("DB1", "TE1"): 3, ("DB1", "DB1"): 0,
    }
    # Table IV / VII: published candidate and affected sets.
    can_rn = {"U_P1": {"PM2", "TE2"}, "U_P2": {"TE2"}}
    aff_n = {
        "U_D1": {"PM1", "PM2", "SE1", "SE2", "S1", "TE1", "TE2", "DB1"},
        "U_D2": {"PM1", "SE2", "S1", "TE1", "DB1"},
    }
    return {
        "names": names,
        "nid": nid,
        "labels": labels,
        "edges": edges,
        "pattern": pattern,
        "iquery": iquery,
        "updates": updates,
        "slen_table3": {(nid[a], nid[b]): d for (a, b), d in slen_table3.items()},
        "can_rn": {k: {nid[n] for n in v} for k, v in can_rn.items()},
        "aff_n": {k: {nid[n] for n in v} for k, v in aff_n.items()},
    }


def fig4_example() -> dict:
    """Fig. 4 partition example (Examples 11–15, Tables VIII–IX).

    Edge set reconstructed so the published per-partition SLen matrices
    hold: P_SE={SE1..SE4}, P_TE={TE1..TE3}, P_PM={PM1};
    IB(P_SE)={SE1,SE2}, OB(P_SE)={PM1,TE1}, OB(P_TE)=∅, OB(P_PM)={SE4}.
    """
    names = ["SE1", "SE2", "SE3", "SE4", "TE1", "TE2", "TE3", "PM1"]
    nid = {n: i for i, n in enumerate(names)}
    labels = {nid[n]: n.rstrip("0123456789") for n in names}
    edges_named = [
        ("SE1", "SE2"), ("SE2", "SE3"), ("SE3", "SE4"),
        ("SE1", "PM1"), ("PM1", "SE4"),
        ("SE2", "TE1"), ("TE1", "TE2"), ("TE2", "TE3"),
    ]
    edges = [(nid[a], nid[b]) for a, b in edges_named]
    inf = None  # finite-only dicts; None not stored
    table8 = {  # SLen within P_SE (finite entries)
        ("SE1", "SE1"): 0, ("SE1", "SE2"): 1, ("SE1", "SE3"): 2, ("SE1", "SE4"): 2,
        ("SE2", "SE2"): 0, ("SE2", "SE3"): 1, ("SE2", "SE4"): 2,
        ("SE3", "SE3"): 0, ("SE3", "SE4"): 1,
        ("SE4", "SE4"): 0,
    }
    table9 = {  # SLen from P_SE to P_TE (finite entries)
        ("SE1", "TE1"): 2, ("SE1", "TE2"): 3, ("SE1", "TE3"): 4,
        ("SE2", "TE1"): 1, ("SE2", "TE2"): 2, ("SE2", "TE3"): 3,
    }
    del inf
    return {
        "names": names,
        "nid": nid,
        "labels": labels,
        "edges": edges,
        "table8": {(nid[a], nid[b]): d for (a, b), d in table8.items()},
        "table9": {(nid[a], nid[b]): d for (a, b), d in table9.items()},
        "ib_pse": {nid["SE1"], nid["SE2"]},
        "ob_pse": {nid["PM1"], nid["TE1"]},
    }
