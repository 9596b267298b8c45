"""Pure-Python reference implementations (ground truth for tests).

Independent of the Spark code paths: plain-dict BFS for all-pairs
shortest path lengths and a worklist fixpoint for BGS node matching.
Used by the test suite to validate every Spark result, alongside the
DuckDB oracle for the relational pieces (see DESIGN.md §6).
"""
from __future__ import annotations

from collections import deque

from repro.graphs.pattern import STAR, PatternGraph

INF = float("inf")


def ref_bfs(adj: dict[int, list[int]], source: int) -> dict[int, int]:
    """Hop distances from ``source`` over adjacency ``adj`` (unreached omitted)."""
    dist = {source: 0}
    q = deque([source])
    while q:
        u = q.popleft()
        for v in adj.get(u, ()):  # unweighted: FIFO BFS is Dijkstra
            if v not in dist:
                dist[v] = dist[u] + 1
                q.append(v)
    return dist


def ref_apsp(
    node_ids: list[int], edges: list[tuple[int, int]]
) -> dict[tuple[int, int], int]:
    """All-pairs shortest path lengths; only finite entries are present.

    This is the reference for the paper's ``SLen`` matrix (sparse form —
    the paper's Hybrid-format remark stores finite entries only too).
    """
    adj: dict[int, list[int]] = {}
    for s, d in edges:
        adj.setdefault(s, []).append(d)
    out: dict[tuple[int, int], int] = {}
    for u in node_ids:
        for v, d in ref_bfs(adj, u).items():
            out[(u, v)] = d
    return out


def ref_match(
    pattern: PatternGraph,
    node_labels: dict[int, str],
    slen: dict[tuple[int, int], int],
) -> dict[int, set[int]]:
    """Maximal bounded-graph-simulation node matching (GPNM, §III-B).

    Returns ``{pid: matching data-node ids}``; all-empty if BGS has no
    match (some pattern node ends with zero matches).
    """
    cand: dict[int, set[int]] = {
        pid: {v for v, lbl in node_labels.items() if lbl == plabel}
        for pid, plabel in pattern.nodes.items()
    }
    changed = True
    while changed:
        changed = False
        for pu, pv, bound in pattern.edges:
            keep = set()
            for v in cand[pu]:
                ok = False
                for v2 in cand[pv]:
                    d = slen.get((v, v2))
                    if d is not None and (bound == STAR or d <= bound):
                        ok = True
                        break
                if ok:
                    keep.add(v)
            if keep != cand[pu]:
                cand[pu] = keep
                changed = True
    if any(not s for s in cand.values()):
        return {pid: set() for pid in pattern.nodes}
    return cand


def ref_gpnm(
    pattern: PatternGraph,
    node_labels: dict[int, str],
    edges: list[tuple[int, int]],
) -> dict[int, set[int]]:
    """From-scratch reference GPNM: APSP then simulation fixpoint."""
    slen = ref_apsp(sorted(node_labels), edges)
    return ref_match(pattern, node_labels, slen)


def ref_affected_nodes(
    old_slen: dict[tuple[int, int], int],
    new_slen: dict[tuple[int, int], int],
) -> set[int]:
    """Aff_N: endpoints of every pair whose shortest path length changed."""
    out: set[int] = set()
    for key in old_slen.keys() | new_slen.keys():
        if old_slen.get(key) != new_slen.get(key):
            out.update(key)
    return out
