"""Validate the pure-Python reference oracle itself.

The reference is ground truth for the Spark layers, so it is checked
against two independent computations: a brute-force Floyd–Warshall and a
DuckDB recursive-CTE shortest path query.
"""
import duckdb
import pandas as pd
import pytest

from repro.graphs.pattern import STAR, PatternGraph
from repro.reference import ref_apsp, ref_bfs, ref_gpnm, ref_match
from tests.util import random_edges

SEEDS = list(range(8))


def floyd_warshall(n: int, edges: list[tuple[int, int]]) -> dict[tuple[int, int], int]:
    INF = 10**9
    d = [[0 if i == j else INF for j in range(n)] for i in range(n)]
    for s, t in edges:
        d[s][t] = min(d[s][t], 1)
    for k in range(n):
        for i in range(n):
            dik = d[i][k]
            if dik == INF:
                continue
            for j in range(n):
                if dik + d[k][j] < d[i][j]:
                    d[i][j] = dik + d[k][j]
    return {(i, j): d[i][j] for i in range(n) for j in range(n) if d[i][j] < INF}


@pytest.mark.parametrize("seed", SEEDS)
def test_ref_apsp_matches_floyd_warshall(seed):
    n = 25
    edges = random_edges(seed, n, 70)
    assert ref_apsp(list(range(n)), edges) == floyd_warshall(n, edges)


@pytest.mark.parametrize("seed", SEEDS)
def test_ref_apsp_matches_duckdb_recursive_cte(seed):
    n = 15
    edges = random_edges(seed, n, 40)
    con = duckdb.connect()
    con.register("edges", pd.DataFrame(edges, columns=["src", "dst"]))
    got = con.execute(
        f"""
        WITH RECURSIVE walk(src, dst, dist) AS (
          SELECT src, dst, 1 FROM edges
          UNION
          SELECT w.src, e.dst, w.dist + 1
          FROM walk w JOIN edges e ON w.dst = e.src
          WHERE w.dist < {n}
        )
        SELECT src, dst, MIN(dist) AS dist FROM walk
        WHERE src <> dst  -- cycles make the CTE return dist>0 diagonals
        GROUP BY src, dst
        """
    ).fetchall()
    con.close()
    expected = ref_apsp(list(range(n)), edges)
    nontrivial = {k: v for k, v in expected.items() if k[0] != k[1]}
    assert {(s, d): x for s, d, x in got} == nontrivial


def test_ref_bfs_unreachable_omitted():
    assert ref_bfs({0: [1]}, 0) == {0: 0, 1: 1}
    assert ref_bfs({0: [1]}, 1) == {1: 0}


def test_ref_bfs_cycle():
    adj = {0: [1], 1: [2], 2: [0]}
    assert ref_bfs(adj, 0) == {0: 0, 1: 1, 2: 2}


def test_ref_match_simple_chain():
    labels = {0: "A", 1: "B", 2: "C"}
    edges = [(0, 1), (1, 2)]
    p = PatternGraph.of({0: "A", 1: "B"}, [(0, 1, 1)])
    m = ref_gpnm(p, labels, edges)
    assert m == {0: {0}, 1: {1}}


def test_ref_match_bound_too_tight():
    labels = {0: "A", 1: "B", 2: "C"}
    edges = [(0, 2), (2, 1)]  # A reaches B in 2 hops
    p = PatternGraph.of({0: "A", 1: "B"}, [(0, 1, 1)])
    assert ref_gpnm(p, labels, edges) == {0: set(), 1: set()}
    p2 = PatternGraph.of({0: "A", 1: "B"}, [(0, 1, 2)])
    assert ref_gpnm(p2, labels, edges) == {0: {0}, 1: {1}}


def test_ref_match_star_bound_means_any_finite():
    labels = {0: "A", 1: "B", 2: "B"}
    edges = [(0, 1)]  # node 2 unreachable from 0
    p = PatternGraph.of({0: "A", 1: "B"}, [(0, 1, STAR)])
    assert ref_gpnm(p, labels, edges)[0] == {0}
    assert ref_gpnm(p, labels, edges)[1] == {1, 2}


def test_ref_match_cascading_removal():
    # B matches only via C; removing C's match must cascade to B then A.
    labels = {0: "A", 1: "B", 2: "C"}
    edges = [(0, 1)]  # B cannot reach any C
    p = PatternGraph.of({0: "A", 1: "B", 2: "C"}, [(0, 1, 1), (1, 2, 1)])
    assert ref_gpnm(p, labels, edges) == {0: set(), 1: set(), 2: set()}


def test_ref_match_empty_when_label_missing():
    labels = {0: "A"}
    p = PatternGraph.of({0: "A", 1: "Z"}, [])
    assert ref_gpnm(p, labels, []) == {0: set(), 1: set()}


def test_ref_match_no_edges_label_only():
    labels = {0: "A", 1: "A", 2: "B"}
    p = PatternGraph.of({0: "A"}, [])
    assert ref_gpnm(p, labels, []) == {0: {0, 1}}


@pytest.mark.parametrize("seed", SEEDS)
def test_ref_match_is_a_valid_simulation(seed):
    """Every surviving match must satisfy all its out-edge constraints."""
    from tests.util import tiny_graph, tiny_pattern

    labels, edges = tiny_graph(seed)
    gp = tiny_pattern(seed, sorted(set(labels.values())))
    slen = ref_apsp(sorted(labels), edges)
    m = ref_match(gp, labels, slen)
    for pu, pv, bound in gp.edges:
        for v in m[pu]:
            assert any(
                (v, v2) in slen and (bound == STAR or slen[(v, v2)] <= bound)
                for v2 in m[pv]
            )
