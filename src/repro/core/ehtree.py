"""Elimination Hierarchy Tree (EH-Tree, §IV-C).

A forest indexing the containment hierarchy of elimination relationships:

* each tree node is one update, storing its affected/candidate node set;
* the update with the largest set becomes a root (strategy (a));
* ``U_b`` is a child of ``U_a`` when ``U_a``'s set covers ``U_b``'s set
  within the same graph (strategies (b)/(c));
* a cross-eliminated ``U_Pi`` hangs under its partner ``U_Di``
  (strategy (d), Example 10 / Fig. 3).

Only *root* updates require an incremental GPNM pass in UA-GPNM
(Algorithm 6); all descendants are eliminated. The tree is a driver-side
index over ≤ tens of updates whose payload sets were computed in Spark.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass
class EHNode:
    """One EH-Tree node: an update and its candidate/affected node set."""

    uid: str
    graph: str  # "P" or "D"
    members: frozenset[int]
    children: list["EHNode"] = field(default_factory=list)

    def walk(self):
        yield self
        for c in self.children:
            yield from c.walk()


def _covers(parent: EHNode, child_graph: str, child_members: frozenset[int],
            child_uid: str, cross: set[tuple[str, str]]) -> bool:
    if parent.graph == child_graph:
        if parent.members > child_members:
            return True
        # equal sets: deterministic tie-break so insertion is antisymmetric
        if parent.members == child_members and parent.uid < child_uid:
            return True
        return False
    # strategy (d): pattern update under its cross-eliminating data update
    return child_graph == "P" and parent.graph == "D" and (child_uid, parent.uid) in cross


def build_ehtree(
    entries: list[tuple[str, str, frozenset[int]]],
    cross_pairs: list[tuple[str, str]] = (),
) -> list[EHNode]:
    """Build the EH forest from ``(uid, graph, member_set)`` entries.

    Entries are inserted largest-set first (paper strategy (a)); each is
    attached to the *deepest* existing node that covers it, else becomes
    a new root. Returns the list of roots.
    """
    cross = set(cross_pairs)
    roots: list[EHNode] = []
    ordered = sorted(entries, key=lambda e: (-len(e[2]), e[0]))

    def all_nodes() -> list[EHNode]:
        out: list[EHNode] = []
        for r in roots:
            out.extend(r.walk())
        return out

    for uid, graph, members in ordered:
        node = EHNode(uid=uid, graph=graph, members=members)
        # Most-specific cover anywhere in the forest (a same-graph cover
        # may itself hang under a cross-graph parent, e.g. U_P1 under
        # U_D1 in Fig. 3 — U_P2 must still find U_P1).
        covers = [
            n for n in all_nodes() if _covers(n, graph, members, uid, cross)
        ]
        if not covers:
            roots.append(node)
        else:
            parent = min(covers, key=lambda n: (len(n.members), n.uid))
            parent.children.append(node)
    return roots


def root_uids(roots: list[EHNode]) -> list[str]:
    """Updates that still require an incremental GPNM pass."""
    return [r.uid for r in roots]


def eliminated_uids(roots: list[EHNode]) -> set[str]:
    """All non-root updates — their passes are subsumed by an ancestor."""
    out: set[str] = set()
    for r in roots:
        for n in r.walk():
            if n is not r:
                out.add(n.uid)
    return out
