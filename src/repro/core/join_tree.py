"""Rooted join trees, free-connex and relation-dominated detection (§2.2).

A :class:`JoinTree` is a rooted orientation of an undirected join tree.
Free-connex detection follows Lemma 2.2: grow the maximal connex subset from
the root (a child joins the subset iff its link to its parent uses only
output attributes) and check it covers ``O``.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable

from .cq import CQ
from .hypergraph import enumerate_tree_edges, is_acyclic

Edge = tuple[str, str]


@dataclass(frozen=True)
class JoinTree:
    """Rooted join tree: ``parent[n]`` is ``None`` for the root."""

    root: str
    parent: tuple[tuple[str, str | None], ...]  # (node, parent) pairs

    @property
    def parent_map(self) -> dict[str, str | None]:
        return dict(self.parent)

    @property
    def nodes(self) -> list[str]:
        return [n for n, _ in self.parent]

    def children(self, n: str) -> list[str]:
        return [c for c, p in self.parent if p == n]

    def post_order(self) -> list[str]:
        """Children before parents; sibling order follows the node order the
        tree was built with (the CQ's relation order)."""
        out: list[str] = []

        def rec(n: str):
            for c in self.children(n):
                rec(c)
            out.append(n)

        rec(self.root)
        return out

    def pre_order(self) -> list[str]:
        out: list[str] = []

        def rec(n: str):
            out.append(n)
            for c in self.children(n):
                rec(c)

        rec(self.root)
        return out

    def height(self) -> int:
        pm = self.parent_map

        def depth(n: str) -> int:
            d = 0
            while pm[n] is not None:
                n = pm[n]
                d += 1
            return d

        return max(depth(n) for n in self.nodes)

    def undirected_edges(self) -> frozenset[Edge]:
        return frozenset(
            tuple(sorted((n, p))) for n, p in self.parent if p is not None
        )


def root_tree(cq: CQ, edges: Iterable[Edge], root: str) -> JoinTree:
    """Orient an undirected edge set away from ``root``; node order (and thus
    sibling visit order) follows the CQ's relation order."""
    order = [r.name for r in cq.relations]
    adj: dict[str, list[str]] = {n: [] for n in order}
    for a, b in edges:
        adj[a].append(b)
        adj[b].append(a)
    for n in adj:
        adj[n].sort(key=order.index)
    parent: dict[str, str | None] = {root: None}
    stack = [root]
    while stack:
        n = stack.pop()
        for m in adj[n]:
            if m not in parent:
                parent[m] = n
                stack.append(m)
    if len(parent) != len(order):
        raise ValueError("edges do not span the query")
    return JoinTree(root, tuple((n, parent[n]) for n in order))


def connex_subset(cq: CQ, tree: JoinTree, output: frozenset[str] | None = None) -> set[str] | None:
    """Maximal connex subset per Lemma 2.2, or ``None`` if the tree is not a
    free-connex join tree for the query's output."""
    o = cq.plan_output if output is None else output
    subset = {tree.root}
    frontier = [tree.root]
    while frontier:
        n = frontier.pop()
        for c in tree.children(n):
            if cq.shared(c, n) <= o:
                subset.add(c)
                frontier.append(c)
    covered = set().union(*(cq.rel(n).attr_set for n in subset))
    return subset if o <= covered else None


def is_free_connex_tree(cq: CQ, tree: JoinTree) -> bool:
    return connex_subset(cq, tree) is not None


def dominating_relations(cq: CQ) -> list[str]:
    """Relations whose attributes cover all output attributes (§2.2)."""
    o = cq.plan_output
    return [r.name for r in cq.relations if o <= r.attr_set]


def enumerate_join_trees(cq: CQ, cap: int = 64) -> list[JoinTree]:
    """All (capped) rooted join trees: every rooting of every undirected
    join tree. Raises on cyclic queries."""
    if not is_acyclic(cq):
        raise ValueError(f"query {cq.name or '?'} is cyclic; decompose first")
    trees: list[JoinTree] = []
    for edges in enumerate_tree_edges(cq, cap=cap):
        for r in cq.relations:
            trees.append(root_tree(cq, edges, r.name))
            if len(trees) >= cap * 8:
                return trees
    return trees


def classify(cq: CQ, cap: int = 64) -> str:
    """'relation-dominated' ⊂ 'free-connex' ⊂ 'acyclic', else 'cyclic'."""
    if not is_acyclic(cq):
        return "cyclic"
    if dominating_relations(cq):
        return "relation-dominated"
    for t in enumerate_join_trees(cq, cap=cap):
        if is_free_connex_tree(cq, t):
            return "free-connex"
    return "acyclic"
