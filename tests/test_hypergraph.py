"""GYO reduction, acyclicity, and join-tree enumeration (§2.2)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.cq import CQ, R
from repro.core.hypergraph import (
    enumerate_tree_edges, gyo_reduce, is_acyclic, is_join_tree
)


def _cq(*attr_sets, output=()):
    rels = tuple(R(f"R{i}", "t", list(a)) for i, a in enumerate(attr_sets))
    return CQ(rels, tuple(output))


# ----------------------------------------------------------- acyclicity
@pytest.mark.parametrize(
    "attr_sets",
    [
        [("a", "b")],
        [("a", "b"), ("b", "c")],
        [("a", "b"), ("b", "c"), ("c", "d")],
        [("a", "b"), ("b", "c"), ("b", "d")],  # star
        [("a", "b", "c"), ("a", "b"), ("b", "c"), ("a", "c")],  # covered cycle
        [("a", "b"), ("c", "d")],  # cartesian, both components acyclic
        [("a", "b", "c", "d"), ("c", "d", "e"), ("e", "f")],
    ],
)
def test_acyclic_queries(attr_sets):
    assert is_acyclic(_cq(*attr_sets))


@pytest.mark.parametrize(
    "attr_sets",
    [
        [("a", "b"), ("b", "c"), ("c", "a")],  # triangle
        [("a", "b"), ("b", "c"), ("c", "d"), ("d", "a")],  # 4-cycle
        [("a", "b"), ("b", "c"), ("c", "d"), ("d", "e"), ("e", "a")],
        # dumbbell: two triangles and a bridge
        [("a", "b"), ("b", "c"), ("c", "a"), ("c", "d"),
         ("d", "e"), ("e", "f"), ("f", "d")],
    ],
)
def test_cyclic_queries(attr_sets):
    assert not is_acyclic(_cq(*attr_sets))


def test_gyo_reduce_triangle_is_stuck():
    rest = gyo_reduce({"A": frozenset("ab"), "B": frozenset("bc"), "C": frozenset("ca")})
    assert len(rest) == 3  # nothing reducible


def test_gyo_reduce_path_vanishes():
    rest = gyo_reduce({"A": frozenset("ab"), "B": frozenset("bc")})
    assert len(rest) <= 1


def test_gyo_identifies_cyclic_core_of_mixed_query():
    rest = gyo_reduce(
        {
            "A": frozenset("ab"), "B": frozenset("bc"), "C": frozenset("ca"),
            "D": frozenset("cd"),  # acyclic appendage
        }
    )
    assert set(rest) == {"A", "B", "C"}


# ------------------------------------------------------ tree enumeration
def test_two_relation_single_tree():
    cq = _cq(("a", "b"), ("b", "c"))
    assert enumerate_tree_edges(cq) == [frozenset({("R0", "R1")})]


def test_path3_trees_are_join_trees():
    cq = _cq(("a", "b"), ("b", "c"), ("c", "d"))
    trees = enumerate_tree_edges(cq)
    assert trees, "a path query must have a join tree"
    for t in trees:
        assert is_join_tree(cq, t)
    # the path itself is the only undirected join tree
    assert frozenset({("R0", "R1"), ("R1", "R2")}) in trees


def test_star_query_trees():
    cq = _cq(("a", "b", "c"), ("a", "x"), ("b", "y"), ("c", "z"))
    trees = enumerate_tree_edges(cq)
    star = frozenset({("R0", "R1"), ("R0", "R2"), ("R0", "R3")})
    assert star in trees


def test_tpch_q9_has_multiple_trees():
    cq = CQ(
        (
            R("R1", "l", ["x1", "x2", "x3", "x4"]),
            R("R2", "o", ["x2", "x5"]),
            R("R3", "ps", ["x3", "x4"]),
            R("R4", "p", ["x3", "x6"]),
            R("R5", "s", ["x4", "x7"]),
            R("R6", "n", ["x7", "x8"]),
        ),
        ("x1", "x2", "x8"),
    )
    trees = enumerate_tree_edges(cq, cap=64)
    assert len(trees) >= 2
    for t in trees:
        assert is_join_tree(cq, t)
    # both paper trees (T1 and T2 shapes) are found
    t_paper = frozenset(
        {("R1", "R2"), ("R1", "R3"), ("R3", "R4"), ("R1", "R5"), ("R5", "R6")}
    )
    assert any(
        {tuple(sorted(e)) for e in t} == {tuple(sorted(e)) for e in t_paper}
        for t in trees
    )


def test_disconnected_query_bridged():
    cq = _cq(("a", "b"), ("c", "d"))
    trees = enumerate_tree_edges(cq)
    assert trees and all(len(t) == 1 for t in trees)


def test_contained_relation_attaches():
    cq = _cq(("a", "b", "c"), ("b", "c"))
    trees = enumerate_tree_edges(cq)
    assert frozenset({("R0", "R1")}) in trees


def test_enumeration_cap_respected():
    # a star of 8 relations over one shared attr has very many trees
    cq = _cq(*[("h", f"u{i}") for i in range(8)])
    trees = enumerate_tree_edges(cq, cap=10)
    assert len(trees) <= 10


# ------------------------------------------------- randomised GYO check
@st.composite
def random_acyclic(draw):
    """Build a random acyclic query by growing a join tree: each new
    relation shares a nonempty attr subset with exactly one existing
    relation plus fresh attrs (an ear), which is acyclic by construction."""
    n = draw(st.integers(2, 7))
    rels = [frozenset({"a0", "b0"})]
    fresh = 0
    for i in range(1, n):
        parent = rels[draw(st.integers(0, i - 1))]
        k = draw(st.integers(1, len(parent)))
        shared = frozenset(sorted(parent)[:k])
        extra = draw(st.integers(0, 2))
        new = set(shared)
        for _ in range(extra):
            fresh += 1
            new.add(f"f{fresh}")
        rels.append(frozenset(new))
    return rels


@given(random_acyclic())
@settings(max_examples=60, deadline=None)
def test_random_acyclic_accepted_and_has_tree(attr_sets):
    cq = _cq(*attr_sets)
    assert is_acyclic(cq)
    trees = enumerate_tree_edges(cq, cap=8)
    assert trees
    assert all(is_join_tree(cq, t) for t in trees)


@given(st.integers(3, 8))
@settings(max_examples=20, deadline=None)
def test_random_cycles_rejected(k):
    attrs = [(f"x{i}", f"x{(i + 1) % k}") for i in range(k)]
    assert not is_acyclic(_cq(*attrs))
