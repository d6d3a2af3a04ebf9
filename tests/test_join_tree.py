"""Rooted join trees, free-connex and relation-dominated detection
(§2.2, Lemma 2.2, the paper's Example 2.3 and Table 6 classifications)."""
import pytest

from repro.core.cq import CQ, R
from repro.core.join_tree import (
    JoinTree, classify, connex_subset, dominating_relations,
    enumerate_join_trees, is_free_connex_tree, root_tree,
)
from repro.core.semiring import BOOL, SUM_PROD
from repro.workloads import all_queries


def q9_relations():
    return (
        R("R1", "l", ["x1", "x2", "x3", "x4"]),
        R("R2", "o", ["x2", "x5"]),
        R("R3", "ps", ["x3", "x4"]),
        R("R4", "p", ["x3", "x6"]),
        R("R5", "s", ["x4", "x7"]),
        R("R6", "n", ["x7", "x8"]),
    )


T1_EDGES = [("R5", "R1"), ("R5", "R6"), ("R1", "R2"), ("R1", "R3"), ("R3", "R4")]
T2_EDGES = [("R1", "R2"), ("R1", "R3"), ("R1", "R4"), ("R1", "R5"), ("R5", "R6")]


@pytest.fixture
def q1():
    return CQ(q9_relations(), ("x1", "x2", "x8"), SUM_PROD, name="Q1")


@pytest.fixture
def q2():
    return CQ(q9_relations(), ("x1", "x2", "x3", "x5", "x6"), SUM_PROD, name="Q2")


@pytest.fixture
def q3():
    return CQ(q9_relations(), ("x1",), SUM_PROD, name="Q3")


# -------------------------------------------------------------- rooting
def test_root_tree_structure(q1):
    t = root_tree(q1, T1_EDGES, "R5")
    assert t.root == "R5"
    assert t.parent_map["R1"] == "R5" and t.parent_map["R4"] == "R3"
    assert sorted(t.children("R1")) == ["R2", "R3"]


def test_post_order_children_first(q1):
    t = root_tree(q1, T1_EDGES, "R5")
    po = t.post_order()
    assert po == ["R2", "R4", "R3", "R1", "R6", "R5"]
    for n in t.nodes:
        p = t.parent_map[n]
        if p:
            assert po.index(n) < po.index(p)


def test_pre_order_root_first(q1):
    t = root_tree(q1, T1_EDGES, "R5")
    pre = t.pre_order()
    assert pre[0] == "R5"


def test_height(q1):
    assert root_tree(q1, T1_EDGES, "R5").height() == 3
    assert root_tree(q1, T2_EDGES, "R1").height() == 2


def test_root_tree_requires_spanning(q1):
    with pytest.raises(ValueError, match="span"):
        root_tree(q1, T1_EDGES[:2], "R5")


def test_undirected_edges_roundtrip(q1):
    t = root_tree(q1, T1_EDGES, "R5")
    assert t.undirected_edges() == frozenset(
        tuple(sorted(e)) for e in T1_EDGES
    )


# ------------------------------------------- free-connex (Example 2.3)
def test_q1_not_free_connex_on_either_tree(q1):
    assert not is_free_connex_tree(q1, root_tree(q1, T1_EDGES, "R5"))
    assert not is_free_connex_tree(q1, root_tree(q1, T2_EDGES, "R1"))


def test_q2_free_connex_on_t2_not_t1(q2):
    t2 = root_tree(q2, T2_EDGES, "R1")
    assert is_free_connex_tree(q2, t2)
    # T1 is invalid for Q2: the R1–R3 link carries non-output x4
    t1 = root_tree(q2, T1_EDGES, "R5")
    assert not is_free_connex_tree(q2, t1)


def test_q2_connex_subset_contents(q2):
    t2 = root_tree(q2, T2_EDGES, "R1")
    sub = connex_subset(q2, t2)
    assert sub is not None
    assert "R1" in sub and "R2" in sub and "R4" in sub
    assert "R5" not in sub  # joins R1 on non-output x4


def test_q3_relation_dominated(q3):
    assert dominating_relations(q3) == ["R1"]


def test_empty_output_dominated_by_all(q1):
    cq = CQ(q9_relations(), (), SUM_PROD)
    assert len(dominating_relations(cq)) == 6


def test_classify_hierarchy(q1, q2, q3):
    assert classify(q1) == "acyclic"
    assert classify(q2) == "free-connex"
    assert classify(q3) == "relation-dominated"


def test_classify_cyclic():
    cq = CQ((R("A", "t", ["a", "b"]), R("B", "t", ["b", "c"]),
             R("C", "t", ["c", "a"])), ())
    assert classify(cq) == "cyclic"


def test_enumerate_join_trees_rejects_cyclic():
    cq = CQ((R("A", "t", ["a", "b"]), R("B", "t", ["b", "c"]),
             R("C", "t", ["c", "a"])), ())
    with pytest.raises(ValueError, match="cyclic"):
        enumerate_join_trees(cq)


def test_enumerate_join_trees_covers_all_roots(q1):
    roots = {t.root for t in enumerate_join_trees(q1, cap=64)}
    assert roots == {f"R{i}" for i in range(1, 7)}


# ---------------------------- Table 6: SGPB free-connex classification
_TABLE6_FREE_CONNEX = {
    "sgpb-q1a": True, "sgpb-q1b": True, "sgpb-q1c": True,
    "sgpb-q3a": True, "sgpb-q3b": True, "sgpb-q3c": True,
    "sgpb-q4a": True, "sgpb-q4b": True, "sgpb-q5a": True, "sgpb-q5b": True,
    "sgpb-q6": False, "sgpb-q7": False, "sgpb-q8": False, "sgpb-q9": False,
}


@pytest.mark.parametrize("name,expected", sorted(_TABLE6_FREE_CONNEX.items()))
def test_sgpb_free_connex_matches_table6(name, expected):
    wl = all_queries()[name]
    cls = classify(wl.cq)
    assert (cls in ("free-connex", "relation-dominated")) == expected


def test_dumbbell_queries_are_cyclic():
    qs = all_queries()
    assert classify(qs["sgpb-q2a"].cq) == "cyclic"
    assert classify(qs["sgpb-q2b"].cq) == "cyclic"
