"""Plan-shape tests pinned to the paper's worked examples:

* Example 3.1 (two-relation Q4): Yannakakis+ needs zero semi-joins,
  Yannakakis needs two;
* Example 3.2 + 3.13 (free-connex Q2 on T2): 2 semi-joins, early
  aggregation-joins for R3/R5/R6, reduction to a full query;
* Example 3.3 + 3.15 (non-free-connex Q1 on T1): 3 semi-joins vs the
  classic algorithm's 10 (Example 2.4), with the exact second-round steps;
* Theorem 3.7: relation-dominated queries finish after round one.
"""
import pytest

from repro.core._emit import Rules
from repro.core.cq import CQ, R
from repro.core.join_tree import root_tree
from repro.core.plan import Finalize, Join, Project, Scan, SemiJoin
from repro.core.semiring import SUM_PROD
from repro.core.yannakakis import plan_yannakakis
from repro.core.yannakakis_plus import plan_yannakakis_plus

NOPK = Rules(pk_fk=False, annot=True)


def q9_relations():
    return (
        R("R1", "l", ["x1", "x2", "x3", "x4"], annot="qty"),
        R("R2", "o", ["x2", "x5"]),
        R("R3", "ps", ["x3", "x4"], annot="cost"),
        R("R4", "p", ["x3", "x6"]),
        R("R5", "s", ["x4", "x7"]),
        R("R6", "n", ["x7", "x8"]),
    )


T1 = [("R5", "R1"), ("R5", "R6"), ("R1", "R2"), ("R1", "R3"), ("R3", "R4")]
T2 = [("R1", "R2"), ("R1", "R3"), ("R1", "R4"), ("R1", "R5"), ("R5", "R6")]


# ------------------------------------------------------- Example 3.1: Q4
@pytest.fixture
def q4():
    return CQ(
        (R("R1", "e", {"x1": "src", "x2": "dst"}),
         R("R2", "e", {"x2": "src", "x3": "dst"})),
        ("x1",), SUM_PROD, name="Q4",
    )


def test_q4_yplus_no_semijoins(q4):
    tree = root_tree(q4, [("R1", "R2")], "R1")
    plan = plan_yannakakis_plus(q4, tree, rules=NOPK)
    assert plan.n_semijoins() == 0
    assert plan.n_joins() == 1
    # exactly: scan, scan, π_{x2}R2, join, finalize
    kinds = [type(s).__name__ for s in plan.steps]
    assert kinds == ["Scan", "Scan", "Project", "Join", "Finalize"]


def test_q4_classic_has_two_semijoins(q4):
    tree = root_tree(q4, [("R1", "R2")], "R1")
    plan = plan_yannakakis(q4, tree)
    assert plan.n_semijoins() == 2
    assert plan.n_joins() == 1


def test_q4_project_aggregates_out_x3(q4):
    tree = root_tree(q4, [("R1", "R2")], "R1")
    plan = plan_yannakakis_plus(q4, tree, rules=NOPK)
    (proj,) = plan.of_type(Project)
    assert proj.attrs == ("x2",) and proj.dedup


# --------------------------------------------- Examples 3.2 + 3.13: Q2/T2
@pytest.fixture
def q2():
    return CQ(q9_relations(), ("x1", "x2", "x3", "x5", "x6"), SUM_PROD, name="Q2")


def test_q2_two_semijoins_four_joins(q2):
    tree = root_tree(q2, T2, "R1")
    plan = plan_yannakakis_plus(q2, tree, rules=NOPK)
    # paper steps: semijoins with R2 and R4; joins with R3, π(R5⋈R6), then
    # second-round joins with R2 and R4 (4 joins before the R5⋈R6 fold = 5)
    assert plan.n_semijoins() == 2
    assert plan.n_joins() == 5


def test_q2_reduced_to_full_query_before_round2(q2):
    tree = root_tree(q2, T2, "R1")
    plan = plan_yannakakis_plus(q2, tree, rules=NOPK)
    # the round-1 aggregation π_{x1,x2,x3} R1 of Example 3.2 step (6)
    projections = [s.attrs for s in plan.of_type(Project)]
    assert ("x1", "x2", "x3") in projections


def test_q2_classic_semijoin_count(q2):
    tree = root_tree(q2, T2, "R1")
    plan = plan_yannakakis(q2, tree)
    assert plan.n_semijoins() == 10  # 5 up + 5 down


# ------------------------------------------ Examples 3.3 + 3.15: Q1 on T1
@pytest.fixture
def q1():
    return CQ(q9_relations(), ("x1", "x2", "x8"), SUM_PROD, name="Q1")


def test_q1_exact_plan_matches_paper(q1):
    tree = root_tree(q1, T1, "R5")
    plan = plan_yannakakis_plus(q1, tree, rules=NOPK)
    assert plan.describe() == "\n".join([
        "R1@1 <- scan l+v",
        "R2@2 <- scan o",
        "R2@3 <- pi[x2] R2@2",          # (1) R1 ← R1 ⋈ π_x2 R2
        "R1@4 <- join[x2] R1@1 R2@3",
        "R3@5 <- scan ps+v",
        "R4@6 <- scan p",
        "R4@7 <- pi[x3] R4@6",          # (2) R3 ← R3 ⋈ π_x3 R4
        "R3@8 <- join[x3] R3@5 R4@7",
        "R1@9 <- join[x3,x4] R1@4 R3@8",  # (3) R1 ← R1 ⋈ R3
        "R1@10 <- pi[x1,x2,x4] R1@9",     # (4) R1 ← π_{x1,x2,x4} R1
        "R5@11 <- scan s",
        "R5@12 <- semijoin[x4] R5@11 R1@10",  # (5) R5 ← R5 ⋉ R1
        "R6@13 <- scan n",
        "R5@14 <- semijoin[x7] R5@12 R6@13",  # (6) R5 ← R5 ⋉ R6
        "R6@15 <- semijoin[x7] R6@13 R5@14",  # (7) R6 ← R6 ⋉ R5
        "R5@16 <- join[x7] R6@15 R5@14",      # (8) π_{x4,x8}(R6 ⋈ R5)
        "R5@17 <- pi[x4,x8] R5@16",
        "R5@18 <- join[x4] R5@17 R1@10",      # (9) π_O(R5 ⋈ R1)
        "result@19 <- finalize[agg:x1,x2,x8] R5@18",
    ])


def test_q1_semijoin_counts_3_vs_10(q1):
    tree = root_tree(q1, T1, "R5")
    assert plan_yannakakis_plus(q1, tree, rules=NOPK).n_semijoins() == 3
    assert plan_yannakakis(q1, tree).n_semijoins() == 10


def test_q1_classic_structure(q1):
    tree = root_tree(q1, T1, "R5")
    plan = plan_yannakakis(q1, tree)
    # phase 3 keeps output attrs alongside parent attrs: π_{A_p ∪ O}
    assert plan.n_joins() == 5
    assert isinstance(plan.steps[-1], Finalize)


# ------------------------------------- Theorem 3.7: relation-dominated
def test_relation_dominated_single_round():
    cq = CQ(q9_relations(), ("x1",), SUM_PROD, name="Q3")
    tree = root_tree(cq, T1, "R1")  # rooted at the dominating relation
    # re-root T1 at R1
    tree = root_tree(cq, T1, "R1")
    plan = plan_yannakakis_plus(cq, tree, rules=NOPK)
    # after round 1 a single relation remains: no second-round join of two
    # reduced partitions — every join absorbs a leaf (its output ⊆ parent)
    assert plan.n_semijoins() == 0
    assert [type(s).__name__ for s in plan.steps][-1] == "Finalize"


def test_full_query_plans_have_no_aggregating_projection():
    from repro.core.semiring import BOOL

    rels = tuple(
        R(f"E{i}", "e", {c1: "src", c2: "dst"})
        for i, (c1, c2) in enumerate([("a", "b"), ("b", "c"), ("c", "d")])
    )
    cq = CQ(rels, ("a", "b", "c", "d"), BOOL, name="full")
    tree = root_tree(cq, [("E0", "E1"), ("E1", "E2")], "E0")
    plan = plan_yannakakis_plus(cq, tree, rules=NOPK)
    assert not plan.of_type(Project)  # nothing to aggregate away
    assert plan.steps[-1].mode == "full"
