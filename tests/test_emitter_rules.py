"""Rule-based per-operator eliminations (§5.1) at the plan level:
PK aggregation/projection elimination, RI semi-join and join elimination,
annotation pruning — all pure plan-shape checks (semantics are checked
against the oracle in test_rules_equivalence.py)."""
import pytest

from repro.core._emit import NO_RULES, Emitter, Rules
from repro.core.cq import CQ, R
from repro.core.join_tree import root_tree
from repro.core.plan import Join, Project, Scan, SemiJoin
from repro.core.semiring import MAX_PLUS, MIN_PROD, SUM_PROD
from repro.core.yannakakis_plus import plan_yannakakis_plus

ALL = Rules(pk_fk=True, annot=True)
PK_ONLY = Rules(pk_fk=True, annot=False)
ANNOT_ONLY = Rules(pk_fk=False, annot=True)


def fact_dim(*, dim_pred=None, ri=True, dim_annot=None):
    """fact(k, v-ish) ⋈ dim(k) with k the dim's PK."""
    rels = (
        R("F", "fact", {"k": "fk", "m": "m"}, annot="m"),
        R("D", "dim", {"k": "id"}, predicate=dim_pred, annot=dim_annot,
          keys=[("k",)]),
    )
    return CQ(
        rels, ("m",), SUM_PROD,
        ri=frozenset({("F", "D")}) if ri else frozenset(),
        name="fd",
    )


def plan_for(cq, rules, root="F"):
    tree = root_tree(cq, [("F", "D")], root)
    return plan_yannakakis_plus(cq, tree, rules=rules)


# ----------------------------------------------- join / scan elimination
def test_ri_pk_join_fully_eliminated():
    plan = plan_for(fact_dim(), ALL)
    # dim contributes nothing: no scan of dim, no join at all
    assert len(plan.of_type(Scan)) == 1
    assert plan.n_joins() == 0 and plan.n_semijoins() == 0


def test_predicate_blocks_elimination():
    plan = plan_for(fact_dim(dim_pred="id > 10"), ALL)
    assert len(plan.of_type(Scan)) == 2
    assert plan.n_joins() == 1


def test_no_ri_blocks_elimination():
    plan = plan_for(fact_dim(ri=False), ALL)
    assert plan.n_joins() == 1


def test_annotated_dim_blocks_join_elimination():
    plan = plan_for(fact_dim(dim_annot="id"), ALL)
    assert plan.n_joins() == 1


def test_rules_off_keeps_join():
    plan = plan_for(fact_dim(), NO_RULES)
    assert plan.n_joins() == 1


# ------------------------------------------- projection (agg) elimination
def wide_dim():
    """fact ⋈ dim(k, z) — z must be projected away before the fold."""
    rels = (
        R("F", "fact", {"k": "fk", "m": "m"}, annot="m"),
        R("D", "dim", {"k": "id", "z": "z"}, predicate="z > 10", keys=[("k",)]),
    )
    return CQ(rels, ("m",), SUM_PROD, ri=frozenset({("F", "D")}), name="wd")


def test_pk_projection_needs_no_dedup():
    # π_{k} dim keeps the PK → plain column select, no grouping
    plan = plan_for(wide_dim(), PK_ONLY)
    proj = [p for p in plan.of_type(Project) if p.attrs == ("k",)]
    assert proj and all(not p.dedup for p in proj)


def test_projection_dedups_without_pk_rule():
    plan = plan_for(wide_dim(), NO_RULES)
    proj = [p for p in plan.of_type(Project) if p.attrs == ("k",)]
    assert proj and all(p.dedup for p in proj)


# -------------------------------------------------- semi-join elimination
def chain3():
    """L(ok, m) ⋈ O(ok, ck) ⋈ C(ck): PK-FK chain with group-by on ck."""
    rels = (
        R("L", "li", {"ok": "ok", "m": "m"}, annot="m"),
        R("O", "ord", {"ok": "id", "ck": "ck"}, keys=[("ok",)]),
        R("C", "cust", {"ck": "id"}, keys=[("ck",)]),
    )
    return CQ(rels, ("ck",), SUM_PROD,
              ri=frozenset({("L", "O"), ("O", "C")}), name="c3")


def test_pk_fk_chain_dim_fold_eliminated_with_rules():
    cq = chain3()
    tree = root_tree(cq, [("O", "L"), ("O", "C")], "O")
    plan = plan_yannakakis_plus(cq, tree, rules=ALL)
    # RI(O→C) + PK(C) kills the customer fold entirely; the annotated
    # lineitem fold must stay
    assert plan.n_joins() == 1
    assert {s.relation.name for s in plan.of_type(Scan)} == {"L", "O"}


def test_pk_fk_chain_all_folds_without_rules():
    cq = chain3()
    tree = root_tree(cq, [("O", "L"), ("O", "C")], "O")
    plan = plan_yannakakis_plus(cq, tree, rules=NO_RULES)
    assert plan.n_joins() == 2
    assert len(plan.of_type(Scan)) == 3


# ---------------------------------------------------- annotation pruning
def count_cq(annots=(None, None)):
    rels = (
        R("E1", "e", {"a": "src", "b": "dst"}, annot=annots[0]),
        R("E2", "e", {"b": "src", "c": "dst"}, annot=annots[1]),
    )
    return CQ(rels, ("a",), SUM_PROD, name="cnt")


def test_pruning_drops_virtual_annotations():
    cq = count_cq()
    tree = root_tree(cq, [("E1", "E2")], "E1")
    plan = plan_yannakakis_plus(cq, tree, rules=ANNOT_ONLY)
    assert all(not s.with_annot for s in plan.of_type(Scan))


def test_primitive_mode_materialises_all_annotations():
    cq = count_cq()
    tree = root_tree(cq, [("E1", "E2")], "E1")
    plan = plan_yannakakis_plus(cq, tree, rules=NO_RULES)
    assert all(s.with_annot for s in plan.of_type(Scan))


def test_pruning_keeps_real_annotations():
    cq = count_cq(annots=("w", None))
    tree = root_tree(cq, [("E1", "E2")], "E1")
    plan = plan_yannakakis_plus(cq, tree, rules=ANNOT_ONLY)
    flags = {s.relation.name: s.with_annot for s in plan.of_type(Scan)}
    assert flags == {"E1": True, "E2": False}


# ----------------------------------------- emitter state-tracking details
def test_project_virtual_count_materialisation():
    cq = count_cq()
    em = Emitter(cq, ANNOT_ONLY)
    n = em.get("E2")
    assert not n.has_annot
    p = em.project(n, frozenset({"b"}))
    # SUM/× over virtual 1s must materialise a count
    assert p.has_annot


def test_project_minmax_identity_stays_virtual():
    rels = (R("E1", "e", {"a": "src", "b": "dst"}),
            R("E2", "e", {"b": "src", "c": "dst"}))
    cq = CQ(rels, ("a",), MIN_PROD, name="m")
    em = Emitter(cq, ANNOT_ONLY)
    p = em.project(em.get("E2"), frozenset({"b"}))
    assert not p.has_annot


def test_project_maxplus_identity_stays_virtual():
    rels = (R("E1", "e", {"a": "src", "b": "dst"}),
            R("E2", "e", {"b": "src", "c": "dst"}))
    cq = CQ(rels, ("a",), MAX_PLUS, name="mp")
    em = Emitter(cq, ANNOT_ONLY)
    p = em.project(em.get("E2"), frozenset({"b"}))
    assert not p.has_annot


def test_join_preserves_keys_over_pk_side():
    cq = chain3()
    em = Emitter(cq, ALL)
    o = em.get("O")
    l = em.get("L")
    j = em.join(l, o)  # join on ok ⊇ key(O)
    assert any(k == frozenset() or k for k in j.keys) or j.keys == l.keys


def test_semijoin_keeps_node_complete_iff_ri():
    cq = chain3()
    em = Emitter(cq, NO_RULES)  # force actual semijoin emission
    o = em.get("O")
    c = em.get("C")
    after = em.semijoin(o, c)
    assert after.complete  # RI(O→C) and C complete
    l = em.get("L")
    after2 = em.semijoin(c, l)  # no RI(C→L)
    assert not after2.complete
