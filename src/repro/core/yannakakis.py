"""The original Yannakakis algorithm (paper §2.3) — the baseline.

Three passes over the join tree: (1) bottom-up semi-joins, (2) top-down
semi-joins (together removing *all* dangling tuples), then (3) bottom-up
aggregation-joins ``R_p ← (π_{A_p ∪ O} R_i) ⋈ R_p``. By default the PK-FK
eliminations are off (they are the Yannakakis+ contribution) but annotation
pruning stays on — carrying literal-1 annotation columns everywhere would
strawman the baseline, which is an implementation detail rather than part of
the algorithm being compared.
"""
from __future__ import annotations

from ._emit import Emitter, Rules
from .cq import CQ
from .join_tree import JoinTree
from .plan import Plan

_CLASSIC_RULES = Rules(pk_fk=False, annot=True)


def plan_yannakakis(cq: CQ, tree: JoinTree, rules: Rules = _CLASSIC_RULES) -> Plan:
    """Generate the classic Yannakakis plan for ``cq`` on ``tree``."""
    em = Emitter(cq, rules)
    out_eff = cq.plan_output
    parent = tree.parent_map
    post = tree.post_order()

    # pass 1: bottom-up semi-joins (R_p ← R_p ⋉ R_i)
    for name in post[:-1]:
        p = parent[name]
        em.nodes[p] = em.semijoin(em.get(p), em.get(name))

    # pass 2: top-down semi-joins (R_c ← R_c ⋉ R_i)
    for name in tree.pre_order():
        for c in tree.children(name):
            em.nodes[c] = em.semijoin(em.get(c), em.get(name))

    # pass 3: bottom-up aggregation-joins, removing one node at a time
    live = set(tree.nodes)
    for name in post[:-1]:
        p = parent[name]
        node = em.nodes[name]
        keep = node.attrs & (em.peek(p).attrs | out_eff)
        node = em.project(node, keep)
        em.nodes[p] = em.apply_eq_filters(em.join(em.nodes[p], node, base=p))
        live.discard(name)

    result = em.finalize(em.get(tree.root))
    plan = Plan(cq, em.steps, result)
    plan.meta["tree"] = tree
    plan.meta["algorithm"] = "yannakakis"
    return plan
