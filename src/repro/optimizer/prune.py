"""Cost-based semi-join suppression (§7.2.4).

The paper's robustness comes in part from *not* running semi-join reductions
that would not reduce anything: "In most queries, only one round or even no
semi-join reduction is required. The rule-based optimizer also helps avoid
unnecessary semi-join reductions." Dropping a semi-join is always
semantically safe (dangling tuples are ignored by the later inner joins);
it only trades the worst-case guarantee for constant-factor savings, so the
decision is driven by cardinality estimates: a semi-join expected to keep
more than ``threshold`` of its input is pure overhead and is removed.

Under the worst-case CE scenario no semi-join can be proven useful, so the
defensive plan keeps them all (pruning is skipped by the caller).
"""
from __future__ import annotations

from dataclasses import replace

from ..core.plan import Filter, Finalize, Join, Plan, Project, Scan, SemiJoin
from .cardinality import Cardinality, Est


def prune_semijoins(plan: Plan, card: Cardinality, threshold: float = 0.8) -> Plan:
    """Return a plan with low-value semi-joins — and low-value aggregating
    projections — removed (consumers rewired to the operator's input).

    Dropping an aggregating projection is safe for the same algebraic
    reason semi-join dropping is: every π in a Yannakakis(+) plan removes
    only attributes that appear in *no* remaining relation, so downstream
    joins are schema-unaffected, and the deferred ⊕ merges the surviving
    duplicates at the next aggregation (associativity). The one exception
    is a plan whose Finalize skipped its own grouping on the strength of a
    projection-established key — those plans keep all projections."""
    env: dict[str, Est] = {}
    alias: dict[str, str] = {}
    steps = []
    dropped = 0
    fin = plan.steps[-1]
    may_prune_projects = not (isinstance(fin, Finalize) and not fin.dedup)

    def res(slot: str) -> str:
        while slot in alias:
            slot = alias[slot]
        return slot

    for s in plan.steps:
        if isinstance(s, Scan):
            env[s.out] = card.scan(s.relation)
            steps.append(s)
        elif isinstance(s, Project):
            src = res(s.src)
            est = card.project(env[src], s.attrs, s.dedup)
            if (
                may_prune_projects
                and s.dedup
                and est.rows >= threshold * env[src].rows
            ):
                alias[s.out] = src
                dropped += 1
                continue
            env[s.out] = est
            steps.append(replace(s, src=src))
        elif isinstance(s, Join):
            l, r = res(s.left), res(s.right)
            env[s.out] = card.join(env[l], env[r], s.on)
            steps.append(replace(s, left=l, right=r))
        elif isinstance(s, SemiJoin):
            l, r = res(s.left), res(s.right)
            est = card.semijoin(env[l], env[r], s.on)
            if est.rows >= threshold * env[l].rows:
                alias[s.out] = l  # not worth it: reuse the unreduced input
                dropped += 1
            else:
                env[s.out] = est
                steps.append(replace(s, left=l, right=r))
        elif isinstance(s, Filter):
            src = res(s.src)
            env[s.out] = env[src]
            steps.append(replace(s, src=src))
        elif isinstance(s, Finalize):
            src = res(s.src)
            env[s.out] = env[src]
            steps.append(replace(s, src=src))
    out = Plan(plan.cq, steps, res(plan.result), dict(plan.meta))
    out.meta["semijoins_pruned"] = dropped
    return out
