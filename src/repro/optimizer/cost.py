"""Cost model over the operator IR (§5.2).

The cost of a plan is the sum over operators of their Table-1 running times
under the cardinality estimates: scans and projections pay their input,
joins pay inputs plus output, semi-joins pay their inputs. This is exactly
the "total intermediate results" metric the paper optimises (Example 5.1),
with input terms added so semi-join work is not free.

In the ``accurate`` scenario, first-round joins between two base relations
are costed with exact pairwise join sizes.
"""
from __future__ import annotations

from ..core.cq import CQ
from ..core.plan import Filter, Finalize, Join, Plan, Project, Scan, SemiJoin
from .cardinality import Cardinality, Est


def cost_plan(plan: Plan, card: Cardinality) -> float:
    """Estimated cost; also annotates ``plan.meta['est_rows']`` per slot."""
    env: dict[str, Est] = {}
    base_slot: dict[str, str] = {}  # slot -> base relation name while unchanged
    total = 0.0
    for s in plan.steps:
        if isinstance(s, Scan):
            est = card.scan(s.relation)
            env[s.out] = est
            base_slot[s.out] = s.relation.name
            total += est.rows
        elif isinstance(s, Project):
            src = env[s.src]
            est = card.project(src, s.attrs, s.dedup)
            env[s.out] = est
            total += src.rows
        elif isinstance(s, Join):
            l, r = env[s.left], env[s.right]
            est = card.join(l, r, s.on)
            lb, rb = base_slot.get(s.left), base_slot.get(s.right)
            if lb and rb:
                exact = card.exact_pair_join(plan.cq.rel(lb), plan.cq.rel(rb))
                if exact is not None:
                    est = Est(max(exact, 1.0), est.ndv, est.keys)
            env[s.out] = est
            total += l.rows + r.rows + est.rows
        elif isinstance(s, SemiJoin):
            l, r = env[s.left], env[s.right]
            est = card.semijoin(l, r, s.on)
            env[s.out] = est
            base_slot[s.out] = base_slot.get(s.left, "")
            total += l.rows + r.rows
        elif isinstance(s, Filter):
            src = env[s.src]
            env[s.out] = Est(max(1.0, src.rows * 0.1), dict(src.ndv), src.keys)
            total += src.rows
        elif isinstance(s, Finalize):
            src = env[s.src]
            out_rows = (
                src.rows
                if not s.dedup or s.mode == "full"
                else card.project(src, s.output, True).rows
            )
            env[s.out] = Est(max(out_rows, 1.0), {}, ())
            total += src.rows
    plan.meta["est_rows"] = {slot: e.rows for slot, e in env.items()}
    plan.meta["cost"] = total
    return total
