"""Commutative semirings for annotated conjunctive queries (paper §2.1).

An annotated CQ propagates a per-tuple annotation ``v`` through the plan:
joins combine annotations with the semiring "multiplication" ``⊗`` and
aggregating projections combine them with the "addition" ``⊕``. Choosing
``(R, +, ·)`` with annotations drawn from data columns yields SUM-of-products
aggregates (e.g. TPC-H Q9's ``SUM(ps_supplycost * l_quantity)``); choosing
``(R, max, +)`` yields MAX-of-sums; the boolean semiring yields DISTINCT
projection.

The boolean semiring is special-cased throughout the executor: it needs no
annotation column at all — ``⊕`` is DISTINCT and ``⊗`` is the plain join.
"""
from __future__ import annotations

from dataclasses import dataclass

#: ⊕ aggregate name -> (Spark/DuckDB SQL aggregate function)
_PLUS_FUNCS = {"sum": "sum", "max": "max", "min": "min"}
#: ⊗ combiner name -> infix SQL operator
_TIMES_OPS = {"mul": "*", "add": "+"}


@dataclass(frozen=True)
class Semiring:
    """A commutative semiring ``(S, ⊕, ⊗)`` with SQL realisations.

    ``plus`` is one of ``sum|max|min`` (the ⊕ SQL aggregate); ``times`` is
    one of ``mul|add`` (the ⊗ infix operator). ``boolean=True`` marks the
    set-semantics semiring ``({F,T}, ∨, ∧)`` executed as DISTINCT.
    """

    name: str
    plus: str = "sum"
    times: str = "mul"
    boolean: bool = False

    @property
    def plus_fn(self) -> str:
        """SQL aggregate function implementing ⊕."""
        return _PLUS_FUNCS[self.plus]

    @property
    def times_op(self) -> str:
        """SQL infix operator implementing ⊗."""
        return _TIMES_OPS[self.times]

    def times_identity_aggregate(self) -> str:
        """⊕-aggregate of all-identity annotations, as SQL over a group.

        With ⊗=mul every missing annotation is 1, so ``SUM(1) == COUNT(*)``
        and ``MAX/MIN(1) == 1``. Used by annotation pruning (§5.1) when no
        relation in scope carries a real annotation.
        """
        return "count(*)" if self.plus == "sum" else f"{self.plus_fn}(1)"


#: SUM of products — e.g. SUM(a*b), COUNT(*) when no annotations.
SUM_PROD = Semiring("sum_prod", plus="sum", times="mul")
#: MIN of products — JOB-style MIN aggregates.
MIN_PROD = Semiring("min_prod", plus="min", times="mul")
#: MAX of products.
MAX_PROD = Semiring("max_prod", plus="max", times="mul")
#: MAX of sums — e.g. MAX(ps_availqty - l_quantity).
MAX_PLUS = Semiring("max_plus", plus="max", times="add")
#: Boolean semiring — DISTINCT projection / full enumeration.
BOOL = Semiring("bool", boolean=True)
