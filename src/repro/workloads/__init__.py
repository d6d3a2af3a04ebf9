"""Benchmark workloads: each module defines its queries as annotated CQs
plus a table loader. ``all_queries()`` aggregates the four benchmarks."""
from __future__ import annotations

from dataclasses import dataclass, field

from ..core.cq import CQ


@dataclass(frozen=True)
class Workload:
    """One benchmark query: the CQ, its benchmark, and metadata used by the
    table builders (shape/type/predicates for SGPB's Table 6; GHD bag hints
    for cyclic queries)."""

    name: str
    benchmark: str
    cq: CQ
    meta: dict = field(default_factory=dict)
    bags: tuple[tuple[str, ...], ...] | None = None


def all_queries() -> dict[str, Workload]:
    from . import job, lsqb, sgpb, tpch

    out: dict[str, Workload] = {}
    for mod in (sgpb, tpch, job, lsqb):
        out.update(mod.queries())
    return out
