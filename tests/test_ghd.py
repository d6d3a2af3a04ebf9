"""GHD decomposition of cyclic queries (§4.1)."""
import pytest

from repro.core.cq import CQ, R
from repro.core.ghd import decompose
from repro.core.hypergraph import is_acyclic
from repro.core.semiring import BOOL, SUM_PROD
from repro.workloads import all_queries


def triangle(annot=None):
    return CQ(
        (R("A", "e", {"a": "src", "b": "dst"}, annot=annot),
         R("B", "e", {"b": "src", "c": "dst"}),
         R("C", "e", {"c": "src", "a": "dst"})),
        (), SUM_PROD, name="tri",
    )


def test_acyclic_passthrough():
    cq = CQ((R("A", "e", ["a", "b"]), R("B", "e", ["b", "c"])), ())
    out, defs = decompose(cq)
    assert out is cq and defs == {}


def test_triangle_single_bag():
    out, defs = decompose(triangle())
    assert is_acyclic(out)
    assert len(defs) == 1
    (bag,) = defs.values()
    assert {r.name for r in bag.relations} == {"A", "B", "C"}
    assert bag.is_full and set(bag.output) == {"a", "b", "c"}


def test_unannotated_bag_uses_bag_semantics():
    _, defs = decompose(triangle())
    (bag,) = defs.values()
    assert bag.semiring.boolean  # full enumeration keeps multiplicities


def test_annotated_bag_carries_product_column():
    out, defs = decompose(triangle(annot="w"))
    (bag,) = defs.values()
    assert not bag.semiring.boolean and bag.alias == "__v"
    bag_rel = next(r for r in out.relations if r.name.startswith("B"))
    assert bag_rel.annot == "__v"


def test_dumbbell_two_triangle_bags_with_hints():
    wl = all_queries()["sgpb-q2b"]
    out, defs = decompose(wl.cq, bags=[list(b) for b in wl.bags])
    assert is_acyclic(out)
    assert len(defs) == 2
    # reduced query: bag(a,b,c) — E4(c,d) — bag(d,e,f): a line-3 join
    names = sorted(r.name for r in out.relations)
    assert names == ["B0", "B1", "E4"]


def test_dumbbell_heuristic_without_hints():
    wl = all_queries()["sgpb-q2b"]
    out, defs = decompose(wl.cq)
    assert is_acyclic(out)
    assert len(defs) == 2  # the triangle-first heuristic finds both


def test_four_cycle_pair_merges():
    cq = CQ(
        tuple(R(f"E{i}", "e", [f"x{i}", f"x{(i+1)%4}"]) for i in range(4)),
        (), SUM_PROD, name="c4",
    )
    out, defs = decompose(cq)
    assert is_acyclic(out)
    assert defs  # at least one pair bag was materialised


def test_ri_referencing_merged_relations_dropped():
    cq = CQ(
        (R("A", "e", ["a", "b"]), R("B", "e", ["b", "c"]),
         R("C", "e", ["c", "a"]), R("D", "d", ["a"], keys=[("a",)])),
        (), SUM_PROD, ri=frozenset({("A", "D")}), name="tri+",
    )
    out, _ = decompose(cq)
    assert all("A" not in pair for pair in out.ri)
