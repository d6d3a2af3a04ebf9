"""TPC-H-lite workload (§7.1, SF scaled to laptop size).

Queries q3, q9, q10, q19 are direct CQ renderings of the paper's simplified
TPC-H conjunctive queries; q5 is the cycle-elimination showcase of Example
5.2 (customer.nationkey = supplier.nationkey closes a cycle that the
PK-FK-licensed rename rule breaks). Cross-relation OR predicates of the real
q19 are simplified to per-relation predicates (the CQ model pushes
selections to scans; §2.1).
"""
from __future__ import annotations

from ..core.cq import CQ, R
from ..core.semiring import SUM_PROD
from . import Workload

# referential integrity of the TPC-H-lite generators: every fact FK hits its
# dimension PK (nation is 0..24 and all nationkeys are drawn from it, etc.)
_RI = frozenset(
    {
        ("L", "O"), ("L", "P"), ("L", "S"), ("L", "PS"),
        ("O", "C"), ("C", "N"), ("S", "N"), ("PS", "P"), ("PS", "S"),
        ("N", "RG"),
    }
)


def _ri(*names: str) -> frozenset:
    keep = set(names)
    return frozenset(p for p in _RI if p[0] in keep and p[1] in keep)


def queries() -> dict[str, Workload]:
    w: dict[str, Workload] = {}

    def add(name, cq):
        w[name] = Workload(name, "tpch", cq)

    # q3: shipping priority — customer ⋈ orders ⋈ lineitem
    c = R("C", "customer", {"ck": "c_custkey"},
          predicate="c_mktsegment = 'BUILDING'", keys=[("ck",)])
    o = R("O", "orders", {"ok": "o_orderkey", "ck": "o_custkey", "odate": "o_orderdate"},
          predicate="o_orderdate < '1995-03-15'", keys=[("ok",)])
    l = R("L", "lineitem", {"ok": "l_orderkey"},
          annot="l_extendedprice * (1 - l_discount)",
          predicate="l_shipdate > '1995-03-15'")
    add("tpch-q3", CQ((c, o, l), ("ok", "odate"), SUM_PROD,
                      alias="revenue", ri=_ri("C", "O", "L"), name="tpch-q3"))

    # q5: local supplier volume — cyclic via customer/supplier nation equality
    c5 = R("C", "customer", {"ck": "c_custkey", "nk": "c_nationkey"}, keys=[("ck",)])
    o5 = R("O", "orders", {"ok": "o_orderkey", "ck": "o_custkey"},
           predicate="o_orderdate >= '1994-01-01' and o_orderdate < '1995-01-01'",
           keys=[("ok",)])
    l5 = R("L", "lineitem", {"ok": "l_orderkey", "sk": "l_suppkey"},
           annot="l_extendedprice * (1 - l_discount)")
    s5 = R("S", "supplier", {"sk": "s_suppkey", "nk": "s_nationkey"}, keys=[("sk",)])
    n5 = R("N", "nation", {"nk": "n_nationkey", "nname": "n_name", "rk": "n_regionkey"},
           keys=[("nk",)])
    rg = R("RG", "region", {"rk": "r_regionkey"},
           predicate="r_name = 'ASIA'", keys=[("rk",)])
    add("tpch-q5", CQ((c5, o5, l5, s5, n5, rg), ("nname",), SUM_PROD,
                      alias="revenue", ri=_ri("C", "O", "L", "S", "N", "RG"),
                      name="tpch-q5"))

    # q9: product type profit — the paper's running example (Example 2.1)
    li = R("L", "lineitem",
           {"rf": "l_returnflag", "ok": "l_orderkey", "pk": "l_partkey", "sk": "l_suppkey"},
           annot="l_quantity")
    o9 = R("O", "orders", {"ok": "o_orderkey"},
           predicate="o_orderdate < '1996-12-31' and o_orderdate > '1996-01-01'",
           keys=[("ok",)])
    ps = R("PS", "partsupp", {"pk": "ps_partkey", "sk": "ps_suppkey"},
           annot="ps_supplycost", keys=[("pk", "sk")])
    p9 = R("P", "part", {"pk": "p_partkey"},
           predicate="p_type IN ('PROMO', 'ECONOMY')", keys=[("pk",)])
    s9 = R("S", "supplier", {"sk": "s_suppkey", "nk": "s_nationkey"}, keys=[("sk",)])
    n9 = R("N", "nation", {"nk": "n_nationkey", "nname": "n_name"}, keys=[("nk",)])
    add("tpch-q9", CQ((li, o9, ps, p9, s9, n9), ("nname", "ok", "rf"), SUM_PROD,
                      alias="part_cost", ri=_ri("L", "O", "PS", "P", "S", "N"),
                      name="tpch-q9"))

    # q10: returned item reporting
    c10 = R("C", "customer", {"ck": "c_custkey", "nk": "c_nationkey"}, keys=[("ck",)])
    o10 = R("O", "orders", {"ok": "o_orderkey", "ck": "o_custkey"},
            predicate="o_orderdate >= '1993-10-01' and o_orderdate < '1994-01-01'",
            keys=[("ok",)])
    l10 = R("L", "lineitem", {"ok": "l_orderkey"},
            annot="l_extendedprice * (1 - l_discount)",
            predicate="l_returnflag = 'R'")
    n10 = R("N", "nation", {"nk": "n_nationkey", "nname": "n_name"}, keys=[("nk",)])
    add("tpch-q10", CQ((c10, o10, l10, n10), ("ck", "nname"), SUM_PROD,
                       alias="revenue", ri=_ri("C", "O", "L", "N"), name="tpch-q10"))

    # q19: discounted revenue — 2-way join with selective predicates
    l19 = R("L", "lineitem", {"pk": "l_partkey"},
            annot="l_extendedprice * (1 - l_discount)",
            predicate="l_quantity >= 1 and l_quantity <= 11")
    p19 = R("P", "part", {"pk": "p_partkey"},
            predicate="p_brand = 'Brand#12' and p_size between 1 and 5",
            keys=[("pk",)])
    add("tpch-q19", CQ((l19, p19), (), SUM_PROD, alias="revenue",
                       ri=_ri("L", "P"), name="tpch-q19"))
    return w


def load_tables(spark, *, sf: float = 0.01, copies: int = 1):
    """TPC-H-lite tables; ``copies`` > 1 reproduces the paper's PK-breaking
    5-copy experiment on the fact tables."""
    from .. import synth_data as sd

    t = {
        "lineitem": sd.lineitem(spark, sf=sf),
        "orders": sd.orders(spark, sf=sf),
        "customer": sd.customer(spark, sf=sf),
        "part": sd.part(spark, sf=sf),
        "supplier": sd.supplier(spark, sf=sf),
        "partsupp": sd.partsupp(spark, sf=sf),
        "nation": sd.nation(spark),
        "region": sd.region(spark),
    }
    if copies > 1:
        for k in t:
            t[k] = sd.duplicate_copies(t[k], copies)
    return t
