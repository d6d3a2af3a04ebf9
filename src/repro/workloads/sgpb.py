"""Sub-Graph Pattern Benchmark (SGPB) — the paper's own benchmark (§7.1,
Appendix C / Table 6): path and dumbbell patterns over graph edge relations,
in three flavours per shape — Full Enumerate (bag output of the full join),
Aggregation (COUNT / SUM with or without GROUP BY), Projection (DISTINCT).

Query/dataset assignment mirrors the paper's structure: the q1/q2/q4
families run on "bitcoin_lite", q3/q6–q9 on the larger skewed
"epinions_lite", and the line-5 q5 family on the milder "dblp_lite". Table 6's classification columns (shape, type,
#predicates, free-connex) are *recomputed* from these definitions by
``repro.tables.table6``.
"""
from __future__ import annotations

from ..core.cq import CQ, R
from ..core.semiring import BOOL, SUM_PROD
from . import Workload


def _path(ds: str, n: int, *, pred0: str | None = None, annot: dict[int, str] | None = None):
    """n-edge path E1(x0,x1) ⋈ … ⋈ En(x_{n-1},x_n) over dataset ``ds``."""
    annot = annot or {}
    names = "abcdefgh"
    return tuple(
        R(
            f"E{i+1}",
            ds,
            {names[i]: "src", names[i + 1]: "dst"},
            predicate=pred0 if i == 0 else None,
            annot=annot.get(i + 1),
        )
        for i in range(n)
    )


def _dumbbell(ds: str, *, pred0: str | None = None):
    """Two triangles bridged by an edge: (a,b,c)-triangle — (c,d) — (d,e,f)-
    triangle. Cyclic; evaluated through a GHD with triangle bags (§4.1)."""
    return (
        R("E1", ds, {"a": "src", "b": "dst"}, predicate=pred0),
        R("E2", ds, {"b": "src", "c": "dst"}),
        R("E3", ds, {"c": "src", "a": "dst"}),
        R("E4", ds, {"c": "src", "d": "dst"}),
        R("E5", ds, {"d": "src", "e": "dst"}),
        R("E6", ds, {"e": "src", "f": "dst"}),
        R("E7", ds, {"f": "src", "d": "dst"}),
    )


_PRED = "src <= 64"  # the selective predicate of the *a variants


def queries() -> dict[str, Workload]:
    b, e, d = "bitcoin_lite", "epinions_lite", "dblp_lite"
    w: dict[str, Workload] = {}

    def add(name, cq, shape, qtype, preds, ds, bags=None):
        w[name] = Workload(
            name, "sgpb", cq,
            meta={"shape": shape, "type": qtype, "predicates": preds, "dataset": ds},
            bags=bags,
        )

    # --- q1: line-3 on bitcoin_lite
    add("sgpb-q1a", CQ(_path(b, 3, pred0=_PRED), ("a", "b", "c", "d"), BOOL, name="sgpb-q1a"),
        "line-3", "full-enumerate", 1, b)
    add("sgpb-q1b", CQ(_path(b, 3), (), SUM_PROD, name="sgpb-q1b"),
        "line-3", "aggregation", 0, b)
    add("sgpb-q1c", CQ(_path(b, 3), ("a", "b", "c"), BOOL, name="sgpb-q1c"),
        "line-3", "projection", 0, b)

    # --- q2: dumbbell on bitcoin_lite (cyclic → GHD with triangle bags)
    tri_bags = (("E1", "E2", "E3"), ("E5", "E6", "E7"))
    add("sgpb-q2a",
        CQ(_dumbbell(b, pred0=_PRED), ("a", "b", "c", "d", "e", "f"), BOOL, name="sgpb-q2a"),
        "dumbbell", "full-enumerate", 1, b, bags=tri_bags)
    add("sgpb-q2b", CQ(_dumbbell(b), (), SUM_PROD, name="sgpb-q2b"),
        "dumbbell", "aggregation", 0, b, bags=tri_bags)

    # --- q3: line-3 on epinions_lite
    add("sgpb-q3a", CQ(_path(e, 3, pred0=_PRED), ("a", "b", "c", "d"), BOOL, name="sgpb-q3a"),
        "line-3", "full-enumerate", 1, e)
    add("sgpb-q3b", CQ(_path(e, 3), (), SUM_PROD, name="sgpb-q3b"),
        "line-3", "aggregation", 0, e)
    add("sgpb-q3c", CQ(_path(e, 3), ("b", "c", "d"), BOOL, name="sgpb-q3c"),
        "line-3", "projection", 0, e)

    # --- q4/q5: line-5
    add("sgpb-q4a", CQ(_path(b, 5), ("b", "c", "d", "e"), BOOL, name="sgpb-q4a"),
        "line-5", "projection", 0, b)
    add("sgpb-q4b", CQ(_path(b, 5), (), SUM_PROD, name="sgpb-q4b"),
        "line-5", "aggregation", 0, b)
    add("sgpb-q5a", CQ(_path(d, 5), ("b", "c", "d", "e"), BOOL, name="sgpb-q5a"),
        "line-5", "projection", 0, d)
    add("sgpb-q5b", CQ(_path(d, 5), (), SUM_PROD, name="sgpb-q5b"),
        "line-5", "aggregation", 0, d)

    # --- q6: line-3 DISTINCT endpoints — the non-free-connex projection
    add("sgpb-q6", CQ(_path(e, 3), ("a", "d"), BOOL, name="sgpb-q6"),
        "line-3", "projection", 0, e)

    # --- q7–q9: line-4 group-by-endpoints aggregations (non-free-connex)
    add("sgpb-q7", CQ(_path(b, 4), ("a", "e"), SUM_PROD, name="sgpb-q7"),
        "line-4", "aggregation", 0, b)
    add("sgpb-q8", CQ(_path(e, 4), ("b", "d"), SUM_PROD, name="sgpb-q8"),
        "line-4", "aggregation", 0, e)
    add("sgpb-q9",
        CQ(_path(e, 4, annot={1: "w", 4: "w"}), ("b", "e"), SUM_PROD, name="sgpb-q9"),
        "line-4", "aggregation", 0, e)
    return w


def load_tables(spark, *, scale: float = 1.0):
    from ..datagen import graph

    return graph.tables(spark, scale=scale)
