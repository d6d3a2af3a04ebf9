"""CQ model: structure, SQL generation, rewrite primitives (§2.1)."""
import pytest

from repro.core.cq import CQ, R, Relation, components, hyperedges
from repro.core.semiring import BOOL, SUM_PROD


@pytest.fixture
def path3():
    return CQ(
        (
            R("E1", "e", {"a": "src", "b": "dst"}),
            R("E2", "e", {"b": "src", "c": "dst"}),
            R("E3", "e", {"c": "src", "d": "dst"}),
        ),
        ("a",),
        SUM_PROD,
        name="p3",
    )


def test_attrs_union(path3):
    assert path3.attrs == {"a", "b", "c", "d"}


def test_shared_attrs(path3):
    assert path3.shared("E1", "E2") == {"b"}
    assert path3.shared("E1", "E3") == frozenset()


def test_rel_lookup(path3):
    assert path3.rel("E2").source == "e"
    with pytest.raises(KeyError):
        path3.rel("E9")


def test_hyperedges(path3):
    assert hyperedges(path3) == {
        "E1": {"a", "b"}, "E2": {"b", "c"}, "E3": {"c", "d"}
    }


def test_output_must_exist():
    with pytest.raises(ValueError, match="output attrs"):
        CQ((R("A", "t", ["x"]),), ("y",))


def test_duplicate_relation_names_rejected():
    with pytest.raises(ValueError, match="duplicate"):
        CQ((R("A", "t", ["x"]), R("A", "t", ["x"])), ())


def test_duplicate_attrs_within_relation_rejected():
    with pytest.raises(ValueError, match="duplicate attrs"):
        Relation("A", "t", ("x", "x"), ("c1", "c2"))


def test_attr_col_arity_checked():
    with pytest.raises(ValueError, match="length mismatch"):
        Relation("A", "t", ("x",), ("c1", "c2"))


def test_r_constructor_mapping_and_list():
    r1 = R("A", "t", {"x": "col_x"})
    assert r1.attrs == ("x",) and r1.cols == ("col_x",)
    r2 = R("A", "t", ["x", "y"])
    assert r2.cols == ("x", "y")


def test_is_full_and_plan_output(path3):
    assert not path3.is_full
    full = CQ(path3.relations, ("a", "b", "c", "d"), BOOL)
    assert full.is_full
    withf = CQ(path3.relations, ("a",), SUM_PROD, eq_filters=(("b", "c"),))
    assert withf.plan_output == {"a", "b", "c"}


def test_rename_attr_moves_keys_too():
    cq = CQ((R("A", "t", ["x", "y"], keys=[("x",)]), R("B", "t", ["x", "z"])), ())
    cq2 = cq.rename_attr("A", "x", "x2")
    assert cq2.rel("A").attrs == ("x2", "y")
    assert cq2.rel("A").keys == (frozenset({"x2"}),)
    assert cq2.rel("B").attrs == ("x", "z")  # other occurrence untouched


def test_components_connected(path3):
    assert components(path3) == [{"E1", "E2", "E3"}]


def test_components_cartesian():
    cq = CQ((R("A", "t", ["x"]), R("B", "t", ["y"])), ())
    comps = components(cq)
    assert sorted(map(sorted, comps)) == [["A"], ["B"]]


# ------------------------------------------------------------------ to_sql
def test_to_sql_count_group_by(path3):
    sql = path3.to_sql()
    assert "count(*) AS agg" in sql
    assert "GROUP BY E1.a" in sql
    assert "E1.b = E2.b" in sql and "E2.c = E3.c" in sql


def test_to_sql_annotated_sum():
    cq = CQ(
        (R("E1", "e", {"a": "src", "b": "dst"}, annot="w"),
         R("E2", "e", {"b": "src", "c": "dst"}, annot="w")),
        ("a",), SUM_PROD,
    )
    assert "sum(E1.__v * E2.__v) AS agg" in cq.to_sql()
    assert "(w) AS __v" in cq.to_sql()


def test_to_sql_distinct_projection(path3):
    cq = CQ(path3.relations, ("a", "d"), BOOL)
    assert cq.to_sql().startswith("SELECT DISTINCT ")


def test_to_sql_full_enumeration_keeps_bag(path3):
    cq = CQ(path3.relations, ("a", "b", "c", "d"), BOOL)
    sql = cq.to_sql()
    assert "DISTINCT" not in sql and "GROUP BY" not in sql


def test_to_sql_predicate_in_subquery():
    cq = CQ((R("A", "t", ["x"], predicate="x > 3"),), ())
    assert "WHERE x > 3" in cq.to_sql()


def test_to_sql_global_aggregate_no_group_by(path3):
    cq = CQ(path3.relations, (), SUM_PROD)
    sql = cq.to_sql()
    assert "GROUP BY" not in sql and "count(*)" in sql


def test_to_sql_eq_filters_in_where(path3):
    cq = CQ(path3.relations, ("a",), SUM_PROD, eq_filters=(("b", "d"),))
    assert "E1.b = E3.d" in cq.to_sql()


def test_scan_sql_renames_columns(path3):
    s = path3.scan_sql(path3.rel("E1"))
    assert "src AS a" in s and "dst AS b" in s
