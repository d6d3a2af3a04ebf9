"""Dataset substrates: schemas, determinism, referential integrity — the
properties the workloads' RI declarations and oracle checks rely on."""
import pytest

from repro import synth_data as sd
from repro.datagen import graph, imdb, lsqb


# ------------------------------------------------------------- TPC-H-lite
def test_lineitem_has_suppkey(quiet_spark):
    df = sd.lineitem(quiet_spark, sf=0.001)
    assert "l_suppkey" in df.columns


def test_lineitem_partsupp_pairs_join(quiet_spark):
    li = sd.lineitem(quiet_spark, sf=0.002)
    ps = sd.partsupp(quiet_spark, sf=0.002)
    n = li.count()
    joined = li.join(
        ps,
        on=[li.l_partkey == ps.ps_partkey, li.l_suppkey == ps.ps_suppkey],
    ).count()
    assert joined == n, "every lineitem (part,supp) pair must hit partsupp"


def test_partsupp_composite_key_unique(quiet_spark):
    ps = sd.partsupp(quiet_spark, sf=0.002)
    assert ps.count() == ps.select("ps_partkey", "ps_suppkey").distinct().count()


def test_supplier_nation_fk(quiet_spark):
    s = sd.supplier(quiet_spark, sf=0.002)
    n = sd.nation(quiet_spark)
    assert s.join(n, s.s_nationkey == n.n_nationkey, "left_anti").count() == 0


def test_nation_region_sizes(quiet_spark):
    assert sd.nation(quiet_spark).count() == 25
    assert sd.region(quiet_spark).count() == 5


def test_duplicate_copies_multiplies(quiet_spark):
    o = sd.orders(quiet_spark, sf=0.001)
    assert sd.duplicate_copies(o, 3).count() == 3 * o.count()


def test_determinism(quiet_spark):
    a = sd.lineitem(quiet_spark, sf=0.001).toPandas()
    b = sd.lineitem(quiet_spark, sf=0.001).toPandas()
    assert a.equals(b)


# ------------------------------------------------------------------ graphs
def test_graph_schema(quiet_spark):
    df = graph.edges(quiet_spark, n_nodes=50, n_edges=200, seed=1)
    assert set(df.columns) == {"src", "dst", "w"}
    assert df.count() == 200


def test_graph_zipf_skews_degrees(quiet_spark):
    uni = graph.edges(quiet_spark, n_nodes=100, n_edges=2000, alpha=0.0, seed=2)
    skew = graph.edges(quiet_spark, n_nodes=100, n_edges=2000, alpha=1.2, seed=2)

    def max_deg(df):
        return df.groupBy("src").count().agg({"count": "max"}).collect()[0][0]

    assert max_deg(skew) > 2 * max_deg(uni)


def test_graph_datasets_named(quiet_spark):
    t = graph.tables(quiet_spark, scale=0.01)
    assert set(t) == {"bitcoin_lite", "epinions_lite", "dblp_lite"}
    for df in t.values():
        assert df.count() >= 40


# --------------------------------------------------------------- IMDB-lite
def test_imdb_schema_complete(quiet_spark):
    t = imdb.tables(quiet_spark, sf=0.01)
    assert set(t) == {
        "title", "company_name", "company_type", "info_type", "keyword",
        "name", "movie_companies", "movie_info", "movie_info_idx",
        "movie_keyword", "cast_info",
    }


def test_imdb_dup_scales_facts_not_dims(quiet_spark):
    t1 = imdb.tables(quiet_spark, sf=0.01, dup=1)
    t3 = imdb.tables(quiet_spark, sf=0.01, dup=3)
    assert t3["cast_info"].count() == 3 * t1["cast_info"].count()
    assert t3["title"].count() == t1["title"].count()


def test_imdb_title_pk_survives_dup(quiet_spark):
    t = imdb.tables(quiet_spark, sf=0.01, dup=3)
    assert t["title"].count() == t["title"].select("id").distinct().count()


def test_imdb_fact_fks_resolve(quiet_spark):
    t = imdb.tables(quiet_spark, sf=0.01)
    mc, cn = t["movie_companies"], t["company_name"]
    assert mc.join(cn, mc.company_id == cn.id, "left_anti").count() == 0
    mk, k = t["movie_keyword"], t["keyword"]
    assert mk.join(k, mk.keyword_id == k.id, "left_anti").count() == 0


def test_imdb_movie_ids_skewed(quiet_spark):
    t = imdb.tables(quiet_spark, sf=0.1)
    top = (
        t["cast_info"].groupBy("movie_id").count()
        .orderBy("count", ascending=False).limit(1).collect()[0]["count"]
    )
    n = t["cast_info"].count()
    titles = t["title"].count()
    assert top > 3 * n / titles  # far above the uniform expectation


# --------------------------------------------------------------- LSQB-lite
def test_lsqb_schema(quiet_spark):
    t = lsqb.tables(quiet_spark, sf=0.01)
    assert set(t) == {
        "country", "city", "person", "knows", "comment", "post", "tag",
        "comment_hastag", "post_hastag",
    }
    assert "reply_of_post_id" in t["comment"].columns


def test_lsqb_knows_fks_resolve(quiet_spark):
    t = lsqb.tables(quiet_spark, sf=0.01)
    kn, p = t["knows"], t["person"]
    assert kn.join(p, kn.person1_id == p.id, "left_anti").count() == 0
    assert kn.join(p, kn.person2_id == p.id, "left_anti").count() == 0


def test_lsqb_reply_fk_resolves(quiet_spark):
    t = lsqb.tables(quiet_spark, sf=0.01)
    c, po = t["comment"], t["post"]
    assert c.join(po, c.reply_of_post_id == po.id, "left_anti").count() == 0
