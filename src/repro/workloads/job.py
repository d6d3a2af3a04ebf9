"""JOB-lite: 16 queries over the IMDB-lite schema, covering every JOB query
named in the paper's tables (1a, 2b, 4a, 8b, 10c, 11d, 17c, 21a, 27b, 27c)
plus fillers from other families. Table 2's statistics are computed over
this pool; Tables 3/4/5 pick the named queries.

The real JOB aggregates ``MIN`` over several (string) columns; the CQ
semiring carries one annotation, so each query aggregates one numeric
measure (MIN of production_year/rating, or COUNT) over the same join shape
— documented as a substitution in DESIGN.md.
"""
from __future__ import annotations

from ..core.cq import CQ, R
from ..core.semiring import MIN_PROD, SUM_PROD
from . import Workload

# structural referential integrity of the IMDB-lite generators
_RI = frozenset(
    {
        ("mc", "t"), ("mc", "cn"), ("mc", "ct"),
        ("mi", "t"), ("mi", "it"),
        ("mi_idx", "t"), ("mi_idx", "it"),
        ("mk", "t"), ("mk", "k"),
        ("ci", "t"), ("ci", "n"),
    }
)


def _ri(rels) -> frozenset:
    names = {r.name for r in rels}
    return frozenset(p for p in _RI if p[0] in names and p[1] in names)


def _t(extra=None, pred=None, annot=None):
    attrs = {"mid": "id"}
    attrs.update(extra or {})
    return R("t", "title", attrs, predicate=pred, annot=annot, keys=[("mid",)])


def _mc(pred=None):
    return R("mc", "movie_companies",
             {"mid": "movie_id", "cid": "company_id", "ctid": "company_type_id"},
             predicate=pred)


def _cn(pred=None):
    return R("cn", "company_name", {"cid": "id"}, predicate=pred, keys=[("cid",)])


def _ct(pred="kind = 'production companies'"):
    return R("ct", "company_type", {"ctid": "id"}, predicate=pred, keys=[("ctid",)])


def _it(pred, alias="it", attr="itid"):
    return R(alias, "info_type", {attr: "id"}, predicate=pred, keys=[(attr,)])


def _mi(pred=None, grp=False):
    attrs = {"mid": "movie_id", "itid2": "info_type_id"}
    if grp:
        attrs["migrp"] = "info_grp"
    return R("mi", "movie_info", attrs, predicate=pred)


def _midx(pred=None, annot=None):
    return R("mi_idx", "movie_info_idx",
             {"mid": "movie_id", "itid": "info_type_id"},
             predicate=pred, annot=annot)


def _mk(pred=None):
    return R("mk", "movie_keyword", {"mid": "movie_id", "kid": "keyword_id"},
             predicate=pred)


def _k(pred="keyword_grp < 5"):
    return R("k", "keyword", {"kid": "id"}, predicate=pred, keys=[("kid",)])


def _ci(extra=None):
    attrs = {"mid": "movie_id", "pid": "person_id"}
    attrs.update(extra or {})
    return R("ci", "cast_info", attrs)


def _n(pred=None):
    return R("n", "name", {"pid": "id"}, predicate=pred, keys=[("pid",)])


def queries() -> dict[str, Workload]:
    w: dict[str, Workload] = {}

    def add(name, rels, output, semiring, alias="agg"):
        rels = tuple(rels)
        w[name] = Workload(
            name, "job",
            CQ(rels, tuple(output), semiring, alias=alias, ri=_ri(rels), name=name),
        )

    YEAR = _t(extra={"year": "production_year"}, annot="production_year")

    # families named in the paper's tables ---------------------------------
    add("job-1a", [_ct(), _it("info = 'top 250 rank'"), _mc(), _midx(), YEAR],
        (), MIN_PROD)
    add("job-2b", [_cn("country_code = '[nl]'"), _mc(), YEAR, _mk(), _k()],
        (), MIN_PROD)
    add("job-4a", [_it("info = 'rating'"), _midx("rating > 5.0", annot="rating"),
                   _t(), _mk(), _k()], (), MIN_PROD)
    add("job-8b", [_ci(), _mc(), _cn("country_code = '[jp]'"), YEAR, _n("gender = 'f'")],
        (), MIN_PROD)
    add("job-10c", [_ci(), _cn("country_code = '[us]'"), _ct(), _mc(), YEAR],
        (), MIN_PROD)
    add("job-11d", [_cn(), _ct(None), _mc(), _mk(), _k(), YEAR], (), MIN_PROD)
    add("job-17c", [_ci({"role": "role_id"}), _cn("country_code = '[us]'"), _k(),
                    _mc(), _mk(), _n(), _t()], ("role",), SUM_PROD)
    add("job-21a", [_cn("country_code = '[de]'"), _ct(), _mc(), _mi(grp=True), _mk(),
                    _k(), YEAR], (), MIN_PROD)
    add("job-27b", [_cn("country_code = '[gb]'"), _ct(), _mc(), _mi("info_grp < 20"),
                    _mk(), _k(), YEAR, _ci()], (), MIN_PROD)
    add("job-27c", [_cn("country_code = '[gb]'"), _ct(None), _mc(), _mi("info_grp < 50"),
                    _mk(), _k(), YEAR, _ci(), _n()], (), MIN_PROD)

    # fillers from other JOB families --------------------------------------
    add("job-3b", [_k(), _mk(), _t(pred="production_year > 2010"),
                   _mi("info_grp < 10", grp=True)], ("migrp",), SUM_PROD)
    add("job-5c", [_ct(None), _mc("note_len > 10"), _mi(), _t(pred="production_year > 2005", extra={"year": "production_year"}, annot="production_year")],
        (), MIN_PROD)
    add("job-6c", [_ci(), YEAR, _mk(), _k("keyword_grp = 1"), _n("gender = 'f'")],
        (), MIN_PROD)
    add("job-12a", [_cn("country_code = '[us]'"), _ct(), _mc(),
                    _it("info = 'rating'"), _midx("rating > 8.0", annot="rating"), _t()],
        (), MIN_PROD)
    add("job-14a", [_it("info = 'rating'"), _midx(annot="rating"), _k("keyword_grp < 2"),
                    _mk(), _t(pred="production_year > 2000")], (), MIN_PROD)
    add("job-16b", [_ci(), _cn("country_code = '[us]'"), _mc(), _mk(), _k(), _n(),
                    _t(extra={"year": "production_year"})], ("year",), SUM_PROD)
    return w


def load_tables(spark, *, sf: float = 1.0, dup: int = 1):
    from ..datagen import imdb

    return imdb.tables(spark, sf=sf, dup=dup)
