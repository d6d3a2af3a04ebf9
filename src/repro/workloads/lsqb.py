"""LSQB-lite: five representative LSQB-style subgraph-count queries over the
LDBC-style schema — acyclic many-to-many chains (q1, q3, q5), a knows
triangle (q2, cyclic → GHD), and a comment/post/tag 5-cycle (q4, cyclic →
GHD via pair merges). All are COUNT aggregations, as in LSQB.
"""
from __future__ import annotations

from ..core.cq import CQ, R
from ..core.semiring import SUM_PROD
from . import Workload

#: referential integrity at the *source* level: (dependent, referenced)
_SOURCE_RI = frozenset(
    {
        ("city", "country"), ("person", "city"), ("knows", "person"),
        ("comment", "person"), ("post", "person"), ("comment", "post"),
        ("comment_hastag", "comment"), ("comment_hastag", "tag"),
        ("post_hastag", "post"), ("post_hastag", "tag"),
    }
)


def queries() -> dict[str, Workload]:
    w: dict[str, Workload] = {}

    def add(name, rels, bags=None, output=()):
        rels = tuple(rels)
        ri = frozenset(
            (a.name, b.name)
            for a in rels
            for b in rels
            if (a.source, b.source) in _SOURCE_RI and (a.attr_set & b.attr_set)
        )
        w[name] = Workload(
            name, "lsqb",
            CQ(rels, tuple(output), SUM_PROD, ri=ri, name=name),
            bags=bags,
        )

    # q1: persons in two cities/countries who know each other (acyclic 7-join)
    add("lsqb-q1", [
        R("country1", "country", {"c1": "id"}, keys=[("c1",)]),
        R("city1", "city", {"ci1": "id", "c1": "country_id"}, keys=[("ci1",)]),
        R("person1", "person", {"p1": "id", "ci1": "city_id"}, keys=[("p1",)]),
        R("knows", "knows", {"p1": "person1_id", "p2": "person2_id"}),
        R("person2", "person", {"p2": "id", "ci2": "city_id"}, keys=[("p2",)]),
        R("city2", "city", {"ci2": "id", "c2": "country_id"}, keys=[("ci2",)]),
        R("country2", "country", {"c2": "id"}, keys=[("c2",)]),
    ])

    # q2: knows triangle among located persons (cyclic core → one GHD bag)
    add("lsqb-q2", [
        R("knows1", "knows", {"p1": "person1_id", "p2": "person2_id"}),
        R("knows2", "knows", {"p2": "person1_id", "p3": "person2_id"}),
        R("knows3", "knows", {"p3": "person1_id", "p1": "person2_id"}),
        R("person1", "person", {"p1": "id", "ci1": "city_id"}, keys=[("p1",)]),
        R("city1", "city", {"ci1": "id"}, predicate="country_id = 1", keys=[("ci1",)]),
    ], bags=(("knows1", "knows2", "knows3"),))

    # q3: two-hop knows chain with located endpoints
    add("lsqb-q3", [
        R("city1", "city", {"ci1": "id"}, predicate="country_id <= 2", keys=[("ci1",)]),
        R("person1", "person", {"p1": "id", "ci1": "city_id"}, keys=[("p1",)]),
        R("knows1", "knows", {"p1": "person1_id", "p2": "person2_id"}),
        R("knows2", "knows", {"p2": "person1_id", "p3": "person2_id"}),
        R("person3", "person", {"p3": "id", "ci3": "city_id"}, keys=[("p3",)]),
        R("city3", "city", {"ci3": "id"}, predicate="country_id <= 2", keys=[("ci3",)]),
    ])

    # q4: comments replying to a post they share a tag with (triangle on
    # comment/post/tag, cyclic → GHD), with the post's creator attached
    add("lsqb-q4", [
        R("cht", "comment_hastag", {"cm": "comment_id", "tg": "tag_id"}),
        R("pht", "post_hastag", {"po": "post_id", "tg": "tag_id"}),
        R("reply", "comment", {"cm": "id", "po": "reply_of_post_id"}, keys=[("cm",)]),
        R("post", "post", {"po": "id", "pp": "creator_id"}, keys=[("po",)]),
        R("person", "person", {"pp": "id"}, predicate="city_id <= 20", keys=[("pp",)]),
    ], bags=(("cht", "pht", "reply"),))

    # q5: three-hop knows chain (3 tables, 4 attributes — paper Table 5)
    add("lsqb-q5", [
        R("knows1", "knows", {"p1": "person1_id", "p2": "person2_id"}),
        R("knows2", "knows", {"p2": "person1_id", "p3": "person2_id"}),
        R("knows3", "knows", {"p3": "person1_id", "p4": "person2_id"}),
    ])
    return w


def load_tables(spark, *, sf: float = 1.0):
    from ..datagen import lsqb

    return lsqb.tables(spark, sf=sf)
