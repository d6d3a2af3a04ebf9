"""IMDB-lite: a synthetic stand-in for the IMDB dataset of the Join Order
Benchmark (JOB).

Schema (minimal columns needed by the JOB-lite queries):

* ``title(id, kind_id, production_year)``           — PK id
* ``company_name(id, country_code)``                — PK id
* ``company_type(id, kind)``                        — PK id
* ``info_type(id, info)``                           — PK id
* ``keyword(id, keyword_grp)``                      — PK id
* ``name(id, gender)``                              — PK id
* ``movie_companies(movie_id, company_id, company_type_id, note_len)``
* ``movie_info(movie_id, info_type_id, info_grp)``
* ``movie_info_idx(movie_id, info_type_id, rating)``
* ``movie_keyword(movie_id, keyword_id)``
* ``cast_info(movie_id, person_id, role_id)``

Fact tables take a duplication factor ``dup``: the paper scales JOB tables
10–100× to create many-to-many behaviour; duplicating fact rows reproduces
that mechanically while keeping dimension/`title` PKs intact (so the PK-FK
rewrite rules of §5.1 stay applicable, as in the paper's Table 3).
Foreign keys into ``title`` are Zipf-skewed — popular movies dominate fact
tables, which is what makes fact⋈fact joins through ``movie_id`` explode.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_SIZES = {  # base rows at sf=1
    "title": 25_000,
    "company_name": 5_000,
    "keyword": 2_000,
    "name": 20_000,
    "movie_companies": 60_000,
    "movie_info": 80_000,
    "movie_info_idx": 40_000,
    "movie_keyword": 70_000,
    "cast_info": 120_000,
}


def _zipf_fk(g: np.random.Generator, n: int, domain: int, alpha: float = 0.5) -> np.ndarray:
    ranks = np.arange(1, domain + 1)
    p = 1.0 / ranks**alpha
    p /= p.sum()
    # permute so popularity is not correlated with key order
    perm = g.permutation(domain) + 1
    return perm[g.choice(domain, size=n, p=p)]


def _dup(pdf: pd.DataFrame, dup: int) -> pd.DataFrame:
    return pd.concat([pdf] * dup, ignore_index=True) if dup > 1 else pdf


def tables(
    spark: SparkSession, *, sf: float = 1.0, dup: int = 1, seed: int = 21
) -> dict[str, DataFrame]:
    """Generate the full IMDB-lite database."""
    g = np.random.default_rng(seed)
    n = {k: max(5, int(v * sf)) for k, v in _SIZES.items()}

    title = pd.DataFrame(
        {
            "id": np.arange(1, n["title"] + 1),
            "kind_id": g.integers(1, 8, n["title"]),
            "production_year": g.integers(1950, 2021, n["title"]),
        }
    )
    company_name = pd.DataFrame(
        {
            "id": np.arange(1, n["company_name"] + 1),
            "country_code": g.choice(
                ["[us]", "[de]", "[nl]", "[gb]", "[fr]", "[jp]", "[in]"],
                n["company_name"],
                p=[0.4, 0.15, 0.1, 0.15, 0.1, 0.05, 0.05],
            ),
        }
    )
    company_type = pd.DataFrame(
        {
            "id": np.arange(1, 5),
            "kind": [
                "production companies", "distributors",
                "special effects companies", "miscellaneous companies",
            ],
        }
    )
    info_type = pd.DataFrame(
        {
            "id": np.arange(1, 21),
            "info": [
                "top 250 rank", "bottom 10 rank", "rating", "votes",
                "genres", "languages", "budget", "gross", "runtimes",
                "countries", "release dates", "color info", "sound mix",
                "certificates", "mpaa", "keywords", "taglines", "plot",
                "quotes", "trivia",
            ],
        }
    )
    keyword = pd.DataFrame(
        {
            "id": np.arange(1, n["keyword"] + 1),
            "keyword_grp": g.integers(0, 50, n["keyword"]),
        }
    )
    name = pd.DataFrame(
        {
            "id": np.arange(1, n["name"] + 1),
            "gender": g.choice(["m", "f", ""], n["name"], p=[0.55, 0.35, 0.1]),
        }
    )
    nmc = n["movie_companies"]
    movie_companies = pd.DataFrame(
        {
            "movie_id": _zipf_fk(g, nmc, n["title"]),
            "company_id": _zipf_fk(g, nmc, n["company_name"], alpha=0.7),
            "company_type_id": g.integers(1, 5, nmc),
            "note_len": g.integers(0, 60, nmc),
        }
    )
    nmi = n["movie_info"]
    movie_info = pd.DataFrame(
        {
            "movie_id": _zipf_fk(g, nmi, n["title"]),
            "info_type_id": g.integers(1, 21, nmi),
            "info_grp": g.integers(0, 100, nmi),
        }
    )
    nix = n["movie_info_idx"]
    movie_info_idx = pd.DataFrame(
        {
            "movie_id": _zipf_fk(g, nix, n["title"]),
            "info_type_id": g.choice([1, 2, 3, 4], nix),
            "rating": (g.random(nix) * 10).round(1),
        }
    )
    nmk = n["movie_keyword"]
    movie_keyword = pd.DataFrame(
        {
            "movie_id": _zipf_fk(g, nmk, n["title"]),
            "keyword_id": _zipf_fk(g, nmk, n["keyword"], alpha=0.7),
        }
    )
    nci = n["cast_info"]
    cast_info = pd.DataFrame(
        {
            "movie_id": _zipf_fk(g, nci, n["title"]),
            "person_id": _zipf_fk(g, nci, n["name"], alpha=0.6),
            "role_id": g.integers(1, 12, nci),
        }
    )
    facts = {
        "movie_companies": movie_companies,
        "movie_info": movie_info,
        "movie_info_idx": movie_info_idx,
        "movie_keyword": movie_keyword,
        "cast_info": cast_info,
    }
    dims = {
        "title": title,
        "company_name": company_name,
        "company_type": company_type,
        "info_type": info_type,
        "keyword": keyword,
        "name": name,
    }
    out = {}
    for k, pdf in dims.items():
        out[k] = spark.createDataFrame(pdf)
    for k, pdf in facts.items():
        out[k] = spark.createDataFrame(_dup(pdf, dup))
    return out
