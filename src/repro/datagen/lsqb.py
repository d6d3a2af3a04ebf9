"""LSQB-lite: synthetic stand-in for the LDBC-SNB derived LSQB benchmark.

Schema (LSQB's subgraph-matching core):

* ``country(id)``, ``city(id, country_id)``, ``person(id, city_id)``
* ``knows(person1_id, person2_id)`` — many-to-many, Zipf-skewed
* ``comment(id, creator_id)``, ``post(id, creator_id)``
* ``tag(id)``, ``comment_hastag(comment_id, tag_id)``,
  ``post_hastag(post_id, tag_id)``

``knows`` is the engine of LSQB's blow-up (chains and triangles of a skewed
many-to-many relation); the synthetic skew reproduces that shape.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def _zipf(g: np.random.Generator, n: int, domain: int, alpha: float = 0.8) -> np.ndarray:
    ranks = np.arange(1, domain + 1)
    p = 1.0 / ranks**alpha
    p /= p.sum()
    perm = g.permutation(domain) + 1
    return perm[g.choice(domain, size=n, p=p)]


def tables(spark: SparkSession, *, sf: float = 1.0, seed: int = 31) -> dict[str, DataFrame]:
    """Generate the LSQB-lite database at scale ``sf`` (sf=1 ≈ 3k persons,
    50k knows edges)."""
    g = np.random.default_rng(seed)
    n_country = 20
    n_city = 200
    n_person = max(10, int(3_000 * sf))
    n_knows = max(20, int(50_000 * sf))
    n_comment = max(10, int(25_000 * sf))
    n_post = max(10, int(12_000 * sf))
    n_tag = 100
    n_cht = max(10, int(30_000 * sf))
    n_pht = max(10, int(15_000 * sf))

    out = {
        "country": pd.DataFrame({"id": np.arange(1, n_country + 1)}),
        "city": pd.DataFrame(
            {
                "id": np.arange(1, n_city + 1),
                "country_id": g.integers(1, n_country + 1, n_city),
            }
        ),
        "person": pd.DataFrame(
            {
                "id": np.arange(1, n_person + 1),
                "city_id": g.integers(1, n_city + 1, n_person),
            }
        ),
        "knows": pd.DataFrame(
            {
                "person1_id": _zipf(g, n_knows, n_person, alpha=0.9),
                "person2_id": _zipf(g, n_knows, n_person, alpha=0.6),
            }
        ),
        "comment": pd.DataFrame(
            {
                "id": np.arange(1, n_comment + 1),
                "creator_id": _zipf(g, n_comment, n_person, alpha=0.8),
                "reply_of_post_id": _zipf(g, n_comment, n_post, alpha=0.7),
            }
        ),
        "post": pd.DataFrame(
            {
                "id": np.arange(1, n_post + 1),
                "creator_id": _zipf(g, n_post, n_person, alpha=0.8),
            }
        ),
        "tag": pd.DataFrame({"id": np.arange(1, n_tag + 1)}),
        "comment_hastag": pd.DataFrame(
            {
                "comment_id": g.integers(1, n_comment + 1, n_cht),
                "tag_id": _zipf(g, n_cht, n_tag, alpha=1.0),
            }
        ),
        "post_hastag": pd.DataFrame(
            {
                "post_id": g.integers(1, n_post + 1, n_pht),
                "tag_id": _zipf(g, n_pht, n_tag, alpha=1.0),
            }
        ),
    }
    return {k: spark.createDataFrame(v) for k, v in out.items()}
