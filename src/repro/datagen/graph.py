"""Synthetic graphs standing in for the SNAP datasets of the paper's SGPB
benchmark (bitcoin, epinions, …).

SGPB stresses many-to-many self-joins of a single edge relation; what drives
the intermediate-result blow-up is the degree distribution, so we generate
seeded random digraphs with a Zipf-skewed source-degree distribution
("epinions_lite") or a milder skew ("bitcoin_lite"). Edges carry an integer
weight ``w`` for annotated (SUM/MIN) queries.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

#: name -> (n_nodes, n_edges, zipf alpha on out-degree, on in-degree) at scale=1
DATASETS = {
    "bitcoin_lite": (3_000, 24_000, 0.6, 0.0),
    "epinions_lite": (8_000, 100_000, 0.9, 0.7),
    "dblp_lite": (10_000, 50_000, 0.3, 0.0),
}


def _skewed(g: np.random.Generator, n: int, domain: int, alpha: float) -> np.ndarray:
    if alpha <= 0:
        return g.integers(1, domain + 1, n)
    ranks = np.arange(1, domain + 1)
    p = 1.0 / ranks**alpha
    p /= p.sum()
    # permute so node id carries no degree information (predicates on id
    # ranges must not silently select the hubs)
    perm = g.permutation(domain) + 1
    return perm[g.choice(domain, size=n, p=p) - 1]


def edges(
    spark: SparkSession,
    *,
    n_nodes: int,
    n_edges: int,
    alpha: float = 0.0,
    beta: float = 0.0,
    seed: int = 11,
) -> DataFrame:
    """Random digraph edge table (src, dst, w); ``alpha``/``beta`` > 0 skew
    out-/in-degrees by a Zipf law (hub nodes → many-to-many join blow-up;
    skew on *both* sides concentrates paths on few endpoint pairs, which is
    what makes early DISTINCT/aggregation pay off, as on the SNAP graphs)."""
    g = np.random.default_rng(seed)
    src = _skewed(g, n_edges, n_nodes, alpha)
    dst = _skewed(g, n_edges, n_nodes, beta)
    pdf = pd.DataFrame(
        {
            "src": src.astype("int64"),
            "dst": dst.astype("int64"),
            "w": g.integers(1, 10, n_edges).astype("int64"),
        }
    )
    return spark.createDataFrame(pdf)


def dataset(spark: SparkSession, name: str, *, scale: float = 1.0, seed: int = 11) -> DataFrame:
    """One of the named SGPB graphs, scaled in edge count (nodes scale with
    sqrt so density grows with scale, as in the larger SNAP graphs)."""
    n_nodes, n_edges, alpha, beta = DATASETS[name]
    return edges(
        spark,
        n_nodes=max(20, int(n_nodes * scale**0.5)),
        n_edges=max(40, int(n_edges * scale)),
        alpha=alpha,
        beta=beta,
        seed=seed,
    )


def tables(spark: SparkSession, *, scale: float = 1.0) -> dict[str, DataFrame]:
    """All SGPB graph tables keyed by their source name."""
    return {name: dataset(spark, name, scale=scale) for name in DATASETS}
