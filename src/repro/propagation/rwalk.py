"""Homophily-only baselines (paper Sections 2.4 and Fig 6i).

Standard semi-supervised label propagation (harmonic functions / MultiRankWalk
style) assumes assortative mixing — in the LinBP framework this is exactly
compatibility matrix ``H = I`` (each class prefers itself). The paper's Fig 6i
sanity check shows these methods collapse on graphs with arbitrary
compatibilities; we reproduce that by running the same propagation engine with
the identity compatibility matrix, plus a degree-normalized random-walk
variant.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.edges import degrees_df
from repro.linops.ops import add, cls_cols, onehot_df
from repro.propagation.linbp import linbp_propagate

__all__ = ["homophily_propagate", "random_walk_propagate"]


def homophily_propagate(
    edges: DataFrame,
    seed_labels: DataFrame,
    k: int,
    *,
    rho_w: float,
    s: float = 0.5,
    iters: int = 10,
) -> DataFrame:
    """Harmonic-functions-style propagation = LinBP with ``H = I_k``."""
    return linbp_propagate(
        edges, seed_labels, np.eye(k), rho_w=rho_w, s=s, iters=iters
    )


def random_walk_propagate(
    edges: DataFrame,
    seed_labels: DataFrame,
    k: int,
    *,
    alpha: float = 0.85,
    iters: int = 10,
) -> DataFrame:
    """MultiRankWalk (paper Eq 3): ``F <- (1-alpha) U + alpha W_col F`` with
    one personalized walk per class. ``W_col`` is the column-normalized
    adjacency, i.e. messages are divided by the *sender's* degree."""
    deg = degrees_df(edges).persist()
    U = onehot_df(seed_labels, k)
    # Normalize each class column of U to sum 1 (teleport distributions).
    cols = cls_cols(k)
    sums = U.agg(*[F.sum(c).alias(c) for c in cols]).first()
    U = U.select(
        "node",
        *[
            (F.col(c) / F.lit(float(sums[c]) if sums[c] else 1.0)).alias(c)
            for c in cols
        ],
    ).persist()
    U.count()
    Fdf = U
    for i in range(iters):
        # Divide sender rows by degree, then aggregate over neighbors.
        sender = (
            Fdf.join(deg, on="node")
            .select("node", *[(F.col(c) / F.col("deg")).alias(c) for c in cols])
        )
        agg = (
            edges.join(sender, edges["dst"] == sender["node"], "inner")
            .groupBy(edges["src"].alias("node"))
            .agg(*[F.sum(c).alias(c) for c in cols])
        )
        nxt = add(U, agg, k, ca=(1.0 - alpha), cb=alpha).persist()
        nxt.count()
        if Fdf is not U:
            Fdf.unpersist()
        Fdf = nxt
        if (i + 1) % 5 == 0:
            Fdf = Fdf.localCheckpoint()
    U.unpersist()
    deg.unpersist()
    return Fdf
