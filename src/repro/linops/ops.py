"""Core DataFrame matrix operations (paper Sections 4.3-4.6).

All operations are pure DataFrame -> DataFrame transformations on the wide
``(node, c0..c{k-1})`` encoding. k is small (2..12 in the paper) so one
double column per class keeps every op a plain join + aggregate that Catalyst
can plan — exactly the paper's point that factorized evaluation *is* join
reordering (its footnote 5 draws the analogy to pushing projections through
joins).

Absent rows mean all-zero rows; ``add`` reconciles them with outer joins +
coalesce so sparsity is preserved through the recurrences.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

__all__ = [
    "cls_cols",
    "onehot_df",
    "spmm",
    "matmul_small",
    "add",
    "scale_rows",
    "xtn",
    "to_numpy_frame",
    "from_numpy_frame",
]


def cls_cols(k: int) -> list[str]:
    """Column names of the k class channels."""
    return [f"c{i}" for i in range(k)]


def onehot_df(labels: DataFrame, k: int, *, centered: bool = False) -> DataFrame:
    """Seed matrix X as a wide DataFrame: one row per *labeled* node.

    ``centered=True`` gives the residual rows ``e_c - 1/k`` used by LinBP
    (unlabeled nodes are simply absent ≡ zero residual rows)."""
    off = -1.0 / k if centered else 0.0
    on = 1.0 + off
    cols = [
        F.when(F.col("label") == i, F.lit(on)).otherwise(F.lit(off)).alias(c)
        for i, c in enumerate(cls_cols(k))
    ]
    return labels.select(F.col("node"), *cols)


def spmm(edges: DataFrame, N: DataFrame, k: int) -> DataFrame:
    """``W @ N``: for each node, sum the rows of N over its neighbors.

    One shuffle join (edges.dst = N.node) + one aggregation. Nodes none of
    whose neighbors appear in N are absent from the result (zero rows)."""
    cols = cls_cols(k)
    joined = edges.join(N, edges["dst"] == N["node"], "inner")
    return joined.groupBy(edges["src"].alias("node")).agg(
        *[F.sum(c).alias(c) for c in cols]
    )


def matmul_small(N: DataFrame, H: np.ndarray) -> DataFrame:
    """``N @ H`` for a small k x k numpy matrix H: each output column is a
    literal linear combination of the k input columns (no shuffle)."""
    k = H.shape[0]
    cols = cls_cols(k)
    exprs = []
    for j in range(k):
        e = sum(F.col(cols[i]) * float(H[i, j]) for i in range(k))
        exprs.append(e.alias(cols[j]))
    return N.select(F.col("node"), *exprs)


def add(A: DataFrame, B: DataFrame, k: int, *, ca: float = 1.0, cb: float = 1.0) -> DataFrame:
    """``ca * A + cb * B`` with absent rows treated as zero (full outer join
    + coalesce)."""
    cols = cls_cols(k)
    a = A.select("node", *[F.col(c).alias(f"a_{c}") for c in cols])
    b = B.select("node", *[F.col(c).alias(f"b_{c}") for c in cols])
    j = a.join(b, on="node", how="full_outer")
    exprs = [
        (
            F.coalesce(F.col(f"a_{c}"), F.lit(0.0)) * ca
            + F.coalesce(F.col(f"b_{c}"), F.lit(0.0)) * cb
        ).alias(c)
        for c in cols
    ]
    return j.select("node", *exprs)


def scale_rows(N: DataFrame, diag: DataFrame, k: int, *, offset: float = 0.0) -> DataFrame:
    """``(diag(d) + offset * I) @ N`` — multiply each row by a per-node scalar
    from ``diag`` (node, deg), e.g. D N or (D - I) N with offset = -1."""
    cols = cls_cols(k)
    j = N.join(diag, on="node", how="inner")
    exprs = [((F.col("deg") + offset) * F.col(c)).alias(c) for c in cols]
    return j.select("node", *exprs)


def xtn(labels: DataFrame, N: DataFrame, k: int) -> np.ndarray:
    """``M = X^T N`` collected to a k x k numpy matrix: join the labeled nodes
    onto N, group by class, sum each channel. Classes with no labeled nodes
    (or none reached) yield zero rows."""
    cols = cls_cols(k)
    rows = (
        labels.join(N, on="node", how="inner")
        .groupBy("label")
        .agg(*[F.sum(c).alias(c) for c in cols])
        .collect()
    )
    M = np.zeros((k, k))
    for r in rows:
        M[int(r["label"])] = [r[c] for c in cols]
    return M


def to_numpy_frame(N: DataFrame, n: int, k: int) -> np.ndarray:
    """Collect a wide frame to a dense n x k array (tests / small graphs)."""
    out = np.zeros((n, k))
    pdf = N.toPandas()
    idx = pdf["node"].to_numpy().astype(int)
    out[idx] = pdf[cls_cols(k)].to_numpy()
    return out


def from_numpy_frame(spark: SparkSession, A: np.ndarray, *, drop_zero_rows: bool = True) -> DataFrame:
    """Lift a dense n x k array to the wide DataFrame encoding."""
    n, k = A.shape
    pdf = pd.DataFrame(A, columns=cls_cols(k))
    pdf.insert(0, "node", np.arange(n, dtype=np.int64))
    if drop_zero_rows:
        pdf = pdf[(A != 0).any(axis=1)]
    return spark.createDataFrame(pdf)
