"""Spectral radius of the adjacency matrix (needed for LinBP's convergence
scaling, paper Eq 2).

The paper uses PyAMG's approximate eigenvalue method; here we use textbook
power iteration — a Spark DataFrame version (the dataflow path) and the numpy
reference in ``repro.reference.power_iteration_rho``.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

__all__ = ["spectral_radius_spark"]


def spectral_radius_spark(edges: DataFrame, *, iters: int = 30, seed: int = 0) -> float:
    """Power iteration ``v <- W v / ||W v||`` over the symmetric edges
    DataFrame. Converges quickly because adjacency spectra of the generated
    graphs have a clear dominant eigenvalue (W symmetric => rho = |lambda_1|).
    """
    nodes = edges.select(F.col("src").alias("node")).distinct()
    v = nodes.withColumn(
        "val", F.abs(F.hash(F.col("node") + F.lit(seed))).cast("double") % 1000.0 + 1.0
    )
    norm = v.agg(F.sqrt(F.sum(F.col("val") ** 2))).first()[0]
    v = v.withColumn("val", F.col("val") / F.lit(norm))
    rho = 0.0
    for i in range(iters):
        w = (
            edges.join(v, edges["dst"] == v["node"], "inner")
            .groupBy(edges["src"].alias("node"))
            .agg(F.sum("val").alias("val"))
        )
        nrm = w.agg(F.sqrt(F.sum(F.col("val") ** 2))).first()[0]
        if not nrm:
            return 0.0
        rho = float(nrm)
        v = w.withColumn("val", F.col("val") / F.lit(nrm))
        if i % 5 == 4:  # keep the plan shallow across iterations
            v = v.localCheckpoint()
    return rho
