"""Shared fixtures for the test suite.

The Spark session comes from the repo-root conftest (session-scoped
``spark``). Here we add session-scoped graph fixtures so the many Spark tests
amortize graph generation and DataFrame materialization.
"""
from __future__ import annotations

from types import SimpleNamespace

import numpy as np
import pandas as pd
import pytest

from repro import reference as R
from repro.core.compat import skew_H
from repro.graphs.edges import sample_seeds, to_spark_edges, to_spark_labels
from repro.graphs.generator import planted_graph


@pytest.fixture(scope="session")
def tiny_graph():
    """A 300-node, d~10, k=3 heterophilous planted graph (numpy side)."""
    return planted_graph(300, 1500, [1 / 3] * 3, skew_H(3, 3.0), seed=7)


@pytest.fixture(scope="session")
def tiny_seeds(tiny_graph):
    """20% stratified seed labels for the tiny graph."""
    return sample_seeds(tiny_graph.labels, 0.2, seed=1)


@pytest.fixture(scope="session")
def tiny_spark(spark, tiny_graph, tiny_seeds):
    """The tiny graph lifted into Spark: symmetric edges (persisted), full
    labels, seed labels, plus the matching numpy views for cross-checks."""
    edges = to_spark_edges(spark, tiny_graph.edges).persist()
    edges.count()
    all_labels = to_spark_labels(spark, tiny_graph.labels)
    seeds = to_spark_labels(spark, tiny_seeds)
    src, dst = tiny_graph.coo()
    X_full = R.onehot(dict(zip(tiny_graph.labels.node, tiny_graph.labels.label)),
                      tiny_graph.n, tiny_graph.k)
    X_seed = R.onehot(dict(zip(tiny_seeds.node, tiny_seeds.label)),
                      tiny_graph.n, tiny_graph.k)
    # Symmetric directed edge list as pandas, for the DuckDB oracle.
    edges_pdf = pd.DataFrame({"src": src, "dst": dst})
    ns = SimpleNamespace(
        g=tiny_graph, edges=edges, all_labels=all_labels, seeds=seeds,
        seeds_pdf=tiny_seeds, src=src, dst=dst, X_full=X_full, X_seed=X_seed,
        edges_pdf=edges_pdf, k=tiny_graph.k, n=tiny_graph.n,
    )
    yield ns
    edges.unpersist()


@pytest.fixture(scope="session")
def micro_coo():
    """A fixed 6-node hand-checkable graph (path + triangle + pendant):

        0-1, 1-2, 2-3, 3-4, 4-2, 4-5
    """
    und = [(0, 1), (1, 2), (2, 3), (3, 4), (4, 2), (4, 5)]
    src = np.array([u for u, v in und] + [v for u, v in und])
    dst = np.array([v for u, v in und] + [u for u, v in und])
    return src, dst, 6
