"""T6 bench (paper Fig 6g/6l): DCEr cost at high k — the O(mk + k^4 r)
regime where the optimization's Hessian-sized work starts to show."""
from __future__ import annotations

import pytest

from repro.core.compat import skew_H
from repro.core.estimators import dcer
from repro.graphs.edges import sample_seeds, to_spark_edges, to_spark_labels
from repro.graphs.generator import planted_graph


@pytest.fixture(scope="module", params=[3, 7])
def k_graph(spark, request):
    k = request.param
    g = planted_graph(10_000, 50_000, [1.0 / k] * k, skew_H(k, 8.0), seed=88)
    edges = to_spark_edges(spark, g.edges).persist()
    edges.count()
    seeds = to_spark_labels(spark, sample_seeds(g.labels, 0.05, seed=0))
    yield k, edges, seeds
    edges.unpersist()


def test_t6_dcer_vs_k(benchmark, k_graph):
    k, edges, seeds = k_graph
    res = benchmark.pedantic(
        lambda: dcer(edges, seeds, k, restarts=10, seed=0),
        rounds=1, iterations=1,
    )
    assert res.H.shape == (k, k)
