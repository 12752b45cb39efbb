"""T1 bench (paper Fig 8): DCEr end-to-end runtime on dataset analogs.

The paper's Fig 8 last column reports DCEr seconds per dataset; this bench
times the same call on the scaled analogs (one large-ish: pokec; one
high-k: cora)."""
from __future__ import annotations

import pytest

from repro.core.estimators import dcer
from repro.datasets import make_analog
from repro.graphs.edges import sample_seeds, to_spark_edges, to_spark_labels


@pytest.fixture(scope="module", params=["pokec", "cora"])
def analog(spark, request):
    g = make_analog(request.param, seed=0, scale=0.25)
    edges = to_spark_edges(spark, g.edges).persist()
    edges.count()
    seeds = to_spark_labels(spark, sample_seeds(g.labels, 0.05, seed=0))
    yield request.param, g, edges, seeds
    edges.unpersist()


def test_t1_dcer_runtime(benchmark, analog):
    name, g, edges, seeds = analog
    res = benchmark.pedantic(
        lambda: dcer(edges, seeds, g.k, restarts=10, seed=0),
        rounds=1, iterations=1,
    )
    assert res.H.shape == (g.k, g.k)
