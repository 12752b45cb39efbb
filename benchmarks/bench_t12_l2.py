"""T12 bench (paper Fig 14): the full estimator ladder on one dataset analog
(enron, k=4) measuring L2 distance from GS — one bench row per method."""
from __future__ import annotations

import pytest

from repro.core.compat import l2_distance
from repro.core.estimators import dce, dcer, gold_standard, lce, mce
from repro.core.sketch import build_sketches
from repro.datasets import make_analog
from repro.graphs.edges import sample_seeds, to_spark_edges, to_spark_labels


@pytest.fixture(scope="module")
def enron(spark):
    g = make_analog("enron", seed=0, scale=0.25)
    edges = to_spark_edges(spark, g.edges).persist()
    edges.count()
    seeds = to_spark_labels(spark, sample_seeds(g.labels, 0.05, seed=0))
    all_labels = to_spark_labels(spark, g.labels)
    gs = gold_standard(edges, all_labels, g.k)
    sk = build_sketches(edges, seeds, g.k, ell_max=5, nb=True)
    yield dict(g=g, edges=edges, seeds=seeds, gs=gs.H, sk=sk)
    edges.unpersist()


@pytest.mark.parametrize("method", ["mce", "lce", "dce", "dcer"])
def test_t12_method_l2(benchmark, enron, method):
    e = enron
    k = e["g"].k

    def run():
        if method == "mce":
            return mce(e["edges"], e["seeds"], k, sketches=e["sk"])
        if method == "lce":
            return lce(e["edges"], e["seeds"], k)
        if method == "dce":
            return dce(e["edges"], e["seeds"], k, sketches=e["sk"])
        return dcer(e["edges"], e["seeds"], k, restarts=10, seed=0,
                    sketches=e["sk"])

    est = benchmark.pedantic(run, rounds=1, iterations=1)
    assert l2_distance(est.H, e["gs"]) < 2.0
