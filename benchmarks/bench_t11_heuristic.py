"""T11 bench (paper Fig 12): end-to-end labeling with the two-value H/L
heuristic vs DCEr on the Prop-37 analog, where the heuristic collapses."""
from __future__ import annotations

import pytest

from repro import reference as R
from repro.core.estimators import dcer, gold_standard, heuristic_hl
from repro.datasets import make_analog
from repro.graphs.edges import sample_seeds, to_spark_edges, to_spark_labels
from repro.propagation.linbp import accuracy_spark, linbp_propagate, predict_labels


@pytest.fixture(scope="module")
def prop37(spark):
    g = make_analog("prop37", seed=0, scale=0.25)
    edges = to_spark_edges(spark, g.edges).persist()
    edges.count()
    seeds = to_spark_labels(spark, sample_seeds(g.labels, 0.05, seed=0))
    all_labels = to_spark_labels(spark, g.labels)
    gs = gold_standard(edges, all_labels, g.k)
    rho = R.power_iteration_rho(*g.coo(), g.n)
    yield dict(g=g, edges=edges, seeds=seeds, all_labels=all_labels,
               gs=gs.H, rho=rho)
    edges.unpersist()


def _acc_with(p, H):
    bel = linbp_propagate(p["edges"], p["seeds"], H, rho_w=p["rho"], iters=10)
    acc = accuracy_spark(predict_labels(bel, p["g"].k), p["all_labels"], p["seeds"])
    bel.unpersist()
    return acc


def test_t11_heuristic_label(benchmark, prop37):
    H = heuristic_hl(prop37["gs"]).H
    acc = benchmark.pedantic(lambda: _acc_with(prop37, H), rounds=1, iterations=1)
    assert acc >= 0.0  # recorded for EXPERIMENTS.md; collapses vs DCEr


def test_t11_dcer_label(benchmark, prop37):
    p = prop37

    def run():
        est = dcer(p["edges"], p["seeds"], p["g"].k, restarts=10, seed=0)
        return _acc_with(p, est.H)

    acc = benchmark.pedantic(run, rounds=1, iterations=1)
    assert acc > 0.4
