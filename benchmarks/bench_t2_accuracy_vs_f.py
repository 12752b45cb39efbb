"""T2 bench (paper Fig 3a/6f): one end-to-end estimate-then-propagate trial
(the unit the accuracy-vs-f sweep repeats)."""
from __future__ import annotations

from repro.core.estimators import dcer
from repro.propagation.linbp import accuracy_spark, linbp_propagate, predict_labels


def test_t2_end_to_end_dcer_trial(benchmark, bench_graph):
    b = bench_graph

    def trial():
        est = dcer(b.edges, b.seeds, b.k, restarts=10, seed=0)
        bel = linbp_propagate(b.edges, b.seeds, est.H, rho_w=b.rho_w, iters=10)
        acc = accuracy_spark(predict_labels(bel, b.k), b.all_labels, b.seeds)
        bel.unpersist()
        return acc

    acc = benchmark.pedantic(trial, rounds=1, iterations=1)
    assert acc > 0.5  # paper Fig 3a: ~0.8+ at f=1%; well above random 1/3
