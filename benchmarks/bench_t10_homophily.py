"""T10 bench (paper Fig 6i): homophily-assuming propagation vs
compatibility-aware LinBP on the same heterophilous graph — the cost is the
same, the accuracy is not (asserted)."""
from __future__ import annotations

from repro.propagation.linbp import accuracy_spark, linbp_propagate, predict_labels
from repro.propagation.rwalk import homophily_propagate


def test_t10_linbp_true_h(benchmark, bench_graph):
    b = bench_graph

    def run():
        bel = linbp_propagate(b.edges, b.seeds, b.H, rho_w=b.rho_w, iters=10)
        acc = accuracy_spark(predict_labels(bel, b.k), b.all_labels, b.seeds)
        bel.unpersist()
        return acc

    acc = benchmark.pedantic(run, rounds=1, iterations=1)
    assert acc > 0.6


def test_t10_homophily_baseline(benchmark, bench_graph):
    b = bench_graph

    def run():
        bel = homophily_propagate(b.edges, b.seeds, b.k, rho_w=b.rho_w, iters=10)
        acc = accuracy_spark(predict_labels(bel, b.k), b.all_labels, b.seeds)
        bel.unpersist()
        return acc

    acc = benchmark.pedantic(run, rounds=1, iterations=1)
    assert acc < 0.75  # falls far behind true-H LinBP (paper Fig 6i shape)
