"""T5 bench (paper Fig 6k / Fig 3b): estimation vs propagation cost on the
same graph — the headline "estimation comes for free" comparison. Four rows:
MCE, DCEr (sketch + 10 optimizations), LCE, and LinBP propagation (10 iters).
"""
from __future__ import annotations

from repro.core.estimators import dcer, lce, mce
from repro.propagation.linbp import linbp_propagate


def test_t5_mce(benchmark, bench_graph):
    b = bench_graph
    res = benchmark.pedantic(lambda: mce(b.edges, b.seeds, b.k),
                             rounds=1, iterations=1)
    assert res.H.shape == (3, 3)


def test_t5_lce(benchmark, bench_graph):
    b = bench_graph
    res = benchmark.pedantic(lambda: lce(b.edges, b.seeds, b.k),
                             rounds=1, iterations=1)
    assert res.H.shape == (3, 3)


def test_t5_dcer(benchmark, bench_graph):
    b = bench_graph
    res = benchmark.pedantic(
        lambda: dcer(b.edges, b.seeds, b.k, restarts=10, seed=0),
        rounds=1, iterations=1,
    )
    assert res.H.shape == (3, 3)


def test_t5_propagation(benchmark, bench_graph):
    b = bench_graph

    def prop():
        bel = linbp_propagate(b.edges, b.seeds, b.H, rho_w=b.rho_w, iters=10)
        n = bel.count()
        bel.unpersist()
        return n

    n = benchmark.pedantic(prop, rounds=1, iterations=1)
    assert n > 0
