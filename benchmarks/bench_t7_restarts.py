"""T7 bench (paper Fig 6h / Section 4.8): the optimization phase alone, at
r = 1 vs r = 10 restarts, on prebuilt sketches — demonstrating that restarts
are cheap because step 2 never touches the graph."""
from __future__ import annotations

import pytest

from repro.core.estimators import dcer
from repro.core.sketch import build_sketches


@pytest.fixture(scope="module")
def sketches(bench_graph):
    return build_sketches(bench_graph.edges, bench_graph.seeds, bench_graph.k,
                          ell_max=5, nb=True)


@pytest.mark.parametrize("r", [1, 10])
def test_t7_opt_phase_vs_restarts(benchmark, bench_graph, sketches, r):
    b = bench_graph
    res = benchmark.pedantic(
        lambda: dcer(b.edges, b.seeds, b.k, restarts=r, seed=0,
                     sketches=sketches),
        rounds=3, iterations=1,
    )
    assert res.opt_time < 5.0  # graph-size independent: fractions of a second
