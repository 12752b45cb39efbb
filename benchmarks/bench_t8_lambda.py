"""T8 bench (paper Figs 6b-6d): a full lambda x ell_max sensitivity sweep on
prebuilt sketches (16 optimizations) — the hyperparameter search the paper's
single-hyperparameter claim makes cheap."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.compat import l2_distance
from repro.core.estimators import dcer
from repro.core.sketch import build_sketches


@pytest.fixture(scope="module")
def sketches(bench_graph):
    return build_sketches(bench_graph.edges, bench_graph.seeds, bench_graph.k,
                          ell_max=5, nb=True)


def test_t8_lambda_sweep(benchmark, bench_graph, sketches):
    b = bench_graph

    def sweep():
        out = {}
        for lam in (0.1, 1.0, 10.0, 100.0):
            for em in (1, 2, 3, 5):
                est = dcer(b.edges, b.seeds, b.k, ell_max=em, lam=lam,
                           restarts=10, seed=0, sketches=sketches)
                out[(lam, em)] = l2_distance(est.H, b.H)
        return out

    out = benchmark.pedantic(sweep, rounds=1, iterations=1)
    assert len(out) == 16
    # the paper's recommended (lambda=10, ell_max=5) must be competitive
    best = min(out.values())
    assert out[(10.0, 5)] < best + 0.3
