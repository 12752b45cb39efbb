"""T9 bench (paper Fig 6a): DCEr on each normalization variant's sketches —
same sketch cost, different optimization targets."""
from __future__ import annotations

import pytest

from repro.core.estimators import dcer
from repro.core.sketch import build_sketches


@pytest.mark.parametrize("variant", [1, 2, 3])
def test_t9_variant(benchmark, bench_graph, variant):
    b = bench_graph

    def run():
        sk = build_sketches(b.edges, b.seeds, b.k, ell_max=5, nb=True,
                            variant=variant)
        return dcer(b.edges, b.seeds, b.k, restarts=10, seed=0, sketches=sk,
                    variant=variant)

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    assert res.H.shape == (3, 3)
