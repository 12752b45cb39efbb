"""T3 bench (paper Fig 5a): cost of the deep NB sketch (ell_max = 8) whose
statistics the consistency table reads off."""
from __future__ import annotations

import numpy as np

from repro.core.sketch import build_sketches


def test_t3_nb_sketch_ell8(benchmark, bench_graph):
    b = bench_graph
    sk = benchmark.pedantic(
        lambda: build_sketches(b.edges, b.seeds, b.k, ell_max=8, nb=True),
        rounds=1, iterations=1,
    )
    # the statistics must track H^l: check the tracked (0,1) entry at l=8
    true = np.linalg.matrix_power(b.H, 8)[0, 1]
    assert abs(sk.P[7][0, 1] - true) < 0.2
