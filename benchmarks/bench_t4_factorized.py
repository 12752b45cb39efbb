"""T4 bench (paper Fig 5b / Example 4.6): explicit ``W^l`` materialization vs
the factorized Algorithm 4.4 — the paper's three-orders-of-magnitude gap.

Two benchmark rows so bench_output.txt shows the ratio directly. The explicit
path is capped at l = 3 (its intermediate already carries ~d^2 m entries)
while the factorized path goes to l = 8."""
from __future__ import annotations

from repro.core.sketch import build_sketches, explicit_power_m


def test_t4_explicit_w3(benchmark, bench_graph):
    b = bench_graph
    M = benchmark.pedantic(
        lambda: explicit_power_m(b.edges, b.seeds, b.k, 3),
        rounds=1, iterations=1,
    )
    assert M.sum() > 0


def test_t4_factorized_ell8(benchmark, bench_graph):
    b = bench_graph
    sk = benchmark.pedantic(
        lambda: build_sketches(b.edges, b.seeds, b.k, ell_max=8, nb=True),
        rounds=1, iterations=1,
    )
    assert len(sk.P) == 8
