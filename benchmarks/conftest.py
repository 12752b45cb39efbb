"""Shared fixtures for the per-table benchmarks.

The session-scoped ``spark`` fixture comes from the repo-root conftest.
Benchmark graphs are module-scoped and deliberately modest — the point of
each bench is the *relative* shape the paper reports (estimation vs
propagation, explicit vs factorized), not absolute seconds; jobs/ runs the
bigger sweeps.
"""
from __future__ import annotations

from types import SimpleNamespace

import pytest

from repro import reference as R
from repro.core.compat import skew_H
from repro.graphs.edges import sample_seeds, to_spark_edges, to_spark_labels
from repro.graphs.generator import planted_graph


@pytest.fixture(scope="session")
def bench_graph(spark):
    """A 20k-node, 100k-edge heterophilous graph (k=3, h=8) with f=1% seeds —
    the workhorse instance for the timing benches (paper's 10k/100k setup)."""
    H = skew_H(3, 8.0)
    g = planted_graph(20_000, 100_000, [1 / 3] * 3, H, seed=77)
    edges = to_spark_edges(spark, g.edges).persist()
    edges.count()
    seeds_pdf = sample_seeds(g.labels, 0.01, seed=0)
    ns = SimpleNamespace(
        g=g, H=H, edges=edges,
        seeds=to_spark_labels(spark, seeds_pdf),
        all_labels=to_spark_labels(spark, g.labels),
        rho_w=R.power_iteration_rho(*g.coo(), g.n),
        k=3,
    )
    yield ns
    edges.unpersist()
