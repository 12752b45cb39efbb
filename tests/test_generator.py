"""Tests for the planted-compatibility graph generator (paper Section 5)."""
from __future__ import annotations

import numpy as np
import pytest

from repro import reference as R
from repro.core.compat import is_doubly_stochastic, skew_H, sinkhorn
from repro.graphs.generator import degree_weights, planted_graph


def _measure_gs(g):
    src, dst = g.coo()
    X = R.onehot(dict(zip(g.labels.node, g.labels.label)), g.n, g.k)
    M = R.m_matrix(X, R.spmm(src, dst, X))
    return R.normalize_m(M, 1)


@pytest.mark.parametrize("h", [3.0, 8.0])
@pytest.mark.parametrize("dist", ["uniform", "powerlaw"])
def test_planted_H_is_recovered_fully_labeled(h, dist):
    H = skew_H(3, h)
    g = planted_graph(3000, 30_000, [1 / 3] * 3, H, dist=dist, seed=0)
    P = _measure_gs(g)
    assert np.abs(P - H).max() < 0.02


@pytest.mark.parametrize("k", [2, 3, 4, 5])
def test_planted_graph_any_k(k):
    H = skew_H(k, 4.0)
    g = planted_graph(1200, 6000, [1.0 / k] * k, H, seed=k)
    assert g.k == k
    P = _measure_gs(g)
    assert np.abs(P - H).max() < 0.06


def test_class_counts_exact():
    g = planted_graph(1000, 4000, [0.2, 0.3, 0.5], skew_H(3, 3.0), seed=1)
    counts = g.labels.groupby("label").size()
    assert counts.tolist() == [200, 300, 500]


def test_edge_count_close_to_target():
    m = 20_000
    g = planted_graph(4000, m, [1 / 3] * 3, skew_H(3, 3.0), seed=2)
    # collisions may shave a small number of edges
    assert 0.97 * m <= g.m <= m


def test_no_self_loops_no_duplicates():
    g = planted_graph(500, 2500, [1 / 3] * 3, skew_H(3, 3.0), seed=3)
    e = g.edges
    assert (e["src"] < e["dst"]).all()
    assert not e.duplicated().any()


def test_determinism_in_seed():
    a = planted_graph(400, 1600, [1 / 3] * 3, skew_H(3, 3.0), seed=11)
    b = planted_graph(400, 1600, [1 / 3] * 3, skew_H(3, 3.0), seed=11)
    assert a.edges.equals(b.edges)
    assert a.labels.equals(b.labels)
    c = planted_graph(400, 1600, [1 / 3] * 3, skew_H(3, 3.0), seed=12)
    assert not a.edges.equals(c.edges)


def test_imbalanced_alpha_general_H():
    # The Fig 6j setting: imbalanced classes with a general symmetric H.
    H = np.array([[0.2, 0.6, 0.2], [0.6, 0.1, 0.3], [0.2, 0.3, 0.5]])
    g = planted_graph(3000, 30_000, [1 / 6, 1 / 3, 1 / 2], H, seed=4)
    P = _measure_gs(g)
    assert np.abs(P - H).max() < 0.03
    counts = g.labels.groupby("label").size().to_numpy()
    assert counts[0] < counts[1] < counts[2]


def test_powerlaw_degrees_more_skewed_than_uniform():
    H = skew_H(3, 3.0)
    gu = planted_graph(2000, 20_000, [1 / 3] * 3, H, dist="uniform", seed=5)
    gp = planted_graph(2000, 20_000, [1 / 3] * 3, H, dist="powerlaw",
                       exponent=0.9, seed=5)
    du = R.degrees(gu.coo()[0], gu.n)
    dp = R.degrees(gp.coo()[0], gp.n)
    assert dp.std() > du.std() * 1.2


def test_degree_weights_families():
    rng = np.random.default_rng(0)
    wu = degree_weights(100, "uniform", 0.3, rng)
    assert np.allclose(wu, 0.01)
    wp = degree_weights(100, "powerlaw", 0.3, rng)
    assert np.isclose(wp.sum(), 1.0)
    assert wp.max() / wp.min() > 2.0  # 100^0.3 ~ 3.98
    with pytest.raises(ValueError):
        degree_weights(10, "exponential", 0.3, rng)


def test_input_validation():
    H = skew_H(3, 3.0)
    with pytest.raises(ValueError):
        planted_graph(100, 500, [0.5, 0.5], H)  # alpha/H mismatch
    with pytest.raises(ValueError):
        planted_graph(100, 500, [0.5, 0.4, 0.4], H)  # alpha sum != 1
    with pytest.raises(ValueError):
        planted_graph(100, 500, [1 / 3] * 3, np.array([[0.1, 0.9, 0.0],
                                                       [0.8, 0.1, 0.1],
                                                       [0.1, 0.0, 0.9]]))  # not symmetric


def test_coo_is_symmetric():
    g = planted_graph(300, 1200, [1 / 3] * 3, skew_H(3, 3.0), seed=6)
    src, dst = g.coo()
    pairs = set(zip(src.tolist(), dst.tolist()))
    assert all((b, a) in pairs for a, b in pairs)
    assert len(src) == 2 * g.m


def test_truth_vector_matches_labels():
    g = planted_graph(300, 1200, [1 / 3] * 3, skew_H(3, 3.0), seed=6)
    t = g.truth()
    assert len(t) == g.n
    assert (t >= 0).all()
    lab = dict(zip(g.labels.node, g.labels.label))
    for node in (0, 100, 299):
        assert t[node] == lab[node]


def test_avg_degree_property():
    g = planted_graph(1000, 5000, [1 / 3] * 3, skew_H(3, 3.0), seed=7)
    assert np.isclose(g.avg_degree, 2 * g.m / g.n)


def test_sinkhorn_planted_dataset_matrix():
    # Planting a sinkhorn-balanced version of a published row-stochastic GS
    # (the dataset-analog path) still yields the expected neighbor stats.
    raw = np.array([[0.08, 0.45, 0.47], [0.45, 0.02, 0.53], [0.47, 0.53, 0.0]])
    H = sinkhorn(raw)
    assert is_doubly_stochastic(H)
    g = planted_graph(3000, 36_000, [0.25, 0.35, 0.4], H, seed=8)
    P = _measure_gs(g)
    assert np.abs(P - H).max() < 0.03
