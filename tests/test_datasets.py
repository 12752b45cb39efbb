"""Tests for the synthetic analogs of the paper's 8 real-world datasets."""
from __future__ import annotations

import numpy as np
import pytest

from repro import reference as R
from repro.core.compat import is_doubly_stochastic, is_symmetric, sinkhorn
from repro.datasets import DATASETS, gs_matrix, make_analog

ALL = list(DATASETS)


def test_eight_datasets_registered():
    assert len(DATASETS) == 8
    assert set(ALL) == {
        "cora", "citeseer", "hepth", "movielens", "enron", "prop37",
        "pokec", "flickr",
    }


@pytest.mark.parametrize("name", ALL)
def test_spec_matches_paper_fig8(name):
    """k, n, m, d of Fig 8 are carried verbatim in the spec."""
    spec = DATASETS[name]
    assert spec.k == spec.H_gs.shape[0]
    # Fig 8's d column ~ 2m/n of Fig 8's n, m columns (paper rounds to 1 dp).
    assert 2 * spec.m_paper / spec.n_paper == pytest.approx(spec.d_paper, rel=0.1)
    assert spec.dcer_time_paper > 0


@pytest.mark.parametrize("name", ALL)
def test_gs_matrix_symmetric_row_stochastic(name):
    H = gs_matrix(name)
    assert is_symmetric(H, tol=1e-9)
    # published matrices are rounded to 2 decimals -> loose row-sum check
    assert np.abs(H.sum(axis=1) - 1.0).max() < 0.03


@pytest.mark.parametrize("name", ALL)
def test_alpha_proper_distribution(name):
    a = DATASETS[name].alpha()
    assert len(a) == DATASETS[name].k
    assert a.sum() == pytest.approx(1.0)
    assert (a > 0).all()


@pytest.mark.parametrize("name", ["movielens", "prop37", "pokec", "enron"])
def test_analog_plants_gs(name):
    """The generated analog's measured neighbor statistics must match the
    Sinkhorn-balanced published GS."""
    g = make_analog(name, seed=0, scale=0.25)
    spec = DATASETS[name]
    assert g.k == spec.k
    src, dst = g.coo()
    X = R.onehot(dict(zip(g.labels.node, g.labels.label)), g.n, g.k)
    P = R.normalize_m(R.m_matrix(X, R.spmm(src, dst, X)), 1)
    H = sinkhorn(spec.H_gs)
    assert np.abs(P - H).max() < 0.08


@pytest.mark.parametrize("name", ALL)
def test_analog_scaled_size_and_degree(name):
    g = make_analog(name, seed=0, scale=0.1)
    spec = DATASETS[name]
    assert g.n == max(200, int(spec.n_analog * 0.1))
    # average degree tracks the paper's d (collisions may shave a little;
    # high-degree specs like prop37 at small n lose more)
    assert g.avg_degree > 0.5 * spec.d_paper
    assert g.avg_degree <= spec.d_paper + 1


def test_analog_deterministic():
    a = make_analog("pokec", seed=5, scale=0.05)
    b = make_analog("pokec", seed=5, scale=0.05)
    assert a.edges.equals(b.edges)


def test_heterophily_and_homophily_mix():
    """Fig 7: Cora/Citeseer homophilous (diagonal-dominant), MovieLens /
    Prop-37 / Flickr heterophilous (off-diagonal-dominant rows)."""
    for name in ("cora", "citeseer"):
        H = gs_matrix(name)
        assert (H.argmax(axis=1) == np.arange(H.shape[0])).all()
    for name in ("movielens", "prop37", "flickr"):
        H = gs_matrix(name)
        assert (H.argmax(axis=1) != np.arange(H.shape[0])).any()


def test_class_imbalance_present():
    a = DATASETS["enron"].alpha()
    assert a.max() / a.min() > 2  # messages vastly outnumber topics


def test_m_analog_property():
    spec = DATASETS["cora"]
    assert spec.m_analog == int(round(spec.n_analog * spec.d_paper / 2))
