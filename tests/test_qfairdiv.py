"""QFairDiv range-query structure: containment, fairness, quality."""
import numpy as np
import pytest

from repro.core import exact
from repro.core.kdtree import KDTree
from repro.core.qfairdiv import QFairDivIndex


def _instance(n, m, seed):
    rng = np.random.default_rng(seed)
    X = rng.uniform(-10, 10, size=(n, 2))
    colors = rng.integers(0, m, size=n)
    colors[:m] = np.arange(m)
    return X, colors


@pytest.mark.parametrize("seed", range(5))
def test_rect_canonical_cover_exact(seed):
    rng = np.random.default_rng(seed)
    X = rng.uniform(-5, 5, size=(80, 2))
    t = KDTree(X)
    lo, hi = np.array([-2.0, -3.0]), np.array([3.0, 2.0])
    nodes = t.canonical_nodes_rect(lo, hi)
    got = sorted(np.concatenate([t.points_under(u) for u in nodes]).tolist()) if nodes else []
    want = sorted(
        np.where(np.all(X >= lo, axis=1) & np.all(X <= hi, axis=1))[0].tolist()
    )
    assert got == want


@pytest.mark.parametrize("seed", range(3))
def test_query_results_inside_rect_and_fair(seed):
    X, colors = _instance(600, 3, seed)
    idx = QFairDivIndex(X, colors, k_max=16)
    lo, hi = np.array([-6.0, -6.0]), np.array([6.0, 6.0])
    quotas = np.array([2, 2, 2])
    res = idx.query(lo, hi, quotas, seed=seed)
    pts = X[res.indices]
    assert np.all(pts >= lo - 1e-12) and np.all(pts <= hi + 1e-12)
    assert res.missed.sum() <= 1
    assert res.extras["coreset_size"] <= 3 * 6 + 18  # O(mk)


def test_query_quotas_clip_to_range_content():
    X, colors = _instance(200, 2, 7)
    # Rectangle that excludes color 1 entirely.
    X[colors == 1] += 100.0
    idx = QFairDivIndex(X, colors, k_max=8)
    res = idx.query(np.array([-20.0, -20.0]), np.array([20.0, 20.0]), np.array([2, 2]))
    assert np.all(colors[res.indices] == 0)


@pytest.mark.parametrize("seed", range(3))
def test_query_quality_vs_bruteforce(seed):
    """Query diversity within a constant factor of the in-range optimum."""
    X, colors = _instance(16, 2, seed)
    lo, hi = np.array([-10.0, -10.0]), np.array([10.0, 10.0])
    quotas = np.array([2, 1])
    inside = np.where(np.all(X >= lo, axis=1) & np.all(X <= hi, axis=1))[0]
    gstar, _ = exact.fairdiv_optimum(X[inside], colors[inside], quotas)
    idx = QFairDivIndex(X, colors, k_max=16)
    best = max(idx.query(lo, hi, quotas, seed=s, g=1.0).diversity for s in range(5))
    assert best >= gstar / 6 - 1e-9


def test_empty_range():
    X, colors = _instance(100, 2, 1)
    idx = QFairDivIndex(X, colors)
    res = idx.query(np.array([100.0, 100.0]), np.array([101.0, 101.0]), np.array([1, 1]))
    assert len(res.indices) == 0
