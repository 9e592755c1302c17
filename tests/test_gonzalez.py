"""Gonzalez k-center: approximation guarantees vs brute-force optimum."""
import numpy as np
import pytest

from repro.core import exact
from repro.core.geometry import diversity, pairwise_distances
from repro.core.gonzalez import (
    gonzalez,
    gonzalez_order,
    gonzalez_radius,
    merge_gonzalez,
)


def _rand(n, d, seed):
    return np.random.default_rng(seed).normal(size=(n, d))


@pytest.mark.parametrize("n,k,seed", [(10, 2, 0), (12, 3, 1), (14, 4, 2), (9, 5, 3)])
def test_two_approximation_of_kcenter(n, k, seed):
    X = _rand(n, 2, seed)
    idx = gonzalez(X, k)
    opt = exact.kcenter_optimum(X, k)
    assert gonzalez_radius(X, idx) <= 2 * opt + 1e-9


@pytest.mark.parametrize("n,k,seed", [(30, 5, 0), (50, 8, 1), (100, 10, 2)])
def test_centers_are_distinct_and_valid(n, k, seed):
    X = _rand(n, 3, seed)
    idx = gonzalez(X, k)
    assert len(idx) == k
    assert len(set(idx.tolist())) == k
    assert idx.min() >= 0 and idx.max() < n


def test_k_larger_than_n_truncates():
    X = _rand(4, 2, 0)
    assert len(gonzalez(X, 10)) == 4
    assert len(gonzalez(X, 0)) == 0


@pytest.mark.parametrize("n,k,seed", [(40, 6, 0), (60, 10, 1)])
def test_order_radii_non_increasing_and_prefix_property(n, k, seed):
    X = _rand(n, 2, seed)
    order, radii = gonzalez_order(X, k)
    assert np.all(np.diff(radii[1:]) <= 1e-12)
    # Prefix t is exactly gonzalez with k=t.
    for t in (2, k // 2, k):
        np.testing.assert_array_equal(order[:t], gonzalez(X, t))


@pytest.mark.parametrize("n,k,seed", [(12, 3, 0), (14, 4, 5)])
def test_maxmin_half_approximation(n, k, seed):
    """Gonzalez centers 1/2-approximate unfair max-min diversification
    (Tamir/Ravi et al.), which is what MFD's gamma upper bound relies on."""
    X = _rand(n, 2, seed)
    idx = gonzalez(X, k)
    # Brute force optimal diversity of any k-subset.
    from itertools import combinations

    best = max(diversity(X[list(s)]) for s in combinations(range(n), k))
    assert diversity(X[idx]) >= best / 2 - 1e-9
    # And it upper bounds nothing smaller: centers diversity <= best.
    assert diversity(X[idx]) <= best + 1e-9


@pytest.mark.parametrize("parts,k,seed", [(2, 4, 0), (4, 6, 1), (8, 5, 2)])
def test_merge_gonzalez_composability(parts, k, seed):
    """Two-round (partitioned) Gonzalez stays a constant-factor k-center
    solution — the property Theorem 4.2 needs from any 'Alg'."""
    X = _rand(200, 3, seed)
    chunks = np.array_split(X, parts)
    partials = [c[gonzalez(c, k)] for c in chunks]
    merged, _ = merge_gonzalez(partials, k)
    assert merged.shape == (k, 3)
    r_merged = pairwise_distances(X, merged).min(axis=1).max()
    r_serial = gonzalez_radius(X, gonzalez(X, k))
    # Composable bound: within a small constant factor of serial Gonzalez.
    assert r_merged <= 4 * r_serial + 1e-9
