"""Unit tests for repro.core.geometry against brute-force references."""
import numpy as np
import pytest

from repro.core import geometry as G


def _rand(n, d, seed):
    return np.random.default_rng(seed).normal(size=(n, d))


@pytest.mark.parametrize("n,d,seed", [(5, 2, 0), (20, 3, 1), (50, 6, 2), (7, 1, 3)])
def test_pairwise_matches_loops(n, d, seed):
    X = _rand(n, d, seed)
    D = G.pairwise_distances(X)
    for i in range(n):
        for j in range(n):
            assert D[i, j] == pytest.approx(np.linalg.norm(X[i] - X[j]), abs=1e-9)


@pytest.mark.parametrize("seed", range(5))
def test_pairwise_rectangular(seed):
    X, Y = _rand(10, 4, seed), _rand(6, 4, seed + 100)
    D = G.pairwise_distances(X, Y)
    assert D.shape == (10, 6)
    assert D[3, 4] == pytest.approx(np.linalg.norm(X[3] - Y[4]))


@pytest.mark.parametrize("seed", range(5))
def test_dists_to_point(seed):
    X = _rand(30, 5, seed)
    p = _rand(1, 5, seed + 7)[0]
    got = G.dists_to_point(X, p)
    np.testing.assert_allclose(got, np.linalg.norm(X - p, axis=1))


@pytest.mark.parametrize("n,seed", [(2, 0), (5, 1), (30, 2)])
def test_diversity_matches_min_pairwise(n, seed):
    X = _rand(n, 3, seed)
    D = G.pairwise_distances(X)
    np.fill_diagonal(D, np.inf)
    assert G.diversity(X) == pytest.approx(D.min())


def test_diversity_degenerate():
    assert G.diversity(np.zeros((1, 2))) == np.inf
    assert G.diversity(np.zeros((0, 2))) == np.inf
    assert G.diversity(np.zeros((3, 2))) == 0.0


@pytest.mark.parametrize("m", [1, 2, 5])
def test_color_counts_and_quotas(m):
    colors = np.array([i % m for i in range(13)])
    counts = G.color_counts(colors, m)
    assert counts.sum() == 13
    assert G.satisfies_quotas(colors, counts)
    assert not G.satisfies_quotas(colors, counts + 1)
    assert np.all(G.missed_per_color(colors, counts) == 0)
    assert np.all(G.missed_per_color(colors, counts + 2) == 2)


@pytest.mark.parametrize("k,m", [(10, 3), (20, 14), (5, 5), (100, 7), (3, 10)])
def test_equal_quotas_sum(k, m):
    q = G.equal_quotas(k, m)
    assert q.sum() == k
    assert q.max() - q.min() <= 1


@pytest.mark.parametrize("k,seed", [(10, 0), (50, 1), (100, 2)])
def test_proportional_quotas(k, seed):
    rng = np.random.default_rng(seed)
    colors = rng.choice(4, size=1000, p=[0.7, 0.2, 0.05, 0.05])
    q = G.proportional_quotas(k, colors, 4)
    assert q.sum() <= k
    counts = G.color_counts(colors, 4)
    # Proportionality: big colors get more.
    assert q[0] >= q[1] >= q[2] - 1
    assert np.all(q <= counts)


def test_bounding_box():
    X = np.array([[0.0, 5.0], [2.0, -1.0], [1.0, 1.0]])
    lo, hi = G.bounding_box(X)
    np.testing.assert_allclose(lo, [0, -1])
    np.testing.assert_allclose(hi, [2, 5])
