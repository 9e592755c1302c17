"""WSPD: every pairwise distance is (1+eps)-approximated by a candidate."""
import numpy as np
import pytest

from repro.core.kdtree import KDTree
from repro.core.wspd import candidate_distances, wspd_pairs


def _rand(n, d, seed):
    return np.random.default_rng(seed).normal(size=(n, d))


@pytest.mark.parametrize("n,seed", [(10, 0), (30, 1), (60, 2)])
@pytest.mark.parametrize("eps", [0.25, 0.5])
def test_every_pair_approximated(n, seed, eps):
    X = _rand(n, 2, seed)
    cands = candidate_distances(X, eps)
    assert len(cands) >= 1
    for i in range(n):
        for j in range(i + 1, n):
            d = np.linalg.norm(X[i] - X[j])
            # Some candidate within multiplicative (1 +/- eps).
            ok = np.any((cands >= (1 - eps) * d) & (cands <= (1 + eps) * d))
            assert ok, f"distance {d} not approximated"


@pytest.mark.parametrize("seed", range(3))
def test_pairs_cover_all_point_pairs(seed):
    """Each point pair (p,q) is separated by exactly >=1 WSPD pair."""
    X = _rand(25, 2, seed)
    t = KDTree(X)
    pairs = wspd_pairs(t, s=2.0)
    covered = np.zeros((25, 25), dtype=int)
    for u, v in pairs:
        pu, pv = t.points_under(u), t.points_under(v)
        for a in pu:
            for b in pv:
                covered[a, b] += 1
                covered[b, a] += 1
    off_diag = ~np.eye(25, dtype=bool)
    assert np.all(covered[off_diag] == 1), "WSPD must cover each pair exactly once"


def test_candidate_count_near_linear():
    X = _rand(200, 2, 0)
    cands = candidate_distances(X, 0.5)
    # Far fewer than the ~20k distinct pairwise distances.
    assert len(cands) < 8000


def test_degenerate_inputs():
    assert len(candidate_distances(np.zeros((1, 2)), 0.5)) == 0
    c = candidate_distances(np.array([[0.0, 0.0], [1.0, 0.0]]), 0.5)
    assert np.any(np.isclose(c, 1.0))
