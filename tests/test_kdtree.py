"""KD-tree (BBD interface) invariants, cross-checked against brute force."""
import numpy as np
import pytest

from repro.core.kdtree import KDTree


def _rand(n, d, seed):
    return np.random.default_rng(seed).normal(size=(n, d))


@pytest.mark.parametrize("n,d,seed", [(1, 2, 0), (2, 2, 1), (17, 3, 2), (64, 2, 3), (100, 6, 4)])
def test_structure_invariants(n, d, seed):
    X = _rand(n, d, seed)
    t = KDTree(X)
    assert t.n_nodes == 2 * n - 1
    leaves = [u for u in range(t.n_nodes) if t.leaf_point[u] >= 0]
    assert len(leaves) == n
    assert sorted(t.leaf_point[u] for u in leaves) == list(range(n))
    # Every point's leaf box is the point itself.
    for i in range(n):
        u = t.point_leaf[i]
        np.testing.assert_allclose(t.lo[u], X[i])
        np.testing.assert_allclose(t.hi[u], X[i])
    # Children partition the parent's point set.
    for u in range(t.n_nodes):
        if t.leaf_point[u] < 0:
            l, r = t.left[u], t.right[u]
            assert t.parent[l] == u and t.parent[r] == u
            assert t.size[u] == t.size[l] + t.size[r]


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("eps", [0.1, 0.5, 1.0])
def test_canonical_cover_soundness(seed, eps):
    """B(x,r) members covered exactly once; nothing beyond (1+eps)r."""
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(60, 2))
    t = KDTree(X)
    x = rng.normal(size=2)
    r = float(rng.uniform(0.2, 1.5))
    nodes = t.canonical_nodes(x, r, eps)
    members = [t.points_under(u) for u in nodes]
    flat = np.concatenate(members) if members else np.empty(0, dtype=np.int64)
    # Disjointness: no point reported twice.
    assert len(flat) == len(set(flat.tolist()))
    dists = np.linalg.norm(X - x, axis=1)
    inside = set(np.where(dists <= r)[0].tolist())
    reported = set(flat.tolist())
    assert inside <= reported, "a point within r was not covered"
    far = set(np.where(dists > (1 + eps) * r + 1e-9)[0].tolist())
    assert not (reported & far), "a point beyond (1+eps)r was reported"


@pytest.mark.parametrize("seed", range(4))
def test_path_to_root(seed):
    X = _rand(33, 3, seed)
    t = KDTree(X)
    for i in (0, 10, 32):
        path = list(t.path_to_root(t.point_leaf[i]))
        assert path[0] == t.point_leaf[i]
        assert path[-1] == 0
        for a, b in zip(path, path[1:]):
            assert t.parent[a] == b


@pytest.mark.parametrize("seed", range(4))
def test_subtree_sums_match_bruteforce(seed):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(40, 2))
    w = rng.random(40)
    w[rng.random(40) < 0.3] = 0.0
    t = KDTree(X)
    s = t.subtree_sums(w)
    for u in range(t.n_nodes):
        pts = t.points_under(u)
        assert s[u] == pytest.approx(w[pts].sum(), abs=1e-9)


@pytest.mark.parametrize("seed", range(4))
def test_sample_and_remove_distribution(seed):
    """Weighted sampling w/o replacement: frequencies of the first draw
    track the weights, and removal is exhaustive and duplicate-free."""
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(6, 2))
    w = np.array([0.4, 0.0, 0.3, 0.1, 0.15, 0.05])
    t = KDTree(X)
    counts = np.zeros(6)
    trials = 4000
    for _ in range(trials):
        sums = t.subtree_sums(w)
        counts[t.sample_and_remove(sums, rng)] += 1
    freq = counts / trials
    np.testing.assert_allclose(freq, w / w.sum(), atol=0.03)
    # Exhaustive drain.
    sums = t.subtree_sums(w)
    drawn = []
    while True:
        p = t.sample_and_remove(sums, rng)
        if p < 0:
            break
        drawn.append(p)
    assert sorted(drawn) == [0, 2, 3, 4, 5]  # zero-weight point never drawn


@pytest.mark.parametrize("n", [10, 100, 1000])
def test_height_logarithmic(n):
    X = _rand(n, 2, 0)
    t = KDTree(X)
    depth = np.zeros(t.n_nodes, dtype=int)
    for u in range(1, t.n_nodes):
        depth[u] = depth[t.parent[u]] + 1
    assert depth.max() <= 2 * int(np.ceil(np.log2(n))) + 2


def test_fuzzy_ball_members_matches_nodes():
    X = _rand(50, 2, 7)
    t = KDTree(X)
    x = X[3]
    got = set(t.fuzzy_ball_members(x, 0.8, 0.5).tolist())
    dists = np.linalg.norm(X - x, axis=1)
    assert set(np.where(dists <= 0.8)[0].tolist()) <= got
    assert got <= set(np.where(dists <= 1.2 * 0.8 * 1.5 + 1e-9)[0].tolist()) or got <= set(
        np.where(dists <= (1 + 0.5) * 0.8 + 1e-9)[0].tolist()
    )
