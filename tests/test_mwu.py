"""MWU Oracle / Update / Round — both backends, vs brute-force references."""
import numpy as np
import pytest

from repro.core import mwu
from repro.core.exact import ball_matrix
from repro.core.geometry import diversity, pairwise_distances


def _instance(n=40, d=2, m=3, seed=0):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(n, d)) * 3.0
    colors = rng.integers(0, m, size=n)
    # Ensure every color is present.
    colors[:m] = np.arange(m)
    return X, colors


@pytest.mark.parametrize("seed", range(4))
def test_oracle_dense_matches_bruteforce_minimum(seed):
    """The oracle's selection minimizes h^T A x over P (k_j smallest
    coefficients per color)."""
    X, colors = _instance(seed=seed)
    quotas = np.array([2, 3, 1])
    prob = mwu.MWUProblem(X, colors, quotas, gamma=2.0, eps=1.0)
    A = ball_matrix(X, prob.radius).astype(float)
    rng = np.random.default_rng(seed)
    h = rng.random(len(X))
    h /= h.sum()
    by_color = mwu._color_index_lists(colors, 3)
    xbar = mwu._oracle_dense(A, h, by_color, quotas)
    w = A @ h
    if xbar is None:
        # Then even the minimal selection exceeds 1.
        best = sum(np.sort(w[colors == j])[: quotas[j]].sum() for j in range(3))
        assert best > 1.0
    else:
        got = w @ xbar
        best = sum(np.sort(w[colors == j])[: quotas[j]].sum() for j in range(3))
        assert got == pytest.approx(best, abs=1e-9)
        assert got <= 1.0 + 1e-9
        for j in range(3):
            assert xbar[colors == j].sum() == quotas[j]


@pytest.mark.parametrize("seed", range(3))
def test_tree_oracle_coefficients_match_fuzzy_neighborhoods(seed):
    """Tree Oracle coefficients w_i equal sum of h over fuzzy-ball
    membership — cross-checked by materializing S^eps via the same tree."""
    from repro.core.kdtree import KDTree

    X, colors = _instance(n=30, seed=seed)
    quotas = np.array([1, 1, 1])
    prob = mwu.MWUProblem(X, colors, quotas, gamma=2.5, eps=0.5)
    tree = KDTree(X)
    rng = np.random.default_rng(seed)
    h = rng.random(len(X))
    h /= h.sum()
    # Reference: A[l, i] = 1 iff i in S^eps_{p_l} per the tree's own cover.
    n = len(X)
    A = np.zeros((n, n))
    for ell in range(n):
        A[ell, tree.fuzzy_ball_members(X[ell], prob.radius, prob.eps)] = 1.0
    w_ref = A.T @ h
    by_color = mwu._color_index_lists(colors, 3)
    xbar = mwu._oracle_tree(tree, prob, h, by_color)
    # Recompute the oracle on reference coefficients.
    sel_ref = []
    for j in range(3):
        idx = np.where(colors == j)[0]
        sel_ref.append(idx[np.argsort(w_ref[idx])[:1]])
    best = w_ref[np.concatenate(sel_ref)].sum()
    if xbar is None:
        assert best > 1.0
    else:
        assert w_ref @ xbar == pytest.approx(best, abs=1e-9)


@pytest.mark.parametrize("backend", ["dense", "tree"])
@pytest.mark.parametrize("seed", range(3))
def test_solve_satisfies_trivial_constraints(backend, seed):
    X, colors = _instance(seed=seed)
    quotas = np.array([2, 2, 2])
    prob = mwu.MWUProblem(X, colors, quotas, gamma=1.0, eps=1.0)
    solve = mwu.solve_dense if backend == "dense" else mwu.solve_tree
    xhat = solve(prob, g=1.0)
    assert xhat is not None
    # Constraints (10) and (12) hold exactly (P is satisfied by every oracle).
    for j in range(3):
        assert xhat[colors == j].sum() == pytest.approx(quotas[j], abs=1e-9)
    assert np.all(xhat >= 0) and np.all(xhat <= 1 + 1e-12)


def test_solve_full_T_bounds_lp2_violation():
    """With full T (g=1) the averaged solution satisfies Constraints (11)
    within additive eps (Theorem 2.2)."""
    X, colors = _instance(n=30, seed=1)
    quotas = np.array([1, 1, 1])
    eps = 0.5
    # Large pairwise distances: pick gamma small so LP2 is clearly feasible.
    prob = mwu.MWUProblem(X, colors, quotas, gamma=0.5, eps=eps)
    xhat = mwu.solve_dense(prob, g=1.0)
    assert xhat is not None
    assert mwu.lp2_violation(prob, xhat) <= eps + 1e-9


def test_infeasible_when_gamma_huge():
    """For gamma far above the point spread, every fair selection packs k
    points into one ball, so the oracle must report infeasibility."""
    X, colors = _instance(n=25, seed=2)
    quotas = np.array([3, 3, 3])
    span = float(pairwise_distances(X).max())
    prob = mwu.MWUProblem(X, colors, quotas, gamma=10 * span, eps=0.5)
    assert mwu.solve_dense(prob, g=0.3) is None
    assert mwu.solve_tree(prob, g=0.3) is None


@pytest.mark.parametrize("backend", ["dense", "tree"])
@pytest.mark.parametrize("seed", range(3))
def test_round_separation(backend, seed):
    """Rounded sets respect the LP2 radius: min pairwise distance > r
    (dense, exact balls) or > r given fuzzy covers (tree: >= r holds
    because conflicts only widen)."""
    X, colors = _instance(n=50, seed=seed)
    quotas = np.array([2, 2, 2])
    prob = mwu.MWUProblem(X, colors, quotas, gamma=1.2, eps=1.0)
    xhat = mwu.solve_dense(prob, g=0.5)
    assert xhat is not None
    rng = np.random.default_rng(seed)
    sel = (
        mwu.round_dense(prob, xhat, rng)
        if backend == "dense"
        else mwu.round_tree(prob, xhat, rng)
    )
    assert len(sel) == len(set(sel.tolist()))
    if len(sel) >= 2:
        assert diversity(X[sel]) > prob.radius - 1e-9
    # Only positive-weight points can be selected.
    assert np.all(xhat[sel] > 0)


def test_round_fairness_in_expectation():
    """Monte-Carlo check of Lemma 3.1: E[|S(c_j)|] >= k_j / (1 + eps)."""
    X, colors = _instance(n=40, seed=3)
    quotas = np.array([2, 2, 2])
    eps = 1.0
    prob = mwu.MWUProblem(X, colors, quotas, gamma=1.0, eps=eps)
    xhat = mwu.solve_dense(prob, g=1.0)
    assert xhat is not None
    rng = np.random.default_rng(0)
    trials = 300
    got = np.zeros(3)
    for _ in range(trials):
        sel = mwu.round_dense(prob, xhat, rng)
        for j in range(3):
            got[j] += (colors[sel] == j).sum()
    got /= trials
    # Allow Monte-Carlo slack of 3 sigma ~ 0.25.
    assert np.all(got >= quotas / (1 + eps) - 0.3), got
