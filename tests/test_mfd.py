"""End-to-end MFD: approximation vs brute-force optimum, fairness, schedules."""
import numpy as np
import pytest

from repro.core import exact
from repro.core.geometry import equal_quotas, missed_per_color
from repro.core.mfd import gamma_upper_bound, mfd


def _instance(n, d, m, seed, spread=3.0):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(n, d)) * spread
    colors = rng.integers(0, m, size=n)
    colors[:m] = np.arange(m)
    return X, colors


@pytest.mark.parametrize("seed", range(4))
def test_gamma_upper_bound_is_upper_bound(seed):
    X, colors = _instance(12, 2, 2, seed)
    quotas = np.array([2, 2])
    gstar, _ = exact.fairdiv_optimum(X, colors, quotas)
    assert gamma_upper_bound(X, int(quotas.sum())) >= gstar - 1e-9


@pytest.mark.parametrize("backend", ["dense", "tree"])
@pytest.mark.parametrize("seed", range(3))
def test_mfd_respects_certified_gamma(backend, seed):
    X, colors = _instance(60, 2, 3, seed)
    quotas = np.array([3, 3, 3])
    res = mfd(X, colors, quotas, backend=backend, seed=seed, g=0.5)
    assert res.gamma > 0
    # Lemma 3.1: realized diversity >= gamma / (2 (1+eps)); eps=1 default.
    assert res.diversity >= res.gamma / (2 * (1 + 1.0)) - 1e-9


@pytest.mark.parametrize("seed", range(5))
def test_mfd_constant_approximation_on_tiny_instances(seed):
    """div(S) within the paper's 1/(2(1+eps)) factor (with schedule slack)
    of the exact optimum, checked by subset enumeration."""
    X, colors = _instance(12, 2, 2, seed)
    quotas = np.array([2, 1])
    gstar, _ = exact.fairdiv_optimum(X, colors, quotas)
    eps = 1.0
    # Average over rounding randomness.
    best = max(
        mfd(X, colors, quotas, eps=eps, g=1.0, decay=0.05, seed=s).diversity
        for s in range(5)
    )
    # Guarantee: gamma_feasible >= (1-decay) * gamma* is not exact because of
    # early stopping; allow the combined factor with 25% schedule slack.
    assert best >= gstar / (2 * (1 + eps)) * 0.75 - 1e-9


@pytest.mark.parametrize("m,k", [(2, 4), (3, 6), (4, 8)])
def test_mfd_fairness_in_expectation(m, k):
    X, colors = _instance(80, 2, m, seed=7)
    quotas = equal_quotas(k, m)
    tot_missed = 0.0
    trials = 10
    for s in range(trials):
        res = mfd(X, colors, quotas, seed=s, g=0.5)
        tot_missed += res.missed.sum()
    # E[|S(c_j)|] >= k_j/(1+eps); empirically misses should be small.
    assert tot_missed / trials <= 0.2 * k + 1


def test_mfd_trim_keeps_fairness_and_improves_div():
    X, colors = _instance(100, 2, 3, seed=11)
    quotas = np.array([3, 3, 3])
    raw = mfd(X, colors, quotas, seed=3, trim=False)
    trm = mfd(X, colors, quotas, seed=3, trim=True)
    assert len(trm.indices) <= len(raw.indices)
    assert trm.diversity >= raw.diversity - 1e-9
    np.testing.assert_array_equal(
        missed_per_color(trm.colors, quotas), trm.missed
    )


def test_mfd_wspd_schedule_close_to_geometric():
    X, colors = _instance(40, 2, 2, seed=5)
    quotas = np.array([2, 2])
    geo = max(mfd(X, colors, quotas, seed=s, g=1.0).gamma for s in range(3))
    wspd = max(
        mfd(X, colors, quotas, seed=s, g=1.0, gamma_schedule="wspd").gamma
        for s in range(3)
    )
    # Both schedules should certify gammas within a small factor.
    assert wspd >= 0.5 * geo


def test_mfd_rejects_infeasible_quotas():
    X, colors = _instance(20, 2, 2, seed=0)
    with pytest.raises(ValueError):
        mfd(X, colors, np.array([50, 1]))


def test_mfd_zero_quota_color_ok():
    X, colors = _instance(30, 2, 3, seed=1)
    res = mfd(X, colors, np.array([2, 0, 2]), seed=0)
    assert res.missed[1] == 0


@pytest.mark.parametrize("g", [0.1, 0.3, 1.0])
def test_early_stopping_parameter_monotone_cost(g):
    """Smaller g runs fewer MWU iterations but still returns a solution
    with the same structural guarantees (micro-benchmark, Fig 3/4)."""
    X, colors = _instance(60, 2, 3, seed=9)
    quotas = np.array([2, 2, 2])
    res = mfd(X, colors, quotas, seed=0, g=g)
    assert res.diversity >= res.gamma / 4 - 1e-9
    assert len(res.indices) >= 1
