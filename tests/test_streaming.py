"""Streaming: doubling algorithm, StreamMFD, SFDM-2, partitioned synopsis."""
import numpy as np
import pytest

from repro.baselines.sfdm2 import SFDM2, sfdm2_offline
from repro.core.geometry import equal_quotas, pairwise_distances
from repro.core.gonzalez import gonzalez, gonzalez_radius
from repro.core.streaming import DoublingKCenter, StreamMFD


def _stream(n, d, m, seed, spread=5.0):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(n, d)) * spread
    colors = rng.integers(0, m, size=n)
    colors[:m] = np.arange(m)
    return X, colors


@pytest.mark.parametrize("k,seed", [(4, 0), (8, 1), (16, 2)])
def test_doubling_capacity_and_coverage(k, seed):
    X, _ = _stream(500, 2, 1, seed)
    dk = DoublingKCenter(k, 2)
    for p in X:
        dk.insert(p)
    assert len(dk.centers) <= k
    # Constant-factor coverage vs offline Gonzalez (2-approx of optimum).
    r_stream = pairwise_distances(X, dk.centers).min(axis=1).max()
    r_gonz = gonzalez_radius(X, gonzalez(X, k))
    assert r_stream <= 16 * r_gonz + 1e-9


def test_doubling_insert_order_invariance_of_guarantee():
    X, _ = _stream(300, 2, 1, 3)
    for perm_seed in range(3):
        order = np.random.default_rng(perm_seed).permutation(len(X))
        dk = DoublingKCenter(6, 2)
        for p in X[order]:
            dk.insert(p)
        r = pairwise_distances(X, dk.centers).min(axis=1).max()
        assert r <= 16 * gonzalez_radius(X, gonzalez(X, 6)) + 1e-9


@pytest.mark.parametrize("m,k", [(2, 6), (3, 9)])
def test_streammfd_storage_and_solution(m, k):
    X, colors = _stream(2000, 2, m, 7)
    quotas = equal_quotas(k, m)
    sm = StreamMFD(2, m, per_color_k=k)
    for i in range(len(X)):
        sm.insert(X[i], int(colors[i]))
    # O(mk) storage, independent of n and spread.
    assert sm.stored_items() <= m * k
    res = sm.solution(quotas, seed=0)
    assert res.diversity > 0
    assert res.missed.sum() <= 2


def test_streammfd_update_cheaper_than_sfdm2_dense():
    """Update-time ordering of Fig 10: StreamMFD < SFDM-2(eps=.15)."""
    import time

    X, colors = _stream(1500, 2, 3, 11)
    quotas = equal_quotas(9, 3)
    sm = StreamMFD(2, 3, per_color_k=9)
    t0 = time.perf_counter()
    for i in range(len(X)):
        sm.insert(X[i], int(colors[i]))
    t_sm = time.perf_counter() - t0
    sf = SFDM2(2, quotas, eps=0.15, d_min=0.05, d_max=30.0)
    t0 = time.perf_counter()
    for i in range(len(X)):
        sf.insert(X[i], int(colors[i]))
    t_sf = time.perf_counter() - t0
    assert t_sm < t_sf


@pytest.mark.parametrize("eps", [0.15, 0.75])
def test_sfdm2_fairness_and_storage(eps):
    X, colors = _stream(800, 2, 3, 13)
    quotas = equal_quotas(6, 3)
    res = sfdm2_offline(X, colors, quotas, eps=eps)
    assert res.missed.sum() <= 1
    assert res.diversity > 0
    # log(Delta) storage blowup: denser grid stores more.
    assert res.extras["stored"] > 0


def test_sfdm2_dense_grid_at_least_as_diverse():
    """eps=0.15 should (weakly) beat eps=0.75 on diversity — Fig 10 shape."""
    X, colors = _stream(1200, 2, 3, 17)
    quotas = equal_quotas(6, 3)
    d15 = sfdm2_offline(X, colors, quotas, eps=0.15).diversity
    d75 = sfdm2_offline(X, colors, quotas, eps=0.75).diversity
    assert d15 >= 0.6 * d75  # allow noise but dense grid must be competitive


def test_partitioned_synopsis_matches_serial_quality(spark):
    from repro.core.coreset import to_spark_points
    from repro.core.streaming import stream_partitioned_synopsis

    X, colors = _stream(3000, 2, 2, 19)
    df = to_spark_points(spark, X, colors, n_partitions=6)
    Xs, cs = stream_partitioned_synopsis(df, per_color_k=8)
    assert len(Xs) <= 2 * 8
    for j in range(2):
        pts = X[colors == j]
        r_par = pairwise_distances(pts, Xs[cs == j]).min(axis=1).max()
        r_ser = gonzalez_radius(pts, gonzalez(pts, 8))
        assert r_par <= 24 * r_ser + 1e-9  # composable constant factor
