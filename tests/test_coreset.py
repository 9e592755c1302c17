"""Coreset construction (Theorem 4.2): serial + distributed, properties."""
import numpy as np
import pytest

from repro.core import exact
from repro.core.coreset import (
    coreset_arrays,
    coreset_numpy,
    coreset_spark,
    feature_columns,
    to_spark_points,
)
from repro.core.geometry import color_counts


def _instance(n, d, m, seed):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(n, d)) * 4.0
    colors = rng.integers(0, m, size=n)
    colors[:m] = np.arange(m)
    return X, colors


@pytest.mark.parametrize("n,m,k,seed", [(100, 3, 5, 0), (200, 4, 8, 1), (50, 2, 30, 2)])
def test_coreset_numpy_size_and_membership(n, m, k, seed):
    X, colors = _instance(n, 2, m, seed)
    sel, sel_colors = coreset_numpy(X, colors, k)
    counts = color_counts(colors, m)
    # Per color: exactly min(k, |P(c_j)|) centers, no duplicates.
    got = color_counts(sel_colors, m)
    np.testing.assert_array_equal(got, np.minimum(counts, k))
    assert len(set(sel.tolist())) == len(sel)


@pytest.mark.parametrize("seed", range(4))
def test_coreset_preserves_fairdiv_optimum_when_exhaustive(seed):
    """k' >= |P(c_j)| makes the coreset the whole set: optimum unchanged."""
    X, colors = _instance(14, 2, 2, seed)
    quotas = np.array([2, 2])
    sel, sel_colors = coreset_numpy(X, colors, 14)
    g_full, _ = exact.fairdiv_optimum(X, colors, quotas)
    g_core, _ = exact.fairdiv_optimum(X[sel], sel_colors, quotas)
    assert g_core == pytest.approx(g_full)


@pytest.mark.parametrize("seed", range(4))
def test_coreset_quality_constant_factor(seed):
    """With k' = k the coreset optimum stays within a small constant of
    the full optimum on random instances (Lemma 4.1 shape)."""
    X, colors = _instance(16, 2, 2, seed)
    quotas = np.array([2, 1])
    sel, sel_colors = coreset_numpy(X, colors, 6)  # k'=2k
    g_full, _ = exact.fairdiv_optimum(X, colors, quotas)
    g_core, _ = exact.fairdiv_optimum(X[sel], sel_colors, quotas)
    assert g_core >= g_full / 2.5 - 1e-9


def test_feature_columns_ordering():
    import pandas as pd

    pdf = pd.DataFrame({"x10": [1.0], "x2": [1.0], "x0": [1.0], "color": [0], "other": [1]})
    assert feature_columns(pdf) == ["x0", "x2", "x10"]


@pytest.mark.parametrize("two_stage", [True, False])
def test_coreset_spark_matches_contract(spark, two_stage):
    X, colors = _instance(400, 3, 3, seed=5)
    df = to_spark_points(spark, X, colors, n_partitions=8)
    pdf = coreset_spark(df, 10, two_stage=two_stage)
    assert set(pdf.columns) == {"x0", "x1", "x2", "color"}
    got = color_counts(pdf["color"].to_numpy(), 3)
    assert np.all(got == 10)
    # Every coreset point is an input point (exact row membership).
    merged = pdf.merge(
        __import__("pandas").DataFrame(X, columns=["x0", "x1", "x2"]).assign(color=colors),
        on=["x0", "x1", "x2", "color"],
        how="left",
        indicator=True,
    )
    assert (merged["_merge"] == "both").all()


def test_coreset_spark_two_stage_close_to_serial(spark):
    """Composable (2-round) coreset covers the space about as well as the
    serial per-color Gonzalez: k-center radius within a small factor."""
    from repro.core.gonzalez import gonzalez
    from repro.core.geometry import pairwise_distances

    X, colors = _instance(600, 2, 2, seed=9)
    df = to_spark_points(spark, X, colors, n_partitions=6)
    Xc, cc = coreset_arrays(df, 8, two_stage=True)
    for j in range(2):
        pts = X[colors == j]
        serial = pts[gonzalez(pts, 8)]
        r_serial = pairwise_distances(pts, serial).min(axis=1).max()
        dist_two = pairwise_distances(pts, Xc[cc == j]).min(axis=1).max()
        assert dist_two <= 4 * r_serial + 1e-9


def test_coreset_then_mfd_end_to_end(spark):
    """Corollary 4.3 wiring: Spark coreset -> driver MFD solves FairDiv."""
    from repro.core.mfd import mfd

    X, colors = _instance(500, 2, 3, seed=3)
    df = to_spark_points(spark, X, colors, n_partitions=4)
    Xc, cc = coreset_arrays(df, 6)
    quotas = np.array([2, 2, 2])
    res = mfd(Xc, cc, quotas, seed=0, g=0.5)
    assert res.diversity > 0
    assert res.missed.sum() <= 2
