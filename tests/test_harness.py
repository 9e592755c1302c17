"""Experiment harness smoke tests at tiny scales (no Spark + Spark paths)."""
import math

import numpy as np
import pytest

from repro.experiments import tables
from repro.experiments.harness import (
    ALGOS,
    RunRecord,
    make_quotas,
    mfd_g_sweep,
    streaming_experiment,
    sweep,
)


def test_make_quotas_modes():
    colors = np.array([0] * 70 + [1] * 20 + [2] * 10)
    eq = make_quotas("equal", 9, colors, 3)
    assert eq.sum() == 9 and eq.max() - eq.min() <= 1
    pr = make_quotas("proportional", 10, colors, 3)
    assert pr.sum() <= 10 and pr[0] > pr[2]
    with pytest.raises(ValueError):
        make_quotas("nope", 5, colors, 3)


def test_sweep_all_algos_tiny():
    records = sweep(
        "adult", [8], ALGOS, scale=0.02, repeats=2, timeout_s=120.0,
        fmmds_budget=500_000,
    )
    assert len(records) == len(ALGOS)
    by_algo = {r.algo: r for r in records}
    mfd_r = by_algo["MFD"]
    assert not mfd_r.dnf
    assert mfd_r.diversity > 0 and mfd_r.runtime_s > 0
    # Every non-DNF baseline returns positive diversity.
    for r in records:
        if not r.dnf:
            assert r.diversity > 0, r.algo


def test_sweep_proportional_mode():
    records = sweep("diabetes", [8], ["MFD", "FairFlow"], scale=0.01,
                    quota_mode="proportional", repeats=1)
    assert all(r.quota_mode == "proportional" for r in records)
    assert all(not r.dnf for r in records)


def test_mfd_g_sweep_runtime_monotone_in_g():
    records = mfd_g_sweep("adult", [8], [0.1, 0.7], scale=0.02, repeats=2)
    r01 = next(r for r in records if r.algo == "MFD-0.1")
    r07 = next(r for r in records if r.algo == "MFD-0.7")
    assert r01.runtime_s <= r07.runtime_s * 1.5  # more iterations cost more


def test_streaming_experiment_tiny():
    rows = streaming_experiment("beer", [6], scale=0.001)
    algos = {r["algo"] for r in rows}
    assert algos == {"StreamMFD", "SFDM-2(e=.15)", "SFDM-2(e=.75)"}
    sm = next(r for r in rows if r["algo"] == "StreamMFD")
    dense = next(r for r in rows if r["algo"] == "SFDM-2(e=.15)")
    assert sm["update_us"] < dense["update_us"]  # Fig 10 headline ordering
    assert sm["stored"] <= dense["stored"]  # O(mk) vs O(mk log Delta)


def test_sweep_with_spark_coreset(spark):
    records = sweep("popsim_1m", [6], ["MFD"], scale=0.002, repeats=1, spark=spark)
    assert len(records) == 1 and not records[0].dnf


def _mk(ds, algo, k, div, t, dnf=False):
    return RunRecord(ds, algo, k, "equal", 100, 2, div, t, 0.0, [], dnf)


def test_pivot_table_renders_dnf():
    recs = [_mk("a", "MFD", 10, 1.5, 0.2), _mk("a", "FMMD-S", 10, math.nan, math.nan, True)]
    out = tables.pivot_table(recs, "diversity", title="T")
    assert "DNF" in out and "1.500" in out and "k=10" in out


def test_pareto_table_flags_dominated():
    recs = [
        _mk("a", "fast-bad", 10, 1.0, 0.1),
        _mk("a", "slow-good", 10, 2.0, 1.0),
        _mk("a", "dominated", 10, 0.5, 2.0),
    ]
    out = tables.pareto_table(recs, title="P")
    lines = [l for l in out.splitlines() if "dominated" in l]
    assert lines and lines[0].rstrip().endswith("no |")
    assert "| a | fast-bad | 0.10 | 1.000 | yes |" in out


def test_missed_table_shape():
    r = RunRecord("d", "MFD-0.3", 20, "equal", 100, 3, 1.0, 0.1, 0.4, [0.2, 0.2, 0.0])
    out = tables.missed_table([r], title="M")
    assert "| d | MFD-0.3 | 20 |" in out and "0.40" in out
