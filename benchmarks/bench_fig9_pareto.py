"""Benchmark: Fig 9 (as table) — (runtime, diversity) pareto check.

Paper's finding: MFD and FairFlow are the only algorithms that always
return a pareto-optimal point (FairFlow by being fastest, MFD by the
best diversity/time balance).
"""
from repro.experiments.harness import ALGOS, sweep
from repro.experiments.tables import pareto_table


def test_bench_fig9(benchmark):
    recs = benchmark.pedantic(
        lambda: sweep("popsim_1m", [20], ALGOS, scale=0.01, repeats=2, spark=None, timeout_s=120),
        rounds=1,
        iterations=1,
    )
    out = pareto_table(recs, title="Fig 9 (bench scale, popsim_1m, k=20)")
    print("\n" + out)
    by = {r.algo: r for r in recs}
    # Robust small-scale shape checks (the full pareto claims — MFD and
    # FairFlow always pareto-optimal — are verified at bench scale by
    # jobs/run_fig9.py; see EXPERIMENTS.md. At this tiny n, FMMD-S's exact
    # search finishes fast and can legitimately dominate the heuristics.)
    finishers = [r for r in recs if not r.dnf]
    assert finishers
    pareto_rows = [l for l in out.splitlines() if l.rstrip().endswith("yes |")]
    assert pareto_rows, "at least one pareto-optimal finisher must exist"
    assert by["MFD"].diversity > by["FairFlow"].diversity
    assert by["MFD"].diversity >= by["FairGreedyFlow"].diversity * 0.9
