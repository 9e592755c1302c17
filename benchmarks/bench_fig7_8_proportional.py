"""Benchmark: Figs 7-8 (as tables) — end-to-end, proportional quotas.

Paper's finding: conclusions identical to the equal-quota case.
"""
from repro.experiments.harness import sweep
from repro.experiments.tables import pivot_table

ALGOS = ["MFD", "FairFlow", "FairGreedyFlow"]


def test_bench_fig7_8(spark, benchmark):
    recs = benchmark.pedantic(
        lambda: sweep(
            "diabetes", [20], ALGOS, quota_mode="proportional", scale=0.05,
            repeats=2, spark=spark, timeout_s=120,
        ),
        rounds=1,
        iterations=1,
    )
    print("\n" + pivot_table(recs, "diversity", title="Fig 7 (bench scale, diabetes) — diversity"))
    print(pivot_table(recs, "runtime_s", title="Fig 8 (bench scale, diabetes) — runtime (s)", nd=2))
    by = {r.algo: r for r in recs}
    assert all(not r.dnf for r in recs)
    # Proportional quotas are easier: MFD should miss almost nothing.
    assert by["MFD"].missed_total <= 2
