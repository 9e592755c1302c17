"""Benchmark: Fig 10 (as table) — streaming on Beer.

Paper's shape: StreamMFD has the fastest update AND post-processing,
with diversity close to SFDM-2(e=.15); SFDM-2(e=.15) updates are up to
30x slower; SFDM-2(e=.75) has much lower diversity.
"""
from repro.experiments.harness import streaming_experiment
from repro.experiments.tables import streaming_table


def test_bench_fig10(benchmark):
    rows = benchmark.pedantic(
        lambda: streaming_experiment("beer", [20], scale=0.005),
        rounds=1,
        iterations=1,
    )
    print("\n" + streaming_table(rows, title="Fig 10 (bench scale)"))
    sm = next(r for r in rows if r["algo"] == "StreamMFD")
    dense = next(r for r in rows if r["algo"] == "SFDM-2(e=.15)")
    sparse = next(r for r in rows if r["algo"] == "SFDM-2(e=.75)")
    assert sm["update_us"] < dense["update_us"]
    assert sm["update_us"] < sparse["update_us"]
    assert sm["post_s"] < dense["post_s"] * 5  # post cost comparable or better
    assert sm["stored"] < dense["stored"]
