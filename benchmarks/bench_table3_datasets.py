"""Benchmark: Table 3 — dataset generation + Spark stats aggregation.

Prints the Table-3 rows (paper n vs bench-scale n) and times the Spark
group-by statistics query on one dataset. The full-scale table is
produced by jobs/run_table3.py; see EXPERIMENTS.md.
"""
import numpy as np

from repro.data.datasets import DATASET_NAMES, _SPECS, dataset_spark
from repro.oracle import assert_equivalent

SCALE = 0.005


def test_bench_table3_stats(spark, benchmark):
    def stats():
        rows = []
        for name in DATASET_NAMES:
            sdf, meta = dataset_spark(spark, name, scale=SCALE)
            cnts = dict(sdf.groupBy("color").count().collect())
            rows.append((name, meta.n, meta.m, meta.d, len(cnts)))
        return rows

    rows = benchmark.pedantic(stats, rounds=1, iterations=1)
    print("\n### Table 3 (bench scale) — | dataset | n ours | n paper | m | d |")
    for name, n, m, d, m_got in rows:
        assert m_got == m
        print(f"| {name} | {n} | {_SPECS[name]['n']} | {m} | {d} |")


def test_bench_table3_oracle_check(spark):
    """The distributed color histogram matches DuckDB on the same frame."""
    from repro.data.datasets import dataset_pandas

    sdf, _ = dataset_spark(spark, "census", scale=SCALE, seed=0)
    pdf, _ = dataset_pandas("census", scale=SCALE, seed=0)
    got = sdf.groupBy("color").count().withColumnRenamed("count", "cnt")
    assert_equivalent(got, "SELECT color, COUNT(*) AS cnt FROM pts GROUP BY color", pts=pdf)
