"""Table 3 — dataset statistics (ours vs paper), computed via Spark SQL.

Usage: spark-submit jobs/run_table3.py   (or: python jobs/run_table3.py)
"""
import json
import os

from _session import get_spark, results_dir

from repro.data.datasets import DATASET_NAMES, _SPECS, dataset_spark
from repro.experiments.harness import BENCH_SCALES


def main() -> str:
    spark = get_spark("table3")
    lines = [
        "### Table 3 — dataset statistics (paper n vs generated n at bench scale)",
        "",
        "| dataset | m (paper/ours) | d (paper/ours) | n paper | n ours | scale |",
        "|---|---|---|---|---|---|",
    ]
    stats = {}
    for name in DATASET_NAMES:
        scale = BENCH_SCALES[name]
        sdf, meta = dataset_spark(spark, name, scale=scale)
        n = sdf.count()
        m = sdf.select("color").distinct().count()
        d = len([c for c in sdf.columns if c.startswith("x")])
        spec = _SPECS[name]
        lines.append(
            f"| {name} | {spec['m']}/{m} | {spec['d']}/{d} | {spec['n']:,} | {n:,} | {scale} |"
        )
        stats[name] = dict(n=n, m=m, d=d, paper_n=spec["n"])
    out = "\n".join(lines) + "\n"
    with open(os.path.join(results_dir(), "table3.md"), "w") as f:
        f.write(out)
    with open(os.path.join(results_dir(), "table3.json"), "w") as f:
        json.dump(stats, f, indent=2)
    print(out)
    return out


if __name__ == "__main__":
    main()
