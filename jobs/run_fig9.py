"""Fig 9 (as table) — pareto front at k=100: (runtime, diversity) per
algorithm per dataset. Derived from the Fig 5/6 records (same sweep)."""
import json
import os

from _session import results_dir

from repro.experiments.harness import RunRecord
from repro.experiments.tables import pareto_table


def main(k: int = 100) -> str:
    path = os.path.join(results_dir(), "fig5_6.json")
    with open(path) as f:
        records = [RunRecord(**r) for r in json.load(f)]
    at_k = [r for r in records if r.k == k]
    out = pareto_table(at_k, title=f"Fig 9 (as table) — runtime vs diversity at k={k} (equal quotas)")
    with open(os.path.join(results_dir(), "fig9.md"), "w") as f:
        f.write(out)
    print(out)
    return out


if __name__ == "__main__":
    main()
