"""Fig 10 (as table) — streaming on Beer: average update time,
post-processing time, diversity for StreamMFD vs SFDM-2(e=.15/.75)."""
import json
import os

from _session import results_dir

from repro.experiments.harness import streaming_experiment
from repro.experiments.tables import streaming_table


def main(ks=(20, 60, 100)) -> str:
    rows = streaming_experiment("beer", list(ks))
    out = streaming_table(rows, title="Fig 10 (as table) — streaming setting, Beer reviews")
    with open(os.path.join(results_dir(), "fig10.md"), "w") as f:
        f.write(out)
    with open(os.path.join(results_dir(), "fig10.json"), "w") as f:
        json.dump(rows, f, indent=2)
    print(out)
    return out


if __name__ == "__main__":
    main()
