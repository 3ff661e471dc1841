"""Table 1: memory usage per algorithm × dataset (resident tracemalloc
bytes after indexing + answering; paper: resident MB on the JVM)."""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

from _common import RESULTS_DIR, parser  # noqa: E402

from repro.bench.harness import build_workload, fmt_table, measure_memory, save_results  # noqa: E402
from repro.engine.base import ALGORITHMS  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    s = args.scale
    datasets = ("snb", "nyc", "biogrid")
    workloads = {
        ds: build_workload(ds, n_updates=int(2000 * s), n_queries=int(300 * s), seed=args.seed)
        for ds in datasets
    }
    rows = []
    payload = {"title": "Table 1 — memory usage (resident MiB)", "algorithms": {}}
    for name in ALGORITHMS:
        row = {"algorithm": name}
        rec = {}
        for ds, (updates, queries) in workloads.items():
            peak = measure_memory(name, updates, queries)
            row[ds] = f"{peak / (1 << 20):.1f}MiB"
            rec[ds] = peak
        rows.append(row)
        payload["algorithms"][name] = rec
        print(f"[done] {name}")
    print()
    print(fmt_table(
        "Table 1 — memory usage, Q=300, |G_E|=2000 (resident tracemalloc)",
        rows,
        ["algorithm", *datasets],
    ))
    save_results(payload, os.path.join(RESULTS_DIR, "table1_memory.json"))
    print("\nresults written to results/table1_memory.json")


if __name__ == "__main__":
    main()
