"""Fig. 15: query insertion (indexing) time per batch of queries as the
query database grows (paper: per 1K up to 5K; ours: per 100 up to 500)."""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))

from _common import RESULTS_DIR, parser  # noqa: E402

from repro.bench.harness import build_workload, fmt_table, save_results  # noqa: E402
from repro.engine.base import ALGORITHMS, make_engine  # noqa: E402
from repro.engine.runner import index_queries  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    s = args.scale
    batch = int(100 * s)
    updates, queries = build_workload(
        "snb", n_updates=int(2000 * s), n_queries=5 * batch, seed=args.seed
    )
    engines = {name: make_engine(name) for name in ALGORITHMS}
    rows = []
    payload = {"title": "Fig 15 — indexing time", "batches": []}
    for b in range(5):
        chunk = queries[b * batch : (b + 1) * batch]
        row = {"x": f"|Q_DB|->{(b + 1) * batch}"}
        rec = {}
        for name, e in engines.items():
            secs = index_queries(e, chunk)
            row[name] = f"{secs * 1000:.1f}"
            rec[name] = secs
        rows.append(row)
        payload["batches"].append(rec)
    print(fmt_table(
        f"Fig 15 — indexing time (ms) per batch of {batch} queries",
        rows,
        ["x"] + ALGORITHMS,
    ))
    save_results(payload, os.path.join(RESULTS_DIR, "table_indexing.json"))
    print("\nresults written to results/table_indexing.json")


if __name__ == "__main__":
    main()
