"""Shared harness for the per-table jobs and pytest benchmarks.

Each evaluation artifact of the paper maps to one job in ``jobs/`` (prints
the same rows the paper reports: x-value × algorithm → answering time per
update in ms, with "timeout at |G_E| = X" markers) and one pytest-benchmark
module in ``benchmarks/``.  Results are also dumped as JSON under
``results/`` so EXPERIMENTS.md can diff paper vs measured.
"""
from __future__ import annotations

import json
import os
import tracemalloc
from typing import Optional, Sequence

from repro.engine.base import make_engine
from repro.engine.runner import RunResult, index_queries, run_stream
from repro.graph.model import QueryPattern, Triple
from repro.streams.datasets import DATASETS
from repro.streams.querygen import generate_queries

#: scaled-down defaults standing in for the paper's baseline workload
#: (|Q_DB|=5K, ℓ=5, σ=25 %, o=35 %, |G_E|=100K — see DESIGN.md §5)
DEFAULTS = dict(n_updates=3000, n_queries=300, avg_len=5, selectivity=0.25, overlap=0.35)


#: default variable-lifting probability per dataset.  NYC/BioGRID queries
#: are more literal-anchored (concrete zones / proteins, as in the paper's
#: workloads); 0.5 on the hub-heavy graphs explodes every engine's views.
VAR_PROB_DEFAULT = {"snb": 0.5, "nyc": 0.35, "biogrid": 0.35}


def build_workload(
    dataset: str = "snb",
    n_updates: int = 3000,
    n_queries: int = 300,
    avg_len: int = 5,
    selectivity: float = 0.25,
    overlap: float = 0.35,
    var_prob: Optional[float] = None,
    seed: int = 0,
) -> tuple[list[Triple], list[QueryPattern]]:
    """Deterministic (stream, query set) pair for one experiment config."""
    if var_prob is None:
        var_prob = VAR_PROB_DEFAULT.get(dataset, 0.5)
    updates = DATASETS[dataset](n_updates, seed=seed)
    queries = generate_queries(
        updates,
        n_queries,
        avg_len=avg_len,
        selectivity=selectivity,
        overlap=overlap,
        var_prob=var_prob,
        seed=seed + 1,
    )
    return updates, queries


def run_algorithms(
    updates: Sequence[Triple],
    queries: Sequence[QueryPattern],
    algos: Sequence[str],
    time_limit_s: Optional[float] = None,
) -> dict[str, dict]:
    """Index + stream each algorithm on a fresh engine; returns per-algo
    metrics (the paper's answering / indexing time and timeout markers)."""
    out: dict[str, dict] = {}
    for name in algos:
        engine = make_engine(name)
        idx_s = index_queries(engine, queries)
        res: RunResult = run_stream(engine, updates, time_limit_s=time_limit_s)
        out[name] = {
            "engine": name,
            "index_s": idx_s,
            "avg_ms_per_update": res.avg_ms_per_update,
            "elapsed_s": res.elapsed_s,
            "processed": res.processed,
            "total_updates": res.total_updates,
            "timed_out": res.timed_out,
            "timeout_reason": res.timeout_reason,
            "n_matched": len(res.matched),
        }
    return out


def measure_memory(
    name: str,
    updates: Sequence[Triple],
    queries: Sequence[QueryPattern],
    time_limit_s: float = 30.0,
) -> int:
    """Resident tracemalloc bytes held after indexing + answering — the
    analogue of Table 1's resident MB (peak would be dominated by the
    uncached variants' *transient* build tables, which the paper's resident
    measurement does not see)."""
    tracemalloc.start()
    try:
        engine = make_engine(name)
        index_queries(engine, queries)
        # tracemalloc slows execution several-fold; cap the answering phase
        # (state keeps growing monotonically, so this under-reports slow
        # engines slightly — noted in EXPERIMENTS.md)
        run_stream(engine, updates, collect_events=False, time_limit_s=time_limit_s)
        current, _ = tracemalloc.get_traced_memory()
    finally:
        del engine
        tracemalloc.stop()
    return current


def fmt_table(title: str, rows: list[dict], columns: list[str]) -> str:
    """Fixed-width text table in the style of the paper's reported rows."""
    widths = {c: max(len(c), *(len(str(r.get(c, ""))) for r in rows)) for c in columns}
    lines = [title, "-" * len(title)]
    lines.append("  ".join(c.ljust(widths[c]) for c in columns))
    for r in rows:
        lines.append("  ".join(str(r.get(c, "")).ljust(widths[c]) for c in columns))
    return "\n".join(lines)


def cell(m: dict, digits: int = 3) -> str:
    """One result cell: avg ms/update, with the paper's timeout asterisk."""
    v = f"{m['avg_ms_per_update']:.{digits}f}"
    if m["timed_out"]:
        v += f"* (timeout at |G_E|={m['processed']})"
    return v


def save_results(payload: dict, path: str) -> None:
    os.makedirs(os.path.dirname(path), exist_ok=True)
    with open(path, "w") as f:
        json.dump(payload, f, indent=2, default=str)
