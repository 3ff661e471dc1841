"""Shared helpers for the per-table benchmarks.

Workloads are built once per (dataset, size, knob) combination and cached
for the whole benchmark session; engines are rebuilt fresh for every
measured run (they are stateful).
"""
from functools import lru_cache

import pytest

from repro.bench.harness import build_workload
from repro.engine.base import make_engine
from repro.engine.runner import index_queries, run_stream

#: per-run wall-clock cap — the scaled analogue of the paper's 24 h threshold
TIME_LIMIT_S = 20.0


@lru_cache(maxsize=32)
def workload(**kw):
    return build_workload(**kw)


def cached_workload(**kw):
    return workload(**kw)


@pytest.fixture
def answer_bench(benchmark):
    """Benchmark one engine's answering phase on one workload; indexing is
    outside the timed region.  Records the paper's metric (ms/update) and
    timeout marker in extra_info."""

    def _run(engine_name: str, **wl_kw):
        updates, queries = cached_workload(**wl_kw)

        def setup():
            e = make_engine(engine_name)
            index_queries(e, queries)
            return (e,), {}

        def target(e):
            return run_stream(e, updates, time_limit_s=TIME_LIMIT_S)

        res = benchmark.pedantic(target, setup=setup, rounds=1, iterations=1)
        benchmark.extra_info["ms_per_update"] = round(res.avg_ms_per_update, 4)
        benchmark.extra_info["timed_out"] = res.timed_out
        benchmark.extra_info["processed"] = res.processed
        benchmark.extra_info["matched"] = len(res.matched)
        return res

    return _run
