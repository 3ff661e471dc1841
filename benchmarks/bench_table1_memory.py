"""Table 1 bench: memory usage per algorithm (resident tracemalloc MiB
after indexing + answering, reported in extra_info; time is incidental)."""
import pytest

from conftest import cached_workload
from repro.bench.harness import measure_memory
from repro.engine.base import ALGORITHMS

WL = dict(dataset="snb", n_updates=1000, n_queries=150, seed=0)


@pytest.mark.parametrize("algo", ALGORITHMS)
def test_memory_snb(benchmark, algo):
    updates, queries = cached_workload(**WL)
    peak = benchmark.pedantic(
        lambda: measure_memory(algo, updates, queries), rounds=1, iterations=1
    )
    benchmark.extra_info["resident_mib"] = round(peak / (1 << 20), 2)
