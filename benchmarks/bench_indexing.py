"""Fig. 15 bench: query indexing (insertion) time for 500 queries."""
import pytest

from conftest import cached_workload
from repro.engine.base import ALGORITHMS, make_engine
from repro.engine.runner import index_queries


@pytest.mark.parametrize("algo", ALGORITHMS)
def test_indexing_500_queries(benchmark, algo):
    _, queries = cached_workload(dataset="snb", n_updates=2000, n_queries=500, seed=0)

    def setup():
        return (make_engine(algo),), {}

    benchmark.pedantic(
        lambda e: index_queries(e, queries), setup=setup, rounds=3, iterations=1
    )
