"""Fig. 13(a) bench: SNB answering time, all seven algorithms at the
baseline workload.  ``ms_per_update`` in extra_info is the paper's metric."""
import pytest

from repro.engine.base import ALGORITHMS

WL = dict(dataset="snb", n_updates=2000, n_queries=200, seed=0)


@pytest.mark.parametrize("algo", ALGORITHMS)
def test_snb_answering(answer_bench, algo):
    answer_bench(algo, **WL)
