"""Fig. 16(a) bench: NYC TAXI — skewed zones; INV-family joins blow up and
hit the threshold, as in the paper."""
import pytest

from repro.engine.base import ALGORITHMS

WL = dict(dataset="nyc", n_updates=2000, n_queries=200, seed=0)


@pytest.mark.parametrize("algo", ALGORITHMS)
def test_nyc_answering(answer_bench, algo):
    answer_bench(algo, **WL)
