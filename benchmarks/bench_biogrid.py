"""Figs. 16(b,c) bench: BioGRID stress — one signature, every update affects
the whole query DB."""
import pytest

from repro.engine.base import ALGORITHMS

WL = dict(dataset="biogrid", n_updates=1500, n_queries=200, seed=0)


@pytest.mark.parametrize("algo", ALGORITHMS)
def test_biogrid_answering(answer_bench, algo):
    answer_bench(algo, **WL)
