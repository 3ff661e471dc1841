"""Figs. 13(f)+14 bench: SNB scale-up under the time threshold — the
long-stream survival race (paper: TRIC+ survives longest)."""
import pytest


@pytest.mark.parametrize("algo", ["tric", "tric+", "inc+", "graphdb"])
def test_snb_scale_8k(answer_bench, algo):
    answer_bench(algo, dataset="snb", n_updates=8000, n_queries=200, seed=0)
