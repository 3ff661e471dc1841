"""Fig. 13(b) bench: answering time vs selectivity σ (representative corner
points; the full sweep is jobs/table_snb_selectivity.py)."""
import pytest


@pytest.mark.parametrize("sigma", [0.10, 0.30])
@pytest.mark.parametrize("algo", ["tric", "tric+", "inc+", "graphdb"])
def test_snb_selectivity(answer_bench, algo, sigma):
    answer_bench(
        algo,
        dataset="snb",
        n_updates=1500,
        n_queries=200,
        selectivity=sigma,
        seed=0,
    )
