"""Fig. 13(d) bench: answering time vs average query size ℓ."""
import pytest


@pytest.mark.parametrize("ell", [3, 7])
@pytest.mark.parametrize("algo", ["tric", "tric+", "inc+", "graphdb"])
def test_snb_query_length(answer_bench, algo, ell):
    answer_bench(
        algo, dataset="snb", n_updates=1500, n_queries=200, avg_len=ell, seed=0
    )
