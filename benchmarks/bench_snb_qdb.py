"""Fig. 13(c) bench: answering time vs query-DB size |Q_DB|."""
import pytest


@pytest.mark.parametrize("nq", [100, 400])
@pytest.mark.parametrize("algo", ["tric", "tric+", "inc+", "graphdb"])
def test_snb_qdb_size(answer_bench, algo, nq):
    answer_bench(algo, dataset="snb", n_updates=1500, n_queries=nq, seed=0)
