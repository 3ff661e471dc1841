"""Fig. 13(e) bench: answering time vs query overlap o — the knob TRIC's
trie clustering is designed to exploit."""
import pytest


@pytest.mark.parametrize("o", [0.25, 0.65])
@pytest.mark.parametrize("algo", ["tric", "tric+", "inc", "inc+"])
def test_snb_overlap(answer_bench, algo, o):
    answer_bench(
        algo, dataset="snb", n_updates=1500, n_queries=200, overlap=o, seed=0
    )
