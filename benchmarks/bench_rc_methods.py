"""§V-C supplement — the three randomisation methods and both RC variants.

Not a numbered table in the paper, but it substantiates two claims made in
§V-C/§V-D: the finite-fields method is the cheapest (pure SQL beats the
cipher UDF and the materialised random-reals table), and the Fig 4 variant
is at least as fast as Fig 3 (small-to-large composition).
"""
import pytest

from repro.analysis.harness import run_algorithm
from repro.graphs.datasets import get_dataset
from repro.graphs import generators as G

from benchmarks.helpers import record, run_once, RESULTS_DIR

_METHODS = ["rc", "rc_gf64", "rc_feistel", "rc_reals", "rc_fig3"]


@pytest.fixture(scope="module")
def candels_edges(spark):
    pdf = get_dataset("candels20").build_pandas("bench", seed=0)
    return G.to_spark(spark, pdf)


@pytest.mark.parametrize("algo", _METHODS)
def test_rc_variant(benchmark, spark, candels_edges, algo):
    rec = run_once(
        benchmark,
        lambda: run_algorithm(
            spark, algo, candels_edges, dataset="candels20",
            profile="methods", budget_factor=None,
        ),
    )
    record(rec, RESULTS_DIR / "rc_methods.json")
    assert not rec.aborted
    assert rec.rounds <= 30
