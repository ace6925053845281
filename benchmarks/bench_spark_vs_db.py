"""§VII-C — RC vs Cracker on the Streets-of-Italy street network.

The paper: on 19M vertices / 20M edges, in-database RC 143 s vs in-database
Cracker 261 s (and 1338 s for Cracker's original Spark code).  The
comparable quantity here is the same-engine RC:CR ratio (paper: 0.55).
"""
import pytest

from repro.analysis.harness import run_cell

from benchmarks.helpers import STREETS_JSON, record, run_once


@pytest.mark.parametrize("algo", ["rc", "cr"])
def test_streets_cell(benchmark, spark, algo):
    rec = run_once(
        benchmark,
        lambda: run_cell(
            spark, algo, "streets_italy", profile="bench", seed=0,
            budget_factor=None,
        ),
    )
    record(rec, STREETS_JSON)
    assert not rec.aborted
    assert rec.n_components == 1
