"""Table I companion — measured rounds/space classes on a doubling family.

Empirically validates the complexity table: RC/HM/CR rounds grow
logarithmically in |V| and TP roughly quadratically in log |V|, while
HM's space explodes on the sequentially numbered path (O(|V|²) worst
case).  Results land in results/table1.json.
"""
import pytest

from repro.analysis.harness import run_algorithm
from repro.graphs import generators as G

from benchmarks.helpers import TABLE1_JSON, record, run_once

SIZES = [500, 2000, 8000]


@pytest.mark.parametrize("algo", ["rc", "hm", "tp", "cr"])
@pytest.mark.parametrize("n", SIZES)
def test_rounds_random_path(benchmark, spark, algo, n):
    pdf = G.path(n, numbering="random", seed=1)
    df = G.to_spark(spark, pdf)
    # No budget here: these cells measure round growth, not abort behaviour
    # (the space classes are exercised by the sequential-path cells below).
    rec = run_once(
        benchmark,
        lambda: run_algorithm(
            spark, algo, df, dataset=f"rpath{n}", profile="table1",
            budget_factor=None,
        ),
    )
    record(rec, TABLE1_JSON)
    assert not rec.aborted
    import math

    # Generous log/log² envelopes around the paper's Table I classes.
    lg = math.log2(n)
    limit = 3.5 * lg * lg if algo == "tp" else 6 * lg
    assert rec.rounds <= limit, (algo, n, rec.rounds)


@pytest.mark.parametrize("algo", ["rc", "hm", "tp"])
def test_sequential_path_space_class(benchmark, spark, algo):
    """HM hits the space budget on the adversarial path; RC/TP stay linear."""
    n = 4000
    pdf = G.path(n, numbering="sequential")
    df = G.to_spark(spark, pdf)
    rec = run_once(
        benchmark,
        lambda: run_algorithm(
            spark, algo, df, dataset=f"spath{n}", profile="table1",
            budget_factor=20.0,
        ),
    )
    record(rec, TABLE1_JSON)
    if algo == "hm":
        assert rec.aborted  # O(|V|²) — the paper's Path100M failure mode
    else:
        assert not rec.aborted
        assert rec.peak_live_rows <= 20 * rec.input_rows
