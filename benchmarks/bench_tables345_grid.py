"""Tables III/IV/V — the full {RC, HM, TP, CR} × 12-dataset grid.

One benchmark per cell, each executed once at the ``bench`` profile
(~10⁴–10⁵ edges; ≈1:10⁴…10⁵ of the paper's data).  Timing feeds Table III;
the persisted RunRecords carry peak-space (Table IV) and bytes-written
(Table V).  Cells the paper marks "—" (resource exhaustion) reproduce here
as engine-budget aborts, which are recorded as aborted runs — the
benchmark then measures the time-to-abort, mirroring a failed cluster run.

Render after the run:  python jobs/report_tables.py
"""
import pytest

from repro.analysis.harness import run_cell
from repro.graphs.datasets import dataset_names

from benchmarks.helpers import record, run_once

ALGOS = ["rc", "hm", "tp", "cr"]


@pytest.mark.parametrize("algo", ALGOS)
@pytest.mark.parametrize("dataset", dataset_names())
def test_grid_cell(benchmark, spark, dataset, algo):
    rec = run_once(
        benchmark,
        lambda: run_cell(
            spark, algo, dataset, profile="bench", seed=0, budget_factor=25.0
        ),
    )
    record(rec)
    # An aborted run is valid output (the paper's "—"); a converged run must
    # have produced a labelling covering every vertex.
    if not rec.aborted:
        assert rec.n_vertices > 0 and rec.n_components > 0
