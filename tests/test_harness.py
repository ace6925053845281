"""Experiment harness: metrics plausibility, aborts, persistence."""
import json

import pytest

from repro.analysis.harness import (
    ALGORITHMS,
    RunRecord,
    load_records,
    run_algorithm,
    run_cell,
    save_records,
)
from repro.graphs import generators as G


class TestRunAlgorithm:
    def test_rc_record_fields(self, spark):
        pdf = G.path(200, numbering="random", seed=0)
        rec = run_algorithm(
            spark, "rc", G.to_spark(spark, pdf), dataset="p200",
            profile="test", verify_against=pdf,
        )
        assert not rec.aborted
        assert rec.n_vertices == 200
        assert rec.n_components == 1
        assert rec.rounds >= 2
        assert rec.seconds > 0
        assert rec.input_rows == 199
        assert rec.total_rows_written > rec.input_rows
        assert rec.peak_live_bytes > 0

    def test_all_registered_algorithms_run(self, spark):
        pdf = G.random_edges(30, 40, seed=2)
        df = G.to_spark(spark, pdf)
        for algo in ALGORITHMS:
            rec = run_algorithm(
                spark, algo, df, dataset="rand", profile="test",
                verify_against=pdf,
            )
            assert not rec.aborted, (algo, rec.abort_reason)
            assert rec.algo == algo

    def test_budget_abort_recorded(self, spark):
        pdf = G.path(2500, numbering="sequential")
        rec = run_algorithm(
            spark, "hm", G.to_spark(spark, pdf), dataset="path",
            profile="test", budget_factor=10.0,
        )
        assert rec.aborted
        assert "budget" in rec.abort_reason
        assert rec.total_rows_written > 0  # partial work still metered

    def test_no_budget(self, spark):
        pdf = G.path(50, numbering="sequential")
        rec = run_algorithm(
            spark, "rc", G.to_spark(spark, pdf), budget_factor=None
        )
        assert not rec.aborted


class TestRunCell:
    def test_cell_on_registry_dataset(self, spark):
        rec = run_cell(spark, "rc", "pathunion10", profile="test", verify=True)
        assert not rec.aborted
        assert rec.n_components == 10
        assert rec.dataset == "pathunion10" and rec.profile == "test"


class TestPersistence:
    def test_save_and_load_merge(self, tmp_path):
        p = tmp_path / "grid.json"
        r1 = RunRecord("rc", "d1", "test", 0, 1.0, 3, 10, 5, 80, 50, 800, 20, 320,
                       5, 1, False, None)
        r2 = RunRecord("hm", "d1", "test", 0, 2.0, 4, 12, 5, 80, 99, 1600, 60, 960,
                       5, 1, True, "space budget")
        save_records([r1], p)
        save_records([r2], p)
        recs = load_records(p)
        assert len(recs) == 2
        # overwrite same key
        r1b = RunRecord("rc", "d1", "test", 0, 9.0, 3, 10, 5, 80, 50, 800, 20, 320,
                        5, 1, False, None)
        save_records([r1b], p)
        recs = load_records(p)
        assert len(recs) == 2
        assert [r for r in recs if r["algo"] == "rc"][0]["seconds"] == 9.0

    def test_load_missing_is_empty(self, tmp_path):
        assert load_records(tmp_path / "none.json") == []

    def test_json_is_valid(self, tmp_path):
        p = tmp_path / "grid.json"
        r = RunRecord("rc", "d", "test", 0, 1.0, 1, 1, 1, 16, 1, 16, 1, 16,
                      1, 1, False, None)
        save_records([r], p)
        json.loads(p.read_text())


class TestMetricsShape:
    def test_rc_space_linear_hm_superlinear_on_path(self, spark):
        """Table IV's shape at test scale: HM peak ≫ RC peak on a path."""
        pdf = G.path(1200, numbering="sequential")
        df = G.to_spark(spark, pdf)
        rc = run_algorithm(spark, "rc", df, budget_factor=None)
        hm = run_algorithm(spark, "hm", df, budget_factor=None)
        assert rc.peak_live_rows < 10 * rc.input_rows
        assert hm.peak_live_rows > 3 * rc.peak_live_rows

    def test_two_phase_most_space_frugal_on_path(self, spark):
        """Table IV on Path100M: TP 5 GB < RC 13 GB (input 3 GB) — same
        ordering here on a path, where RC's doubled+relabelled edge tables
        dominate TP's star edges."""
        pdf = G.path(1500, numbering="sequential")
        df = G.to_spark(spark, pdf)
        rc = run_algorithm(spark, "rc", df, budget_factor=None)
        tp = run_algorithm(spark, "tp", df, budget_factor=None)
        assert tp.peak_live_rows <= rc.peak_live_rows
        # and both stay a small multiple of the input (linear space)
        assert rc.peak_live_rows <= 8 * rc.input_rows
        assert tp.peak_live_rows <= 8 * tp.input_rows
