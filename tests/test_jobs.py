"""Smoke tests for the spark-submit job entrypoints (test-profile scale)."""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"


def _load(name):
    spec = importlib.util.spec_from_file_location(f"jobs_{name}", JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


class TestTable2Job:
    def test_produces_markdown(self, tmp_path):
        mod = _load("table2_datasets")
        out = tmp_path / "t2.json"
        md = mod.main(profile="test", seed=0, out=str(out))
        assert "| andromeda |" in md
        assert out.exists()


class TestGridJob:
    def test_small_grid(self, spark, tmp_path):
        mod = _load("table345_grid")
        out = tmp_path / "grid.json"
        recs = mod.main(
            spark,
            profile="test",
            algos=["rc", "tp"],
            datasets=["pathunion10", "rmat"],
            out=str(out),
            verify=True,
            log=lambda *a, **k: None,
        )
        assert len(recs) == 4
        assert out.exists()
        assert all(not r.aborted for r in recs)


class TestTable1Job:
    def test_rounds_family(self, spark):
        mod = _load("table1_rounds")
        recs = mod.main(spark, sizes=(60,), log=lambda *a, **k: None)
        assert len(recs) == 8  # 2 numberings × 4 algorithms
        rc = [r for r in recs if r.algo == "rc"]
        assert all(not r.aborted for r in rc)


class TestStreetsJob:
    def test_runs_and_reports_ratio(self, spark, tmp_path):
        mod = _load("spark_vs_db")
        lines = []
        recs = mod.main(
            spark, profile="test", out=str(tmp_path / "s.json"), log=lines.append
        )
        assert len(recs) == 2
        assert any("ratio" in ln for ln in lines)


class TestReportJob:
    def test_report_from_grid(self, spark, tmp_path):
        grid_mod = _load("table345_grid")
        out = tmp_path / "grid.json"
        grid_mod.main(
            spark, profile="test", algos=["rc"], datasets=["rmat"],
            out=str(out), log=lambda *a, **k: None,
        )
        rep = _load("report_tables")
        md = rep.main(str(out), table2_profile=None, log=lambda *a, **k: None)
        assert "Table III" in md and "| rmat |" in md


class TestRunCCJob:
    def test_csv_roundtrip(self, spark, tmp_path):
        import pandas as pd

        mod = _load("run_cc")
        inp = tmp_path / "edges.csv"
        pd.DataFrame({"a": [1, 2, 10], "b": [2, 3, 11]}).to_csv(inp, index=False)
        labels = mod.main(spark, str(inp), None, algorithm="rc", normalize=True)
        got = {r["v"]: r["r"] for r in labels.collect()}
        assert got == {1: 1, 2: 1, 3: 1, 10: 10, 11: 10}
