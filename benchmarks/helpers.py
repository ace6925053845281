"""Shared helpers for the benchmark suite.

Every grid benchmark runs its cell exactly once (``benchmark.pedantic``,
rounds=1): a cell is a full multi-round Spark algorithm execution, so
statistical repetition is prohibitively slow and the paper itself reports
3-run means with ≤4% relative standard deviation.

Each cell's full RunRecord (rounds, peak space, bytes written, aborts) is
merged into ``results/grid.json`` so Tables III/IV/V can be rendered from
one artifact (``python jobs/report_tables.py``).
"""
from __future__ import annotations

from pathlib import Path

from repro.analysis.harness import RunRecord, save_records

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"
GRID_JSON = RESULTS_DIR / "grid.json"
STREETS_JSON = RESULTS_DIR / "streets.json"
TABLE1_JSON = RESULTS_DIR / "table1.json"


def record(rec: RunRecord, path: Path = GRID_JSON) -> RunRecord:
    RESULTS_DIR.mkdir(exist_ok=True)
    save_records([rec], path)
    return rec


def run_once(benchmark, fn):
    """Execute ``fn`` once under pytest-benchmark and return its result."""
    out = {}

    def wrapper():
        out["result"] = fn()

    benchmark.pedantic(wrapper, rounds=1, iterations=1, warmup_rounds=0)
    return out["result"]
