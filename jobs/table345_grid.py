"""Tables III/IV/V: run the {RC, HM, TP, CR} × 12-dataset grid.

One run of this grid produces all three tables — runtime (III), max space
(IV) and total written (V) are projections of the same metered executions.
Results merge into results/grid.json; render with jobs/report_tables.py.

Usage:
  python jobs/table345_grid.py [--profile bench] [--algos rc,hm,tp,cr]
                               [--datasets all] [--seed 0] [--budget 25]
"""
from __future__ import annotations

import argparse
import sys


def main(
    spark,
    *,
    profile: str = "bench",
    algos: list[str] | None = None,
    datasets: list[str] | None = None,
    seed: int = 0,
    budget_factor: float = 25.0,
    out: str | None = None,
    verify: bool = False,
    log=print,
):
    from repro.analysis.harness import run_cell, save_records
    from repro.graphs.datasets import dataset_names

    algos = algos or ["rc", "hm", "tp", "cr"]
    datasets = datasets or dataset_names()
    records = []
    for ds in datasets:
        for algo in algos:
            rec = run_cell(
                spark, algo, ds, profile=profile, seed=seed,
                budget_factor=budget_factor, verify=verify,
            )
            records.append(rec)
            log(
                f"{ds:18s} {algo:4s} t={rec.seconds:7.1f}s rounds={rec.rounds:3d} "
                f"peakMB={rec.peak_live_bytes / 1e6:8.2f} "
                f"writtenMB={rec.total_bytes_written / 1e6:8.2f} "
                f"comps={rec.n_components:6d} "
                f"{'ABORT: ' + rec.abort_reason if rec.aborted else ''}"
            )
            if out:
                save_records(records, out)
    return records


if __name__ == "__main__":
    sys.path.insert(0, ".")
    from common import get_spark, results_path

    ap = argparse.ArgumentParser()
    ap.add_argument("--profile", default="bench", choices=["test", "bench"])
    ap.add_argument("--algos", default="rc,hm,tp,cr")
    ap.add_argument("--datasets", default="all")
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--budget", type=float, default=25.0)
    ap.add_argument("--verify", action="store_true")
    args = ap.parse_args()
    spark = get_spark("table345_grid")
    main(
        spark,
        profile=args.profile,
        algos=args.algos.split(","),
        datasets=None if args.datasets == "all" else args.datasets.split(","),
        seed=args.seed,
        budget_factor=args.budget,
        verify=args.verify,
        out=results_path("grid.json"),
    )
