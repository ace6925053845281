"""Table II: generate every dataset, report |V|, |E|, #components.

Usage: python jobs/table2_datasets.py [--profile bench] [--seed 0]
Writes results/table2.json and prints the markdown table (paper numbers
alongside).  Pure pandas/union-find — no Spark needed for the counting.
"""
from __future__ import annotations

import argparse
import json


def main(profile: str = "bench", seed: int = 0, out: str | None = None) -> str:
    from repro.analysis.report import dataset_stats, format_table2

    stats = dataset_stats(profile=profile, seed=seed)
    table = format_table2(stats)
    if out:
        with open(out, "w") as f:
            json.dump(stats, f, indent=1)
    return table


if __name__ == "__main__":
    from common import results_path

    ap = argparse.ArgumentParser()
    ap.add_argument("--profile", default="bench", choices=["test", "bench"])
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    print(main(args.profile, args.seed, out=results_path("table2.json")))
