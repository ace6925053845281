"""Render Tables I–V (paper vs measured) from results/grid.json.

Usage: python jobs/report_tables.py [--grid results/grid.json]
                                    [--write-experiments EXPERIMENTS.md]
Prints markdown suitable for EXPERIMENTS.md; with --write-experiments it
replaces the block between the RESULTS:BEGIN/END markers in that file.
"""
from __future__ import annotations

import argparse
import re
import sys


def main(grid_path: str, table2_profile: str | None = None, log=print) -> str:
    from repro.analysis.harness import load_records
    from repro.analysis.report import (
        dataset_stats,
        format_rounds_table,
        format_table2,
        format_table3,
        format_table4,
        format_table5,
    )

    records = load_records(grid_path)
    parts = []
    if table2_profile:
        parts += ["## Table II — datasets", format_table2(dataset_stats(table2_profile))]
    if records:
        parts += [
            "## Table III — runtimes", format_table3(records),
            "## Table IV — maximum space", format_table4(records),
            "## Table V — total written", format_table5(records),
            "## Rounds (Table I companion)", format_rounds_table(records),
        ]
    out = "\n\n".join(parts)
    log(out)
    return out


def write_experiments(markdown: str, path: str) -> None:
    """Replace the RESULTS block in EXPERIMENTS.md with fresh tables."""
    with open(path) as f:
        text = f.read()
    new = re.sub(
        r"(<!-- RESULTS:BEGIN.*?-->).*?(<!-- RESULTS:END -->)",
        lambda m: f"{m.group(1)}\n\n{markdown}\n\n{m.group(2)}",
        text,
        flags=re.S,
    )
    with open(path, "w") as f:
        f.write(new)


if __name__ == "__main__":
    sys.path.insert(0, ".")
    from common import results_path

    ap = argparse.ArgumentParser()
    ap.add_argument("--grid", default=results_path("grid.json"))
    ap.add_argument("--table2-profile", default="bench")
    ap.add_argument("--write-experiments", default=None)
    args = ap.parse_args()
    md = main(args.grid, args.table2_profile)
    if args.write_experiments:
        write_experiments(md, args.write_experiments)
