"""Table I companion: measured steps/space classes per algorithm.

Table I in the paper is a theory table (expected rounds & space).  The
empirical counterpart here runs all four algorithms on a doubling family
of random-numbered paths plus the adversarial sequential path, recording
rounds and peak space, so a reader can check:

* RC, HM, CR rounds grow ~logarithmically, TP ~log²;
* RC/TP peak space stays a constant multiple of the input while HM's
  explodes on the sequential path (its O(|V|²) worst case).

Usage: python jobs/table1_rounds.py [--sizes 250,500,1000,2000]
"""
from __future__ import annotations

import argparse
import sys


def main(spark, *, sizes=(250, 500, 1000, 2000), budget_factor=40.0, log=print):
    from repro.analysis.harness import run_algorithm
    from repro.graphs import generators as G

    records = []
    for n in sizes:
        for numbering in ("random", "sequential"):
            pdf = G.path(n, numbering=numbering, seed=1)
            df = G.to_spark(spark, pdf)
            for algo in ("rc", "hm", "tp", "cr"):
                rec = run_algorithm(
                    spark, algo, df,
                    dataset=f"path{n}_{numbering}", profile="table1",
                    budget_factor=budget_factor,
                )
                records.append(rec)
                log(
                    f"path n={n:6d} {numbering:10s} {algo:3s} "
                    f"rounds={'—' if rec.aborted else rec.rounds:>3} "
                    f"peak/input={'—' if rec.aborted else round(rec.peak_live_rows / max(rec.input_rows, 1), 1)}"
                )
    return records


if __name__ == "__main__":
    sys.path.insert(0, ".")
    from common import get_spark

    ap = argparse.ArgumentParser()
    ap.add_argument("--sizes", default="250,500,1000,2000")
    args = ap.parse_args()
    spark = get_spark("table1_rounds")
    recs = main(spark, sizes=[int(s) for s in args.sizes.split(",")])
    from repro.analysis.report import format_rounds_table

    print(format_rounds_table([r.to_dict() for r in recs]))
