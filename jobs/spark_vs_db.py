"""§VII-C: Randomised Contraction vs Cracker on the Streets-of-Italy graph.

The paper reports, on the 19M-vertex/20M-edge street network: Cracker's
original Spark code 1338 s, in-database Cracker 261 s, in-database RC
143 s — i.e. RC ≈ 1.8× faster than the best competitor in the same engine.
Here both algorithms run in the same (Spark-hosted) engine on the scaled
street network, so the comparable number is the RC:CR ratio.

Usage: python jobs/spark_vs_db.py [--profile bench] [--seed 0]
"""
from __future__ import annotations

import argparse
import sys


def main(spark, *, profile: str = "bench", seed: int = 0, out: str | None = None, log=print):
    from repro.analysis.harness import run_cell, save_records

    records = []
    for algo in ("rc", "cr"):
        rec = run_cell(
            spark, algo, "streets_italy", profile=profile, seed=seed,
            budget_factor=None,
        )
        records.append(rec)
        log(f"streets_italy {algo:3s} t={rec.seconds:7.1f}s rounds={rec.rounds}")
    if out:
        save_records(records, out)
    ratio = records[0].seconds / records[1].seconds
    log(
        f"RC/CR runtime ratio: ours {ratio:.2f} "
        f"(paper in-database: 143/261 = 0.55; "
        f"paper Cracker original Spark: 1338 s)"
    )
    return records


if __name__ == "__main__":
    sys.path.insert(0, ".")
    from common import get_spark, results_path

    ap = argparse.ArgumentParser()
    ap.add_argument("--profile", default="bench", choices=["test", "bench"])
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = get_spark("spark_vs_db")
    main(spark, profile=args.profile, seed=args.seed, out=results_path("streets.json"))
