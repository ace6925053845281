"""Randomised Contraction — the paper's core algorithm (Figs 3, 4, 8).

Both variants take an edge DataFrame with columns ``v, w`` (bigint; each row
one undirected edge, loop edges allowed to represent isolated vertices) and
produce a table ``Result(v, r)`` assigning every vertex a label unique to
its connected component.

* :func:`randomised_contraction` — Fig 3: composes the running label table
  ``L`` with each round's representative table ``R`` immediately.
  Deterministic linear space (L never grows).
* :func:`randomised_contraction_fast` — Fig 4: keeps all per-round tables
  ``R_i`` and composes them back-to-front (small-to-large joins), carrying
  the affine ``(A, B)`` accumulation stack for finite-field methods.
  Faster; space linear in expectation only.

The SQL emitted matches the paper's pseudocode line for line; it executes
through :class:`repro.mppdb.Engine` so rounds, rows and bytes are metered.
"""
from __future__ import annotations

import random
from dataclasses import dataclass

from pyspark.sql import DataFrame, SparkSession

from ..ff.methods import Method, get_method
from ..mppdb import Engine, EngineStats


@dataclass
class RCResult:
    """Outcome of one Randomised Contraction run."""

    result: DataFrame  # columns (v, r)
    rounds: int
    stats: EngineStats
    method: str
    variant: str
    seed: int


def _setup_edges(eng: Engine, edges: DataFrame) -> int:
    """Create the symmetric working edge table E = G ∪ reversed(G)."""
    eng.register_input("G", edges.select("v", "w"))
    g = eng.ref("G")
    return eng.ctas(
        "E",
        f"select v, w from {g} union all select w as v, v as w from {g}",
        label="setup",
    )


def _contract(eng: Engine, e: str, r: str) -> int:
    """One contraction: map both edge endpoints through R, drop loops/dups."""
    return eng.ctas(
        "T",
        f"select distinct V.r as v, W.r as w "
        f"from {eng.ref(e)} as E, {eng.ref(r)} as V, {eng.ref(r)} as W "
        f"where E.v = V.v and E.w = W.v and V.r != W.r",
        label="contract",
    )


def randomised_contraction(
    spark: SparkSession,
    edges: DataFrame,
    *,
    method: str | Method = "gfp",
    seed: int = 0,
    engine: Engine | None = None,
    max_rounds: int = 512,
) -> RCResult:
    """Fig 3 variant: deterministic linear space."""
    m = get_method(method)
    m.prepare(spark)
    rng = random.Random(seed)
    own = engine is None
    eng = engine if engine is not None else Engine(spark)
    try:
        _setup_edges(eng, edges)
        first, rounds = True, 0
        while True:
            eng.next_round()
            rounds += 1
            if rounds > max_rounds:
                raise RuntimeError(f"no convergence after {max_rounds} rounds")
            params = m.draw(rng)
            m.make_rep_table(eng, "E", "R", params)
            rowcount = _contract(eng, "E", "R")
            eng.drop("E")
            eng.rename("T", "E")
            if first:
                first = False
                eng.rename("R", "L")
            else:
                miss = m.missing_sql(params, "L.r")
                eng.ctas(
                    "T",
                    f"select L.v as v, coalesce(R.r, {miss}) as r "
                    f"from {eng.ref('L')} as L left outer join {eng.ref('R')} as R "
                    f"on (L.r = R.v)",
                    label="compose",
                )
                eng.drop("L", "R")
                eng.rename("T", "L")
            if rowcount == 0:
                break
        eng.rename("L", "Result")
        result = eng.table("Result")
        if own:
            # Detach from the engine's parquet storage, which close() deletes.
            result = result.localCheckpoint(eager=True)
        return RCResult(result, rounds, eng.stats, m.name, "fig3", seed)
    finally:
        if own:
            eng.close()


def randomised_contraction_fast(
    spark: SparkSession,
    edges: DataFrame,
    *,
    method: str | Method = "gfp",
    seed: int = 0,
    engine: Engine | None = None,
    max_rounds: int = 512,
) -> RCResult:
    """Fig 4 variant: small-to-large composition, stochastic linear space."""
    m = get_method(method)
    m.prepare(spark)
    rng = random.Random(seed)
    own = engine is None
    eng = engine if engine is not None else Engine(spark)
    try:
        _setup_edges(eng, edges)
        stack: list = []
        i = 0
        while True:
            eng.next_round()
            i += 1
            if i > max_rounds:
                raise RuntimeError(f"no convergence after {max_rounds} rounds")
            params = m.draw(rng)
            stack.append(params)
            m.make_rep_table(eng, "E", f"R{i}", params)
            rowcount = _contract(eng, "E", f"R{i}")
            eng.drop("E")
            eng.rename("T", "E")
            if rowcount == 0:
                break
        rounds = i
        eng.drop("E")  # empty by termination; the paper drops ccgraph too
        acc = m.identity_params if m.relabels else None
        while i > 1:
            i -= 1
            popped = stack.pop()  # round i+1's parameters
            if m.relabels:
                acc = m.compose_params(acc, popped)
                miss = m.missing_sql(acc, "L.r")
            else:
                miss = "L.r"
            eng.ctas(
                "T",
                f"select L.v as v, coalesce(R.r, {miss}) as r "
                f"from {eng.ref(f'R{i}')} as L left outer join "
                f"{eng.ref(f'R{i + 1}')} as R on (L.r = R.v)",
                label="compose",
            )
            eng.drop(f"R{i}", f"R{i + 1}")
            eng.rename("T", f"R{i}")
        eng.rename("R1", "Result")
        result = eng.table("Result")
        if own:
            # Detach from the engine's parquet storage, which close() deletes.
            result = result.localCheckpoint(eager=True)
        return RCResult(result, rounds, eng.stats, m.name, "fig4", seed)
    finally:
        if own:
            eng.close()
