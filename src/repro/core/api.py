"""DataFrame-in → DataFrame-out front end for all algorithms.

``connected_components(spark, edges)`` runs the paper's Randomised
Contraction by default and returns a labels DataFrame ``(v, r)``.  Pass
``normalize=True`` to map the arbitrary unique labels to the minimum
vertex ID of each component (handy for comparisons; the paper requires
only uniqueness).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..baselines import bfs_cc, cracker, hash_to_min, two_phase
from .contraction import randomised_contraction, randomised_contraction_fast

_DISPATCH = {
    "rc": randomised_contraction_fast,
    "rc_fast": randomised_contraction_fast,
    "rc_deterministic": randomised_contraction,
}
_BASELINES = {
    "bfs": bfs_cc,
    "hash_to_min": hash_to_min,
    "two_phase": two_phase,
    "cracker": cracker,
}


def normalize_labels(result: DataFrame) -> DataFrame:
    """Relabel (v, r) so each component's label is its minimum vertex ID."""
    mins = result.groupBy("r").agg(F.min("v").alias("c"))
    return result.join(mins, "r").select("v", F.col("c").alias("r"))


def connected_components(
    spark: SparkSession,
    edges: DataFrame,
    *,
    algorithm: str = "rc",
    method: str = "gfp",
    seed: int = 0,
    normalize: bool = False,
    **kwargs,
) -> DataFrame:
    """Compute connected-component labels (v, r) for an edge DataFrame.

    ``algorithm``: rc | rc_fast | rc_deterministic | bfs | hash_to_min |
    two_phase | cracker.  ``method``/``seed`` apply to the RC variants.
    """
    if algorithm in _DISPATCH:
        res = _DISPATCH[algorithm](spark, edges, method=method, seed=seed, **kwargs)
    elif algorithm in _BASELINES:
        res = _BASELINES[algorithm](spark, edges, **kwargs)
    else:
        raise ValueError(
            f"unknown algorithm {algorithm!r}; choose from "
            f"{sorted(_DISPATCH) + sorted(_BASELINES)}"
        )
    out = res.result
    return normalize_labels(out) if normalize else out
