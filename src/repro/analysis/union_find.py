"""Ground-truth connected components via union–find (the classic algorithm).

The paper's §I points out Union/Find is the sequential optimum but unsuited
to distributed execution; here it serves as the single-machine *oracle*
against which every distributed algorithm's output partition is checked.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame


class UnionFind:
    """Array-based union–find with path halving and union by size."""

    def __init__(self, n: int):
        self.parent = np.arange(n, dtype=np.int64)
        self.size = np.ones(n, dtype=np.int64)

    def find(self, x: int) -> int:
        p = self.parent
        while p[x] != x:
            p[x] = p[p[x]]
            x = p[x]
        return int(x)

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra == rb:
            return
        if self.size[ra] < self.size[rb]:
            ra, rb = rb, ra
        self.parent[rb] = ra
        self.size[ra] += self.size[rb]


def components_pandas(edges: pd.DataFrame) -> pd.DataFrame:
    """Labels (v, c) for an edge list; c = min vertex ID in v's component."""
    v = edges["v"].to_numpy(dtype=np.int64)
    w = edges["w"].to_numpy(dtype=np.int64)
    ids, idx = np.unique(np.concatenate([v, w]), return_inverse=True)
    n = len(ids)
    uf = UnionFind(n)
    vi, wi = idx[: len(v)], idx[len(v):]
    for a, b in zip(vi.tolist(), wi.tolist()):
        uf.union(a, b)
    roots = np.fromiter((uf.find(i) for i in range(n)), dtype=np.int64, count=n)
    # Since ids is sorted ascending, the min original ID of each root group is
    # the ID at the group's smallest dense index.
    min_of_root: dict[int, int] = {}
    for i in range(n):
        r = int(roots[i])
        if r not in min_of_root:
            min_of_root[r] = int(ids[i])
    c = np.fromiter((min_of_root[int(r)] for r in roots), dtype=np.int64, count=n)
    return pd.DataFrame({"v": ids, "c": c})


def components(edges: DataFrame | pd.DataFrame) -> pd.DataFrame:
    """As :func:`components_pandas`, accepting a Spark edge DataFrame."""
    pdf = edges.select("v", "w").toPandas() if isinstance(edges, DataFrame) else edges
    return components_pandas(pdf)


def n_components(edges: DataFrame | pd.DataFrame) -> int:
    """Number of connected components of the edge list."""
    labels = components(edges)
    return int(labels["c"].nunique())


def normalise_labels(result: pd.DataFrame) -> pd.DataFrame:
    """Map arbitrary labels (v, r) to canonical (v, c = min v per label)."""
    m = result.groupby("r")["v"].transform("min")
    return pd.DataFrame({"v": result["v"].to_numpy(), "c": m.to_numpy()}).sort_values(
        "v"
    ).reset_index(drop=True)


def assert_valid_labels(result: DataFrame | pd.DataFrame, edges: DataFrame | pd.DataFrame) -> None:
    """Assert a (v, r) labelling is exactly the connected components of edges.

    Checks (1) every vertex of the edge list is labelled exactly once and
    (2) two vertices share a label iff union–find puts them in one component.
    """
    rpdf = result.toPandas() if isinstance(result, DataFrame) else result.copy()
    truth = components(edges)
    assert sorted(rpdf.columns) == ["r", "v"], f"bad columns {list(rpdf.columns)}"
    assert rpdf["v"].is_unique, "duplicate vertex labels"
    got_vs = set(rpdf["v"].tolist())
    want_vs = set(truth["v"].tolist())
    assert got_vs == want_vs, (
        f"vertex set mismatch: missing={sorted(want_vs - got_vs)[:5]} "
        f"extra={sorted(got_vs - want_vs)[:5]}"
    )
    norm = normalise_labels(rpdf)
    truth = truth.sort_values("v").reset_index(drop=True)
    pd.testing.assert_frame_equal(norm, truth, check_dtype=False)
