"""Shared small-graph cases for the algorithm correctness batteries.

Each case is a pandas edge list (columns v, w) covering a structural corner:
paths (worst cases), cycles, stars, cliques, grids, random multigraphs,
loop edges (isolated vertices), duplicates, bipartite graphs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.graphs import generators as G


def _df(pairs) -> pd.DataFrame:
    v, w = zip(*pairs)
    return pd.DataFrame({"v": np.array(v, dtype=np.int64), "w": np.array(w, dtype=np.int64)})


def _grid(rows: int, cols: int) -> pd.DataFrame:
    idx = np.arange(rows * cols, dtype=np.int64).reshape(rows, cols)
    h = np.stack([idx[:, :-1].ravel(), idx[:, 1:].ravel()], axis=1)
    vv = np.stack([idx[:-1, :].ravel(), idx[1:, :].ravel()], axis=1)
    e = np.concatenate([h, vv])
    return pd.DataFrame({"v": e[:, 0], "w": e[:, 1]})


def small_graphs() -> dict[str, pd.DataFrame]:
    rng = np.random.default_rng(42)
    cl8 = [(i, j) for i in range(8) for j in range(i + 1, 8)]
    two_cliques = [(i, j) for i in range(5) for j in range(i + 1, 5)] + [
        (i + 100, j + 100) for i in range(5) for j in range(i + 1, 5)
    ]
    return {
        "single_edge": _df([(7, 13)]),
        "loop_only": _df([(5, 5)]),
        "loops_and_edge": _df([(1, 1), (2, 3), (9, 9)]),
        "path10_sequential": G.path(10, numbering="sequential"),
        "path25_random": G.path(25, numbering="random", seed=3),
        "cycle12": _df([(i, (i + 1) % 12) for i in range(12)]),
        "star15": _df([(0, i) for i in range(1, 15)]),
        "star15_center_max": _df([(100, i) for i in range(1, 15)]),
        "clique8": _df(cl8),
        "two_cliques": _df(two_cliques),
        "bridge": _df([(0, 1), (1, 2), (2, 3), (10, 11), (11, 12), (3, 10)]),
        "grid4x5": _grid(4, 5),
        "random_multi": G.random_edges(40, 70, seed=7),
        "random_sparse": G.random_edges(200, 90, seed=8),
        "duplicates": _df([(1, 2), (2, 1), (1, 2), (2, 3), (3, 2), (2, 3)]),
        "bipartite": _df([(i, 1000 + (i % 4)) for i in range(12)]),
        "path_union_zigzag": G.path_union([5, 9, 17], numbering="zigzag"),
        "big_ids": _df([(2**30 - 1, 2**30 - 5), (2**30 - 5, 12), (99, 99)]),
    }


SMALL_GRAPH_NAMES = sorted(small_graphs().keys())
