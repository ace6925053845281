"""Pure-Python contraction primitives for the paper's theory claims.

Used by tests to verify, by direct enumeration or simulation:

* Fig 2 — the sequentially numbered path is the worst case (contracts by
  exactly one vertex); an optimally numbered path contracts to ⌈n/3⌉;
* Theorem 1 — expected shrink factor γ ≤ 3/4 under the finite-fields
  method;
* Appendix B, Theorem 2 — E(#representatives) ≤ (2/3)·n under full
  randomisation, tight on the directed 3-cycle.
"""
from __future__ import annotations

from itertools import permutations
from typing import Callable, Hashable, Iterable, Mapping

Vertex = Hashable
Edge = tuple[Vertex, Vertex]


def closed_neighbourhoods(
    edges: Iterable[Edge], *, directed: bool = False
) -> dict[Vertex, set[Vertex]]:
    """N[v] for every vertex appearing in ``edges`` (out-neighbourhoods if directed)."""
    nbrs: dict[Vertex, set[Vertex]] = {}
    for v, w in edges:
        nbrs.setdefault(v, {v}).add(w)
        nbrs.setdefault(w, {w})
        if not directed:
            nbrs[w].add(v)
    return nbrs


def representatives(
    edges: Iterable[Edge],
    h: Callable[[Vertex], float] | Mapping[Vertex, float],
    *,
    directed: bool = False,
) -> dict[Vertex, Vertex]:
    """r(v) = argmin over N[v] of h — one round's representative choice."""
    key = h.__getitem__ if isinstance(h, Mapping) else h
    return {
        v: min(nv, key=key)
        for v, nv in closed_neighbourhoods(edges, directed=directed).items()
    }


def contract_once(
    edges: Iterable[Edge],
    h: Callable[[Vertex], float] | Mapping[Vertex, float],
) -> tuple[set[Edge], dict[Vertex, Vertex]]:
    """One contraction step: relabel endpoints by r, drop loops and duplicates.

    Returns the new (canonically ordered) undirected edge set and the map r.
    """
    r = representatives(edges, h)
    new_edges = {
        (min(r[v], r[w]), max(r[v], r[w])) for v, w in edges if r[v] != r[w]
    }
    return new_edges, r


def expected_representatives(
    edges: Iterable[Edge], *, directed: bool = False
) -> float:
    """Exact E(#representatives) over all |V|! labellings (small graphs only)."""
    nbrs = closed_neighbourhoods(list(edges), directed=directed)
    verts = sorted(nbrs, key=repr)
    n = len(verts)
    if n > 9:
        raise ValueError(f"{n}! labellings is too many to enumerate")
    total = 0
    count = 0
    for perm in permutations(range(n)):
        label = dict(zip(verts, perm))
        reps = {min(nbrs[v], key=label.__getitem__) for v in verts}
        total += len(reps)
        count += 1
    return total / count
