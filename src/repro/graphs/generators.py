"""Synthetic graph generators — structure-preserving stand-ins for Table II.

Every generator returns a pandas DataFrame with int64 columns ``v, w`` (one
row per undirected edge; duplicates and loops allowed where meaningful) and
is deterministic in ``seed``.  Vertex IDs always fit in [0, 2^31 − 1) so
both the GF(p) and GF(2^64) randomisation methods apply.  Where the paper
randomises vertex IDs to decouple structure from numbering, we do the same
(:func:`randomise_ids`); the two adversarial path datasets keep their
deliberate numbering.

Use :func:`to_spark` to lift an edge list into a Spark DataFrame.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..analysis.union_find import UnionFind

#: Vertex IDs live in [0, ID_SPACE); matches GF(p)'s field size.
ID_SPACE = (1 << 31) - 1


def to_spark(spark: SparkSession, edges: pd.DataFrame) -> DataFrame:
    """Lift a pandas edge list to Spark with bigint columns v, w."""
    pdf = pd.DataFrame(
        {"v": edges["v"].astype("int64"), "w": edges["w"].astype("int64")}
    )
    return spark.createDataFrame(pdf)


def randomise_ids(edges: pd.DataFrame, seed: int) -> pd.DataFrame:
    """Replace vertex IDs with a random permutation of a dense ID range.

    Mirrors the paper: "The vertex IDs were chosen at random so that they
    would not reflect the geometry of the original image."
    """
    rng = np.random.default_rng(seed)
    v = edges["v"].to_numpy(dtype=np.int64)
    w = edges["w"].to_numpy(dtype=np.int64)
    ids = np.unique(np.concatenate([v, w]))
    perm = rng.permutation(len(ids)).astype(np.int64)
    lut = pd.Series(perm, index=ids)
    return pd.DataFrame({"v": lut[v].to_numpy(), "w": lut[w].to_numpy()})


# ---------------------------------------------------------------------------
# adversarial paths
# ---------------------------------------------------------------------------


def path(n: int, *, numbering: str = "sequential", seed: int = 0) -> pd.DataFrame:
    """A path on n vertices.

    ``numbering='sequential'`` is the paper's Path100M worst case (IDs along
    the path); ``'optimal'`` is Fig 2(b)'s best case for one contraction
    step; ``'random'`` randomises IDs.
    """
    if n < 1:
        raise ValueError("need n >= 1")
    pos = np.arange(n, dtype=np.int64)
    if numbering == "sequential":
        ids = pos
    elif numbering == "optimal":
        # Fig 2(b): a local minimum every three positions (… high high low …).
        ids = np.empty(n, dtype=np.int64)
        lows = np.arange(1, n, 3)
        others = np.setdiff1d(pos, lows)
        ids[lows] = np.arange(len(lows))
        ids[others] = len(lows) + np.arange(len(others))
    elif numbering == "random":
        ids = np.random.default_rng(seed).permutation(n).astype(np.int64)
    else:
        raise ValueError(f"unknown numbering {numbering!r}")
    if n == 1:
        return pd.DataFrame({"v": ids[:1], "w": ids[:1]})  # loop edge
    return pd.DataFrame({"v": ids[:-1], "w": ids[1:]})


def path_union(
    lengths: list[int] | None = None,
    *,
    total: int | None = None,
    n_paths: int = 10,
    numbering: str = "zigzag",
    seed: int = 0,
) -> pd.DataFrame:
    """Union of paths of different lengths — the Two-Phase worst case.

    PathUnion10 in the paper is "a union of path graphs of different lengths
    with vertices numbered in a specific way" ([26]'s lower-bound instance,
    not spelled out).  Our reconstruction: geometric lengths and, per path,
    **zig-zag** numbering (positions alternate between the low and high end
    of the path's ID block), which empirically inflates the alternating
    star algorithm's round count versus sequential or random numbering.
    """
    if lengths is None:
        if total is None:
            raise ValueError("pass lengths or total")
        base = max(2, total // ((1 << n_paths) - 1))
        lengths = [base * (1 << i) for i in range(n_paths)]
    frames = []
    offset = 0
    for li, length in enumerate(lengths):
        pos = np.arange(length, dtype=np.int64)
        if numbering == "zigzag":
            ids = np.where(pos % 2 == 0, pos // 2, length - 1 - pos // 2) + offset
        elif numbering == "sequential":
            ids = pos + offset
        elif numbering == "random":
            ids = (
                np.random.default_rng(seed + li).permutation(length).astype(np.int64)
                + offset
            )
        else:
            raise ValueError(f"unknown numbering {numbering!r}")
        if length == 1:
            frames.append(pd.DataFrame({"v": ids[:1], "w": ids[:1]}))
        else:
            frames.append(pd.DataFrame({"v": ids[:-1], "w": ids[1:]}))
        offset += length
    return pd.concat(frames, ignore_index=True)


# ---------------------------------------------------------------------------
# R-MAT (Chakrabarti et al. [36]) — parameters of [26]
# ---------------------------------------------------------------------------


def rmat(
    scale: int,
    n_edges: int,
    *,
    a: float = 0.57,
    b: float = 0.19,
    c: float = 0.19,
    d: float = 0.05,
    seed: int = 0,
    randomize: bool = True,
) -> pd.DataFrame:
    """R-MAT graph over a 2^scale ID space with the paper's parameters."""
    if abs(a + b + c + d - 1.0) > 1e-9:
        raise ValueError("quadrant probabilities must sum to 1")
    rng = np.random.default_rng(seed)
    src = np.zeros(n_edges, dtype=np.int64)
    dst = np.zeros(n_edges, dtype=np.int64)
    for _ in range(scale):
        r = rng.random(n_edges)
        # quadrants: [0,a) → (0,0); [a,a+b) → (0,1); [a+b,a+b+c) → (1,0); rest (1,1)
        sbit = (r >= a + b).astype(np.int64)
        dbit = ((r >= a) & (r < a + b) | (r >= a + b + c)).astype(np.int64)
        src = (src << 1) | sbit
        dst = (dst << 1) | dbit
    edges = pd.DataFrame({"v": src, "w": dst})
    return randomise_ids(edges, seed + 1) if randomize else edges


# ---------------------------------------------------------------------------
# image / video connectivity graphs (Andromeda, Candels)
# ---------------------------------------------------------------------------


def _smooth_field(
    shape: tuple[int, ...],
    rng: np.random.Generator,
    block: int = 8,
    noise_sd: float = 12.0,
) -> np.ndarray:
    """A blocky-smooth random RGB field in [0, 255]^3 over ``shape`` pixels."""
    coarse_shape = tuple(max(1, s // block + 1) for s in shape)
    out = np.empty(shape + (3,), dtype=np.float64)
    for ch in range(3):
        coarse = rng.uniform(0, 255, size=coarse_shape)
        field = coarse
        for axis, s in enumerate(shape):
            field = np.repeat(field, block, axis=axis)
        sl = tuple(slice(0, s) for s in shape)
        out[..., ch] = field[sl]
    out += rng.normal(0, noise_sd, size=out.shape)
    return np.clip(out, 0, 255)


def _adjacency_edges(
    img: np.ndarray, index: np.ndarray, threshold: float
) -> pd.DataFrame:
    """Edges between axis-adjacent pixels with RGB distance ≤ threshold."""
    frames = []
    ndim = img.ndim - 1  # last axis is colour
    for axis in range(ndim):
        sl_a = [slice(None)] * ndim
        sl_b = [slice(None)] * ndim
        sl_a[axis] = slice(0, -1)
        sl_b[axis] = slice(1, None)
        diff = img[tuple(sl_a)] - img[tuple(sl_b)]
        dist = np.sqrt((diff**2).sum(axis=-1))
        keep = dist <= threshold
        frames.append(
            pd.DataFrame(
                {
                    "v": index[tuple(sl_a)][keep].ravel(),
                    "w": index[tuple(sl_b)][keep].ravel(),
                }
            )
        )
    return pd.concat(frames, ignore_index=True)


def image_graph(
    width: int, height: int, *, threshold: float = 50.0, seed: int = 0
) -> pd.DataFrame:
    """Andromeda stand-in: 2-D image 4-connectivity graph, randomised IDs."""
    rng = np.random.default_rng(seed)
    # noise_sd tuned so ~15% of adjacency edges break and ~4% of pixels end
    # up in small fragments — matching the paper's |E|/|V| = 1.57 and
    # components/|V| = 4.3% for the Andromeda graph.
    img = _smooth_field((height, width), rng, noise_sd=15.0)
    index = np.arange(height * width, dtype=np.int64).reshape(height, width)
    edges = _adjacency_edges(img, index, threshold)
    return randomise_ids(edges, seed + 1)


def video_graph(
    width: int, height: int, frames: int, *, threshold: float = 20.0, seed: int = 0
) -> pd.DataFrame:
    """Candels stand-in: 3-D (x, y, time) 6-connectivity graph, randomised IDs."""
    rng = np.random.default_rng(seed)
    # Lower noise than the 2-D case: with 6-connectivity and threshold 20,
    # this keeps ~95% of adjacency edges, reproducing the paper's
    # |E|/|V| ≈ 2.9 for the Candels series.
    vid = _smooth_field((frames, height, width), rng, noise_sd=4.5)
    index = np.arange(frames * height * width, dtype=np.int64).reshape(
        frames, height, width
    )
    edges = _adjacency_edges(vid, index, threshold)
    return randomise_ids(edges, seed + 1)


# ---------------------------------------------------------------------------
# social graph (Friendster stand-in)
# ---------------------------------------------------------------------------


def chung_lu(
    n: int, n_edges: int, *, exponent: float = 2.5, seed: int = 0
) -> pd.DataFrame:
    """Power-law (Chung–Lu) graph: endpoints sampled ∝ degree weights."""
    rng = np.random.default_rng(seed)
    weights = (np.arange(1, n + 1, dtype=np.float64)) ** (-1.0 / (exponent - 1.0))
    weights /= weights.sum()
    v = rng.choice(n, size=n_edges, p=weights).astype(np.int64)
    w = rng.choice(n, size=n_edges, p=weights).astype(np.int64)
    keep = v != w
    edges = pd.DataFrame({"v": v[keep], "w": w[keep]})
    return randomise_ids(edges, seed + 1)


# ---------------------------------------------------------------------------
# Bitcoin stand-ins
# ---------------------------------------------------------------------------


def bitcoin_addresses(n_tx: int, *, seed: int = 0) -> pd.DataFrame:
    """Bipartite transaction→input-address graph (address-clustering shape).

    Transactions draw 1 + Poisson(0.9) input addresses from a pool with
    Zipf-like reuse, reproducing the paper's regime of |E| ≲ |V| with ~25%
    of the vertices ending up as singleton-ish components.
    """
    rng = np.random.default_rng(seed)
    # Mostly single-input transactions over a large, lightly reused address
    # pool: tuned to the paper's regime |E|/|V| ≈ 0.95 and ≈25% of vertices
    # in singleton-ish components.
    k = 1 + rng.poisson(0.35, size=n_tx)
    n_inputs = int(k.sum())
    n_addr = int(n_tx * 1.6)
    ranks = np.arange(1, n_addr + 1, dtype=np.float64)
    p = ranks**-0.55
    p /= p.sum()
    addr = rng.choice(n_addr, size=n_inputs, p=p).astype(np.int64)
    tx = np.repeat(np.arange(n_tx, dtype=np.int64), k)
    # Address IDs live above the transaction IDs (bipartite).
    edges = pd.DataFrame({"v": tx, "w": addr + n_tx})
    return randomise_ids(edges, seed + 1)


def bitcoin_full(n_tx: int, *, seed: int = 0) -> pd.DataFrame:
    """Full transaction graph: tx → output, output → spending tx.

    Each transaction creates ~2 outputs; ~80% of outputs are later spent by
    a subsequent transaction, chaining almost everything into a handful of
    giant components (the paper's 37k components over 1.5G vertices).
    """
    rng = np.random.default_rng(seed)
    n_out_per_tx = 1 + rng.poisson(1.0, size=n_tx)
    n_out = int(n_out_per_tx.sum())
    out_tx = np.repeat(np.arange(n_tx, dtype=np.int64), n_out_per_tx)
    out_id = np.arange(n_out, dtype=np.int64) + n_tx  # outputs above tx IDs
    frames = [pd.DataFrame({"v": out_tx, "w": out_id})]
    spent = rng.random(n_out) < 0.9
    # A spent output is consumed by a strictly later transaction.
    creator = out_tx[spent]
    room = (n_tx - 1 - creator).astype(np.float64)
    ok = room > 0
    creator = creator[ok]
    spender = creator + 1 + (rng.random(len(creator)) * room[ok]).astype(np.int64)
    frames.append(pd.DataFrame({"v": out_id[spent][ok], "w": spender}))
    return randomise_ids(pd.concat(frames, ignore_index=True), seed + 1)


# ---------------------------------------------------------------------------
# street network (Streets of Italy stand-in, §VII-C)
# ---------------------------------------------------------------------------


def streets(width: int, height: int, *, extra_frac: float = 0.05, seed: int = 0) -> pd.DataFrame:
    """Street network: random spanning tree of a grid plus a few chords.

    Yields |E| ≈ 1.05·|V| over one giant component — the regime of the
    Cracker paper's "Streets of Italy" (19M vertices / 20M edges).
    """
    rng = np.random.default_rng(seed)
    n = width * height
    idx = np.arange(n, dtype=np.int64).reshape(height, width)
    horiz = np.stack([idx[:, :-1].ravel(), idx[:, 1:].ravel()], axis=1)
    vert = np.stack([idx[:-1, :].ravel(), idx[1:, :].ravel()], axis=1)
    lattice = np.concatenate([horiz, vert])
    order = rng.permutation(len(lattice))
    uf = UnionFind(n)
    tree_rows = []
    extra_rows = []
    for i in order.tolist():
        a, b = int(lattice[i, 0]), int(lattice[i, 1])
        if uf.find(a) != uf.find(b):
            uf.union(a, b)
            tree_rows.append(i)
        else:
            extra_rows.append(i)
    n_extra = int(extra_frac * n)
    chosen = tree_rows + extra_rows[:n_extra]
    edges = pd.DataFrame({"v": lattice[chosen, 0], "w": lattice[chosen, 1]})
    return randomise_ids(edges, seed + 1)


# ---------------------------------------------------------------------------
# generic random graphs (tests)
# ---------------------------------------------------------------------------


def random_edges(n_vertices: int, n_edges: int, *, seed: int = 0) -> pd.DataFrame:
    """Uniform random (multi)graph; may contain loops and duplicates."""
    rng = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "v": rng.integers(0, n_vertices, n_edges, dtype=np.int64),
            "w": rng.integers(0, n_vertices, n_edges, dtype=np.int64),
        }
    )
