"""64-bit Feistel cipher — stand-in for the paper's "encryption method".

§V-C proposes relabelling vertices through an encryption function ``e_k``
(the paper uses Blowfish as a database UDF).  The algorithm needs only that
``e_k`` is (a) a bijection on the 64-bit ID domain and (b) parameterised by
a small key that is cheap to broadcast.  Any balanced Feistel network
provides both by construction, so we substitute a 4-round Feistel over two
32-bit halves with a murmur3-style round function (documented in DESIGN.md
§4).  Bijectivity is unit-tested via the exact inverse :func:`decrypt`.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

M32 = (1 << 32) - 1
M64 = (1 << 64) - 1
ROUNDS = 4
#: Per-round key-schedule constants (odd, arbitrary).
_RC = (0x9E3779B1, 0x85EBCA77, 0xC2B2AE3D, 0x27D4EB2F)


def _subkeys(key: int) -> list[int]:
    """Derive one 32-bit subkey per round from a 64-bit key."""
    key &= M64
    return [((key >> (16 * (i % 4))) ^ _RC[i] ^ (key & M32)) & M32 for i in range(ROUNDS)]


def _f(r: int, k: int) -> int:
    """Round function: murmur3-style avalanche of (half ^ subkey)."""
    h = (r ^ k) & M32
    h = (h * 0xCC9E2D51) & M32
    h ^= h >> 15
    h = (h * 0x1B873593) & M32
    h ^= h >> 13
    return h


def encrypt(x: int, key: int) -> int:
    """Encrypt one signed/unsigned 64-bit value; returns signed int64."""
    x &= M64
    left, right = x >> 32, x & M32
    for k in _subkeys(key):
        left, right = right, left ^ _f(right, k)
    y = (left << 32) | right
    return y - (1 << 64) if y >= (1 << 63) else y


def decrypt(y: int, key: int) -> int:
    """Exact inverse of :func:`encrypt`; returns signed int64."""
    y &= M64
    left, right = y >> 32, y & M32
    for k in reversed(_subkeys(key)):
        left, right = right ^ _f(left, k), left
    x = (left << 32) | right
    return x - (1 << 64) if x >= (1 << 63) else x


def _f_vec(r: np.ndarray, k: int) -> np.ndarray:
    h = (r ^ np.uint64(k)) & np.uint64(M32)
    h = (h * np.uint64(0xCC9E2D51)) & np.uint64(M32)
    h ^= h >> np.uint64(15)
    h = (h * np.uint64(0x1B873593)) & np.uint64(M32)
    h ^= h >> np.uint64(13)
    return h


def encrypt_vec(x: np.ndarray, key: int) -> np.ndarray:
    """Vectorised :func:`encrypt` over an int64 array."""
    xu = np.ascontiguousarray(x, dtype=np.int64).view(np.uint64)
    left = xu >> np.uint64(32)
    right = xu & np.uint64(M32)
    for k in _subkeys(key):
        left, right = right, left ^ _f_vec(right, k)
    y = (left << np.uint64(32)) | right
    return y.view(np.int64)


SQL_NAME = "feistel64"


def register(spark) -> None:
    """Register the SQL function ``feistel64(x, key)`` (idempotent)."""
    from pyspark.sql.functions import pandas_udf

    @pandas_udf("long")
    def _feistel64(x: pd.Series, key: pd.Series) -> pd.Series:
        if len(x) == 0:
            return pd.Series([], dtype="int64")
        k = int(key.iloc[0])
        return pd.Series(encrypt_vec(x.to_numpy(dtype=np.int64), k))

    spark.udf.register(SQL_NAME, _feistel64)
