"""GF(2^64) arithmetic — the paper's finite-fields randomisation method.

The paper implements ``axplusb(a, x, b) = a*x + b`` over GF(2^64) as a C
user-defined function (Fig. 7), using polynomial arithmetic modulo the
irreducible polynomial ``x^64 + x^4 + x^3 + x + 1`` (low bits ``0x1b``).
Here the same function is provided three ways:

* :func:`axb` — scalar reference (arbitrary Python ints, signed-int64 I/O
  semantics identical to the paper's C code);
* :func:`axb_vec` — NumPy-vectorised over an array of ``x`` (64 xor/shift
  passes, one per bit of ``x``), used by the pandas UDF;
* :func:`register` — registers the pandas UDF as the SQL function
  ``axb_gf64(a, x, b)`` so the paper's SQL runs verbatim.

Values are stored as *signed* int64 (SQL ``bigint``) and reinterpreted as
the 64 coefficient bits of a field element, exactly as in the paper.  The
``min``/``least`` aggregation in the algorithm therefore orders elements by
their signed-int64 representation; any total order works because ``h`` is a
bijection.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

#: Low bits of the irreducible polynomial x^64 + x^4 + x^3 + x + 1.
IRRPOLY = 0x1B
#: Mask selecting 64 bits.
M64 = (1 << 64) - 1


def to_u64(x: int) -> int:
    """Reinterpret a (possibly negative) int64 as an unsigned 64-bit value."""
    return x & M64


def to_i64(x: int) -> int:
    """Reinterpret an unsigned 64-bit value as a signed int64 (SQL bigint)."""
    x &= M64
    return x - (1 << 64) if x >= (1 << 63) else x


def mul(a: int, x: int) -> int:
    """Carry-less product ``a * x`` reduced mod IRRPOLY (unsigned semantics)."""
    a, x = to_u64(a), to_u64(x)
    r = 0
    while x:
        if x & 1:
            r ^= a
        x >>= 1
        a = ((a << 1) & M64) ^ (IRRPOLY if a >> 63 else 0)
    return r


def axb(a: int, x: int, b: int) -> int:
    """``a*x + b`` over GF(2^64); signed int64 in, signed int64 out.

    Mirrors the paper's C UDF ``axplusb`` bit for bit.
    """
    return to_i64(mul(a, x) ^ to_u64(b))


def pow_(a: int, e: int) -> int:
    """``a**e`` in GF(2^64) by square-and-multiply (unsigned semantics)."""
    r, base = 1, to_u64(a)
    while e:
        if e & 1:
            r = mul(r, base)
        base = mul(base, base)
        e >>= 1
    return r


def inv(a: int) -> int:
    """Multiplicative inverse ``a^(2^64 - 2)``; ``a`` must be nonzero."""
    if to_u64(a) == 0:
        raise ZeroDivisionError("0 has no inverse in GF(2^64)")
    return pow_(a, (1 << 64) - 2)


def axb_inverse(a: int, y: int, b: int) -> int:
    """Solve ``y = a*x + b`` for ``x``: the inverse map of :func:`axb`."""
    return to_i64(mul(inv(a), to_u64(y) ^ to_u64(b)))


def axb_vec(a: int, x: np.ndarray, b: int) -> np.ndarray:
    """Vectorised :func:`axb` over an int64 array ``x`` (scalar ``a``, ``b``).

    ``a`` evolves through the 64 shift steps as a Python int (exact), while
    the per-element accumulation is a NumPy uint64 xor — 64 vector passes
    total, independent of array length.
    """
    xu = np.ascontiguousarray(x, dtype=np.int64).view(np.uint64)
    r = np.zeros_like(xu)
    aa = to_u64(a)
    one = np.uint64(1)
    for i in range(64):
        bit = (xu >> np.uint64(i)) & one
        r ^= np.uint64(aa) * bit
        aa = ((aa << 1) & M64) ^ (IRRPOLY if aa >> 63 else 0)
    r ^= np.uint64(to_u64(b))
    return r.view(np.int64)


SQL_NAME = "axb_gf64"


def register(spark) -> None:
    """Register the SQL function ``axb_gf64(a, x, b)`` (idempotent).

    This is the stand-in for the paper loading its C UDF into HAWQ: a
    vectorised pandas UDF so arithmetic stays in NumPy, not per-row Python.
    """
    from pyspark.sql.functions import pandas_udf

    @pandas_udf("long")
    def _axb_gf64(a: pd.Series, x: pd.Series, b: pd.Series) -> pd.Series:
        if len(x) == 0:
            return pd.Series([], dtype="int64")
        av, bv = int(a.iloc[0]), int(b.iloc[0])
        out = axb_vec(av, x.to_numpy(dtype=np.int64), bv)
        return pd.Series(out)

    spark.udf.register(SQL_NAME, _axb_gf64)
