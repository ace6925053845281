"""Randomisation substrates: GF(2^64), GF(p), Feistel cipher, random reals."""
from . import feistel, gf2_64, gfp
from .methods import (
    FeistelMethod,
    GF64Method,
    GFPMethod,
    Method,
    RandomRealsMethod,
    get_method,
)

__all__ = [
    "feistel",
    "gf2_64",
    "gfp",
    "Method",
    "GFPMethod",
    "GF64Method",
    "FeistelMethod",
    "RandomRealsMethod",
    "get_method",
]
