"""GF(2^64) arithmetic: field axioms, bijectivity, scalar↔vector agreement."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.ff import gf2_64 as gf

I64 = st.integers(min_value=-(2**63), max_value=2**63 - 1)
U64 = st.integers(min_value=0, max_value=2**64 - 1)


class TestScalarBasics:
    def test_mul_identity(self):
        for x in [0, 1, 2, 5, 123456789, 2**63 - 1, -1, -(2**62)]:
            assert gf.mul(1, x) == gf.to_u64(x)

    def test_mul_zero(self):
        assert gf.mul(0, 12345) == 0
        assert gf.mul(12345, 0) == 0

    def test_mul_known_value(self):
        # x * x for x = 2 (polynomial t): t*t = t^2 = 4.
        assert gf.mul(2, 2) == 4
        # t^63 * t = t^64 = t^4 + t^3 + t + 1 = IRRPOLY (the reduction).
        assert gf.mul(1 << 63, 2) == gf.IRRPOLY

    def test_axb_identity_map(self):
        for x in [0, 1, -5, 2**62, -(2**63) + 1]:
            assert gf.axb(1, x, 0) == gf.to_i64(x)

    def test_axb_translation(self):
        # a*0 + b = b.
        assert gf.axb(12345, 0, 678) == 678

    def test_signed_unsigned_roundtrip(self):
        for x in [0, 1, 2**63 - 1, 2**63, 2**64 - 1]:
            assert gf.to_u64(gf.to_i64(x)) == x


class TestFieldAxioms:
    @given(a=U64, b=U64)
    @settings(max_examples=50, deadline=None)
    def test_mul_commutative(self, a, b):
        assert gf.mul(a, b) == gf.mul(b, a)

    @given(a=U64, b=U64, c=U64)
    @settings(max_examples=30, deadline=None)
    def test_mul_associative(self, a, b, c):
        assert gf.mul(gf.mul(a, b), c) == gf.mul(a, gf.mul(b, c))

    @given(a=U64, b=U64, c=U64)
    @settings(max_examples=30, deadline=None)
    def test_distributive(self, a, b, c):
        # addition in GF(2^64) is xor
        assert gf.mul(a, b ^ c) == gf.mul(a, b) ^ gf.mul(a, c)

    @given(a=st.integers(min_value=1, max_value=2**64 - 1))
    @settings(max_examples=25, deadline=None)
    def test_inverse(self, a):
        assert gf.mul(a, gf.inv(a)) == 1

    def test_zero_has_no_inverse(self):
        with pytest.raises(ZeroDivisionError):
            gf.inv(0)


class TestBijection:
    @given(a=st.integers(min_value=1, max_value=2**64 - 1), x=I64, b=I64)
    @settings(max_examples=50, deadline=None)
    def test_axb_invertible(self, a, x, b):
        y = gf.axb(a, x, b)
        assert gf.axb_inverse(a, y, b) == gf.to_i64(x)

    def test_axb_injective_on_sample(self):
        a, b = 0x123456789ABCDEF, 42
        xs = list(range(-500, 500))
        ys = {gf.axb(a, x, b) for x in xs}
        assert len(ys) == len(xs)


class TestVectorised:
    @given(a=I64, b=I64)
    @settings(max_examples=20, deadline=None)
    def test_matches_scalar(self, a, b):
        xs = np.array([0, 1, -1, 7, -(2**63) + 1, 2**63 - 1, 123456789], dtype=np.int64)
        got = gf.axb_vec(a, xs, b)
        want = np.array([gf.axb(a, int(x), b) for x in xs], dtype=np.int64)
        np.testing.assert_array_equal(got, want)

    def test_large_array(self):
        rng = np.random.default_rng(0)
        xs = rng.integers(-(2**63), 2**63 - 1, 10_000, dtype=np.int64)
        a, b = 0x9E3779B97F4A7C15, -12345
        got = gf.axb_vec(a, xs, b)
        # bijection → no collisions on distinct inputs
        assert len(np.unique(got)) == len(np.unique(xs))
        idx = [0, 1, 4999, 9999]
        for i in idx:
            assert int(got[i]) == gf.axb(a, int(xs[i]), b)

    def test_empty_array(self):
        out = gf.axb_vec(3, np.array([], dtype=np.int64), 4)
        assert out.size == 0 and out.dtype == np.int64


class TestSparkUDF:
    def test_registered_udf_matches_python(self, spark):
        gf.register(spark)
        a, b = 987654321987654321, -111
        df = spark.range(0, 100).selectExpr(
            "id as x", f"axb_gf64(cast('{a}' as bigint), id, cast('{b}' as bigint)) as y"
        )
        rows = df.collect()
        for r in rows:
            assert r["y"] == gf.axb(a, r["x"], b)
