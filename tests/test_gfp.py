"""GF(p) (p = 2^31 − 1) arithmetic and its pure-SQL expression."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.ff import gfp

INP = st.integers(min_value=0, max_value=gfp.P - 1)
A = st.integers(min_value=1, max_value=gfp.P - 1)


class TestScalar:
    def test_p_is_mersenne_prime(self):
        assert gfp.P == 2**31 - 1
        # sympy-free primality: trial division by known small primes suffices
        # for 2^31-1 (a known Mersenne prime); sanity check a few divisors.
        for d in [3, 5, 7, 11, 13, 17, 19, 23, 29, 31, 37, 41, 43, 47]:
            assert gfp.P % d != 0

    def test_identity(self):
        for x in [0, 1, 17, gfp.P - 1]:
            assert gfp.axb(1, x, 0) == x

    @given(a=A, x=INP, b=INP)
    @settings(max_examples=50, deadline=None)
    def test_invertible(self, a, x, b):
        y = gfp.axb(a, x, b)
        assert 0 <= y < gfp.P
        assert gfp.axb_inverse(a, y, b) == x

    @given(a=A)
    @settings(max_examples=25, deadline=None)
    def test_mul_inverse(self, a):
        assert (a * gfp.inv(a)) % gfp.P == 1

    def test_zero_has_no_inverse(self):
        with pytest.raises(ZeroDivisionError):
            gfp.inv(0)
        with pytest.raises(ZeroDivisionError):
            gfp.inv(gfp.P)

    def test_domain_check(self):
        assert gfp.check_domain(0) and gfp.check_domain(gfp.P - 1)
        assert not gfp.check_domain(-1) and not gfp.check_domain(gfp.P)

    def test_vectorised_matches_scalar(self):
        rng = np.random.default_rng(1)
        xs = rng.integers(0, gfp.P, 1000, dtype=np.int64)
        a, b = 123456789, 987654321
        got = gfp.axb_vec(a, xs, b)
        want = np.array([gfp.axb(a, int(x), b) for x in xs[:50]])
        np.testing.assert_array_equal(got[:50], want)
        assert len(np.unique(got)) == len(np.unique(xs))


class TestSQL:
    def test_sql_expr_matches_python(self, spark):
        a, b = 2_000_000_011 % gfp.P, 77
        expr = gfp.axb_sql(a, "id", b)
        rows = spark.range(0, 200).selectExpr("id", f"{expr} as y").collect()
        for r in rows:
            assert r["y"] == gfp.axb(a, r["id"], b)

    def test_sql_no_overflow_at_extremes(self, spark):
        # Largest a and x: a*x must not overflow a bigint under ANSI mode.
        a = gfp.P - 1
        expr = gfp.axb_sql(a, "x", gfp.P - 1)
        row = spark.sql(
            f"select {expr} as y from (select cast({gfp.P - 1} as bigint) as x)"
        ).collect()[0]
        assert row["y"] == gfp.axb(a, gfp.P - 1, gfp.P - 1)
