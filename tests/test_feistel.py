"""Feistel cipher (encryption method stand-in): bijectivity and dispersion."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.ff import feistel

I64 = st.integers(min_value=-(2**63), max_value=2**63 - 1)
KEY = st.integers(min_value=0, max_value=2**64 - 1)


class TestScalar:
    @given(x=I64, key=KEY)
    @settings(max_examples=60, deadline=None)
    def test_roundtrip(self, x, key):
        assert feistel.decrypt(feistel.encrypt(x, key), key) == x

    def test_injective_on_sample(self):
        key = 0xDEADBEEFCAFEBABE
        xs = list(range(-2000, 2000))
        ys = {feistel.encrypt(x, key) for x in xs}
        assert len(ys) == len(xs)

    def test_keys_differ(self):
        xs = list(range(100))
        a = [feistel.encrypt(x, 1) for x in xs]
        b = [feistel.encrypt(x, 2) for x in xs]
        assert a != b

    def test_dispersion_breaks_sequential_order(self):
        # The whole point: a sequentially numbered path must not stay sorted.
        key = 12345
        ys = [feistel.encrypt(x, key) for x in range(1000)]
        ascending = sum(1 for i in range(999) if ys[i] < ys[i + 1])
        assert 300 < ascending < 700  # ~50% under a random-looking bijection


class TestVectorised:
    def test_matches_scalar(self):
        rng = np.random.default_rng(5)
        xs = rng.integers(-(2**63), 2**63 - 1, 500, dtype=np.int64)
        key = 0x0123456789ABCDEF
        got = feistel.encrypt_vec(xs, key)
        for i in [0, 1, 100, 499]:
            assert int(got[i]) == feistel.encrypt(int(xs[i]), key)

    def test_vector_bijective(self):
        xs = np.arange(-5000, 5000, dtype=np.int64)
        got = feistel.encrypt_vec(xs, 42)
        assert len(np.unique(got)) == len(xs)

    def test_empty(self):
        assert feistel.encrypt_vec(np.array([], dtype=np.int64), 1).size == 0


class TestSparkUDF:
    def test_registered_udf_matches_python(self, spark):
        feistel.register(spark)
        key = 2**62 + 12345
        rows = spark.range(0, 64).selectExpr(
            "id", f"feistel64(id, cast('{key}' as bigint)) as y"
        ).collect()
        for r in rows:
            assert r["y"] == feistel.encrypt(r["id"], key)
