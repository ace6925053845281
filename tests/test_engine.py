"""The mppdb Engine: catalog semantics, metering, budgets."""
import pytest

from repro.mppdb import Engine, SpaceBudgetExceeded


@pytest.fixture()
def eng(spark):
    with Engine(spark, shuffle_partitions=4) as e:
        yield e


class TestCatalog:
    def test_ctas_and_table(self, eng):
        n = eng.ctas("t", "select id as v from range(10)")
        assert n == 10
        assert eng.rows("t") == 10
        assert eng.table("t").count() == 10
        assert "t" in eng.tables()

    def test_ref_is_queryable(self, eng, spark):
        eng.ctas("a", "select id from range(5)")
        got = spark.sql(f"select count(*) as c from {eng.ref('a')}").collect()[0]["c"]
        assert got == 5

    def test_drop(self, eng, spark):
        eng.ctas("a", "select id from range(5)")
        ref = eng.ref("a")
        eng.drop("a")
        assert "a" not in eng.tables()
        with pytest.raises(Exception):
            spark.sql(f"select * from {ref}").collect()

    def test_rename(self, eng, spark):
        eng.ctas("a", "select id from range(7)")
        eng.rename("a", "b")
        assert eng.rows("b") == 7
        assert "a" not in eng.tables()
        assert spark.sql(f"select count(*) c from {eng.ref('b')}").collect()[0]["c"] == 7

    def test_rename_onto_existing_fails(self, eng):
        eng.ctas("a", "select id from range(1)")
        eng.ctas("b", "select id from range(1)")
        with pytest.raises(ValueError):
            eng.rename("a", "b")

    def test_duplicate_ctas_fails(self, eng):
        eng.ctas("a", "select id from range(1)")
        with pytest.raises(ValueError):
            eng.ctas("a", "select id from range(1)")

    def test_two_engines_do_not_collide(self, spark):
        with Engine(spark) as e1, Engine(spark) as e2:
            e1.ctas("t", "select id from range(3)")
            e2.ctas("t", "select id from range(8)")
            assert e1.rows("t") == 3
            assert e2.rows("t") == 8
            assert e1.ref("t") != e2.ref("t")

    def test_register_input(self, eng, spark):
        df = spark.range(12).selectExpr("id as v", "id + 1 as w")
        n = eng.register_input("G", df)
        assert n == 12
        assert eng.stats.input_rows == 12
        assert eng.stats.input_bytes == 12 * 16  # two bigints


class TestMetering:
    def test_rows_and_bytes_written(self, eng):
        eng.ctas("a", "select id from range(100)")
        eng.ctas("b", "select id, id as j from range(50)")
        st = eng.stats
        assert st.total_rows_written == 150
        assert st.total_bytes_written == 100 * 8 + 50 * 16
        assert st.n_ctas == 2

    def test_peak_tracks_drops(self, eng):
        eng.ctas("a", "select id from range(100)")
        eng.drop("a")
        eng.ctas("b", "select id from range(10)")
        assert eng.stats.peak_live_rows == 100
        assert eng.live_rows == 10

    def test_rounds(self, eng):
        assert eng.round == 0
        eng.next_round()
        eng.ctas("a", "select id from range(1)")
        eng.next_round()
        eng.ctas("b", "select id from range(1)")
        assert eng.stats.rounds == 2

    def test_scalar_and_row(self, eng):
        eng.ctas("a", "select id from range(9)")
        assert eng.scalar(f"select count(*) from {eng.ref('a')}") == 9
        r = eng.row(f"select count(*) as c, sum(id) as s from {eng.ref('a')}")
        assert r["c"] == 9 and r["s"] == 36
        # reads are recorded but do not count as writes
        assert eng.stats.total_rows_written == 9
        assert eng.stats.n_queries == 3

    def test_query_records_have_timing(self, eng):
        eng.ctas("a", "select id from range(4)", label="mylabel")
        rec = [q for q in eng.stats.queries if q.label == "mylabel"][0]
        assert rec.rows == 4 and rec.seconds > 0 and rec.kind == "ctas"

    def test_summary_keys(self, eng):
        eng.ctas("a", "select id from range(4)")
        s = eng.stats.summary()
        for k in ["n_queries", "rounds", "total_rows_written", "peak_live_bytes"]:
            assert k in s


class TestBudget:
    def test_budget_exceeded(self, spark):
        with Engine(spark, max_live_rows=100) as e:
            e.ctas("a", "select id from range(50)")
            with pytest.raises(SpaceBudgetExceeded) as ei:
                e.ctas("b", "select id from range(80)")
            assert ei.value.live_rows == 130

    def test_budget_respects_drops(self, spark):
        with Engine(spark, max_live_rows=100) as e:
            e.ctas("a", "select id from range(90)")
            e.drop("a")
            e.ctas("b", "select id from range(90)")  # fine after drop


class TestLifecycle:
    def test_close_drops_views(self, spark):
        e = Engine(spark)
        e.ctas("a", "select id from range(2)")
        ref = e.ref("a")
        e.close()
        with pytest.raises(Exception):
            spark.sql(f"select * from {ref}").collect()

    def test_closed_engine_rejects_ctas(self, spark):
        e = Engine(spark)
        e.close()
        with pytest.raises(RuntimeError):
            e.ctas("a", "select 1")

    def test_shuffle_partitions_restored(self, spark):
        before = spark.conf.get("spark.sql.shuffle.partitions")
        with Engine(spark, shuffle_partitions=3):
            assert spark.conf.get("spark.sql.shuffle.partitions") == "3"
        assert spark.conf.get("spark.sql.shuffle.partitions") == before
