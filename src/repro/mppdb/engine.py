"""An in-Spark "MPP database": CTAS / DROP / RENAME with resource metering.

The paper's algorithms are Python drivers issuing SQL statements
(``CREATE TABLE … AS SELECT``, ``DROP TABLE``, ``ALTER TABLE … RENAME``)
against Apache HAWQ.  :class:`Engine` reproduces that execution model on a
SparkSession:

* every logical table is **materialised to parquet** and re-read — the
  direct analogue of the database writing each table to storage.  This also
  severs Catalyst lineage *and statistics* between rounds.  (Materialising
  via ``localCheckpoint`` instead is a known trap for iterative SQL: Spark
  carries the origin plan's size estimate into the checkpointed relation,
  the estimates multiply at every self-join round, and after ~12 rounds the
  planner spends minutes multiplying million-digit BigIntegers in
  ``SizeInBytesOnlyStatsPlanVisitor``.)
* :meth:`ref` resolves logical → run-unique temp-view names so algorithm
  code can embed table names in SQL strings;
* per-statement metrics (rows, bytes, seconds, round number) feed the
  reproduction of the paper's Tables III–V;
* an optional **row budget** emulates a cluster running out of resources:
  exceeding it raises :class:`SpaceBudgetExceeded`, which the harness
  renders as the paper's "—" entries.

Byte metrics use logical row width (8 bytes per bigint/double column) so
space ratios are deterministic and comparable across algorithms, mirroring
the fixed-width row accounting of the paper's database tables.
"""
from __future__ import annotations

import itertools
import shutil
import tempfile
import time
from pathlib import Path

from pyspark.sql import DataFrame, SparkSession

from .metrics import EngineStats, QueryRecord

_engine_ids = itertools.count()

#: Estimated storage width in bytes per Spark SQL type name.
_WIDTHS = {"bigint": 8, "double": 8, "int": 4, "float": 4, "boolean": 1}


class SpaceBudgetExceeded(RuntimeError):
    """Raised when live rows exceed the engine's budget (paper's "—" case)."""

    def __init__(self, live_rows: int, budget: int):
        super().__init__(f"live rows {live_rows} exceed budget {budget}")
        self.live_rows = live_rows
        self.budget = budget


def _row_width(df: DataFrame) -> int:
    return sum(_WIDTHS.get(f.dataType.simpleString(), 16) for f in df.schema.fields)


class Engine:
    """A metered SQL execution context. Use as a context manager."""

    def __init__(
        self,
        spark: SparkSession,
        *,
        max_live_rows: int | None = None,
        shuffle_partitions: int | None = 8,
    ):
        self.spark = spark
        self.stats = EngineStats()
        self.max_live_rows = max_live_rows
        self._prefix = f"mpp{next(_engine_ids)}"
        self._dir = Path(tempfile.mkdtemp(prefix=f"{self._prefix}_"))
        self._tables: dict[str, DataFrame] = {}
        self._paths: dict[str, Path] = {}
        self._rows: dict[str, int] = {}
        self._bytes: dict[str, int] = {}
        self._seq = itertools.count()
        self._round = 0
        self._closed = False
        self._saved_shuffle: str | None = None
        if shuffle_partitions is not None:
            self._saved_shuffle = spark.conf.get("spark.sql.shuffle.partitions")
            spark.conf.set("spark.sql.shuffle.partitions", str(shuffle_partitions))

    # --- catalog -----------------------------------------------------

    def ref(self, name: str) -> str:
        """Physical (temp-view) name of logical table ``name`` for SQL strings."""
        return f"{self._prefix}_{name}"

    def table(self, name: str) -> DataFrame:
        """The DataFrame behind logical table ``name``."""
        return self._tables[name]

    def tables(self) -> list[str]:
        return sorted(self._tables)

    def rows(self, name: str) -> int:
        return self._rows[name]

    @property
    def live_rows(self) -> int:
        return sum(self._rows.values())

    @property
    def live_bytes(self) -> int:
        return sum(self._bytes.values())

    # --- rounds ------------------------------------------------------

    def next_round(self) -> int:
        """Advance the round counter (one paper-algorithm iteration)."""
        self._round += 1
        return self._round

    @property
    def round(self) -> int:
        return self._round

    # --- statements --------------------------------------------------

    def register_input(self, name: str, df: DataFrame) -> int:
        """Register the input table. Counts toward input size, not writes."""
        t0 = time.perf_counter()
        stored, n = self._materialise(name, df)
        dt = time.perf_counter() - t0
        self._install(name, stored, n)
        b = self._bytes[name]
        self.stats.input_rows += n
        self.stats.input_bytes += b
        self.stats.queries.append(
            QueryRecord("input", self._round, n, b, dt, "input", name)
        )
        return n

    def ctas(self, name: str, sql: str, *, label: str | None = None) -> int:
        """``CREATE TABLE name AS <sql>`` — materialise, meter, budget-check."""
        self._check_open()
        if name in self._tables:
            raise ValueError(f"table {name!r} already exists; drop or rename first")
        t0 = time.perf_counter()
        stored, n = self._materialise(name, self.spark.sql(sql))
        dt = time.perf_counter() - t0
        self._install(name, stored, n)
        b = self._bytes[name]
        self.stats.queries.append(
            QueryRecord(label or name, self._round, n, b, dt, "ctas", name)
        )
        if self.max_live_rows is not None and self.live_rows > self.max_live_rows:
            raise SpaceBudgetExceeded(self.live_rows, self.max_live_rows)
        return n

    def scalar(self, sql: str, *, label: str = "read"):
        """Run a read-only query, return the single value of its single row."""
        return self.row(sql, label=label)[0]

    def row(self, sql: str, *, label: str = "read"):
        """Run a read-only query, return its single Row."""
        self._check_open()
        t0 = time.perf_counter()
        row = self.spark.sql(sql).collect()[0]
        dt = time.perf_counter() - t0
        self.stats.queries.append(QueryRecord(label, self._round, 0, 0, dt, "read"))
        return row

    def drop(self, *names: str) -> None:
        """``DROP TABLE name[, ...]`` — frees the space in the live accounting."""
        for name in names:
            self.spark.catalog.dropTempView(self.ref(name))
            shutil.rmtree(self._paths.pop(name), ignore_errors=True)
            del self._tables[name], self._rows[name], self._bytes[name]

    def rename(self, old: str, new: str) -> None:
        """``ALTER TABLE old RENAME TO new`` (new must not exist)."""
        if new in self._tables:
            raise ValueError(f"table {new!r} already exists")
        df = self._tables.pop(old)
        self.spark.catalog.dropTempView(self.ref(old))
        self._paths[new] = self._paths.pop(old)
        self._rows[new] = self._rows.pop(old)
        self._bytes[new] = self._bytes.pop(old)
        self._tables[new] = df
        df.createOrReplaceTempView(self.ref(new))

    # --- lifecycle ---------------------------------------------------

    def close(self) -> None:
        if self._closed:
            return
        for name in list(self._tables):
            try:
                self.spark.catalog.dropTempView(self.ref(name))
            except Exception:
                pass
        self._tables.clear()
        self._paths.clear()
        self._rows.clear()
        self._bytes.clear()
        shutil.rmtree(self._dir, ignore_errors=True)
        if self._saved_shuffle is not None:
            self.spark.conf.set("spark.sql.shuffle.partitions", self._saved_shuffle)
        self._closed = True

    def __enter__(self) -> "Engine":
        return self

    def __exit__(self, *exc) -> None:
        self.close()

    # --- internals ---------------------------------------------------

    def _materialise(self, name: str, df: DataFrame) -> tuple[DataFrame, int]:
        """Write ``df`` to parquet and read it back (the CTAS storage step)."""
        path = self._dir / f"{name}_{next(self._seq)}"
        df.write.mode("overwrite").parquet(str(path))
        stored = self.spark.read.parquet(str(path))
        n = stored.count()  # metadata-only count on parquet
        self._paths[name] = path
        return stored, n

    def _install(self, name: str, df: DataFrame, n: int) -> None:
        self._tables[name] = df
        self._rows[name] = n
        self._bytes[name] = n * _row_width(df)
        df.createOrReplaceTempView(self.ref(name))
        self.stats.peak_live_rows = max(self.stats.peak_live_rows, self.live_rows)
        self.stats.peak_live_bytes = max(self.stats.peak_live_bytes, self.live_bytes)

    def _check_open(self) -> None:
        if self._closed:
            raise RuntimeError("engine is closed")
