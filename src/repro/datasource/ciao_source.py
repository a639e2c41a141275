"""``format("ciao")`` — a Python DataSource V2 over a CIAO store.

This is the Spark integration layer of the reproduction (the paper
hooked Spark 2.4's execution engine; the repro hint prescribes a V2
DataSource with filter push-down — see DESIGN.md § Substitutions):

* ``pushFilters`` receives the query's data filters, maps the supported
  shapes (``EqualTo``, ``StringContains``, ``IsNotNull``, ``In``) onto
  the store's predicate hashmap, and records the matched predicate ids.
* **Every** filter is returned as residual: client-side bit-vectors
  admit false positives, so Spark must re-evaluate the full predicate —
  exactly the paper's "verify that a tuple is actually valid" rule.
* ``partitions`` emits one partition per Parquet chunk; when the query
  matches **no** pushed predicate (and the store has a lazy side), raw
  JSON partitions are added, and they are parsed on demand — the
  expensive path uncovered queries pay in the paper.
* ``read`` ANDs the matched bit-vectors to skip Parquet rows before
  they ever reach Spark.

Requires ``spark.sql.python.filterPushdown.enabled=true`` (set by
:func:`register_ciao`); without it Spark never calls ``pushFilters`` and
the source degrades to a correct full scan of both sides.
"""
from __future__ import annotations

import json
import time
from dataclasses import dataclass
from typing import Iterable, Iterator, List, Sequence

from pyspark.sql.datasource import (
    DataSource,
    DataSourceReader,
    EqualTo,
    Filter,
    In,
    InputPartition,
    IsNotNull,
    StringContains,
)

from repro.core.predicates import Query
from repro.core.storage import Manifest, spark_ddl


def _literal_key(column: str, value) -> tuple | None:
    """Simple-predicate key for ``column = value`` (type decides the class)."""
    if isinstance(value, bool):
        return ("kv", column, json.dumps(value))
    if isinstance(value, str):
        return ("exact", column, value)
    if isinstance(value, (int, float)):
        return ("kv", column, json.dumps(value))
    return None


def filters_to_clause_keys(filters: Sequence[Filter]) -> dict[int, tuple]:
    """Map each supported pushed filter to a canonical clause key.

    Returns ``{index in filters: clause key}``; unsupported filters are
    simply absent (they stay residual-only and cannot enable skipping).
    """
    out: dict[int, tuple] = {}
    for i, f in enumerate(filters):
        if isinstance(f, (EqualTo, StringContains, IsNotNull, In)) and len(f.attribute) != 1:
            continue  # nested columns are not in our stores
        if isinstance(f, EqualTo):
            k = _literal_key(f.attribute[0], f.value)
            if k is not None:
                out[i] = (k,)
        elif isinstance(f, StringContains):
            out[i] = (("substr", f.attribute[0], f.value),)
        elif isinstance(f, IsNotNull):
            out[i] = (("presence", f.attribute[0]),)
        elif isinstance(f, In):
            ks = [_literal_key(f.attribute[0], v) for v in f.value]
            if all(k is not None for k in ks):
                out[i] = tuple(sorted(ks))
    return out


@dataclass
class ChunkPartition(InputPartition):
    chunk: str
    kind: str  # "parquet" | "raw"


class CiaoReader(DataSourceReader):
    """Batch reader over a CIAO store with bit-vector data skipping."""

    def __init__(self, path: str):
        if not path:
            raise ValueError("ciao source needs a path: .load(<store dir>)")
        self._path = path
        self._manifest = Manifest.load(path)
        self._matched_ids: list[int] = []
        self._pushdown_seen = False

    def pushFilters(self, filters: List[Filter]) -> Iterable[Filter]:
        self._pushdown_seen = True
        keyed = filters_to_clause_keys(filters)
        self._matched_ids = sorted(
            self._manifest.pred_ids[k]
            for k in keyed.values()
            if k in self._manifest.pred_ids
        )
        # All filters stay residual: bit-vectors allow false positives.
        return filters

    def partitions(self) -> Sequence[ChunkPartition]:
        parts = [ChunkPartition(c, "parquet") for c in self._manifest.chunks]
        covered = len(self._matched_ids) > 0
        if self._manifest.partial and not covered:
            parts += [ChunkPartition(c, "raw") for c in self._manifest.chunks]
        return parts

    def read(self, partition: ChunkPartition) -> Iterator:
        # Imports here so the pickled reader stays light on the worker.
        from repro.core.skipping import chunk_parquet_table, chunk_raw_table

        if partition.kind == "parquet":
            table = chunk_parquet_table(self._manifest, partition.chunk, self._matched_ids)
        else:
            table = chunk_raw_table(self._manifest, partition.chunk)
        yield from table.to_batches()


class CiaoDataSource(DataSource):
    """DataSource entry point; register with :func:`register_ciao`."""

    @classmethod
    def name(cls) -> str:
        return "ciao"

    def schema(self) -> str:
        return spark_ddl(Manifest.load(self.options.get("path")).schema)

    def reader(self, schema) -> CiaoReader:
        return CiaoReader(self.options.get("path"))


def register_ciao(spark) -> None:
    """Register the source and enable Python-source filter push-down."""
    spark.conf.set("spark.sql.python.filterPushdown.enabled", "true")
    spark.dataSource.register(CiaoDataSource)


def run_query_spark(spark, store_path: str, query: Query) -> tuple[int, float]:
    """COUNT(*) one workload query through the ciao source; returns
    (count, wall seconds). The caller registers the source once."""
    df = spark.read.format("ciao").load(store_path).where(query.where_sql())
    t0 = time.perf_counter()
    n = df.count()
    return n, time.perf_counter() - t0
