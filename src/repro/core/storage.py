"""CIAO store: partial data loading and on-disk layout (CIAO Sec. VI-A).

The server receives JSON chunks with per-clause bit-vectors from the
client. For each chunk it eagerly parses and converts to Parquet only
the objects whose bit is 1 for **at least one** pushed clause; all-zero
objects stay unparsed in a raw ``.jsonl`` sidecar (lazy side). The
bit-vectors of the loaded rows are kept per chunk for query-time data
skipping (Sec. VI-B).

Layout::

    <store>/manifest.json              # schema, chunk list, predicate hashmap
    <store>/chunks/chunk-NNNNN.parquet # eagerly loaded tuples
    <store>/chunks/chunk-NNNNN.bv.json # per-predicate packed bit-vectors
    <store>/chunks/chunk-NNNNN.raw.jsonl # unloaded raw objects

With **zero pushed clauses** the store degenerates into the paper's
zero-budget baseline: conventional eager loading of every object into
Parquet, no bit-vectors, no raw side.
"""
from __future__ import annotations

import json
import os
import time
from dataclasses import dataclass, field
from typing import Any, Sequence

import numpy as np
import pandas as pd
import pyarrow as pa
import pyarrow.parquet as pq

from .client import DEFAULT_CHUNK_SIZE, iter_chunks, pack_bits, prefilter_chunk, unpack_bits
from .predicates import Clause

# Store type names → (pyarrow type, Spark DDL type).
_TYPES: dict[str, tuple[pa.DataType, str]] = {
    "string": (pa.string(), "string"),
    "bigint": (pa.int64(), "bigint"),
    "double": (pa.float64(), "double"),
    "boolean": (pa.bool_(), "boolean"),
}

Schema = list[tuple[str, str]]  # [(column, type_name)]


def key_to_json(key: tuple) -> list:
    """Clause keys are tuples of tuples; JSON round-trips them as lists."""
    return [list(k) for k in key]


def key_from_json(obj: list) -> tuple:
    return tuple(tuple(k) for k in obj)


def arrow_schema(schema: Schema) -> pa.Schema:
    return pa.schema([(name, _TYPES[t][0]) for name, t in schema])


def spark_ddl(schema: Schema) -> str:
    return ", ".join(f"{name} {_TYPES[t][1]}" for name, t in schema)


def parse_lines(lines: Sequence[str], schema: Schema) -> pa.Table:
    """Parse raw JSON lines into an Arrow table with the store schema.

    This is the expensive server-side step the paper's partial loading
    avoids for irrelevant objects (paper: rapidJSON → Arrow C++; here:
    ``json.loads`` → pyarrow).
    """
    cols: dict[str, list] = {name: [] for name, _ in schema}
    for ln in lines:
        obj = json.loads(ln)
        for name, _ in schema:
            cols[name].append(obj.get(name))
    arrays = []
    for name, t in schema:
        vals = cols[name]
        if t == "bigint":
            vals = [None if v is None else int(v) for v in vals]
        elif t == "double":
            vals = [None if v is None else float(v) for v in vals]
        arrays.append(pa.array(vals, type=_TYPES[t][0]))
    return pa.Table.from_arrays(arrays, schema=arrow_schema(schema))


@dataclass
class BuildStats:
    """Timings and counters from one store build — the raw material for
    the paper's "Prefiltering" and "Data loading" series."""

    n_objects: int
    n_loaded: int
    n_chunks: int
    prefilter_s: float
    load_s: float
    pushed_sql: list[str] = field(default_factory=list)

    @property
    def loading_ratio(self) -> float:
        """Loaded objects / all objects (paper Fig. 7's 'loading ratio')."""
        return self.n_loaded / self.n_objects if self.n_objects else 0.0


def build_store(
    path: str,
    lines: Sequence[str],
    schema: Schema,
    clauses: Sequence[Clause],
    *,
    chunk_size: int = DEFAULT_CHUNK_SIZE,
    partial: bool = True,
) -> BuildStats:
    """Client-prefilter + partially load ``lines`` into a store at ``path``.

    Prefiltering (client) and loading (server) are timed separately, as
    the paper reports them as separate series. Single-threaded, matching
    the paper's testbed ("all of the experiment processes are
    single-threaded").

    ``partial=False`` models the server policy visible throughout the
    paper's experiments (Sec. VII-E2/E3: "the numbers of predicates
    pushed down are not large enough to enable partial loading"): when
    the pushed set does not cover every prospective query, the server
    still loads *all* objects eagerly — an uncovered query would have to
    parse the raw side anyway — but keeps the bit-vectors so covered
    queries can data-skip. The harness passes
    ``partial = (every query contains >= 1 pushed clause)``.
    """
    chunks_dir = os.path.join(path, "chunks")
    os.makedirs(chunks_dir, exist_ok=True)
    clause_list = list(clauses)
    keys = [cl.key() for cl in clause_list]
    if len(set(keys)) != len(keys):
        raise ValueError("duplicate clauses pushed down")

    chunk_names: list[str] = []
    prefilter_s = 0.0
    load_s = 0.0
    n_loaded = 0
    n_objects = 0
    for ci, chunk in enumerate(iter_chunks(lines, chunk_size)):
        n_objects += len(chunk)
        name = f"chunk-{ci:05d}"
        chunk_names.append(name)

        # --- client side: bit-vector generation (timed) ---
        t0 = time.perf_counter()
        bvs = prefilter_chunk(chunk, clause_list)
        prefilter_s += time.perf_counter() - t0

        if clause_list and partial:
            mask = np.zeros(len(chunk), dtype=bool)
            for key in keys:
                mask |= bvs[key]
        else:
            # Zero-budget eager baseline, or coverage < 100 %: load all.
            mask = np.ones(len(chunk), dtype=bool)

        # --- server side: parse + Parquet conversion of selected rows (timed) ---
        selected = [ln for ln, m in zip(chunk, mask) if m]
        t0 = time.perf_counter()
        table = parse_lines(selected, schema)
        pq.write_table(table, os.path.join(chunks_dir, f"{name}.parquet"))
        load_s += time.perf_counter() - t0
        n_loaded += len(selected)

        # --- sidecars: bit-vectors over loaded-row order, plus raw leftovers ---
        if clause_list:
            side = {
                "n": int(mask.sum()),
                "bitvectors": {
                    str(i): pack_bits(bvs[key][mask]) for i, key in enumerate(keys)
                },
            }
            with open(os.path.join(chunks_dir, f"{name}.bv.json"), "w") as f:
                json.dump(side, f)
            if partial:
                leftovers = [ln for ln, m in zip(chunk, mask) if not m]
                with open(os.path.join(chunks_dir, f"{name}.raw.jsonl"), "w") as f:
                    for ln in leftovers:
                        f.write(ln + "\n")

    manifest = {
        "schema": [list(s) for s in schema],
        "chunk_size": chunk_size,
        "partial": bool(clause_list and partial),
        "chunks": chunk_names,
        "n_objects": n_objects,
        "n_loaded": n_loaded,
        "predicates": [
            {
                "id": i,
                "key": key_to_json(cl.key()),
                "patterns": cl.pattern_strings(),
                "sql": cl.to_sql(),
            }
            for i, cl in enumerate(clause_list)
        ],
    }
    with open(os.path.join(path, "manifest.json"), "w") as f:
        json.dump(manifest, f, indent=1)

    return BuildStats(
        n_objects=n_objects,
        n_loaded=n_loaded,
        n_chunks=len(chunk_names),
        prefilter_s=prefilter_s,
        load_s=load_s,
        pushed_sql=[cl.to_sql() for cl in clause_list],
    )


@dataclass(frozen=True)
class Manifest:
    """Parsed ``manifest.json`` plus path helpers."""

    path: str
    schema: Schema
    chunk_size: int
    partial: bool
    chunks: tuple[str, ...]
    n_objects: int
    n_loaded: int
    pred_ids: dict[tuple, int]  # clause key -> predicate id
    pred_sql: dict[int, str]

    @staticmethod
    def load(path: str) -> "Manifest":
        with open(os.path.join(path, "manifest.json")) as f:
            m = json.load(f)
        return Manifest(
            path=path,
            schema=[tuple(s) for s in m["schema"]],
            chunk_size=int(m["chunk_size"]),
            partial=bool(m["partial"]),
            chunks=tuple(m["chunks"]),
            n_objects=int(m["n_objects"]),
            n_loaded=int(m["n_loaded"]),
            pred_ids={key_from_json(p["key"]): int(p["id"]) for p in m["predicates"]},
            pred_sql={int(p["id"]): p["sql"] for p in m["predicates"]},
        )

    @property
    def has_pushdown(self) -> bool:
        return bool(self.pred_ids)

    def chunk_parquet(self, name: str) -> str:
        return os.path.join(self.path, "chunks", f"{name}.parquet")

    def chunk_bv(self, name: str) -> str:
        return os.path.join(self.path, "chunks", f"{name}.bv.json")

    def chunk_raw(self, name: str) -> str:
        return os.path.join(self.path, "chunks", f"{name}.raw.jsonl")

    def read_bitvectors(self, name: str) -> tuple[int, dict[int, np.ndarray]]:
        """Loaded-row-order bit-vectors of one chunk: (n_rows, {id: bits})."""
        with open(self.chunk_bv(name)) as f:
            side = json.load(f)
        n = int(side["n"])
        return n, {int(i): unpack_bits(h, n) for i, h in side["bitvectors"].items()}

    def read_raw_lines(self, name: str) -> list[str]:
        p = self.chunk_raw(name)
        if not os.path.exists(p):
            return []
        with open(p) as f:
            return [ln.rstrip("\n") for ln in f if ln.strip()]
