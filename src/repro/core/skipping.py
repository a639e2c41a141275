"""Query-time data skipping over a CIAO store (CIAO Sec. VI-B).

Given a query's conjunctive clauses, CIAO looks each clause up in the
store's predicate hashmap. If the query contains at least one pushed
clause ("covered"), only the Parquet side need be scanned — the raw
side cannot contain a tuple valid for any pushed clause — and the
matched clauses' bit-vectors are ANDed to skip rows. Tuples surviving
the bit-vector still carry false positives, so the **full** query
predicate is always re-evaluated on parsed rows (here; or by Spark's
residual filters in the DataSource path).

Uncovered queries must scan Parquet **and** parse the raw JSON side.

This module is the engine shared by the driver-side scanner (used in
tests/harness) and the Spark Python DataSource (``repro.datasource``).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

import numpy as np
import pyarrow as pa
import pyarrow.parquet as pq

from .predicates import Query
from .storage import Manifest, parse_lines


def match_pushed(manifest: Manifest, clause_keys: Sequence[tuple]) -> list[int]:
    """Predicate ids of the query clauses that were pushed down."""
    return sorted(manifest.pred_ids[k] for k in clause_keys if k in manifest.pred_ids)


@dataclass
class ScanPlan:
    """What a query scan must touch, decided from the manifest alone."""

    matched_ids: list[int]
    scan_raw: bool  # True when the raw JSON side must be parsed too

    @staticmethod
    def plan(manifest: Manifest, clause_keys: Sequence[tuple]) -> "ScanPlan":
        matched = match_pushed(manifest, clause_keys)
        covered = len(matched) > 0
        # Only a partially-loaded store has a raw side to scan.
        return ScanPlan(matched, scan_raw=manifest.partial and not covered)


def chunk_parquet_table(
    manifest: Manifest, chunk: str, matched_ids: Sequence[int]
) -> pa.Table:
    """Read one chunk's Parquet side, skipping rows via bit-vectors."""
    table = pq.read_table(manifest.chunk_parquet(chunk))
    if not matched_ids:
        return table
    n, bvs = manifest.read_bitvectors(chunk)
    mask = np.ones(n, dtype=bool)
    for i in matched_ids:
        mask &= bvs[i]
    return table.filter(pa.array(mask))


def chunk_raw_table(manifest: Manifest, chunk: str) -> pa.Table:
    """Parse one chunk's raw (unloaded) side on demand."""
    return parse_lines(manifest.read_raw_lines(chunk), manifest.schema)


@dataclass
class ScanStats:
    rows_scanned: int      # rows handed to predicate re-evaluation
    rows_skipped: int      # parquet rows eliminated by bit-vectors
    raw_parsed: int        # raw-side objects parsed on demand
    result_count: int      # exact COUNT(*) of the query


def scan_count(manifest_or_path, query: Query) -> ScanStats:
    """Driver-side exact COUNT(*) with data skipping — the reference
    implementation the Spark DataSource path is tested against."""
    m = (
        manifest_or_path
        if isinstance(manifest_or_path, Manifest)
        else Manifest.load(manifest_or_path)
    )
    plan = ScanPlan.plan(m, query.clause_keys())
    scanned = skipped = raw_parsed = count = 0
    for chunk in m.chunks:
        full = pq.read_table(m.chunk_parquet(chunk))
        t = chunk_parquet_table(m, chunk, plan.matched_ids)
        skipped += full.num_rows - t.num_rows
        scanned += t.num_rows
        for rec in t.to_pylist():
            if query.eval_parsed(rec):
                count += 1
        if plan.scan_raw:
            rt = chunk_raw_table(m, chunk)
            raw_parsed += rt.num_rows
            scanned += rt.num_rows
            for rec in rt.to_pylist():
                if query.eval_parsed(rec):
                    count += 1
    return ScanStats(scanned, skipped, raw_parsed, count)
