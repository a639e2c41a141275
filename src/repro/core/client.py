"""Client-side prefiltering (CIAO Sec. IV, Step 1 of Fig. 1).

A *client* receives the pushed-down pattern strings, streams its raw
JSON lines in chunks (paper default: 1 000 objects per chunk), and for
each chunk emits one bit-vector per pushed clause: bit=1 means the
object *may* satisfy the clause (false positives allowed), bit=0 means
it certainly does not (no false negatives).

Two implementations are provided:

* :func:`prefilter_chunk` — vectorised pandas ``str.contains`` over the
  clause's regex (the regex is an exact transliteration of the paper's
  find/scan-to-comma algorithm, see ``predicates.raw_regex``). This is
  the substrate whose per-record cost the cost model is calibrated on.
* :func:`prefilter_spark` — the same computation distributed with Spark
  ``applyInPandas``, one task per chunk, for large inputs.

Wall-clock time spent here is the paper's "prefiltering" time series.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Iterable, Iterator, Sequence

import numpy as np
import pandas as pd

from .predicates import Clause

DEFAULT_CHUNK_SIZE = 1000


def iter_chunks(lines: Sequence[str], chunk_size: int = DEFAULT_CHUNK_SIZE) -> Iterator[list[str]]:
    """Split a stream of raw JSON lines into client chunks."""
    if chunk_size <= 0:
        raise ValueError("chunk_size must be positive")
    for i in range(0, len(lines), chunk_size):
        yield list(lines[i : i + chunk_size])


def prefilter_chunk(
    lines: Sequence[str], clauses: Sequence[Clause]
) -> dict[tuple, np.ndarray]:
    """Evaluate every pushed clause on every raw line of one chunk.

    Returns ``{clause.key(): bool ndarray of len(lines)}``. With no
    clauses pushed, returns an empty dict (the server then falls back to
    eager full loading — the paper's zero-budget baseline).
    """
    s = pd.Series(list(lines), dtype="object")
    out: dict[tuple, np.ndarray] = {}
    for cl in clauses:
        out[cl.key()] = s.str.contains(cl.raw_regex(), regex=True).to_numpy(dtype=bool)
    return out


@dataclass
class PrefilterResult:
    """Bit-vectors for every chunk plus the client's total wall time."""

    chunk_bitvectors: list[dict[tuple, np.ndarray]]
    n_objects: int
    elapsed_s: float

    @property
    def per_record_us(self) -> float:
        """Measured client cost in µs per record — comparable to the budget."""
        return 1e6 * self.elapsed_s / max(1, self.n_objects)


def prefilter(
    lines: Sequence[str],
    clauses: Sequence[Clause],
    *,
    chunk_size: int = DEFAULT_CHUNK_SIZE,
) -> PrefilterResult:
    """Run the (single-threaded, as in the paper's testbed) client over
    all chunks, timing only the predicate evaluation."""
    chunk_bvs: list[dict[tuple, np.ndarray]] = []
    elapsed = 0.0
    for chunk in iter_chunks(lines, chunk_size):
        t0 = time.perf_counter()
        bvs = prefilter_chunk(chunk, clauses)
        elapsed += time.perf_counter() - t0
        chunk_bvs.append(bvs)
    return PrefilterResult(chunk_bvs, len(lines), elapsed)


def pack_bits(bits: np.ndarray) -> str:
    """Pack a boolean vector into a hex string (chunk sidecar encoding)."""
    return np.packbits(np.asarray(bits, dtype=bool)).tobytes().hex()


def unpack_bits(hex_str: str, n: int) -> np.ndarray:
    """Inverse of :func:`pack_bits` for a vector of known length ``n``."""
    return np.unpackbits(
        np.frombuffer(bytes.fromhex(hex_str), dtype=np.uint8), count=n
    ).astype(bool)


def prefilter_spark(spark, lines, clauses: Sequence[Clause], *, chunk_size: int = DEFAULT_CHUNK_SIZE):
    """Distributed prefilter: one Spark task per client chunk.

    ``lines`` is a DataFrame with columns ``(seq: long, raw: string)``
    where ``seq`` is the 0-based stream position (defines chunk
    membership). Returns a DataFrame ``(chunk_id, pred_idx, n, bits)``
    with packed bit-vectors; ``pred_idx`` indexes ``clauses`` in the
    given order.
    """
    from pyspark.sql import functions as F

    regexes = [cl.raw_regex() for cl in clauses]

    def eval_chunk(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("seq")
        s = pdf["raw"].astype("object")
        rows = []
        cid = int(pdf["chunk_id"].iloc[0])
        for idx, rx in enumerate(regexes):
            bits = s.str.contains(rx, regex=True).to_numpy(dtype=bool)
            rows.append((cid, idx, len(bits), pack_bits(bits)))
        return pd.DataFrame(rows, columns=["chunk_id", "pred_idx", "n", "bits"])

    with_chunks = lines.withColumn("chunk_id", (F.col("seq") / chunk_size).cast("long"))
    return with_chunks.groupBy("chunk_id").applyInPandas(
        eval_chunk, schema="chunk_id long, pred_idx int, n int, bits string"
    )
