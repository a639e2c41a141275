"""Conventional eager loading — the paper's budget-0 baseline.

"Our baseline in these experiments is the one with zero budget (i.e. no
optimization is applied)" (Sec. VII-D): every JSON object is parsed and
converted to Parquet up front, no client prefiltering, no bit-vectors,
and every query scans the full Parquet data. This is exactly a CIAO
store built with an empty pushed set; this module exists to make the
baseline an explicit, documented entry point.
"""
from __future__ import annotations

from repro.core.storage import BuildStats, build_store
from repro.data.datasets import Dataset


def full_load_store(
    path: str, dataset: Dataset, *, chunk_size: int = 500
) -> BuildStats:
    """Eagerly load a whole dataset into a (pushdown-free) store."""
    return build_store(path, dataset.lines, dataset.schema, [], chunk_size=chunk_size)
