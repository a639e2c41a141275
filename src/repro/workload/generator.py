"""Synthetic query workloads (paper Sec. VII-C / Table III).

Every query is ``SELECT COUNT(*) FROM <dataset> WHERE <conjunctive
predicates>``. A workload draws each query's clauses from a predicate
pool: each pool clause carries a selection probability; probabilities
are scaled so the expected clause count per query is
``expected_preds`` (3 in the paper), and their *shape* is either
uniform or Zipfian (``numpy``-style: smaller exponent = more skew is
what the paper reports; here the exponent is the usual Zipf alpha and
Table III's A=Zipf(1.5), B=Zipf(2) map to ``alpha=1.5`` / ``alpha=2``
with alpha-larger = more mass on the head — workload A additionally
shuffles which clauses are head clauses by seed).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

import numpy as np
import pandas as pd

from repro.core.predicates import Clause, Query


def estimate_selectivities(
    clauses: Sequence[Clause],
    parsed: pd.DataFrame,
    *,
    sample: int | None = 500,
    seed: int = 0,
    floor: float = 1e-4,
) -> dict[tuple, float]:
    """Per-clause selectivity estimated on a sample of the parsed data
    (the paper estimates "by evaluating them on sampled datasets").

    A floor keeps zero-match estimates from zeroing out `f` products.
    """
    if sample is not None and len(parsed) > sample:
        parsed = parsed.sample(n=sample, random_state=seed)
    records = parsed.to_dict("records")
    out = {}
    for cl in clauses:
        hits = sum(1 for r in records if cl.eval_parsed(r))
        out[cl.key()] = max(floor, hits / max(1, len(records)))
    return out


@dataclass(frozen=True)
class WorkloadSpec:
    """Table III row: a named workload's generation parameters."""

    name: str
    n_queries: int
    expected_preds: float
    distribution: str  # "uniform" or "zipf"
    zipf_alpha: float = 0.0
    seed: int = 0


# The paper's three end-to-end workloads (Table III).
TABLE3_SPECS = {
    "A": WorkloadSpec("A", 200, 3.0, "zipf", 1.5, seed=11),
    "B": WorkloadSpec("B", 200, 3.0, "zipf", 2.0, seed=12),
    "C": WorkloadSpec("C", 200, 3.0, "uniform", seed=13),
}

# Paper Table III reported values, for the reproduction diff.
PAPER_TABLE3 = {
    "A": {"n_predicates": 732, "min_max": (1, 8), "distribution": "Zipfian(1.5)"},
    "B": {"n_predicates": 617, "min_max": (1, 7), "distribution": "Zipfian(2)"},
    "C": {"n_predicates": 607, "min_max": (1, 10), "distribution": "Uniform"},
}


def _selection_probs(n: int, spec: WorkloadSpec, g: np.random.Generator) -> np.ndarray:
    if spec.distribution == "uniform":
        p = np.full(n, spec.expected_preds / n)
    elif spec.distribution == "zipf":
        w = 1.0 / np.arange(1, n + 1) ** spec.zipf_alpha
        p = w / w.sum() * spec.expected_preds
        g.shuffle(p)  # which clause is a head clause is arbitrary
    else:
        raise ValueError(f"unknown distribution {spec.distribution!r}")
    return np.clip(p, 0.0, 0.95)


def generate_workload(pool: Sequence[Clause], spec: WorkloadSpec) -> list[Query]:
    """Draw ``spec.n_queries`` conjunctive queries from ``pool``.

    Each clause joins a query independently with its selection
    probability; empty draws are redrawn (every paper query has >= 1
    predicate, Table III min = 1).
    """
    g = np.random.default_rng(spec.seed)
    probs = _selection_probs(len(pool), spec, g)
    queries: list[Query] = []
    while len(queries) < spec.n_queries:
        mask = g.random(len(pool)) < probs
        if not mask.any():
            continue
        clauses = tuple(c for c, m in zip(pool, mask) if m)
        queries.append(Query(clauses, name=f"{spec.name}-q{len(queries)}"))
    return queries


def workload_summary(queries: Sequence[Query]) -> dict:
    """The Table III columns for a generated workload."""
    counts = [len(q.clauses) for q in queries]
    return {
        "n_queries": len(queries),
        "n_predicates": int(sum(counts)),
        "min_preds": int(min(counts)),
        "max_preds": int(max(counts)),
    }


def skewness_factor(appearances: Sequence[int]) -> float:
    """The paper's skewness formula (Sec. VII-E3)::

        sum_i (X_i - mean)^3 / ((N - 1) * sigma^3)

    where ``X_i`` is the number of queries containing predicate ``i``
    and sigma is the population standard deviation.
    """
    x = np.asarray(appearances, dtype=float)
    n = len(x)
    if n < 2:
        return 0.0
    sigma = float(np.sqrt(np.mean((x - x.mean()) ** 2)))
    if sigma == 0.0:
        return 0.0
    return float(np.sum((x - x.mean()) ** 3) / ((n - 1) * sigma**3))


def predicate_appearances(queries: Sequence[Query]) -> dict[tuple, int]:
    """How many queries contain each distinct clause."""
    out: dict[tuple, int] = {}
    for q in queries:
        for c in q.clauses:
            out[c.key()] = out.get(c.key(), 0) + 1
    return out
