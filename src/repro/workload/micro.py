"""Micro-benchmark workload constructors (paper Sec. VII-E, Figs. 7-12).

All three micros run on the Windows-log dataset:

* **Selectivity** (Figs. 7-8): 3 workloads of 5 queries x 3 conjunctive
  predicates at selectivity ~0.01 / 0.15 / 0.35; 2 predicates pushed,
  partial loading enabled. The two pushed predicates are the
  controlled-selectivity ``tag_a``/``tag_b`` exact matches (jointly
  distributed, see ``data.datasets``), shared by all 5 queries; the
  third predicate varies per query.
* **Overlap** (Figs. 9-10): workloads L/M/H with 1 / 2 / 4 predicates
  per query over a 5-clause pool, uniform, 2 pushed. Pushing {P1, P2}
  covers 2 / 3 / 5 of the queries respectively; only H enables partial
  loading (every query covered).
* **Skewness** (Figs. 11-12): 5 queries x 2 predicates with the paper's
  skewness factor ~0.0 / 0.5 / 2.0; 1 predicate pushed. The
  appearance-count vector is found by exhaustive search over
  compositions, then realised as an assignment of clauses to queries.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass

from repro.core.predicates import Clause, ExactMatch, Query, SubstringMatch
from .generator import skewness_factor

# ----------------------------------------------------------------------
# Selectivity micro
# ----------------------------------------------------------------------

SELECTIVITY_LEVELS = {"high": "s001", "medium": "s015", "low": "s035"}
# paper naming: "high selectivity" = most selective = sel 0.01


@dataclass(frozen=True)
class MicroWorkload:
    name: str
    queries: tuple[Query, ...]
    pushed: tuple[Clause, ...]


def selectivity_workload(level: str) -> MicroWorkload:
    """5 queries, 3 conj predicates each, all at the level's selectivity;
    push the two shared tag predicates."""
    tag = SELECTIVITY_LEVELS[level]
    a = Clause.of(ExactMatch("tag_a", f"x_{tag}"))
    b = Clause.of(ExactMatch("tag_b", f"y_{tag}"))
    # Third predicate: a per-query month pattern (loose, keeps results
    # non-empty; conjunction selectivity is still dominated by the tags).
    extras = [Clause.of(SubstringMatch("time", f"-{m:02d}-")) for m in (1, 3, 5, 7, 9)]
    queries = tuple(
        Query.of(a, b, extras[i], name=f"sel-{level}-q{i}") for i in range(5)
    )
    return MicroWorkload(f"sel-{level}", queries, (a, b))


# ----------------------------------------------------------------------
# Overlap micro
# ----------------------------------------------------------------------

def _overlap_pool() -> list[Clause]:
    """Five distinct moderately-selective clauses on winlog."""
    return [
        Clause.of(SubstringMatch("time", "-01-")),
        Clause.of(SubstringMatch("time", "-02-")),
        Clause.of(SubstringMatch("info", "evt000")),
        Clause.of(ExactMatch("level", "Warning")),
        Clause.of(SubstringMatch("time", " 00:")),
    ]


def overlap_workload(level: str) -> MicroWorkload:
    """L/M/H overlap: 1 / 2 / 4 predicates per query over a 5-pool.

    Overlap-increasing construction: q_i of L is {P_i}; of M is
    {P_i, P_(i+1 mod 5)}; of H is all pool clauses except P_(i+2 mod 5).
    Pushed set is always {P_0, P_1}. Note the H queries are conjunctions
    of month-predicates etc. that can be mutually exclusive — COUNT(*)
    may be 0, which matches the micro's purpose (it measures scan cost,
    not result size).
    """
    pool = _overlap_pool()
    per_query = {"L": 1, "M": 2, "H": 4}[level]
    queries = []
    for i in range(5):
        if per_query == 1:
            cls = [pool[i]]
        elif per_query == 2:
            cls = [pool[i], pool[(i + 1) % 5]]
        else:
            cls = [pool[j] for j in range(5) if j != (i + 2) % 5]
        queries.append(Query(tuple(cls), name=f"ol-{level}-q{i}"))
    return MicroWorkload(f"ol-{level}", tuple(queries), (pool[0], pool[1]))


# ----------------------------------------------------------------------
# Skewness micro
# ----------------------------------------------------------------------

def _skew_counts(
    n_queries: int, per_query: int, target: float, head: int
) -> list[int]:
    """Appearance-count vector X summing to n_queries*per_query with
    X[0] == ``head`` (the pushed clause's query coverage — the paper
    pins it: L_sk covers 1 query, M_sk 3, H_sk all 5), max(X) <= head,
    and skewness_factor(X) closest to ``target``.

    Ties prefer MORE distinct predicates, so the zero-skew workload is
    the maximally spread one ([1]*10), not a degenerate [5,5] that also
    has a zero third moment.
    """
    total = n_queries * per_query
    best: tuple[float, int, list[int]] | None = None
    for n_preds in range(2, total + 1):
        for comp in _bounded_partitions(total, n_preds, head):
            if comp[0] != head:
                continue
            sk = skewness_factor(comp)
            cand = (abs(sk - target), -n_preds, list(comp))
            if best is None or cand[:2] < best[:2]:
                best = cand
    assert best is not None, "no composition with the requested head count"
    return best[2]


def _bounded_partitions(total: int, parts: int, bound: int):
    """Non-increasing positive integer compositions of ``total`` into
    ``parts`` parts, each <= bound."""

    def rec(remaining, parts_left, maximum):
        if parts_left == 0:
            if remaining == 0:
                yield ()
            return
        lo = -(-remaining // parts_left)  # ceil: keep parts positive
        for first in range(min(maximum, remaining - parts_left + 1), max(1, lo) - 1, -1):
            for rest in rec(remaining - first, parts_left - 1, first):
                yield (first,) + rest

    yield from rec(total, parts, bound)


def _assign_counts(counts: list[int], n_queries: int, per_query: int) -> list[list[int]]:
    """Realise X as per-query clause-index sets (greedy largest-first)."""
    remaining = list(counts)
    assignment: list[list[int]] = [[] for _ in range(n_queries)]
    for _ in range(per_query):
        for qi in range(n_queries):
            # pick the clause with most remaining appearances not yet in q
            cand = sorted(
                (i for i in range(len(counts)) if i not in assignment[qi] and remaining[i] > 0),
                key=lambda i: -remaining[i],
            )
            if not cand:
                raise ValueError("infeasible skew assignment")
            assignment[qi].append(cand[0])
            remaining[cand[0]] -= 1
    return assignment


SKEW_TARGETS = {"L": 0.0, "M": 0.5, "H": 2.0}
# Queries covered by the one pushed clause, per the paper's Sec. VII-E3
# narrative: L -> q0 only, M -> q0..q2, H -> all five.
SKEW_HEADS = {"L": 1, "M": 3, "H": 5}


def skewness_workload(level: str, *, n_queries: int = 5, per_query: int = 2) -> MicroWorkload:
    """5 queries x 2 predicates at the target skewness; push 1 (the most
    frequent clause)."""
    target = SKEW_TARGETS[level]
    counts = _skew_counts(n_queries, per_query, target, SKEW_HEADS[level])
    assignment = _assign_counts(counts, n_queries, per_query)
    # Clause pool: distinct info-stem substrings (plentiful, comparable cost).
    pool = [Clause.of(SubstringMatch("info", f"evt{i:03d}")) for i in range(len(counts))]
    queries = tuple(
        Query(tuple(pool[i] for i in idxs), name=f"sk-{level}-q{qi}")
        for qi, idxs in enumerate(assignment)
    )
    return MicroWorkload(f"sk-{level}", queries, (pool[0],))


def achieved_skewness(w: MicroWorkload) -> float:
    """Skewness factor actually realised by a micro workload."""
    from .generator import predicate_appearances

    return skewness_factor(list(predicate_appearances(list(w.queries)).values()))
