"""Predicate-selection optimisation (CIAO Sec. V).

Choose a set ``S`` of clauses to push to clients maximising the expected
filtering benefit::

    f(S) = sum_q freq(q) * (1 - prod_{p in P_q ∩ S} sel(p))

subject to the knapsack constraint ``sum_{p in S} cost(p) <= B`` (``B``
in µs/record of client budget). ``f`` is monotone submodular (proved in
the paper Sec. V-B; property-tested here in ``tests/test_selection.py``).

Following Khuller–Moss–Naor via [26], we run two greedies — plain
best-benefit (Algorithm 1) and best benefit/cost ratio (Algorithm 2) —
and return the better of the two, which guarantees
``f(S) >= (1/2)(1 - 1/e) * OPT ≈ 0.316 * OPT``.
"""
from __future__ import annotations

import itertools
import math
from dataclasses import dataclass, field
from typing import Hashable, Iterable, Mapping, Sequence

PredKey = Hashable


@dataclass(frozen=True)
class SelectionProblem:
    """The optimisation instance.

    ``queries[i]`` is the list of candidate clause keys of query ``i``
    (clauses unsupported on the client are simply omitted); ``sel`` and
    ``cost`` map clause keys to selectivity in [0, 1] and client cost in
    µs/object; ``freq`` is the relative query frequency (uniform in the
    paper's experiments).
    """

    queries: tuple[tuple[PredKey, ...], ...]
    sel: Mapping[PredKey, float]
    cost: Mapping[PredKey, float]
    freq: tuple[float, ...] = ()

    def __post_init__(self):
        if not self.freq:
            object.__setattr__(
                self, "freq", tuple([1.0 / max(1, len(self.queries))] * len(self.queries))
            )
        if len(self.freq) != len(self.queries):
            raise ValueError("freq must align with queries")
        for q in self.queries:
            for p in q:
                if p not in self.sel or p not in self.cost:
                    raise ValueError(f"missing sel/cost for predicate {p!r}")
        for p, s in self.sel.items():
            if not (0.0 <= s <= 1.0):
                raise ValueError(f"selectivity out of range for {p!r}: {s}")

    @property
    def candidates(self) -> list[PredKey]:
        """All distinct candidate clause keys, in first-appearance order."""
        seen: dict[PredKey, None] = {}
        for q in self.queries:
            for p in q:
                seen.setdefault(p)
        return list(seen)

    def f(self, S: Iterable[PredKey]) -> float:
        """The expected benefit of pushing down ``S``."""
        Sset = set(S)
        total = 0.0
        for q, fr in zip(self.queries, self.freq):
            prod = 1.0
            for p in q:
                if p in Sset:
                    prod *= self.sel[p]
            total += fr * (1.0 - prod)
        return total

    def total_cost(self, S: Iterable[PredKey]) -> float:
        return sum(self.cost[p] for p in set(S))


def _greedy(problem: SelectionProblem, budget: float, *, ratio: bool) -> set[PredKey]:
    """Shared greedy loop. ``ratio=False`` is the paper's Algorithm 1
    (pick max benefit), ``ratio=True`` is Algorithm 2 (max benefit/cost).

    Deviations from the paper's pseudocode, both safe:
    * the argmax is restricted to predicates that still fit the budget
      (the pseudocode's while-condition only checks that *some* predicate
      fits);
    * selection stops once the best marginal benefit is 0 — padding the
      set with useless predicates burns client cycles for f-gain 0.
    """
    S: set[PredKey] = set()
    spent = 0.0
    f_S = 0.0
    remaining = set(problem.candidates)
    while True:
        feasible = [p for p in remaining if spent + problem.cost[p] <= budget]
        if not feasible:
            break
        best_p, best_score, best_f = None, -math.inf, f_S
        for p in feasible:
            f_new = problem.f(S | {p})
            gain = f_new - f_S
            score = gain / problem.cost[p] if ratio and problem.cost[p] > 0 else gain
            if ratio and problem.cost[p] == 0:
                score = math.inf if gain > 0 else 0.0
            if score > best_score:
                best_p, best_score, best_f = p, score, f_new
        if best_p is None or best_f - f_S <= 0.0:
            break
        S.add(best_p)
        spent += problem.cost[best_p]
        f_S = best_f
    return S


def greedy_naive(problem: SelectionProblem, budget: float) -> set[PredKey]:
    """Paper Algorithm 1: repeatedly add the highest-benefit predicate."""
    return _greedy(problem, budget, ratio=False)


def greedy_ratio(problem: SelectionProblem, budget: float) -> set[PredKey]:
    """Paper Algorithm 2: repeatedly add the best benefit-cost ratio."""
    return _greedy(problem, budget, ratio=True)


@dataclass(frozen=True)
class SelectionResult:
    selected: frozenset
    benefit: float
    spent: float
    algorithm: str


def select(problem: SelectionProblem, budget: float) -> SelectionResult:
    """Run both greedies and keep the better — the 0.316-approx combo."""
    s1 = greedy_naive(problem, budget)
    s2 = greedy_ratio(problem, budget)
    f1, f2 = problem.f(s1), problem.f(s2)
    if f1 >= f2:
        return SelectionResult(frozenset(s1), f1, problem.total_cost(s1), "naive")
    return SelectionResult(frozenset(s2), f2, problem.total_cost(s2), "ratio")


def exhaustive(problem: SelectionProblem, budget: float) -> SelectionResult:
    """Brute-force optimum — for testing the approximation bound only."""
    cands = problem.candidates
    if len(cands) > 20:
        raise ValueError("exhaustive search is for small test instances")
    best: tuple[float, frozenset] = (0.0, frozenset())
    for r in range(len(cands) + 1):
        for combo in itertools.combinations(cands, r):
            if problem.total_cost(combo) <= budget:
                v = problem.f(combo)
                if v > best[0]:
                    best = (v, frozenset(combo))
    return SelectionResult(best[1], best[0], problem.total_cost(best[1]), "exhaustive")
