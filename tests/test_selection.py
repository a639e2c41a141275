"""Tests for the submodular predicate-selection optimiser (paper Sec. V)."""
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.selection import (
    SelectionProblem,
    exhaustive,
    greedy_naive,
    greedy_ratio,
    select,
)


def _mk(queries, sel, cost, freq=()):
    return SelectionProblem(
        queries=tuple(tuple(q) for q in queries), sel=sel, cost=cost, freq=tuple(freq)
    )


def _random_problem(seed, n_preds=6, n_queries=4):
    g = np.random.default_rng(seed)
    preds = [f"p{i}" for i in range(n_preds)]
    queries = []
    for _ in range(n_queries):
        k = int(g.integers(1, n_preds + 1))
        queries.append(tuple(g.choice(preds, size=k, replace=False)))
    sel = {p: float(g.uniform(0.01, 0.99)) for p in preds}
    cost = {p: float(g.uniform(0.1, 2.0)) for p in preds}
    return _mk(queries, sel, cost)


# ----------------------------------------------------------------------
# f(S): definition and hand-checked values
# ----------------------------------------------------------------------


class TestObjective:
    def test_empty_set_zero(self):
        p = _random_problem(0)
        assert p.f(set()) == 0.0

    def test_single_query_single_pred(self):
        p = _mk([("a",)], {"a": 0.2}, {"a": 1.0})
        assert p.f({"a"}) == pytest.approx(1 - 0.2)

    def test_conjunction_multiplies_selectivities(self):
        p = _mk([("a", "b")], {"a": 0.2, "b": 0.5}, {"a": 1, "b": 1})
        assert p.f({"a", "b"}) == pytest.approx(1 - 0.2 * 0.5)

    def test_freq_weighting(self):
        p = _mk(
            [("a",), ("b",)],
            {"a": 0.0, "b": 0.0},
            {"a": 1, "b": 1},
            freq=(0.75, 0.25),
        )
        assert p.f({"a"}) == pytest.approx(0.75)
        assert p.f({"b"}) == pytest.approx(0.25)

    def test_uniform_freq_default(self):
        p = _mk([("a",), ("b",)], {"a": 0.0, "b": 0.5}, {"a": 1, "b": 1})
        assert p.f({"a", "b"}) == pytest.approx(0.5 * 1.0 + 0.5 * 0.5)

    def test_pred_outside_query_ignored(self):
        p = _mk([("a",)], {"a": 0.5, "b": 0.0}, {"a": 1, "b": 1})
        # b not in the query: adding it cannot help.
        assert p.f({"b"}) == 0.0
        assert p.f({"a", "b"}) == p.f({"a"})

    def test_candidates_deduplicated_in_order(self):
        p = _mk([("a", "b"), ("b", "c")], {x: 0.5 for x in "abc"}, {x: 1 for x in "abc"})
        assert p.candidates == ["a", "b", "c"]

    def test_total_cost(self):
        p = _mk([("a", "b")], {"a": 0.5, "b": 0.5}, {"a": 1.5, "b": 2.5})
        assert p.total_cost({"a", "b"}) == pytest.approx(4.0)


class TestValidation:
    def test_missing_sel_raises(self):
        with pytest.raises(ValueError):
            _mk([("a",)], {}, {"a": 1.0})

    def test_bad_selectivity_raises(self):
        with pytest.raises(ValueError):
            _mk([("a",)], {"a": 1.5}, {"a": 1.0})

    def test_freq_length_mismatch_raises(self):
        with pytest.raises(ValueError):
            _mk([("a",)], {"a": 0.5}, {"a": 1.0}, freq=(0.5, 0.5))


# ----------------------------------------------------------------------
# Submodularity + monotonicity (the paper's Sec. V-B proof, checked)
# ----------------------------------------------------------------------


@given(st.integers(0, 10_000), st.integers(0, 1000))
@settings(max_examples=150, deadline=None)
def test_f_is_submodular(seed, subset_seed):
    p = _random_problem(seed)
    g = np.random.default_rng(subset_seed)
    cands = p.candidates
    S = {c for c in cands if g.random() < 0.5}
    T = {c for c in cands if g.random() < 0.5}
    assert p.f(S) + p.f(T) >= p.f(S | T) + p.f(S & T) - 1e-9


@given(st.integers(0, 10_000), st.integers(0, 1000))
@settings(max_examples=150, deadline=None)
def test_f_is_monotone(seed, subset_seed):
    p = _random_problem(seed)
    g = np.random.default_rng(subset_seed)
    S = {c for c in p.candidates if g.random() < 0.5}
    extra = [c for c in p.candidates if c not in S]
    if extra:
        assert p.f(S | {extra[0]}) >= p.f(S) - 1e-12


# ----------------------------------------------------------------------
# Greedy algorithms (paper Algorithms 1 & 2) and the combined 0.316-approx
# ----------------------------------------------------------------------


class TestGreedy:
    def test_budget_zero_selects_nothing(self):
        p = _random_problem(1)
        assert greedy_naive(p, 0.0) == set()
        assert greedy_ratio(p, 0.0) == set()

    def test_budget_respected(self):
        for seed in range(20):
            p = _random_problem(seed)
            b = 2.0
            for algo in (greedy_naive, greedy_ratio):
                S = algo(p, b)
                assert p.total_cost(S) <= b + 1e-9

    def test_huge_budget_selects_all_useful(self):
        p = _mk([("a", "b")], {"a": 0.3, "b": 0.4}, {"a": 1, "b": 1})
        S = greedy_naive(p, 100.0)
        assert S == {"a", "b"}

    def test_zero_gain_predicates_not_selected(self):
        # "c" is in no query: the greedy must not burn budget on it.
        p = _mk([("a",)], {"a": 0.5, "c": 0.1}, {"a": 1.0, "c": 0.1})
        object.__setattr__(p, "queries", (("a",),))
        S = greedy_naive(p, 10.0)
        assert "c" not in S

    def test_naive_ignores_cost(self):
        # One expensive high-benefit pred vs several cheap ones; naive
        # grabs the expensive one first.
        p = _mk(
            [("big",), ("s1",), ("s2",)],
            {"big": 0.01, "s1": 0.2, "s2": 0.2},
            {"big": 10.0, "s1": 1.0, "s2": 1.0},
        )
        S = greedy_naive(p, 10.0)
        assert "big" in S and len(S) == 1

    def test_ratio_prefers_cheap(self):
        p = _mk(
            [("big",), ("s1",), ("s2",)],
            {"big": 0.01, "s1": 0.2, "s2": 0.2},
            {"big": 10.0, "s1": 1.0, "s2": 1.0},
        )
        S = greedy_ratio(p, 10.0)
        assert S == {"s1", "s2"}

    def test_select_returns_better_of_both(self):
        p = _mk(
            [("big",), ("s1",), ("s2",)],
            {"big": 0.01, "s1": 0.2, "s2": 0.2},
            {"big": 10.0, "s1": 1.0, "s2": 1.0},
        )
        res = select(p, 10.0)
        assert res.benefit == pytest.approx(
            max(p.f(greedy_naive(p, 10.0)), p.f(greedy_ratio(p, 10.0)))
        )
        assert res.algorithm in ("naive", "ratio")

    def test_zero_cost_predicate_handled(self):
        p = _mk([("a",)], {"a": 0.5}, {"a": 0.0})
        S = greedy_ratio(p, 1.0)
        assert S == {"a"}


APPROX = 0.5 * (1 - 1 / math.e)  # ≈ 0.316


@pytest.mark.parametrize("seed", range(30))
def test_combined_greedy_meets_0316_bound(seed):
    """Khuller–Moss–Naor: max(greedy, ratio-greedy) >= 0.316 * OPT."""
    p = _random_problem(seed, n_preds=7, n_queries=5)
    budget = float(np.random.default_rng(seed).uniform(0.5, 6.0))
    opt = exhaustive(p, budget)
    got = select(p, budget)
    assert got.benefit >= APPROX * opt.benefit - 1e-9
    assert got.spent <= budget + 1e-9


def test_exhaustive_rejects_large_instances():
    p = _random_problem(0, n_preds=6)
    object.__setattr__(p, "queries", tuple(tuple(f"p{i}" for i in range(25)) for _ in range(1)))
    p2 = _mk(
        [[f"p{i}" for i in range(25)]],
        {f"p{i}": 0.5 for i in range(25)},
        {f"p{i}": 1.0 for i in range(25)},
    )
    with pytest.raises(ValueError):
        exhaustive(p2, 1.0)


def test_exhaustive_is_optimal_small():
    p = _mk(
        [("a", "b"), ("b", "c")],
        {"a": 0.9, "b": 0.1, "c": 0.5},
        {"a": 1, "b": 1, "c": 1},
    )
    res = exhaustive(p, 1.0)
    # best single predicate under budget 1 is b (hits both queries).
    assert res.selected == frozenset({"b"})
