"""Tests for the Sec. VII-E micro-benchmark workload constructors."""
import pytest

from repro.data.datasets import WINLOG_TAG_FREQS, winlog
from repro.harness import coverage
from repro.workload.generator import estimate_selectivities
from repro.workload.micro import (
    SELECTIVITY_LEVELS,
    SKEW_HEADS,
    SKEW_TARGETS,
    achieved_skewness,
    overlap_workload,
    selectivity_workload,
    skewness_workload,
)


class TestSelectivityWorkloads:
    @pytest.mark.parametrize("level", list(SELECTIVITY_LEVELS))
    def test_shape(self, level):
        w = selectivity_workload(level)
        assert len(w.queries) == 5
        assert all(len(q.clauses) == 3 for q in w.queries)
        assert len(w.pushed) == 2

    @pytest.mark.parametrize("level", list(SELECTIVITY_LEVELS))
    def test_partial_loading_enabled(self, level):
        # paper: "We push down 2 predicates ... and make sure partial
        # loading is enabled" — every query contains both pushed tags.
        w = selectivity_workload(level)
        assert coverage(list(w.queries), {c.key() for c in w.pushed}) == 1.0

    @pytest.mark.parametrize(
        "level,target", [("high", 0.01), ("medium", 0.15), ("low", 0.35)]
    )
    def test_pushed_selectivity_near_target(self, level, target):
        ds = winlog(4000, seed=0)
        w = selectivity_workload(level)
        sel = estimate_selectivities(list(w.pushed), ds.parsed(), sample=2000)
        for v in sel.values():
            assert v == pytest.approx(target, abs=max(0.01, 0.35 * target))

    def test_levels_map_paper_naming(self):
        # "high selectivity" = most selective = lowest fraction.
        assert SELECTIVITY_LEVELS["high"] == "s001"
        assert WINLOG_TAG_FREQS["s001"] < WINLOG_TAG_FREQS["s035"]


class TestOverlapWorkloads:
    @pytest.mark.parametrize("level,k", [("L", 1), ("M", 2), ("H", 4)])
    def test_preds_per_query(self, level, k):
        w = overlap_workload(level)
        assert len(w.queries) == 5
        assert all(len(q.clauses) == k for q in w.queries)
        assert len(w.pushed) == 2

    @pytest.mark.parametrize("level,cov", [("L", 0.4), ("M", 0.6), ("H", 1.0)])
    def test_coverage_progression(self, level, cov):
        """Pushing {P0, P1} covers 2 / 3 / 5 of the queries — the paper's
        overlap progression; only H enables partial loading."""
        w = overlap_workload(level)
        assert coverage(list(w.queries), {c.key() for c in w.pushed}) == pytest.approx(cov)

    def test_distinct_clauses_within_query(self):
        for level in "LMH":
            for q in overlap_workload(level).queries:
                keys = [c.key() for c in q.clauses]
                assert len(set(keys)) == len(keys)


class TestSkewnessWorkloads:
    @pytest.mark.parametrize("level", list(SKEW_TARGETS))
    def test_shape(self, level):
        w = skewness_workload(level)
        assert len(w.queries) == 5
        assert all(len(q.clauses) == 2 for q in w.queries)
        assert len(w.pushed) == 1

    @pytest.mark.parametrize("level", list(SKEW_TARGETS))
    def test_achieved_skew_near_target(self, level):
        assert achieved_skewness(skewness_workload(level)) == pytest.approx(
            SKEW_TARGETS[level], abs=0.3
        )

    @pytest.mark.parametrize("level", list(SKEW_TARGETS))
    def test_pushed_clause_coverage_matches_paper(self, level):
        """L covers q0 only; M covers 3 queries; H covers all five
        (Sec. VII-E3's narrative)."""
        w = skewness_workload(level)
        cov = coverage(list(w.queries), {c.key() for c in w.pushed})
        assert cov == pytest.approx(SKEW_HEADS[level] / 5)

    def test_only_h_enables_partial(self):
        covs = {
            lvl: coverage(
                list(skewness_workload(lvl).queries),
                {c.key() for c in skewness_workload(lvl).pushed},
            )
            for lvl in SKEW_TARGETS
        }
        assert covs["H"] == 1.0 and covs["L"] < 1.0 and covs["M"] < 1.0

    def test_zero_skew_is_fully_spread(self):
        w = skewness_workload("L")
        keys = {c.key() for q in w.queries for c in q.clauses}
        assert len(keys) == 10  # every clause appears exactly once
