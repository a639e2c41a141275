"""Fast unit tests for harness helpers (no Spark, tiny data)."""
import pytest

from repro.core.predicates import Clause, ExactMatch, Query, SubstringMatch
from repro.data.datasets import winlog
from repro.harness import (
    BudgetRow,
    build_problem,
    calibrate_cost_model,
    coverage,
    fraction_benefiting,
    run_store_and_queries,
    speedups,
)
from repro.workload.generator import estimate_selectivities


def _row(budget, load_s, query_s, per_q=(), scanned=()):
    return BudgetRow(
        budget_us=budget, n_pushed=0, benefit=0.0, coverage=0.0, partial=False,
        prefilter_s=0.01, load_s=load_s, loading_ratio=1.0, query_s=query_s,
        n_queries=len(per_q), per_query_s=list(per_q), per_query_scanned=list(scanned),
    )


class TestSpeedups:
    def test_baseline_is_one(self):
        rows = [_row(0.0, 2.0, 4.0), _row(1.0, 1.0, 2.0)]
        sp = speedups(rows)
        assert sp[0]["speedup_load"] == 1.0
        assert sp[1]["speedup_load"] == 2.0
        assert sp[1]["speedup_query"] == 2.0

    def test_e2e_includes_prefilter(self):
        r = _row(1.0, 1.0, 2.0)
        assert r.e2e_s == pytest.approx(0.01 + 1.0 + 2.0)

    def test_requires_baseline_row(self):
        with pytest.raises(StopIteration):
            speedups([_row(1.0, 1.0, 1.0)])


class TestFractionBenefiting:
    def test_fractions(self):
        base = _row(0.0, 1.0, 3.0, per_q=(1.0, 1.0, 1.0), scanned=(100, 100, 100))
        b1 = _row(2.0, 1.0, 2.0, per_q=(0.5, 2.0, 0.9), scanned=(10, 100, 100))
        out = fraction_benefiting([base, b1])
        assert len(out) == 1
        assert out[0]["frac_faster"] == pytest.approx(2 / 3)
        assert out[0]["frac_fewer_rows"] == pytest.approx(1 / 3)

    def test_skips_baseline_row(self):
        base = _row(0.0, 1.0, 3.0, per_q=(1.0,))
        assert fraction_benefiting([base]) == []


class TestBuildProblem:
    def test_round_trip(self):
        c1 = Clause.of(ExactMatch("level", "Info"))
        c2 = Clause.of(SubstringMatch("info", "evt000"))
        queries = [Query.of(c1), Query.of(c1, c2)]
        sel = {c1.key(): 0.5, c2.key(): 0.1}
        cost = {c1.key(): 1.0, c2.key(): 2.0}
        p = build_problem(queries, sel, cost)
        assert p.f({c1.key()}) == pytest.approx(0.5 * 0.5 + 0.5 * 0.5)
        assert p.total_cost({c1.key(), c2.key()}) == 3.0


class TestCalibrateCostModel:
    def test_pads_small_pools(self):
        ds = winlog(120, seed=1)
        c = Clause.of(ExactMatch("level", "Info"))
        sel = estimate_selectivities([c], ds.parsed(), sample=100)
        model, r2 = calibrate_cost_model(ds, [c], sel, n_sample_lines=100, repeat=1)
        assert model.predict_simple(0.5, 10, 200.0) >= 0.0
        assert -1.0 <= r2 <= 1.0


class TestRunStoreAndQueries:
    def test_driver_path_returns_scanned(self, tmp_path):
        ds = winlog(150, seed=2)
        c = Clause.of(ExactMatch("level", "Info"))
        stats, times, counts, scanned = run_store_and_queries(
            ds, [Query.of(c)], [c],
            store_path=str(tmp_path / "s"), chunk_size=64, partial=True,
        )
        assert stats.n_objects == 150
        assert len(times) == len(counts) == len(scanned) == 1
        assert counts[0] == int((ds.parsed()["level"] == "Info").sum())

    def test_rebuild_overwrites_existing_store(self, tmp_path):
        ds = winlog(80, seed=3)
        path = str(tmp_path / "s")
        for _ in range(2):  # second build must not fail or double-count
            stats, *_ = run_store_and_queries(
                ds, [], [], store_path=path, chunk_size=40, partial=False
            )
        assert stats.n_objects == 80


class TestCoverage:
    def test_partial_coverage(self):
        c1 = Clause.of(ExactMatch("a", "x"))
        c2 = Clause.of(ExactMatch("a", "y"))
        qs = [Query.of(c1), Query.of(c2), Query.of(c1, c2)]
        assert coverage(qs, {c1.key()}) == pytest.approx(2 / 3)
