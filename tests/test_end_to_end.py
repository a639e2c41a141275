"""Integration tests: budget sweeps and micro runs through the harness."""
import dataclasses

import duckdb
import pytest

from repro.data.datasets import winlog, ycsb, yelp
from repro.harness import (
    coverage,
    fraction_benefiting,
    run_budget_sweep,
    run_micro,
    speedups,
)
from repro.workload.generator import TABLE3_SPECS, generate_workload
from repro.workload.micro import overlap_workload, selectivity_workload, skewness_workload
from repro.workload.templates import predicate_pool

BUDGETS = [0.0, 2.0, 8.0]


def _small_workload(dataset: str, n_queries: int, which="A"):
    spec = dataclasses.replace(TABLE3_SPECS[which], n_queries=n_queries)
    return generate_workload(predicate_pool(dataset), spec)


def _duck_counts(parsed, queries):
    con = duckdb.connect()
    con.register("t", parsed)
    out = [int(con.execute(q.count_sql("t")).fetchone()[0]) for q in queries]
    con.close()
    return out


@pytest.mark.parametrize(
    "gen,name", [(winlog, "winlog"), (yelp, "yelp"), (ycsb, "ycsb")], ids=["winlog", "yelp", "ycsb"]
)
def test_sweep_driver_path(gen, name, tmp_path):
    ds = gen(500, seed=21)
    queries = _small_workload(name, 12)
    rows = run_budget_sweep(ds, queries, BUDGETS, workdir=str(tmp_path), chunk_size=128, cost_repeat=1)

    base = rows[0]
    assert base.budget_us == 0.0 and base.n_pushed == 0
    assert base.loading_ratio == 1.0 and not base.partial

    # CIAO must never change query answers — at any budget, and they must
    # equal the DuckDB ground truth.
    truth = _duck_counts(ds.parsed(), queries)
    for r in rows:
        assert r.counts == truth, f"budget {r.budget_us} changed results"
        assert 0.0 < r.loading_ratio <= 1.0
        assert r.n_queries == len(queries)

    # Larger budgets push at least as many predicates.
    pushed = [r.n_pushed for r in rows]
    assert pushed == sorted(pushed)
    assert pushed[-1] > 0

    # If partial loading kicked in, fewer objects were loaded.
    for r in rows[1:]:
        if r.partial:
            assert r.loading_ratio < 1.0


def test_sweep_speedup_rows(tmp_path):
    ds = winlog(500, seed=22)
    queries = _small_workload("winlog", 10)
    rows = run_budget_sweep(ds, queries, BUDGETS, workdir=str(tmp_path), chunk_size=128, cost_repeat=1)
    sp = speedups(rows)
    assert sp[0]["speedup_load"] == 1.0 and sp[0]["speedup_query"] == 1.0
    assert {"budget_us", "loading_ratio", "speedup_e2e"} <= set(sp[0])
    assert len(sp) == len(BUDGETS)


def test_fraction_benefiting_structure(tmp_path):
    ds = ycsb(400, seed=23)
    queries = _small_workload("ycsb", 10, which="C")
    rows = run_budget_sweep(
        ds, queries, BUDGETS, workdir=str(tmp_path), chunk_size=128,
        cost_repeat=1, collect_scan_stats=True,
    )
    fb = fraction_benefiting(rows)
    assert len(fb) == len(BUDGETS) - 1
    for e in fb:
        assert 0.0 <= e["frac_faster"] <= 1.0
        assert 0.0 <= e["frac_fewer_rows"] <= 1.0


def test_benefit_monotone_in_budget(tmp_path):
    ds = winlog(500, seed=24)
    queries = _small_workload("winlog", 12)
    rows = run_budget_sweep(
        ds, queries, [0.0, 1.0, 4.0, 16.0], workdir=str(tmp_path), chunk_size=128, cost_repeat=1
    )
    benefits = [r.benefit for r in rows]
    assert benefits == sorted(benefits)


def test_coverage_helper():
    queries = _small_workload("winlog", 8)
    all_keys = {k for q in queries for k in q.clause_keys()}
    assert coverage(queries, all_keys) == 1.0
    assert coverage(queries, set()) == 0.0
    assert coverage([], {("x",)}) == 0.0


class TestRunMicro:
    def test_selectivity_micro(self, tmp_path):
        ds = winlog(600, seed=25)
        res = run_micro(ds, selectivity_workload("high"), workdir=str(tmp_path))
        assert res.partial
        assert res.loading_ratio < 0.2
        assert res.ciao_load_s < res.base_load_s
        assert len(res.base_query_s) == len(res.ciao_query_s) == 5

    def test_overlap_micro_partial_only_h(self, tmp_path):
        ds = winlog(400, seed=26)
        for level, partial in [("L", False), ("M", False), ("H", True)]:
            res = run_micro(ds, overlap_workload(level), workdir=str(tmp_path))
            assert res.partial == partial
            if partial:
                assert res.loading_ratio < 1.0
            else:
                assert res.loading_ratio == 1.0

    def test_skew_micro_partial_only_h(self, tmp_path):
        ds = winlog(400, seed=27)
        for level, partial in [("L", False), ("M", False), ("H", True)]:
            res = run_micro(ds, skewness_workload(level), workdir=str(tmp_path))
            assert res.partial == partial

    def test_micro_counts_equal_truth(self, tmp_path):
        ds = winlog(400, seed=28)
        w = overlap_workload("M")
        res = run_micro(ds, w, workdir=str(tmp_path))
        assert res.counts == _duck_counts(ds.parsed(), list(w.queries))

    def test_skipping_reduces_scanned_rows(self, tmp_path):
        ds = winlog(600, seed=29)
        res = run_micro(ds, selectivity_workload("high"), workdir=str(tmp_path))
        assert sum(res.ciao_scanned) < sum(res.base_scanned)


def test_sweep_spark_path_matches_driver(spark, tmp_path):
    """The Spark DataSource execution path returns the same per-query
    counts as the driver-side reference scanner."""
    ds = winlog(400, seed=30)
    queries = _small_workload("winlog", 5)
    d_rows = run_budget_sweep(
        ds, queries, [0.0, 4.0], workdir=str(tmp_path / "d"), chunk_size=128, cost_repeat=1
    )
    s_rows = run_budget_sweep(
        ds, queries, [0.0, 4.0], workdir=str(tmp_path / "s"), chunk_size=128,
        cost_repeat=1, spark=spark,
    )
    for dr, sr in zip(d_rows, s_rows):
        assert dr.counts == sr.counts
