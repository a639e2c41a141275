"""End-to-end and micro-benchmark experiment harness (paper Sec. VII).

One *budget sweep* (the paper's Figs. 3-5 per dataset) does, per budget:

1. estimate clause selectivities on a sample of the parsed data;
2. cost every candidate clause with the calibrated cost model;
3. pick the pushed set with the 0.316-approx combined greedy;
4. client-prefilter + (partially) load the raw lines into a CIAO store,
   timing prefiltering and loading separately;
5. run every workload query — through the Spark ``ciao`` DataSource by
   default, or through the deterministic driver-side scanner — timing
   total query processing.

Budget 0 is the paper's baseline: conventional eager loading, no
bit-vectors, full scans.
"""
from __future__ import annotations

import os
import shutil
import time
from dataclasses import dataclass, field
from typing import Sequence

import numpy as np

from repro.core import cost_model as cm
from repro.core.predicates import Clause, Query
from repro.core.selection import SelectionProblem, select
from repro.core.skipping import scan_count
from repro.core.storage import BuildStats, build_store
from repro.data.datasets import Dataset
from repro.workload.generator import estimate_selectivities


def coverage(queries: Sequence[Query], pushed_keys: set) -> float:
    """Fraction of queries containing at least one pushed clause."""
    if not queries:
        return 0.0
    hit = sum(1 for q in queries if any(k in pushed_keys for k in q.clause_keys()))
    return hit / len(queries)


def calibrate_cost_model(
    dataset: Dataset,
    clauses: Sequence[Clause],
    selectivities: dict[tuple, float],
    *,
    n_sample_lines: int = 300,
    n_clauses: int = 12,
    repeat: int = 3,
    seed: int = 0,
) -> tuple[cm.CostModel, float]:
    """Measure a spread of clauses on sample lines and fit the model —
    the per-deployment calibration step of Sec. V-D / VII-F."""
    g = np.random.default_rng(seed)
    lines = list(dataset.lines[:n_sample_lines])
    pool = list(clauses)
    picks = [pool[i] for i in g.choice(len(pool), size=min(n_clauses, len(pool)), replace=False)]
    sels = [selectivities[c.key()] for c in picks]
    # Tiny workloads can have fewer clauses than regression coefficients;
    # pad with never-matching probe patterns of varying length (sel 0).
    from repro.core.predicates import Clause, SubstringMatch

    probe_col = next(n for n, t in dataset.schema if t == "string")
    k = 0
    while len(picks) < max(6, min(n_clauses, len(pool))):
        picks.append(Clause.of(SubstringMatch(probe_col, "\x7f" * (2 + 3 * k))))
        sels.append(0.0)
        k += 1
    samples = cm.collect_samples(picks, lines, sels, repeat=repeat)
    return cm.calibrate(samples)


def build_problem(
    queries: Sequence[Query],
    selectivities: dict[tuple, float],
    costs: dict[tuple, float],
) -> SelectionProblem:
    return SelectionProblem(
        queries=tuple(tuple(q.clause_keys()) for q in queries),
        sel=selectivities,
        cost=costs,
    )


@dataclass
class BudgetRow:
    """One point of a Figs. 3-5 style sweep."""

    budget_us: float
    n_pushed: int
    benefit: float
    coverage: float
    partial: bool
    prefilter_s: float
    load_s: float
    loading_ratio: float
    query_s: float
    n_queries: int
    per_query_s: list[float] = field(default_factory=list)
    per_query_scanned: list[int] = field(default_factory=list)
    counts: list[int] = field(default_factory=list)
    pushed_sql: list[str] = field(default_factory=list)

    @property
    def e2e_s(self) -> float:
        """End-to-end = prefilter + load + query (the paper's total)."""
        return self.prefilter_s + self.load_s + self.query_s


def run_store_and_queries(
    dataset: Dataset,
    queries: Sequence[Query],
    pushed: Sequence[Clause],
    *,
    store_path: str,
    chunk_size: int,
    partial: bool,
    spark=None,
    collect_scan_stats: bool = False,
) -> tuple[BuildStats, list[float], list[int], list[int]]:
    """Build one store and run every query against it.

    With ``spark`` given, queries run through the ``ciao`` DataSource
    (wall-clock timed); otherwise through the driver-side scanner.
    Returns (build stats, per-query seconds, per-query counts,
    per-query rows-scanned [driver path / collect_scan_stats only]).
    """
    if os.path.exists(store_path):
        shutil.rmtree(store_path)
    stats = build_store(
        store_path, dataset.lines, dataset.schema, pushed,
        chunk_size=chunk_size, partial=partial,
    )
    times: list[float] = []
    counts: list[int] = []
    scanned: list[int] = []
    if spark is not None:
        from repro.datasource import register_ciao, run_query_spark

        register_ciao(spark)
        for q in queries:
            n, dt = run_query_spark(spark, store_path, q)
            times.append(dt)
            counts.append(n)
        if collect_scan_stats:
            for q in queries:
                scanned.append(scan_count(store_path, q).rows_scanned)
    else:
        for q in queries:
            t0 = time.perf_counter()
            st = scan_count(store_path, q)
            times.append(time.perf_counter() - t0)
            counts.append(st.result_count)
            scanned.append(st.rows_scanned)
    return stats, times, counts, scanned


def run_budget_sweep(
    dataset: Dataset,
    queries: Sequence[Query],
    budgets_us: Sequence[float],
    *,
    workdir: str,
    spark=None,
    chunk_size: int = 500,
    sel_sample: int = 500,
    cost_repeat: int = 3,
    collect_scan_stats: bool = False,
    keep_stores: bool = False,
) -> list[BudgetRow]:
    """The full Figs. 3-5 experiment for one dataset + workload."""
    pool_keys: dict[tuple, Clause] = {}
    for q in queries:
        for c in q.clauses:
            pool_keys.setdefault(c.key(), c)
    pool = list(pool_keys.values())

    # Warmup: a throwaway mini-build so the budget-0 baseline (first
    # measured build) does not absorb import/JIT/page-cache warmup.
    warm = Dataset(dataset.name, dataset.lines[:50], dataset.schema)
    run_store_and_queries(
        warm, [], [], store_path=os.path.join(workdir, "warmup"),
        chunk_size=chunk_size, partial=False,
    )
    shutil.rmtree(os.path.join(workdir, "warmup"), ignore_errors=True)

    parsed = dataset.parsed()
    sel = estimate_selectivities(pool, parsed, sample=sel_sample)
    model, _r2 = calibrate_cost_model(dataset, pool, sel, repeat=cost_repeat)
    len_t = dataset.avg_line_len
    costs = {c.key(): model.clause_cost(c, sel[c.key()], len_t) for c in pool}
    problem = build_problem(queries, sel, costs)

    rows: list[BudgetRow] = []
    for b in budgets_us:
        if b <= 0:
            pushed: list[Clause] = []
            benefit, cov = 0.0, 0.0
        else:
            res = select(problem, b)
            pushed = [pool_keys[k] for k in sorted(res.selected)]
            benefit = res.benefit
            cov = coverage(queries, set(res.selected))
        partial = bool(pushed) and cov >= 1.0
        store_path = os.path.join(workdir, f"store_b{b:g}".replace(".", "_"))
        stats, times, counts, scanned = run_store_and_queries(
            dataset, queries, pushed,
            store_path=store_path, chunk_size=chunk_size, partial=partial,
            spark=spark, collect_scan_stats=collect_scan_stats,
        )
        rows.append(
            BudgetRow(
                budget_us=float(b),
                n_pushed=len(pushed),
                benefit=benefit,
                coverage=cov,
                partial=partial,
                prefilter_s=stats.prefilter_s,
                load_s=stats.load_s,
                loading_ratio=stats.loading_ratio,
                query_s=float(sum(times)),
                n_queries=len(queries),
                per_query_s=times,
                per_query_scanned=scanned,
                counts=counts,
                pushed_sql=stats.pushed_sql,
            )
        )
        if not keep_stores:
            shutil.rmtree(store_path, ignore_errors=True)
    return rows


def speedups(rows: Sequence[BudgetRow]) -> list[dict]:
    """Loading / query / end-to-end speedups vs the budget-0 baseline."""
    base = next(r for r in rows if r.budget_us <= 0)
    out = []
    for r in rows:
        out.append(
            {
                "budget_us": r.budget_us,
                "n_pushed": r.n_pushed,
                "partial": r.partial,
                "loading_ratio": round(r.loading_ratio, 4),
                "prefilter_s": round(r.prefilter_s, 4),
                "load_s": round(r.load_s, 4),
                "query_s": round(r.query_s, 4),
                "e2e_s": round(r.e2e_s, 4),
                "speedup_load": round(base.load_s / r.load_s, 2) if r.load_s > 0 else float("inf"),
                "speedup_query": round(base.query_s / r.query_s, 2) if r.query_s > 0 else float("inf"),
                "speedup_e2e": round(base.e2e_s / r.e2e_s, 2) if r.e2e_s > 0 else float("inf"),
            }
        )
    return out


@dataclass
class MicroResult:
    """Baseline-vs-CIAO comparison for one micro workload (Figs. 7-12)."""

    name: str
    pushed_sql: list[str]
    partial: bool
    base_load_s: float
    ciao_load_s: float
    loading_ratio: float
    base_query_s: list[float]
    ciao_query_s: list[float]
    base_scanned: list[int]
    ciao_scanned: list[int]
    counts: list[int]


def run_micro(
    dataset: Dataset,
    micro,
    *,
    workdir: str,
    spark=None,
    chunk_size: int = 500,
) -> MicroResult:
    """Run one Sec. VII-E micro workload: eager baseline store vs CIAO
    store with the workload's fixed pushed set (the micros push a fixed
    number of predicates rather than running the optimiser)."""
    queries = list(micro.queries)
    pushed = list(micro.pushed)
    cov = coverage(queries, {c.key() for c in pushed})
    partial = bool(pushed) and cov >= 1.0
    b_stats, b_times, b_counts, b_scanned = run_store_and_queries(
        dataset, queries, [],
        store_path=os.path.join(workdir, f"{micro.name}-base"),
        chunk_size=chunk_size, partial=False, spark=spark,
        collect_scan_stats=spark is not None,
    )
    c_stats, c_times, c_counts, c_scanned = run_store_and_queries(
        dataset, queries, pushed,
        store_path=os.path.join(workdir, f"{micro.name}-ciao"),
        chunk_size=chunk_size, partial=partial, spark=spark,
        collect_scan_stats=spark is not None,
    )
    assert b_counts == c_counts, "CIAO must not change query results"
    return MicroResult(
        name=micro.name,
        pushed_sql=[c.to_sql() for c in pushed],
        partial=partial,
        base_load_s=b_stats.load_s,
        ciao_load_s=c_stats.load_s,
        loading_ratio=c_stats.loading_ratio,
        base_query_s=b_times,
        ciao_query_s=c_times,
        base_scanned=b_scanned,
        ciao_scanned=c_scanned,
        counts=c_counts,
    )


def fraction_benefiting(rows: Sequence[BudgetRow]) -> list[dict]:
    """Paper Fig. 6: per budget, the fraction of queries with lower query
    time than at budget 0 (plus the deterministic rows-scanned variant)."""
    base = next(r for r in rows if r.budget_us <= 0)
    out = []
    for r in rows:
        if r.budget_us <= 0:
            continue
        n = len(r.per_query_s)
        faster = sum(1 for a, b in zip(r.per_query_s, base.per_query_s) if a < b)
        entry = {"budget_us": r.budget_us, "frac_faster": faster / n if n else 0.0}
        if r.per_query_scanned and base.per_query_scanned:
            fewer = sum(
                1 for a, b in zip(r.per_query_scanned, base.per_query_scanned) if a < b
            )
            entry["frac_fewer_rows"] = fewer / n if n else 0.0
        out.append(entry)
    return out
