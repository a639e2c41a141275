"""Benchmarks for the static-table reproductions (Tables II-IV).

Table II/III are generation-time benchmarks (pool + workload builds);
Table IV benchmarks the full calibration measurement + regression and
records the per-platform R² in ``extra_info`` so bench_output.txt
contains the reproduced table.
"""
import os
import sys

import pytest

sys.path.insert(0, os.path.abspath(os.path.join(os.path.dirname(__file__), "..", "jobs")))

from repro.workload.generator import TABLE3_SPECS, generate_workload, workload_summary
from repro.workload.templates import predicate_pool


def test_table2_pool_generation(benchmark):
    pools = benchmark(
        lambda: {d: predicate_pool(d) for d in ("yelp", "winlog", "ycsb")}
    )
    benchmark.extra_info["pool_sizes"] = {d: len(p) for d, p in pools.items()}


@pytest.mark.parametrize("wname", ["A", "B", "C"])
def test_table3_workload_generation(benchmark, wname):
    pool = predicate_pool("winlog")
    queries = benchmark(generate_workload, pool, TABLE3_SPECS[wname])
    benchmark.extra_info["summary"] = workload_summary(queries)
    benchmark.extra_info["paper_distribution"] = TABLE3_SPECS[wname].distribution


def test_table4_cost_model_calibration(benchmark):
    import table4_cost_model as job

    rows = benchmark.pedantic(
        job.run,
        kwargs=dict(n_objects=1500, n_preds=60, n_lines=500, repeat=3, seed=7),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["table4"] = [
        {k: r[k] for k in ("platform", "ours_R2", "paper_R2")} for r in rows
    ]
    r2 = {r["platform"]: r["ours_R2"] for r in rows}
    # The paper's ordering must reproduce: dedicated node > local > cloud.
    assert r2["PKU Weiming"] > r2["Local Server"] > r2["Alibaba Cloud"]
