"""Reproduce paper Fig. 6 (as a table): fraction of workload-C YCSB
queries whose query time drops thanks to data skipping, per budget.

The paper finds 37-68 % of queries benefit even though workload C's
aggregate numbers barely move. We report the wall-clock fraction and a
deterministic rows-scanned fraction (timing on small synthetic data is
noisy; the scan-count version captures the same effect exactly).

Usage: python jobs/fig6_query_benefit.py [--n-objects 5000] [--n-queries 50]
"""
from __future__ import annotations

import dataclasses
import sys
import tempfile

from _common import base_parser, get_spark, print_table

from repro.data.datasets import ycsb
from repro.harness import fraction_benefiting, run_budget_sweep
from repro.workload.generator import TABLE3_SPECS, generate_workload
from repro.workload.templates import predicate_pool

PAPER_RANGE = "paper: 37%-68% of queries benefit"


def run(
    *,
    n_objects: int = 5000,
    n_queries: int = 50,
    budgets=(0.0, 2.0, 4.0, 8.0, 16.0),
    chunk_size: int = 500,
    seed: int = 7,
    spark=None,
    workdir: str | None = None,
) -> list[dict]:
    ds = ycsb(n_objects, seed=seed)
    pool = predicate_pool("ycsb")
    spec = dataclasses.replace(TABLE3_SPECS["C"], n_queries=n_queries)
    queries = generate_workload(pool, spec)
    wd = workdir or tempfile.mkdtemp(prefix="ciao-fig6-")
    rows = run_budget_sweep(
        ds, queries, budgets, workdir=wd, spark=spark,
        chunk_size=chunk_size, collect_scan_stats=True,
    )
    return fraction_benefiting(rows)


def main(argv=None) -> list[dict]:
    p = base_parser(__doc__)
    p.add_argument("--n-queries", type=int, default=50)
    p.add_argument("--budgets", default="0,2,4,8,16")
    args = p.parse_args(argv)
    budgets = [float(b) for b in args.budgets.split(",")]
    spark = None if args.no_spark else get_spark("ciao-fig6")
    rows = run(
        n_objects=args.n_objects, n_queries=args.n_queries, budgets=budgets,
        chunk_size=args.chunk_size, seed=args.seed, spark=spark, workdir=args.workdir,
    )
    out = [
        {
            "budget_us": r["budget_us"],
            "frac_queries_faster": round(r["frac_faster"], 2),
            "frac_fewer_rows_scanned": round(r.get("frac_fewer_rows", float("nan")), 2),
        }
        for r in rows
    ]
    print_table("Fig 6 — workload C on YCSB: queries benefiting from skipping", out)
    print(f"\n{PAPER_RANGE}")
    if spark is not None:
        spark.stop()
    return rows


if __name__ == "__main__":
    main(sys.argv[1:])
