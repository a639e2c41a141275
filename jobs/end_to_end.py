"""Reproduce paper Figs. 3-5 (as tables): end-to-end budget sweeps.

For one dataset, generates workloads A/B/C (Table III specs), sweeps the
client computation budget, and prints per budget: #pushed predicates,
prefiltering time, data-loading time (+ loading ratio), total
query-processing time, and the speedups vs the zero-budget baseline.

Budgets are in calibrated µs/record *of this Python substrate* — the
Python string engine is ~10-50x slower per byte than the paper's C++
client, so the sweep spans a correspondingly wider numeric range while
exercising the same selection trajectory (see DESIGN.md).

Usage:
  python jobs/end_to_end.py --dataset winlog [--n-objects 5000]
      [--n-queries 50] [--budgets 0,1,2,4,8,16] [--no-spark]
"""
from __future__ import annotations

import dataclasses
import sys
import tempfile

from _common import base_parser, get_spark, print_table

from repro.data.datasets import DATASETS
from repro.harness import run_budget_sweep, speedups
from repro.workload.generator import TABLE3_SPECS, generate_workload
from repro.workload.templates import predicate_pool

PAPER_HEADLINE = "paper: loading up to 21x, query up to 23x, e2e up to 19x @ 1 µs budget"


def run(
    dataset: str,
    *,
    n_objects: int = 5000,
    n_queries: int = 50,
    budgets=(0.0, 1.0, 2.0, 4.0, 8.0, 16.0),
    chunk_size: int = 500,
    seed: int = 7,
    spark=None,
    workdir: str | None = None,
) -> dict[str, list[dict]]:
    ds = DATASETS[dataset](n_objects, seed=seed)
    pool = predicate_pool(dataset)
    out: dict[str, list[dict]] = {}
    for wname, spec in TABLE3_SPECS.items():
        spec = dataclasses.replace(spec, n_queries=n_queries)
        queries = generate_workload(pool, spec)
        wd = workdir or tempfile.mkdtemp(prefix=f"ciao-{dataset}-{wname}-")
        rows = run_budget_sweep(
            ds, queries, budgets, workdir=wd, spark=spark, chunk_size=chunk_size
        )
        out[wname] = speedups(rows)
    return out


def main(argv=None) -> dict:
    p = base_parser(__doc__)
    p.add_argument("--dataset", default="winlog", choices=["yelp", "winlog", "ycsb"])
    p.add_argument("--n-queries", type=int, default=50)
    p.add_argument("--budgets", default="0,1,2,4,8,16")
    args = p.parse_args(argv)
    budgets = [float(b) for b in args.budgets.split(",")]
    spark = None if args.no_spark else get_spark("ciao-end-to-end")
    result = run(
        args.dataset,
        n_objects=args.n_objects,
        n_queries=args.n_queries,
        budgets=budgets,
        chunk_size=args.chunk_size,
        seed=args.seed,
        spark=spark,
        workdir=args.workdir,
    )
    for wname, rows in result.items():
        print_table(f"Fig 3-5 style sweep — {args.dataset}, workload {wname}", rows)
    print(f"\n{PAPER_HEADLINE}")
    if spark is not None:
        spark.stop()
    return result


if __name__ == "__main__":
    main(sys.argv[1:])
