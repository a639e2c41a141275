"""Reproduce paper Figs. 9-10 (as tables): sensitivity to predicate
overlap on the Windows-log dataset.

Workloads L/M/H have 1 / 2 / 4 predicates per query over a 5-clause
pool; two clauses pushed. Pushing {P0, P1} covers 2 / 3 / 5 of the five
queries, so only H enables partial loading (Fig. 9) while M already
gains more query-time skipping than L (Fig. 10).

Usage: python jobs/micro_overlap.py [--n-objects 5000] [--no-spark]
"""
from __future__ import annotations

import sys
import tempfile

from _common import base_parser, get_spark, print_table

from repro.data.datasets import winlog
from repro.harness import run_micro
from repro.workload.micro import overlap_workload


def run(*, n_objects=5000, chunk_size=500, seed=7, spark=None, workdir=None):
    ds = winlog(n_objects, seed=seed)
    wd = workdir or tempfile.mkdtemp(prefix="ciao-micro-ol-")
    loading_rows, query_rows = [], []
    for level in ("L", "M", "H"):
        res = run_micro(ds, overlap_workload(level), workdir=wd, spark=spark, chunk_size=chunk_size)
        loading_rows.append(
            {
                "workload": f"ol-{level}",
                "partial_loading": res.partial,
                "baseline_load_s": round(res.base_load_s, 4),
                "ciao_load_s": round(res.ciao_load_s, 4),
                "loading_ratio": round(res.loading_ratio, 4),
            }
        )
        for i, (b, c) in enumerate(zip(res.base_query_s, res.ciao_query_s)):
            query_rows.append(
                {
                    "workload": f"ol-{level}",
                    "query": f"q{i}",
                    "baseline_s": round(b, 4),
                    "ciao_s": round(c, 4),
                    "count": res.counts[i],
                }
            )
    return {"loading": loading_rows, "query": query_rows}


def main(argv=None):
    p = base_parser(__doc__)
    args = p.parse_args(argv)
    spark = None if args.no_spark else get_spark("ciao-micro-ol")
    out = run(n_objects=args.n_objects, chunk_size=args.chunk_size, seed=args.seed,
              spark=spark, workdir=args.workdir)
    print_table("Fig 9 — loading time vs overlap (winlog)", out["loading"])
    print_table("Fig 10 — query time vs overlap (winlog)", out["query"])
    if spark is not None:
        spark.stop()
    return out


if __name__ == "__main__":
    main(sys.argv[1:])
