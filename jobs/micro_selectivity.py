"""Reproduce paper Figs. 7-8 (as tables): sensitivity to predicate
selectivity on the Windows-log dataset.

Three workloads (5 queries x 3 conjunctive predicates) at selectivity
~0.01 / 0.15 / 0.35; two predicates pushed, partial loading enabled.
Reports data-loading time + loading ratio (Fig. 7) and per-query
execution time vs the eager baseline (Fig. 8).

Usage: python jobs/micro_selectivity.py [--n-objects 5000] [--no-spark]
"""
from __future__ import annotations

import sys
import tempfile

from _common import base_parser, get_spark, print_table

from repro.data.datasets import winlog
from repro.harness import run_micro
from repro.workload.micro import SELECTIVITY_LEVELS, selectivity_workload


def run(*, n_objects=5000, chunk_size=500, seed=7, spark=None, workdir=None):
    ds = winlog(n_objects, seed=seed)
    wd = workdir or tempfile.mkdtemp(prefix="ciao-micro-sel-")
    loading_rows, query_rows = [], []
    for level in SELECTIVITY_LEVELS:  # high (0.01) / medium (0.15) / low (0.35)
        res = run_micro(ds, selectivity_workload(level), workdir=wd, spark=spark, chunk_size=chunk_size)
        loading_rows.append(
            {
                "workload": f"sel-{level}",
                "baseline_load_s": round(res.base_load_s, 4),
                "ciao_load_s": round(res.ciao_load_s, 4),
                "loading_ratio": round(res.loading_ratio, 4),
                "speedup": round(res.base_load_s / res.ciao_load_s, 2) if res.ciao_load_s else float("inf"),
            }
        )
        for i, (b, c) in enumerate(zip(res.base_query_s, res.ciao_query_s)):
            query_rows.append(
                {
                    "workload": f"sel-{level}",
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
    spark = None if args.no_spark else get_spark("ciao-micro-sel")
    out = run(n_objects=args.n_objects, chunk_size=args.chunk_size, seed=args.seed,
              spark=spark, workdir=args.workdir)
    print_table("Fig 7 — loading time vs selectivity (winlog)", out["loading"])
    print_table("Fig 8 — query time vs selectivity (winlog)", out["query"])
    if spark is not None:
        spark.stop()
    return out


if __name__ == "__main__":
    main(sys.argv[1:])
