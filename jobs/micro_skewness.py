"""Reproduce paper Figs. 11-12 (as tables): sensitivity to predicate
skewness on the Windows-log dataset.

Workloads of 5 queries x 2 predicates constructed to hit the paper's
skewness factors ~0.0 / 0.5 / 2.0; one predicate pushed (the most
frequent). Only the fully-skewed workload H covers every query and so
enables partial loading (Fig. 11); M gains query-time skipping on the
covered queries (Fig. 12).

Usage: python jobs/micro_skewness.py [--n-objects 5000] [--no-spark]
"""
from __future__ import annotations

import sys
import tempfile

from _common import base_parser, get_spark, print_table

from repro.data.datasets import winlog
from repro.harness import run_micro
from repro.workload.micro import SKEW_TARGETS, achieved_skewness, skewness_workload


def run(*, n_objects=5000, chunk_size=500, seed=7, spark=None, workdir=None):
    ds = winlog(n_objects, seed=seed)
    wd = workdir or tempfile.mkdtemp(prefix="ciao-micro-sk-")
    loading_rows, query_rows = [], []
    for level, target in SKEW_TARGETS.items():
        w = skewness_workload(level)
        res = run_micro(ds, w, workdir=wd, spark=spark, chunk_size=chunk_size)
        loading_rows.append(
            {
                "workload": f"sk-{level}",
                "target_skew": target,
                "achieved_skew": round(achieved_skewness(w), 2),
                "partial_loading": res.partial,
                "baseline_load_s": round(res.base_load_s, 4),
                "ciao_load_s": round(res.ciao_load_s, 4),
                "loading_ratio": round(res.loading_ratio, 4),
            }
        )
        for i, (b, c) in enumerate(zip(res.base_query_s, res.ciao_query_s)):
            query_rows.append(
                {
                    "workload": f"sk-{level}",
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
    spark = None if args.no_spark else get_spark("ciao-micro-sk")
    out = run(n_objects=args.n_objects, chunk_size=args.chunk_size, seed=args.seed,
              spark=spark, workdir=args.workdir)
    print_table("Fig 11 — loading time vs skewness (winlog)", out["loading"])
    print_table("Fig 12 — query time vs skewness (winlog)", out["query"])
    if spark is not None:
        spark.stop()
    return out


if __name__ == "__main__":
    main(sys.argv[1:])
