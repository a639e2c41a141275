"""Reproduce paper Table III: the three end-to-end query workloads.

Generates workloads A (Zipf 1.5), B (Zipf 2), C (Uniform) of 200
COUNT(*) queries each over a dataset's predicate pool and prints the
Table III columns (#Predicates, Min/Max #Predicates, Distribution) next
to the paper's values, plus the realised skewness factor.

Usage: python jobs/table3_workloads.py [--dataset winlog]
"""
from __future__ import annotations

import sys

from _common import base_parser, print_table

from repro.workload.generator import (
    PAPER_TABLE3,
    TABLE3_SPECS,
    generate_workload,
    predicate_appearances,
    skewness_factor,
    workload_summary,
)
from repro.workload.templates import predicate_pool


def run(dataset: str = "winlog") -> list[dict]:
    pool = predicate_pool(dataset)
    rows = []
    for name, spec in TABLE3_SPECS.items():
        queries = generate_workload(pool, spec)
        s = workload_summary(queries)
        sk = skewness_factor(list(predicate_appearances(queries).values()))
        paper = PAPER_TABLE3[name]
        rows.append(
            {
                "workload": name,
                "distribution": paper["distribution"],
                "ours_#preds": s["n_predicates"],
                "paper_#preds": paper["n_predicates"],
                "ours_min/max": f"{s['min_preds']}/{s['max_preds']}",
                "paper_min/max": f"{paper['min_max'][0]}/{paper['min_max'][1]}",
                "skew_factor": round(sk, 2),
            }
        )
    return rows


def main(argv=None) -> list[dict]:
    p = base_parser(__doc__)
    p.add_argument("--dataset", default="winlog", choices=["yelp", "winlog", "ycsb"])
    args = p.parse_args(argv)
    rows = run(args.dataset)
    print_table(f"Table III — workloads over the {args.dataset} pool", rows)
    return rows


if __name__ == "__main__":
    main(sys.argv[1:])
