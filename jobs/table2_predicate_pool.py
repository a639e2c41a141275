"""Reproduce paper Table II: predicate templates and candidate counts.

Prints, per dataset, each template with our candidate count next to the
paper's, plus the estimated selectivity range the candidates span on the
synthetic data (the property the experiments rely on).

Usage: python jobs/table2_predicate_pool.py [--n-objects N]
"""
from __future__ import annotations

import sys

from _common import base_parser, print_table

from repro.data.datasets import DATASETS
from repro.workload.generator import estimate_selectivities
from repro.workload.templates import PAPER_TABLE2, templates


def run(n_objects: int = 2000, seed: int = 7) -> dict[str, list[dict]]:
    out: dict[str, list[dict]] = {}
    for name, gen in DATASETS.items():
        ds = gen(n_objects, seed=seed)
        parsed = ds.parsed()
        paper = dict(PAPER_TABLE2[name])
        rows = []
        for t in templates(name):
            sel = estimate_selectivities(t.clauses, parsed, sample=500)
            vals = sorted(sel.values())
            rows.append(
                {
                    "template": t.name,
                    "ours_#candidates": t.n_candidates,
                    "paper_#candidates": paper[t.name],
                    "sel_min": round(vals[0], 4),
                    "sel_max": round(vals[-1], 4),
                }
            )
        out[name] = rows
    return out


def main(argv=None) -> dict:
    p = base_parser(__doc__)
    args = p.parse_args(argv)
    result = run(args.n_objects, args.seed)
    for name, rows in result.items():
        print_table(f"Table II — {name}", rows)
    return result


if __name__ == "__main__":
    main(sys.argv[1:])
