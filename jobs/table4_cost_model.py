"""Reproduce paper Table IV: cost-model calibration R² per platform.

For each dataset: draw 100 random predicates from its pool, measure the
per-object evaluation cost of each on sample lines (real measurements on
this container = the "Local Server" row), replay the measurements under
the simulated Alibaba-Cloud and PKU-Weiming noise profiles (see
DESIGN.md § Substitutions), fit the Sec. V-D linear model per platform,
and print R² next to the paper's.

Usage: python jobs/table4_cost_model.py [--n-objects N] [--n-preds 100]
"""
from __future__ import annotations

import sys

import numpy as np

from _common import base_parser, print_table

from repro.core import cost_model as cm
from repro.data.datasets import DATASETS
from repro.workload.generator import estimate_selectivities
from repro.workload.templates import predicate_pool

PAPER_TABLE4 = {"local": 0.897, "cloud": 0.666, "hpc": 0.978}


def run(
    n_objects: int = 2000,
    n_preds: int = 100,
    n_lines: int = 500,
    repeat: int = 3,
    seed: int = 7,
) -> list[dict]:
    g = np.random.default_rng(seed)
    # Pool measured samples across the three datasets, as the paper
    # randomly chooses 100 predicates "respectively from three datasets".
    all_samples: list[cm.CalibrationSample] = []
    for name, gen in DATASETS.items():
        ds = gen(n_objects, seed=seed)
        pool = predicate_pool(name)
        picks = [pool[i] for i in g.choice(len(pool), size=min(n_preds, len(pool)), replace=False)]
        sel = estimate_selectivities(picks, ds.parsed(), sample=500)
        lines = list(ds.lines[:n_lines])
        all_samples += cm.collect_samples(
            picks, lines, [sel[c.key()] for c in picks], repeat=repeat
        )
    rows = []
    for key, profile in cm.PLATFORMS.items():
        if key == "local":
            samples = all_samples  # genuine container measurements
        else:
            samples = cm.simulate_platform(all_samples, profile, seed=seed)
        model, r2 = cm.calibrate(samples)
        rows.append(
            {
                "platform": profile.name,
                "hardware": profile.hardware,
                "ours_R2": round(r2, 3),
                "paper_R2": PAPER_TABLE4[key],
            }
        )
    return rows


def main(argv=None) -> list[dict]:
    p = base_parser(__doc__)
    p.add_argument("--n-preds", type=int, default=100)
    p.add_argument("--repeat", type=int, default=3)
    args = p.parse_args(argv)
    rows = run(args.n_objects, args.n_preds, repeat=args.repeat, seed=args.seed)
    print_table("Table IV — cost-model calibration", rows)
    return rows


if __name__ == "__main__":
    main(sys.argv[1:])
