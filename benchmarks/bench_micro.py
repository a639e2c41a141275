"""Benchmarks reproducing the micro-experiments (paper Figs. 7-12).

Driver-side execution (the per-query differences at this scale would be
drowned by Spark's per-query dispatch overhead; the Spark path is
correctness-tested in tests/). Each benchmark records loading times,
loading ratio and per-query times for baseline vs CIAO in
``extra_info``.
"""
import shutil
import tempfile

import pytest

from repro.data.datasets import winlog
from repro.harness import run_micro
from repro.workload.micro import (
    SELECTIVITY_LEVELS,
    achieved_skewness,
    overlap_workload,
    selectivity_workload,
    skewness_workload,
)

N_OBJECTS = 20_000
CHUNK = 1000


def _run(micro):
    ds = winlog(N_OBJECTS, seed=7)
    wd = tempfile.mkdtemp(prefix=f"bench-{micro.name}-")
    try:
        return run_micro(ds, micro, workdir=wd, chunk_size=CHUNK)
    finally:
        shutil.rmtree(wd, ignore_errors=True)


def _record(benchmark, res):
    benchmark.extra_info["result"] = {
        "workload": res.name,
        "partial": res.partial,
        "base_load_s": round(res.base_load_s, 4),
        "ciao_load_s": round(res.ciao_load_s, 4),
        "loading_ratio": round(res.loading_ratio, 4),
        "base_query_s": [round(t, 4) for t in res.base_query_s],
        "ciao_query_s": [round(t, 4) for t in res.ciao_query_s],
        "counts": res.counts,
    }


@pytest.mark.parametrize("level", list(SELECTIVITY_LEVELS))
def test_fig7_8_selectivity(benchmark, level):
    res = benchmark.pedantic(_run, args=(selectivity_workload(level),), rounds=1, iterations=1)
    _record(benchmark, res)
    # Fig 7's shape: partial loading on, ratio tracks selectivity.
    assert res.partial and res.loading_ratio < 1.0
    assert res.ciao_load_s < res.base_load_s


@pytest.mark.parametrize("level", ["L", "M", "H"])
def test_fig9_10_overlap(benchmark, level):
    res = benchmark.pedantic(_run, args=(overlap_workload(level),), rounds=1, iterations=1)
    _record(benchmark, res)
    # Fig 9's shape: only the high-overlap workload partial-loads.
    assert res.partial == (level == "H")
    if level == "H":
        assert res.ciao_load_s < res.base_load_s


@pytest.mark.parametrize("level", ["L", "M", "H"])
def test_fig11_12_skewness(benchmark, level):
    micro = skewness_workload(level)
    res = benchmark.pedantic(_run, args=(micro,), rounds=1, iterations=1)
    _record(benchmark, res)
    benchmark.extra_info["achieved_skew"] = round(achieved_skewness(micro), 3)
    # Fig 11's shape: only the fully-skewed workload partial-loads.
    assert res.partial == (level == "H")
