"""Smoke tests: every jobs/ entry point runs and prints its table."""
import importlib
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(__file__), "..", "jobs")
sys.path.insert(0, os.path.abspath(JOBS_DIR))


def _job(name):
    return importlib.import_module(name)


class TestTable2Job:
    def test_run(self, capsys):
        mod = _job("table2_predicate_pool")
        out = mod.run(n_objects=300)
        assert set(out) == {"yelp", "winlog", "ycsb"}
        for rows in out.values():
            for r in rows:
                assert r["ours_#candidates"] == r["paper_#candidates"]

    def test_main_prints(self, capsys):
        mod = _job("table2_predicate_pool")
        mod.main(["--n-objects", "200"])
        captured = capsys.readouterr().out
        assert "Table II" in captured and "stars = <int>" in captured


class TestTable3Job:
    def test_run(self):
        mod = _job("table3_workloads")
        rows = mod.run("winlog")
        assert [r["workload"] for r in rows] == ["A", "B", "C"]
        for r in rows:
            assert r["ours_#preds"] > 0
            lo, hi = map(int, r["ours_min/max"].split("/"))
            assert 1 <= lo <= hi

    def test_main_prints(self, capsys):
        mod = _job("table3_workloads")
        mod.main(["--dataset", "ycsb"])
        assert "Table III" in capsys.readouterr().out


class TestTable4Job:
    def test_run_orders_platforms(self):
        mod = _job("table4_cost_model")
        rows = mod.run(n_objects=400, n_preds=25, n_lines=200, repeat=1)
        r2 = {r["platform"]: r["ours_R2"] for r in rows}
        assert set(r2) == {"Local Server", "Alibaba Cloud", "PKU Weiming"}
        assert r2["PKU Weiming"] > r2["Alibaba Cloud"]
        for r in rows:
            assert -1.0 <= r["ours_R2"] <= 1.0

    def test_main_prints(self, capsys):
        mod = _job("table4_cost_model")
        mod.main(["--n-objects", "300", "--n-preds", "20", "--repeat", "1"])
        assert "Table IV" in capsys.readouterr().out


class TestEndToEndJob:
    def test_run_driver_path(self, tmp_path):
        mod = _job("end_to_end")
        out = mod.run(
            "winlog", n_objects=400, n_queries=6, budgets=(0.0, 4.0),
            chunk_size=128, workdir=str(tmp_path),
        )
        assert set(out) == {"A", "B", "C"}
        for rows in out.values():
            assert rows[0]["budget_us"] == 0.0
            assert rows[0]["speedup_load"] == 1.0

    def test_main_prints(self, capsys, tmp_path):
        mod = _job("end_to_end")
        mod.main(
            [
                "--dataset", "winlog", "--n-objects", "300", "--n-queries", "4",
                "--budgets", "0,4", "--chunk-size", "128", "--no-spark",
                "--workdir", str(tmp_path),
            ]
        )
        assert "workload A" in capsys.readouterr().out


class TestFig6Job:
    def test_run(self, tmp_path):
        mod = _job("fig6_query_benefit")
        rows = mod.run(
            n_objects=300, n_queries=6, budgets=(0.0, 4.0),
            chunk_size=128, workdir=str(tmp_path),
        )
        assert len(rows) == 1
        assert 0.0 <= rows[0]["frac_faster"] <= 1.0


@pytest.mark.parametrize(
    "job,figs",
    [
        ("micro_selectivity", ("Fig 7", "Fig 8")),
        ("micro_overlap", ("Fig 9", "Fig 10")),
        ("micro_skewness", ("Fig 11", "Fig 12")),
    ],
)
def test_micro_jobs(job, figs, capsys, tmp_path):
    mod = _job(job)
    out = mod.run(n_objects=400, chunk_size=128, workdir=str(tmp_path))
    assert len(out["loading"]) == 3
    assert len(out["query"]) == 15
    mod.main(["--n-objects", "300", "--no-spark", "--workdir", str(tmp_path)])
    printed = capsys.readouterr().out
    for f in figs:
        assert f in printed
