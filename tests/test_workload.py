"""Tests for workload generation (Table III) and the skewness formula."""
import dataclasses

import numpy as np
import pandas as pd
import pytest

from repro.core.predicates import Clause, ExactMatch
from repro.workload.generator import (
    PAPER_TABLE3,
    TABLE3_SPECS,
    WorkloadSpec,
    estimate_selectivities,
    generate_workload,
    predicate_appearances,
    skewness_factor,
    workload_summary,
)
from repro.workload.templates import predicate_pool
from repro.data.datasets import winlog


class TestSkewnessFormula:
    def test_uniform_counts_zero(self):
        assert skewness_factor([2, 2, 2, 2]) == 0.0

    def test_symmetric_zero(self):
        assert skewness_factor([1, 2, 3]) == 0.0

    def test_right_skew_positive(self):
        assert skewness_factor([5, 1, 1, 1, 1, 1]) > 0

    def test_left_skew_negative(self):
        assert skewness_factor([5, 5, 5, 5, 1]) < 0

    def test_hand_computed(self):
        # X = [3, 1, 1, 1]; mean 1.5; devs 1.5,-.5,-.5,-.5
        x = [3, 1, 1, 1]
        sigma = np.sqrt(np.mean((np.array(x) - 1.5) ** 2))
        expected = (1.5**3 + 3 * (-0.5) ** 3) / (3 * sigma**3)
        assert skewness_factor(x) == pytest.approx(expected)

    def test_degenerate_cases(self):
        assert skewness_factor([5]) == 0.0
        assert skewness_factor([]) == 0.0
        assert skewness_factor([2, 2]) == 0.0


class TestSelectivityEstimation:
    def test_range_and_floor(self):
        ds = winlog(400, seed=0)
        pool = predicate_pool("winlog")[:40]
        sel = estimate_selectivities(pool, ds.parsed(), sample=200)
        assert all(1e-4 <= v <= 1.0 for v in sel.values())

    def test_exact_on_tiny_frame(self):
        pdf = pd.DataFrame({"a": ["x", "x", "y", "z"]})
        cl = Clause.of(ExactMatch("a", "x"))
        sel = estimate_selectivities([cl], pdf, sample=None)
        assert sel[cl.key()] == pytest.approx(0.5)

    def test_sampling_caps_rows(self):
        pdf = pd.DataFrame({"a": ["x"] * 1000})
        cl = Clause.of(ExactMatch("a", "x"))
        sel = estimate_selectivities([cl], pdf, sample=50)
        assert sel[cl.key()] == 1.0


class TestGenerateWorkload:
    POOL = predicate_pool("winlog")

    def test_table3_specs_shapes(self):
        assert set(TABLE3_SPECS) == {"A", "B", "C"}
        assert TABLE3_SPECS["A"].zipf_alpha == 1.5
        assert TABLE3_SPECS["B"].zipf_alpha == 2.0
        assert TABLE3_SPECS["C"].distribution == "uniform"
        for w in PAPER_TABLE3.values():
            assert w["min_max"][0] == 1

    def test_n_queries_and_min_one_pred(self):
        spec = dataclasses.replace(TABLE3_SPECS["C"], n_queries=40)
        qs = generate_workload(self.POOL, spec)
        s = workload_summary(qs)
        assert s["n_queries"] == 40
        assert s["min_preds"] >= 1

    def test_expected_preds_close_to_three(self):
        spec = dataclasses.replace(TABLE3_SPECS["C"], n_queries=300)
        qs = generate_workload(self.POOL, spec)
        s = workload_summary(qs)
        mean = s["n_predicates"] / s["n_queries"]
        assert 2.4 < mean < 3.8  # E=3 plus redraw-empty bias

    def test_deterministic_by_seed(self):
        spec = TABLE3_SPECS["A"]
        a = generate_workload(self.POOL, spec)
        b = generate_workload(self.POOL, spec)
        assert [q.where_sql() for q in a] == [q.where_sql() for q in b]

    def test_zipf_more_skewed_than_uniform(self):
        """Table III's point: A (Zipf 1.5) > B (Zipf 2) > C (uniform)
        in predicate skewness."""
        sk = {}
        for name in "ABC":
            spec = dataclasses.replace(TABLE3_SPECS[name], n_queries=150)
            qs = generate_workload(self.POOL, spec)
            sk[name] = skewness_factor(list(predicate_appearances(qs).values()))
        assert sk["A"] > sk["C"]
        assert sk["B"] > sk["C"]

    def test_clauses_come_from_pool(self):
        spec = dataclasses.replace(TABLE3_SPECS["B"], n_queries=25)
        qs = generate_workload(self.POOL, spec)
        pool_keys = {c.key() for c in self.POOL}
        for q in qs:
            for c in q.clauses:
                assert c.key() in pool_keys

    def test_unknown_distribution_raises(self):
        spec = WorkloadSpec("X", 5, 3.0, "normal")
        with pytest.raises(ValueError):
            generate_workload(self.POOL, spec)

    def test_appearance_counting(self):
        c1, c2 = self.POOL[0], self.POOL[1]
        from repro.core.predicates import Query

        qs = [Query.of(c1), Query.of(c1, c2)]
        apps = predicate_appearances(qs)
        assert apps[c1.key()] == 2 and apps[c2.key()] == 1
