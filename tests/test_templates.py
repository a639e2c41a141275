"""Tests for the Table II predicate template pools."""
import pytest

from repro.data.datasets import DATASETS
from repro.workload.generator import estimate_selectivities
from repro.workload.templates import (
    PAPER_TABLE2,
    predicate_pool,
    template_summary,
    templates,
)

POOL_SIZES = {"yelp": 341, "winlog": 387, "ycsb": 337}


@pytest.mark.parametrize("dataset", ["yelp", "winlog", "ycsb"])
class TestTable2:
    def test_candidate_counts_match_paper(self, dataset):
        """The Table II reproduction: identical template list and
        candidate counts."""
        assert template_summary(dataset) == PAPER_TABLE2[dataset]

    def test_pool_size(self, dataset):
        assert len(predicate_pool(dataset)) == POOL_SIZES[dataset]

    def test_clause_keys_unique(self, dataset):
        pool = predicate_pool(dataset)
        assert len({c.key() for c in pool}) == len(pool)

    def test_columns_exist_in_schema(self, dataset):
        ds = DATASETS[dataset](5, seed=0)
        cols = {c for c, _ in ds.schema}
        for t in templates(dataset):
            for cl in t.clauses:
                for p in cl.preds:
                    assert p.column in cols, (t.name, p)

    def test_templates_hit_data(self, dataset):
        """Each template has at least one candidate with selectivity
        above the floor on a reasonable sample — the pools are not dead
        weight on the synthetic data."""
        ds = DATASETS[dataset](800, seed=0)
        parsed = ds.parsed()
        for t in templates(dataset):
            sel = estimate_selectivities(t.clauses, parsed, sample=400)
            assert max(sel.values()) > 1e-3, t.name

    def test_selectivities_span_a_range(self, dataset):
        """The experiments need both selective and unselective
        predicates in each pool."""
        ds = DATASETS[dataset](800, seed=0)
        sel = estimate_selectivities(predicate_pool(dataset), ds.parsed(), sample=400)
        vals = sorted(sel.values())
        assert vals[0] < 0.01
        assert vals[-1] > 0.2

    def test_no_false_negatives_on_real_lines(self, dataset):
        """Every pool clause respects the raw/parsed contract on actual
        generated lines."""
        ds = DATASETS[dataset](150, seed=1)
        parsed = ds.parsed().to_dict("records")
        for cl in predicate_pool(dataset)[::7]:  # sampled for speed
            for rec, ln in zip(parsed, ds.lines):
                if cl.eval_parsed(rec):
                    assert cl.eval_raw(ln), (cl, ln)
