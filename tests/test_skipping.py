"""Tests for query-time data skipping over a CIAO store (Sec. VI-B)."""
import json

import duckdb
import pytest

from repro.core.predicates import Clause, ExactMatch, KeyValueMatch, Query, SubstringMatch
from repro.core.skipping import ScanPlan, match_pushed, scan_count
from repro.core.storage import Manifest, build_store
from repro.core.client import pack_bits, unpack_bits
from repro.data.datasets import winlog, ycsb, yelp


def _duck_count(parsed, query: Query) -> int:
    con = duckdb.connect()
    con.register("t", parsed)
    n = con.execute(query.count_sql("t")).fetchone()[0]
    con.close()
    return int(n)


PUSHED = [
    Clause.of(SubstringMatch("info", "evt000")),
    Clause.of(ExactMatch("level", "Error")),
    Clause.of(SubstringMatch("time", "-01-")),
]


@pytest.fixture(scope="module")
def store(tmp_path_factory):
    ds = winlog(400, seed=6)
    path = str(tmp_path_factory.mktemp("store") / "s")
    build_store(path, ds.lines, ds.schema, PUSHED, chunk_size=128)
    return ds, path


class TestScanPlan:
    def test_covered_query_skips_raw(self, store):
        _, path = store
        m = Manifest.load(path)
        q = Query.of(PUSHED[0], Clause.of(ExactMatch("component", "CBS")))
        plan = ScanPlan.plan(m, q.clause_keys())
        assert plan.matched_ids == [m.pred_ids[PUSHED[0].key()]]
        assert not plan.scan_raw

    def test_uncovered_query_scans_raw(self, store):
        _, path = store
        m = Manifest.load(path)
        q = Query.of(Clause.of(ExactMatch("component", "CBS")))
        plan = ScanPlan.plan(m, q.clause_keys())
        assert plan.matched_ids == [] and plan.scan_raw

    def test_multiple_matches_intersect(self, store):
        _, path = store
        m = Manifest.load(path)
        q = Query.of(PUSHED[0], PUSHED[2])
        plan = ScanPlan.plan(m, q.clause_keys())
        assert len(plan.matched_ids) == 2

    def test_match_pushed_ignores_unknown(self, store):
        _, path = store
        m = Manifest.load(path)
        unknown = Clause.of(ExactMatch("level", "Info"))
        assert match_pushed(m, [unknown.key(), PUSHED[1].key()]) == [
            m.pred_ids[PUSHED[1].key()]
        ]

    def test_eager_store_never_scans_raw(self, tmp_path):
        ds = winlog(100, seed=1)
        path = str(tmp_path / "s")
        build_store(path, ds.lines, ds.schema, [], chunk_size=50)
        m = Manifest.load(path)
        plan = ScanPlan.plan(m, [Clause.of(ExactMatch("level", "Info")).key()])
        assert not plan.scan_raw and plan.matched_ids == []


class TestScanCount:
    @pytest.mark.parametrize(
        "mk_query",
        [
            lambda: Query.of(PUSHED[0]),
            lambda: Query.of(PUSHED[1]),
            lambda: Query.of(PUSHED[0], PUSHED[2]),
            lambda: Query.of(PUSHED[0], Clause.of(ExactMatch("component", "CBS"))),
            lambda: Query.of(Clause.of(ExactMatch("component", "CBS"))),  # uncovered
            lambda: Query.of(Clause.of(SubstringMatch("info", "evt001"))),  # uncovered
            lambda: Query.of(Clause.of(PUSHED[0].preds[0], PUSHED[1].preds[0])),  # disjunction, unpushed
        ],
        ids=["covered1", "covered2", "covered-pair", "mixed", "uncovered-exact", "uncovered-substr", "uncovered-disj"],
    )
    def test_exact_counts_vs_duckdb(self, store, mk_query):
        ds, path = store
        q = mk_query()
        st = scan_count(path, q)
        assert st.result_count == _duck_count(ds.parsed(), q)

    def test_covered_query_skips_rows(self, store):
        _, path = store
        st = scan_count(path, Query.of(PUSHED[1]))
        assert st.rows_skipped > 0
        assert st.raw_parsed == 0

    def test_uncovered_query_parses_raw(self, store):
        _, path = store
        st = scan_count(path, Query.of(Clause.of(ExactMatch("component", "CBS"))))
        assert st.raw_parsed > 0

    def test_conjunction_intersects_bitvectors(self, store):
        _, path = store
        single = scan_count(path, Query.of(PUSHED[0]))
        pair = scan_count(path, Query.of(PUSHED[0], PUSHED[2]))
        assert pair.rows_scanned <= single.rows_scanned
        assert pair.result_count <= single.result_count

    def test_non_partial_store_counts(self, tmp_path):
        ds = winlog(200, seed=2)
        path = str(tmp_path / "s")
        build_store(path, ds.lines, ds.schema, PUSHED, chunk_size=64, partial=False)
        for q in [Query.of(PUSHED[0]), Query.of(Clause.of(ExactMatch("component", "CBS")))]:
            assert scan_count(path, q).result_count == _duck_count(ds.parsed(), q)

    def test_skipping_is_actually_applied(self, store, tmp_path):
        """Corrupt one sidecar bit: a covered query must now miss that
        row — proving the bit-vector path is live, not decorative."""
        ds, _ = store
        path = str(tmp_path / "corrupt")
        build_store(path, ds.lines, ds.schema, PUSHED, chunk_size=128)
        m = Manifest.load(path)
        q = Query.of(PUSHED[1])
        honest = scan_count(path, q)
        assert honest.result_count > 0
        pid = m.pred_ids[PUSHED[1].key()]
        flipped = 0
        for chunk in m.chunks:
            n, bvs = m.read_bitvectors(chunk)
            if bvs[pid].any() and not flipped:
                idx = int(bvs[pid].argmax())
                bvs[pid][idx] = False
                flipped += 1
                side = {
                    "n": n,
                    "bitvectors": {str(i): pack_bits(b) for i, b in bvs.items()},
                }
                with open(m.chunk_bv(chunk), "w") as f:
                    json.dump(side, f)
        assert flipped == 1
        corrupted = scan_count(path, q)
        # One fewer row survives the bit-vector; the count drops iff the
        # dropped row was a true match (it was: bits of this store come
        # from eval_raw, and an Error-level row is never a false positive
        # for the exact-match pattern... but we only rely on <=).
        assert corrupted.rows_scanned == honest.rows_scanned - 1
        assert corrupted.result_count <= honest.result_count


@pytest.mark.parametrize("gen", [yelp, ycsb], ids=["yelp", "ycsb"])
def test_other_datasets_counts(gen, tmp_path):
    ds = gen(250, seed=11)
    pushed = {
        "yelp": [Clause.of(KeyValueMatch("stars", 5)), Clause.of(SubstringMatch("text", "delicious"))],
        "ycsb": [Clause.of(KeyValueMatch("isActive", True)), Clause.of(ExactMatch("age_group", "adult"))],
    }[ds.name]
    path = str(tmp_path / "s")
    build_store(path, ds.lines, ds.schema, pushed, chunk_size=64)
    queries = [
        Query.of(pushed[0]),
        Query.of(pushed[1]),
        Query.of(pushed[0], pushed[1]),
    ]
    parsed = ds.parsed()
    for q in queries:
        assert scan_count(path, q).result_count == _duck_count(parsed, q)
