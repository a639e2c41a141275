"""Tests for the Spark Python DataSource V2 with filter push-down."""
import json

import pytest
from pyspark.sql import functions as F
from pyspark.sql.datasource import EqualTo, In, IsNotNull, IsNull, Not, StringContains

from repro.core.client import pack_bits
from repro.core.predicates import Clause, ExactMatch, KeyValueMatch, Query, SubstringMatch
from repro.core.skipping import scan_count
from repro.core.storage import Manifest, build_store
from repro.data.datasets import winlog, ycsb, yelp
from repro.datasource import filters_to_clause_keys, register_ciao
from repro.datasource.ciao_source import CiaoReader
from repro.oracle import assert_equivalent

PUSHED = [
    Clause.of(SubstringMatch("info", "evt000")),
    Clause.of(ExactMatch("level", "Error")),
    Clause.of(SubstringMatch("time", "-01-")),
]


@pytest.fixture(scope="module")
def winlog_store(tmp_path_factory):
    ds = winlog(400, seed=8)
    path = str(tmp_path_factory.mktemp("wl") / "store")
    build_store(path, ds.lines, ds.schema, PUSHED, chunk_size=128)
    return ds, path


@pytest.fixture(scope="module")
def ciao(spark):
    register_ciao(spark)
    return spark


# ----------------------------------------------------------------------
# Filter -> clause-key mapping
# ----------------------------------------------------------------------


class TestFilterMapping:
    def test_equalto_string_is_exact(self):
        keys = filters_to_clause_keys([EqualTo(("level",), "Error")])
        assert keys[0] == Clause.of(ExactMatch("level", "Error")).key()

    def test_equalto_int_is_kv(self):
        keys = filters_to_clause_keys([EqualTo(("stars",), 5)])
        assert keys[0] == Clause.of(KeyValueMatch("stars", 5)).key()

    def test_equalto_bool_is_kv(self):
        keys = filters_to_clause_keys([EqualTo(("isActive",), True)])
        assert keys[0] == Clause.of(KeyValueMatch("isActive", True)).key()

    def test_string_contains_is_substr(self):
        keys = filters_to_clause_keys([StringContains(("info",), "evt000")])
        assert keys[0] == Clause.of(SubstringMatch("info", "evt000")).key()

    def test_isnotnull_is_presence(self):
        from repro.core.predicates import KeyPresence

        keys = filters_to_clause_keys([IsNotNull(("email",))])
        assert keys[0] == Clause.of(KeyPresence("email")).key()

    def test_in_is_disjunction(self):
        keys = filters_to_clause_keys([In(("name",), ("Bob", "John"))])
        expected = Clause.of(ExactMatch("name", "Bob"), ExactMatch("name", "John"))
        assert keys[0] == expected.key()

    def test_unsupported_filters_skipped(self):
        keys = filters_to_clause_keys(
            [IsNull(("a",)), Not(EqualTo(("a",), "x")), EqualTo(("a",), None)]
        )
        assert keys == {}

    def test_nested_column_skipped(self):
        assert filters_to_clause_keys([EqualTo(("a", "b"), "x")]) == {}

    def test_indices_preserved(self):
        keys = filters_to_clause_keys(
            [IsNull(("a",)), EqualTo(("level",), "Error")]
        )
        assert list(keys) == [1]


# ----------------------------------------------------------------------
# Reader unit behaviour
# ----------------------------------------------------------------------


class TestReader:
    def test_push_filters_returns_all_residual(self, winlog_store):
        _, path = winlog_store
        r = CiaoReader(path)
        filters = [EqualTo(("level",), "Error"), StringContains(("info",), "zzz")]
        residual = list(r.pushFilters(filters))
        assert residual == filters  # false positives => Spark re-checks all

    def test_matched_ids_set(self, winlog_store):
        _, path = winlog_store
        m = Manifest.load(path)
        r = CiaoReader(path)
        r.pushFilters([EqualTo(("level",), "Error")])
        assert r._matched_ids == [m.pred_ids[PUSHED[1].key()]]

    def test_partitions_covered_parquet_only(self, winlog_store):
        _, path = winlog_store
        r = CiaoReader(path)
        r.pushFilters([EqualTo(("level",), "Error")])
        kinds = {p.kind for p in r.partitions()}
        assert kinds == {"parquet"}

    def test_partitions_uncovered_include_raw(self, winlog_store):
        _, path = winlog_store
        r = CiaoReader(path)
        r.pushFilters([EqualTo(("component",), "CBS")])
        kinds = [p.kind for p in r.partitions()]
        assert kinds.count("raw") == kinds.count("parquet") == 4

    def test_no_pushdown_call_scans_everything(self, winlog_store):
        _, path = winlog_store
        r = CiaoReader(path)
        kinds = {p.kind for p in r.partitions()}
        assert kinds == {"parquet", "raw"}

    def test_missing_path_rejected(self):
        with pytest.raises(ValueError):
            CiaoReader("")


# ----------------------------------------------------------------------
# Full Spark integration, oracle-checked
# ----------------------------------------------------------------------


def _ciao_df(spark, path):
    return spark.read.format("ciao").load(path)


class TestSparkIntegration:
    def test_full_scan_equals_parsed(self, ciao, winlog_store):
        ds, path = winlog_store
        df = _ciao_df(ciao, path)
        assert_equivalent(df, "SELECT * FROM t", t=ds.parsed())

    def test_schema_matches_store(self, ciao, winlog_store):
        ds, path = winlog_store
        df = _ciao_df(ciao, path)
        assert [f.name for f in df.schema.fields] == [n for n, _ in ds.schema]

    @pytest.mark.parametrize(
        "where",
        [
            "info LIKE '%evt000%'",
            "level = 'Error'",
            "time LIKE '%-01-%'",
            "info LIKE '%evt000%' AND time LIKE '%-01-%'",
            "level = 'Error' AND component = 'CBS'",
            "component = 'CBS'",
            "level IN ('Error', 'Warning')",
            "info LIKE '%evt001%'",
        ],
    )
    def test_counts_match_oracle(self, ciao, winlog_store, where):
        ds, path = winlog_store
        df = (
            _ciao_df(ciao, path)
            .where(where)
            .select(F.count(F.lit(1)).alias("cnt"))
        )
        assert_equivalent(
            df, f"SELECT COUNT(*) AS cnt FROM t WHERE {where}", t=ds.parsed()
        )

    def test_projection_after_filter(self, ciao, winlog_store):
        ds, path = winlog_store
        df = _ciao_df(ciao, path).where("level = 'Error'").select("level", "component")
        assert_equivalent(
            df, "SELECT level, component FROM t WHERE level = 'Error'", t=ds.parsed()
        )

    def test_pushdown_skipping_is_live(self, ciao, tmp_path):
        """Flip every set bit of one pushed predicate to 0. If the scan
        consults bit-vectors, a query on that predicate now returns 0
        rows; if skipping were decorative, Spark's residual filter would
        still find the matches."""
        ds = winlog(300, seed=12)
        path = str(tmp_path / "store")
        build_store(path, ds.lines, ds.schema, PUSHED, chunk_size=100)
        m = Manifest.load(path)
        pid = m.pred_ids[PUSHED[1].key()]
        for chunk in m.chunks:
            n, bvs = m.read_bitvectors(chunk)
            bvs[pid][:] = False
            side = {"n": n, "bitvectors": {str(i): pack_bits(b) for i, b in bvs.items()}}
            with open(m.chunk_bv(chunk), "w") as f:
                json.dump(side, f)
        df = _ciao_df(ciao, path).where("level = 'Error'")
        true_count = int((ds.parsed()["level"] == "Error").sum())
        assert true_count > 0
        assert df.count() == 0  # all matches skipped => pushdown is live

    def test_eager_store_baseline_path(self, ciao, tmp_path):
        ds = winlog(200, seed=13)
        path = str(tmp_path / "store")
        build_store(path, ds.lines, ds.schema, [], chunk_size=64)
        df = _ciao_df(ciao, path).where("level = 'Info'").select(
            F.count(F.lit(1)).alias("cnt")
        )
        assert_equivalent(
            df, "SELECT COUNT(*) AS cnt FROM t WHERE level = 'Info'", t=ds.parsed()
        )

    def test_spark_matches_driver_scanner(self, ciao, winlog_store):
        ds, path = winlog_store
        queries = [
            Query.of(PUSHED[0]),
            Query.of(PUSHED[1], Clause.of(ExactMatch("component", "CBS"))),
            Query.of(Clause.of(SubstringMatch("info", "evt002"))),
        ]
        for q in queries:
            df = _ciao_df(ciao, path).where(q.where_sql())
            assert df.count() == scan_count(path, q).result_count


@pytest.mark.parametrize("gen", [yelp, ycsb], ids=["yelp", "ycsb"])
def test_other_datasets_spark_counts(gen, ciao, tmp_path):
    ds = gen(250, seed=14)
    pushed = {
        "yelp": [Clause.of(KeyValueMatch("stars", 5)), Clause.of(SubstringMatch("text", "delicious"))],
        "ycsb": [Clause.of(KeyValueMatch("isActive", True)), Clause.of(ExactMatch("age_group", "adult"))],
    }[ds.name]
    path = str(tmp_path / "store")
    build_store(path, ds.lines, ds.schema, pushed, chunk_size=64)
    wheres = {
        "yelp": ["stars = 5", "text LIKE '%delicious%'", "stars = 5 AND useful = 0"],
        "ycsb": ["isActive = true", "age_group = 'adult'", "isActive = true AND children = 2"],
    }[ds.name]
    for where in wheres:
        df = (
            ciao.read.format("ciao").load(path)
            .where(where)
            .select(F.count(F.lit(1)).alias("cnt"))
        )
        assert_equivalent(
            df, f"SELECT COUNT(*) AS cnt FROM t WHERE {where}", t=ds.parsed()
        )
