"""Tests for client-side prefiltering and bit-vector generation (Sec. IV)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.client import (
    DEFAULT_CHUNK_SIZE,
    iter_chunks,
    pack_bits,
    prefilter,
    prefilter_chunk,
    prefilter_spark,
    unpack_bits,
)
from repro.core.predicates import Clause, ExactMatch, KeyValueMatch, SubstringMatch
from repro.data.datasets import winlog, yelp


class TestChunking:
    def test_even_split(self):
        chunks = list(iter_chunks(list("abcdef"), 2))
        assert chunks == [["a", "b"], ["c", "d"], ["e", "f"]]

    def test_ragged_tail(self):
        chunks = list(iter_chunks(list("abcde"), 2))
        assert chunks[-1] == ["e"]

    def test_single_chunk(self):
        assert list(iter_chunks(["x"], 100)) == [["x"]]

    def test_empty_input(self):
        assert list(iter_chunks([], 10)) == []

    def test_bad_chunk_size(self):
        with pytest.raises(ValueError):
            list(iter_chunks(["x"], 0))

    def test_default_chunk_size_is_paper_1k(self):
        assert DEFAULT_CHUNK_SIZE == 1000


class TestPrefilterChunk:
    LINES = [
        '{"name": "Bob", "age": 10}',
        '{"name": "Alice", "age": 22}',
        '{"name": "John", "age": 10}',
    ]

    def test_bitvector_per_clause(self):
        c1 = Clause.of(ExactMatch("name", "Bob"))
        c2 = Clause.of(KeyValueMatch("age", 10))
        bvs = prefilter_chunk(self.LINES, [c1, c2])
        assert set(bvs) == {c1.key(), c2.key()}
        assert bvs[c1.key()].tolist() == [True, False, False]
        assert bvs[c2.key()].tolist() == [True, False, True]

    def test_no_clauses_empty_dict(self):
        assert prefilter_chunk(self.LINES, []) == {}

    def test_matches_scalar_eval_on_dataset(self):
        ds = winlog(300, seed=3)
        clauses = [
            Clause.of(SubstringMatch("info", "evt001")),
            Clause.of(ExactMatch("level", "Error")),
            Clause.of(SubstringMatch("time", "-03-")),
        ]
        bvs = prefilter_chunk(ds.lines, clauses)
        for cl in clauses:
            expected = [cl.eval_raw(ln) for ln in ds.lines]
            assert bvs[cl.key()].tolist() == expected


class TestPrefilter:
    def test_chunked_result_shapes(self):
        ds = yelp(250, seed=1)
        clauses = [Clause.of(SubstringMatch("text", "delicious"))]
        res = prefilter(ds.lines, clauses, chunk_size=100)
        assert res.n_objects == 250
        assert len(res.chunk_bitvectors) == 3
        assert [len(next(iter(b.values()))) for b in res.chunk_bitvectors] == [100, 100, 50]
        assert res.elapsed_s > 0
        assert res.per_record_us > 0

    def test_concatenated_equals_unchunked(self):
        ds = yelp(150, seed=2)
        cl = Clause.of(KeyValueMatch("stars", 5))
        res = prefilter(ds.lines, [cl], chunk_size=40)
        whole = prefilter_chunk(ds.lines, [cl])[cl.key()]
        cat = np.concatenate([b[cl.key()] for b in res.chunk_bitvectors])
        assert cat.tolist() == whole.tolist()


class TestBitPacking:
    def test_roundtrip_simple(self):
        bits = np.array([True, False, True, True, False])
        assert unpack_bits(pack_bits(bits), 5).tolist() == bits.tolist()

    def test_empty(self):
        assert unpack_bits(pack_bits(np.array([], dtype=bool)), 0).tolist() == []

    @given(st.lists(st.booleans(), max_size=300))
    @settings(max_examples=100, deadline=None)
    def test_roundtrip_property(self, bits):
        arr = np.array(bits, dtype=bool)
        assert unpack_bits(pack_bits(arr), len(bits)).tolist() == bits


class TestPrefilterSpark:
    def test_distributed_matches_sequential(self, spark):
        ds = winlog(400, seed=5)
        clauses = [
            Clause.of(SubstringMatch("info", "evt000")),
            Clause.of(ExactMatch("level", "Warning")),
        ]
        import pandas as pd

        lines_df = spark.createDataFrame(
            pd.DataFrame({"seq": range(len(ds.lines)), "raw": list(ds.lines)})
        )
        out = prefilter_spark(spark, lines_df, clauses, chunk_size=150).toPandas()
        seq = prefilter(ds.lines, clauses, chunk_size=150)
        assert sorted(out["chunk_id"].unique().tolist()) == [0, 1, 2]
        for _, row in out.iterrows():
            expected = seq.chunk_bitvectors[int(row["chunk_id"])][
                clauses[int(row["pred_idx"])].key()
            ]
            got = unpack_bits(row["bits"], int(row["n"]))
            assert got.tolist() == expected.tolist()
