"""Unit tests for the string-based predicate engine (paper Sec. IV, Table I)."""
import json

import duckdb
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.predicates import (
    Clause,
    ExactMatch,
    KeyPresence,
    KeyValueMatch,
    Query,
    SubstringMatch,
)

# ----------------------------------------------------------------------
# Table I mirror — each supported predicate row, its example, its pattern
# ----------------------------------------------------------------------


class TestTable1Patterns:
    def test_exact_match_pattern_is_quoted_value(self):
        assert ExactMatch("name", "Bob").pattern_strings() == ['"Bob"']

    def test_substring_match_pattern_is_bare_substring(self):
        assert SubstringMatch("text", "delicious").pattern_strings() == ["delicious"]

    def test_key_presence_pattern_is_quoted_key(self):
        assert KeyPresence("email").pattern_strings() == ['"email"']

    def test_key_value_match_has_two_patterns(self):
        assert KeyValueMatch("age", 10).pattern_strings() == ['"age"', "10"]

    def test_table1_sql_forms(self):
        assert ExactMatch("name", "Bob").to_sql() == "name = 'Bob'"
        assert SubstringMatch("text", "delicious").to_sql() == "text LIKE '%delicious%'"
        assert KeyPresence("email").to_sql() == "email IS NOT NULL"
        assert KeyValueMatch("age", 10).to_sql() == "age = 10"


# ----------------------------------------------------------------------
# Raw evaluation semantics
# ----------------------------------------------------------------------


class TestExactMatch:
    p = ExactMatch("name", "Bob")

    def test_hit(self):
        assert self.p.eval_raw('{"name": "Bob", "age": 22}')

    def test_miss(self):
        assert not self.p.eval_raw('{"name": "Alice", "age": 22}')

    def test_false_positive_value_under_other_key(self):
        # Paper Sec. IV-B: "Bob" under another key must (and may) match.
        assert self.p.eval_raw('{"nick": "Bob", "name": "Al"}')

    def test_no_partial_word_match(self):
        # Quoted pattern: "Bob" does not match value "Bobby".
        assert not self.p.eval_raw('{"name": "Bobby"}')

    def test_eval_parsed_exact(self):
        assert self.p.eval_parsed({"name": "Bob"})
        assert not self.p.eval_parsed({"name": "Bobby"})
        assert not self.p.eval_parsed({})


class TestSubstringMatch:
    p = SubstringMatch("text", "delicious")

    def test_hit_inside_value(self):
        assert self.p.eval_raw('{"text": "so delicious wow"}')

    def test_miss(self):
        assert not self.p.eval_raw('{"text": "bland"}')

    def test_false_positive_in_other_field(self):
        assert self.p.eval_raw('{"title": "delicious", "text": "meh"}')

    def test_eval_parsed_requires_column(self):
        assert self.p.eval_parsed({"text": "very delicious"})
        assert not self.p.eval_parsed({"title": "delicious"})
        assert not self.p.eval_parsed({"text": None})

    def test_like_metacharacters_rejected_in_sql(self):
        with pytest.raises(ValueError):
            SubstringMatch("text", "50%").to_sql()


class TestKeyPresence:
    p = KeyPresence("email")

    def test_hit(self):
        assert self.p.eval_raw('{"email": "a@b.c"}')

    def test_miss(self):
        assert not self.p.eval_raw('{"name": "Bob"}')

    def test_eval_parsed_null_is_absent(self):
        assert not self.p.eval_parsed({"email": None})
        assert self.p.eval_parsed({"email": "x"})


class TestKeyValueMatch:
    p = KeyValueMatch("age", 10)

    def test_hit(self):
        assert self.p.eval_raw('{"name": "Bob", "age": 10}')

    def test_miss_wrong_value(self):
        assert not self.p.eval_raw('{"name": "Bob", "age": 22}')

    def test_false_positive_superstring_value(self):
        # 10 inside 100 is a false positive — allowed, caught by residual.
        assert self.p.eval_raw('{"age": 100}')
        assert not self.p.eval_parsed({"age": 100})

    def test_value_after_comma_not_matched(self):
        # The search window ends at the first comma after the key.
        assert not self.p.eval_raw('{"age": 9, "height": 10}')

    def test_key_occurrence_inside_earlier_value_not_false_negative(self):
        # "age" appears inside a text value before the real key; the
        # scan must try every occurrence (no false negative).
        line = json.dumps({"text": 'my "age" is secret', "age": 10})
        assert self.p.eval_raw(line)

    def test_bool_value(self):
        q = KeyValueMatch("isActive", True)
        assert q.eval_raw('{"isActive": true}')
        assert not q.eval_raw('{"isActive": false}')
        assert q.to_sql() == "isActive = true"

    def test_eval_parsed_bool_not_int(self):
        q = KeyValueMatch("flag", True)
        assert not q.eval_parsed({"flag": 1})
        assert q.eval_parsed({"flag": True})
        p1 = KeyValueMatch("n", 1)
        assert not p1.eval_parsed({"n": True})
        assert p1.eval_parsed({"n": 1})


# ----------------------------------------------------------------------
# Clause (disjunction) and Query (conjunction)
# ----------------------------------------------------------------------


class TestClause:
    def test_empty_clause_rejected(self):
        with pytest.raises(ValueError):
            Clause(())

    def test_or_semantics_raw(self):
        c = Clause.of(ExactMatch("name", "Bob"), ExactMatch("name", "John"))
        assert c.eval_raw('{"name": "John"}')
        assert c.eval_raw('{"name": "Bob"}')
        assert not c.eval_raw('{"name": "Al"}')

    def test_or_semantics_parsed(self):
        c = Clause.of(ExactMatch("name", "Bob"), ExactMatch("name", "John"))
        assert c.eval_parsed({"name": "John"})
        assert not c.eval_parsed({"name": "Al"})

    def test_key_is_order_insensitive(self):
        a = Clause.of(ExactMatch("name", "Bob"), ExactMatch("name", "John"))
        b = Clause.of(ExactMatch("name", "John"), ExactMatch("name", "Bob"))
        assert a.key() == b.key()

    def test_distinct_clauses_distinct_keys(self):
        a = Clause.of(ExactMatch("name", "Bob"))
        b = Clause.of(ExactMatch("name", "John"))
        c = Clause.of(KeyValueMatch("name", 1))
        assert len({a.key(), b.key(), c.key()}) == 3

    def test_pattern_strings_concatenate(self):
        c = Clause.of(ExactMatch("a", "x"), KeyValueMatch("b", 2))
        assert c.pattern_strings() == ['"x"', '"b"', "2"]

    def test_disjunction_sql(self):
        c = Clause.of(ExactMatch("name", "Bob"), ExactMatch("name", "John"))
        assert c.to_sql() == "(name = 'Bob' OR name = 'John')"

    def test_sql_quote_escapes_single_quote(self):
        assert ExactMatch("name", "O'Brien").to_sql() == "name = 'O''Brien'"


class TestQuery:
    def test_where_and_count_sql(self):
        q = Query.of(
            Clause.of(ExactMatch("name", "Bob")), Clause.of(KeyValueMatch("age", 10))
        )
        assert q.where_sql() == "name = 'Bob' AND age = 10"
        assert q.count_sql("t") == "SELECT COUNT(*) AS cnt FROM t WHERE name = 'Bob' AND age = 10"

    def test_empty_query_is_true(self):
        assert Query.of().where_sql() == "TRUE"

    def test_conjunction_parsed(self):
        q = Query.of(
            Clause.of(ExactMatch("name", "Bob")), Clause.of(KeyValueMatch("age", 10))
        )
        assert q.eval_parsed({"name": "Bob", "age": 10})
        assert not q.eval_parsed({"name": "Bob", "age": 11})

    def test_clause_keys(self):
        c1, c2 = Clause.of(ExactMatch("a", "x")), Clause.of(KeyPresence("b"))
        assert Query.of(c1, c2).clause_keys() == [c1.key(), c2.key()]


# ----------------------------------------------------------------------
# SQL semantics agree with DuckDB (predicate-level ground truth)
# ----------------------------------------------------------------------

_ROWS = [
    {"name": "Bob", "age": 10, "text": "a delicious pie", "email": "b@x.y", "ok": True},
    {"name": "Bobby", "age": 100, "text": "bland", "email": None, "ok": False},
    {"name": "John", "age": 10, "text": None, "email": "j@x.y", "ok": True},
    {"name": None, "age": None, "text": "delicious!", "email": None, "ok": None},
]


@pytest.mark.parametrize(
    "pred",
    [
        ExactMatch("name", "Bob"),
        ExactMatch("name", "Nobody"),
        SubstringMatch("text", "delicious"),
        KeyPresence("email"),
        KeyValueMatch("age", 10),
        KeyValueMatch("ok", True),
        KeyValueMatch("ok", False),
    ],
    ids=lambda p: p.to_sql(),
)
def test_eval_parsed_matches_duckdb(pred):
    pdf = pd.DataFrame(_ROWS)
    con = duckdb.connect()
    con.register("t", pdf)
    expected = con.execute(f"SELECT COUNT(*) AS c FROM t WHERE {pred.to_sql()}").fetchone()[0]
    con.close()
    got = sum(1 for r in _ROWS if pred.eval_parsed(r))
    assert got == expected


# ----------------------------------------------------------------------
# Property: no false negatives, and regex == scalar evaluation
# ----------------------------------------------------------------------

_SAFE = st.text(
    alphabet=st.characters(min_codepoint=32, max_codepoint=126, blacklist_characters='"\\%_'),
    min_size=1,
    max_size=8,
)
_KEYS = st.sampled_from(["alpha", "beta", "gamma", "delta", "text"])
_VALS = st.one_of(_SAFE, st.integers(-1000, 1000), st.booleans())


@st.composite
def _record_and_pred(draw):
    keys = draw(st.lists(_KEYS, min_size=1, max_size=4, unique=True))
    record = {k: draw(_VALS) for k in keys}
    col = draw(_KEYS)
    kind = draw(st.sampled_from(["exact", "substr", "presence", "kv"]))
    if kind == "exact":
        pred = ExactMatch(col, draw(_SAFE))
    elif kind == "substr":
        pred = SubstringMatch(col, draw(_SAFE))
    elif kind == "presence":
        pred = KeyPresence(col)
    else:
        pred = KeyValueMatch(col, draw(st.one_of(st.integers(-1000, 1000), st.booleans())))
    # Half the time, force the predicate to be satisfied by the record.
    if draw(st.booleans()):
        if kind == "exact":
            record[col] = pred.value
        elif kind == "substr":
            record[col] = draw(_SAFE) + pred.value + draw(_SAFE)
        elif kind == "presence":
            record.setdefault(col, draw(_SAFE))
        else:
            record[col] = pred.value
    return record, pred


@given(_record_and_pred())
@settings(max_examples=300, deadline=None)
def test_no_false_negatives(case):
    """If a parsed record satisfies the predicate, the raw-string
    evaluation MUST flag the serialised record (paper Sec. IV-B)."""
    record, pred = case
    line = json.dumps(record)
    if pred.eval_parsed(record):
        assert pred.eval_raw(line), (record, pred)


@given(_record_and_pred())
@settings(max_examples=300, deadline=None)
def test_raw_regex_equals_scalar_eval(case):
    """The vectorised regex path and the scalar find/scan loop must
    agree — the client may use either."""
    record, pred = case
    line = json.dumps(record)
    s = pd.Series([line])
    vec = bool(s.str.contains(pred.raw_regex(), regex=True)[0])
    assert vec == pred.eval_raw(line), (record, pred)


@given(_record_and_pred())
@settings(max_examples=150, deadline=None)
def test_clause_no_false_negatives(case):
    record, pred = case
    other = ExactMatch("zeta", "never-present-value")
    clause = Clause.of(pred, other)
    line = json.dumps(record)
    if clause.eval_parsed(record):
        assert clause.eval_raw(line)
