"""String-based predicate engine (CIAO Sec. IV).

CIAO evaluates SQL predicates on raw JSON *lines* with substring search
only — no parsing. Four predicate classes are supported (paper Table I):

=====================  =======================  ==========================
Predicate              SQL example              Pattern string(s)
=====================  =======================  ==========================
Exact string match     ``name = "Bob"``         ``"Bob"`` (JSON-quoted)
Substring match        ``text LIKE %delicious%``  ``delicious``
Key-presence match     ``email != NULL``        ``"email"``
Key-value match        ``age = 10``             ``"age"`` then ``10``
=====================  =======================  ==========================

The raw-line evaluation is allowed to produce **false positives** (the
pattern may occur in an unrelated key/value) but never **false
negatives**: if the pattern strings are absent, the object cannot
satisfy the predicate. Queries therefore always re-evaluate their full
predicate on parsed tuples (``eval_parsed`` here; Spark residual filters
in the DataSource path).

A *clause* is a disjunction of simple predicates and is the atomic unit
of pushdown (Sec. V-A); a *query* is a conjunction of clauses.
"""
from __future__ import annotations

import json
import re
from dataclasses import dataclass, field
from typing import Any, Sequence


def _sql_quote(s: str) -> str:
    return "'" + s.replace("'", "''") + "'"


def _like_no_meta(s: str) -> str:
    # Spark and DuckDB disagree on ESCAPE-clause string-literal parsing,
    # so instead of escaping we forbid LIKE metacharacters in substring
    # patterns (none of our workloads produce them).
    if any(ch in s for ch in "%_\\"):
        raise ValueError(f"substring pattern may not contain LIKE metacharacters: {s!r}")
    return s


@dataclass(frozen=True)
class SimplePredicate:
    """Base class for the four string-matchable predicate types."""

    column: str

    # -- identity -----------------------------------------------------
    def key(self) -> tuple:
        """Canonical hashable identity used to match query predicates
        against pushed-down predicates (the predicate hashmap key)."""
        raise NotImplementedError

    # -- client side (raw, no parse) ---------------------------------
    def pattern_strings(self) -> list[str]:
        """The literal pattern strings the client searches for."""
        raise NotImplementedError

    def eval_raw(self, line: str) -> bool:
        """Substring-search evaluation on one raw JSON line.

        May return true for a non-matching object (false positive);
        must return true for every matching object (no false negatives).
        """
        raise NotImplementedError

    def raw_regex(self) -> str:
        """A regex equivalent of ``eval_raw`` for vectorised evaluation
        (``pandas.Series.str.contains(regex=True)``)."""
        raise NotImplementedError

    # -- server side (parsed, exact) ---------------------------------
    def eval_parsed(self, record: dict) -> bool:
        """Exact SQL semantics on a parsed JSON object."""
        raise NotImplementedError

    def to_sql(self) -> str:
        """Exact SQL condition (valid in both Spark SQL and DuckDB)."""
        raise NotImplementedError


@dataclass(frozen=True)
class ExactMatch(SimplePredicate):
    """``column = "value"`` for a string value.

    Pattern string is the JSON-encoded value *including quotes* (paper
    Table I row 1: ``"Bob"``), so a bare substring inside a longer word
    does not match, but the same quoted string under another key does
    (false positive, allowed).
    """

    value: str

    def key(self) -> tuple:
        return ("exact", self.column, self.value)

    def pattern_strings(self) -> list[str]:
        return [json.dumps(self.value)]

    def eval_raw(self, line: str) -> bool:
        return json.dumps(self.value) in line

    def raw_regex(self) -> str:
        return re.escape(json.dumps(self.value))

    def eval_parsed(self, record: dict) -> bool:
        return record.get(self.column) == self.value

    def to_sql(self) -> str:
        return f"{self.column} = {_sql_quote(self.value)}"


@dataclass(frozen=True)
class SubstringMatch(SimplePredicate):
    """``column LIKE '%value%'``. Pattern string is the bare substring."""

    value: str

    def key(self) -> tuple:
        return ("substr", self.column, self.value)

    def pattern_strings(self) -> list[str]:
        return [self.value]

    def eval_raw(self, line: str) -> bool:
        return self.value in line

    def raw_regex(self) -> str:
        return re.escape(self.value)

    def eval_parsed(self, record: dict) -> bool:
        v = record.get(self.column)
        return isinstance(v, str) and self.value in v

    def to_sql(self) -> str:
        return f"{self.column} LIKE {_sql_quote('%' + _like_no_meta(self.value) + '%')}"


@dataclass(frozen=True)
class KeyPresence(SimplePredicate):
    """``column IS NOT NULL``. Pattern string is the quoted key."""

    def key(self) -> tuple:
        return ("presence", self.column)

    def pattern_strings(self) -> list[str]:
        return [json.dumps(self.column)]

    def eval_raw(self, line: str) -> bool:
        return json.dumps(self.column) in line

    def raw_regex(self) -> str:
        return re.escape(json.dumps(self.column))

    def eval_parsed(self, record: dict) -> bool:
        return record.get(self.column) is not None

    def to_sql(self) -> str:
        return f"{self.column} IS NOT NULL"


@dataclass(frozen=True)
class KeyValueMatch(SimplePredicate):
    """``column = <non-string literal>`` (int / float / bool).

    Client algorithm (paper Sec. IV-B): find the quoted key string, scan
    forward to the next key-value delimiter (a comma), and check whether
    the value string occurs in between. Every occurrence of the key
    pattern is tried — stopping at the first would allow a false
    negative when the key string also appears inside an earlier value.
    The paper's "same number, different spelling" caveat (2.4 vs 24e-1)
    applies: the value must be serialised canonically, which our
    ``json.dumps``-based generators guarantee.
    """

    value: Any  # int | float | bool

    def _value_str(self) -> str:
        return json.dumps(self.value)

    def key(self) -> tuple:
        return ("kv", self.column, self._value_str())

    def pattern_strings(self) -> list[str]:
        return [json.dumps(self.column), self._value_str()]

    def eval_raw(self, line: str) -> bool:
        key_pat = json.dumps(self.column)
        val_pat = self._value_str()
        start = 0
        while True:
            i = line.find(key_pat, start)
            if i < 0:
                return False
            window_end = line.find(",", i + len(key_pat))
            if window_end < 0:
                window_end = len(line)
            if val_pat in line[i + len(key_pat) : window_end]:
                return True
            start = i + 1

    def raw_regex(self) -> str:
        # "between the key and the next comma" is exactly [^,]* .
        return re.escape(json.dumps(self.column)) + "[^,]*" + re.escape(self._value_str())

    def eval_parsed(self, record: dict) -> bool:
        v = record.get(self.column)
        if isinstance(self.value, bool) or isinstance(v, bool):
            return v is self.value
        return v == self.value

    def to_sql(self) -> str:
        if isinstance(self.value, bool):
            return f"{self.column} = {'true' if self.value else 'false'}"
        return f"{self.column} = {self.value}"


@dataclass(frozen=True)
class Clause:
    """A disjunction of simple predicates — the atomic pushdown unit.

    ``name IN ('Bob', 'John')`` is one clause with two ``ExactMatch``
    members; pushing only ``name = 'Bob'`` would create false negatives
    for the disjunction, so clauses are pushed whole (Sec. V-A).
    """

    preds: tuple[SimplePredicate, ...]

    def __post_init__(self):
        if not self.preds:
            raise ValueError("a clause needs at least one simple predicate")

    @staticmethod
    def of(*preds: SimplePredicate) -> "Clause":
        return Clause(tuple(preds))

    def key(self) -> tuple:
        return tuple(sorted(p.key() for p in self.preds))

    def pattern_strings(self) -> list[str]:
        return [s for p in self.preds for s in p.pattern_strings()]

    def eval_raw(self, line: str) -> bool:
        return any(p.eval_raw(line) for p in self.preds)

    def raw_regex(self) -> str:
        if len(self.preds) == 1:
            return self.preds[0].raw_regex()
        return "|".join(f"(?:{p.raw_regex()})" for p in self.preds)

    def eval_parsed(self, record: dict) -> bool:
        return any(p.eval_parsed(record) for p in self.preds)

    def to_sql(self) -> str:
        if len(self.preds) == 1:
            return self.preds[0].to_sql()
        return "(" + " OR ".join(p.to_sql() for p in self.preds) + ")"

    def describe(self) -> str:
        return self.to_sql()


@dataclass(frozen=True)
class Query:
    """``SELECT COUNT(*) FROM t WHERE c1 AND c2 AND ...`` — the single
    query template used throughout the paper's evaluation (Sec. VII-C)."""

    clauses: tuple[Clause, ...]
    name: str = ""

    @staticmethod
    def of(*clauses: Clause, name: str = "") -> "Query":
        return Query(tuple(clauses), name=name)

    def clause_keys(self) -> list[tuple]:
        return [c.key() for c in self.clauses]

    def eval_parsed(self, record: dict) -> bool:
        return all(c.eval_parsed(record) for c in self.clauses)

    def where_sql(self) -> str:
        if not self.clauses:
            return "TRUE"
        return " AND ".join(c.to_sql() for c in self.clauses)

    def count_sql(self, table: str) -> str:
        return f"SELECT COUNT(*) AS cnt FROM {table} WHERE {self.where_sql()}"
