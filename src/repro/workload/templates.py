"""Predicate template pools — reproduction of paper Table II.

Each dataset has a fixed list of (template, candidate clauses); the
candidate counts match Table II exactly:

Yelp review: useful/cool/funny = <int> (100 each), stars = <int> (5),
user_id = <string> (5), text LIKE <string> (5), date LIKE year (14),
date LIKE month (12).

Windows log: info LIKE <string> (200), time LIKE month (12) / day (31)
/ hour (24) / minute (60) / second (60).

YCSB: isActive = <bool> (2), linear_score = <int> (100),
weighted_score = <int> (100), phone_country = <string> (3),
age_group = <string> (4), age_by_group = <int> (100),
url_domain LIKE <string> (12), url_site LIKE <string> (14),
email LIKE <string> (2).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.predicates import Clause, ExactMatch, KeyValueMatch, SubstringMatch
from repro.data.datasets import (
    YCSB_AGE_GROUPS,
    YCSB_EMAIL_PROVIDERS,
    YCSB_PHONE_COUNTRIES,
    YCSB_URL_DOMAINS,
    YCSB_URL_SITES,
    YELP_POWER_USERS,
    YELP_TEXT_MARKERS,
    WINLOG_INFO_STEMS,
)


@dataclass(frozen=True)
class Template:
    """One Table II row: a predicate shape and its candidate values."""

    name: str
    clauses: tuple[Clause, ...]

    @property
    def n_candidates(self) -> int:
        return len(self.clauses)


def _t(name: str, clauses) -> Template:
    return Template(name, tuple(clauses))


def _yelp_templates() -> list[Template]:
    ints = range(100)
    return [
        _t("useful = <int>", [Clause.of(KeyValueMatch("useful", i)) for i in ints]),
        _t("cool = <int>", [Clause.of(KeyValueMatch("cool", i)) for i in ints]),
        _t("funny = <int>", [Clause.of(KeyValueMatch("funny", i)) for i in ints]),
        _t("stars = <int>", [Clause.of(KeyValueMatch("stars", i)) for i in range(1, 6)]),
        _t("user_id = <string>", [Clause.of(ExactMatch("user_id", u)) for u in YELP_POWER_USERS]),
        _t("text LIKE <string>", [Clause.of(SubstringMatch("text", w)) for w in YELP_TEXT_MARKERS]),
        _t(
            'date LIKE "%20[0-1][0-9]%" (year)',
            [Clause.of(SubstringMatch("date", str(y))) for y in range(2007, 2021)],
        ),
        _t(
            'date LIKE "%-[0-1][0-9]-%" (month)',
            [Clause.of(SubstringMatch("date", f"-{m:02d}-")) for m in range(1, 13)],
        ),
    ]


def _winlog_templates() -> list[Template]:
    return [
        _t("info LIKE <string>", [Clause.of(SubstringMatch("info", s)) for s in WINLOG_INFO_STEMS]),
        _t(
            'time LIKE "%-[0-1][0-9]-%" (month)',
            [Clause.of(SubstringMatch("time", f"-{m:02d}-")) for m in range(1, 13)],
        ),
        _t(
            'time LIKE "%-[0-3][0-9] %" (day)',
            [Clause.of(SubstringMatch("time", f"-{d:02d} ")) for d in range(1, 32)],
        ),
        _t(
            'time LIKE "%[0-2][0-9]:%" (hour)',
            [Clause.of(SubstringMatch("time", f" {h:02d}:")) for h in range(24)],
        ),
        _t(
            'time LIKE "%:[0-5][0-9]:%" (minute)',
            [Clause.of(SubstringMatch("time", f":{m:02d}:")) for m in range(60)],
        ),
        _t(
            'time LIKE "%:[0-5][0-9],%" (second)',
            [Clause.of(SubstringMatch("time", f":{s:02d},")) for s in range(60)],
        ),
    ]


def _ycsb_templates() -> list[Template]:
    return [
        _t("isActive = <boolean>", [Clause.of(KeyValueMatch("isActive", b)) for b in (True, False)]),
        _t("linear_score = <int>", [Clause.of(KeyValueMatch("linear_score", i)) for i in range(100)]),
        _t("weighted_score = <int>", [Clause.of(KeyValueMatch("weighted_score", i)) for i in range(100)]),
        _t("phone_country = <string>", [Clause.of(ExactMatch("phone_country", c)) for c in YCSB_PHONE_COUNTRIES]),
        _t("age_group = <string>", [Clause.of(ExactMatch("age_group", a)) for a in YCSB_AGE_GROUPS]),
        _t("age_by_group = <int>", [Clause.of(KeyValueMatch("age_by_group", i)) for i in range(100)]),
        _t("url_domain LIKE <string>", [Clause.of(SubstringMatch("url", d)) for d in YCSB_URL_DOMAINS]),
        _t("url_site LIKE <string>", [Clause.of(SubstringMatch("url", f"//{s}.")) for s in YCSB_URL_SITES]),
        _t("email LIKE <string>", [Clause.of(SubstringMatch("email", p)) for p in YCSB_EMAIL_PROVIDERS]),
    ]


TEMPLATE_POOLS: dict[str, callable] = {
    "yelp": _yelp_templates,
    "winlog": _winlog_templates,
    "ycsb": _ycsb_templates,
}

# Paper Table II candidate counts, for the reproduction diff.
PAPER_TABLE2 = {
    "yelp": [
        ("useful = <int>", 100),
        ("cool = <int>", 100),
        ("funny = <int>", 100),
        ("stars = <int>", 5),
        ("user_id = <string>", 5),
        ("text LIKE <string>", 5),
        ('date LIKE "%20[0-1][0-9]%" (year)', 14),
        ('date LIKE "%-[0-1][0-9]-%" (month)', 12),
    ],
    "winlog": [
        ("info LIKE <string>", 200),
        ('time LIKE "%-[0-1][0-9]-%" (month)', 12),
        ('time LIKE "%-[0-3][0-9] %" (day)', 31),
        ('time LIKE "%[0-2][0-9]:%" (hour)', 24),
        ('time LIKE "%:[0-5][0-9]:%" (minute)', 60),
        ('time LIKE "%:[0-5][0-9],%" (second)', 60),
    ],
    "ycsb": [
        ("isActive = <boolean>", 2),
        ("linear_score = <int>", 100),
        ("weighted_score = <int>", 100),
        ("phone_country = <string>", 3),
        ("age_group = <string>", 4),
        ("age_by_group = <int>", 100),
        ("url_domain LIKE <string>", 12),
        ("url_site LIKE <string>", 14),
        ("email LIKE <string>", 2),
    ],
}


def templates(dataset: str) -> list[Template]:
    return TEMPLATE_POOLS[dataset]()


def predicate_pool(dataset: str) -> list[Clause]:
    """All candidate clauses of a dataset, template order preserved."""
    return [c for t in templates(dataset) for c in t.clauses]


def template_summary(dataset: str) -> list[tuple[str, int]]:
    """(template, #candidates) rows — the Table II reproduction."""
    return [(t.name, t.n_candidates) for t in templates(dataset)]
