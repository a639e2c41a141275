"""Synthetic JSON-lines generators for the paper's three datasets.

The originals (Yelp Open Dataset review.json 5 GB, LogHub Windows event
log 27 GB, fakeit-generated YCSB customers 20 GB) are not
redistributable and far too large for this testbed, so we generate
deterministic JSON lines with the *same attributes and candidate-value
counts that Table II's predicate templates need*, plus realistic filler
so object lengths are in the right regime for the cost model
(``len(t)`` matters). Value frequencies are Zipf-skewed so every
predicate template spans a range of selectivities — the property all of
the paper's experiments actually exercise.

Extra, non-relational fields (arrays, nested objects in YCSB) are kept
in the JSON but excluded from the store schema; CIAO's raw-string
matching sees them (false-positive source, as with the real data) while
the relational side ignores them.

The Windows-log generator additionally carries two jointly-distributed
tag fields (``tag_a``/``tag_b``) with calibrated marginal frequencies
0.01 / 0.15 / 0.35 — the controlled-selectivity attributes the paper's
micro-benchmarks (Sec. VII-E1) pick "attributes whose frequencies
roughly represent the corresponding selectivity" from.
"""
from __future__ import annotations

import json
from dataclasses import dataclass
from functools import lru_cache
from typing import Callable

import numpy as np
import pandas as pd

from repro.core.storage import Schema, parse_lines

# Marginal frequencies of the controlled winlog tag levels (index-aligned
# x/y tag values share one latent level, so x_i and y_i are perfectly
# correlated — lets micro-benchmarks conjoin two same-selectivity
# predicates without emptying the result).
WINLOG_TAG_FREQS = {"s001": 0.01, "s015": 0.15, "s035": 0.35}


@dataclass(frozen=True)
class Dataset:
    """Raw JSON lines + the relational schema CIAO loads them into."""

    name: str
    lines: tuple[str, ...]
    schema: Schema

    def parsed(self) -> pd.DataFrame:
        """Fully parsed relational view — ground truth for the oracle."""
        return parse_lines(self.lines, self.schema).to_pandas()

    @property
    def avg_line_len(self) -> float:
        return float(np.mean([len(ln) for ln in self.lines]))


def _zipf_probs(k: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, k + 1) ** alpha
    return w / w.sum()


_WORDS = (
    "the quick brown fox jumps over a lazy dog while people wait in line for "
    "coffee and pancakes at the corner diner near the old station platform "
    "where trains seldom stop anymore and pigeons gather around benches"
).split()

# The five marker words behind Yelp's `text LIKE <string>` template.
YELP_TEXT_MARKERS = ("delicious", "terrible", "friendly", "overpriced", "cozy")
YELP_POWER_USERS = tuple(f"user_pw_{i}" for i in range(5))


def yelp(n: int = 2000, seed: int = 0) -> Dataset:
    """Synthetic review.json: one review object per line."""
    g = np.random.default_rng(seed)
    stars = g.choice([1, 2, 3, 4, 5], n, p=[0.07, 0.08, 0.15, 0.3, 0.4])
    counters = {
        name: g.choice(np.arange(100), n, p=_zipf_probs(100, 1.3))
        for name in ("useful", "funny", "cool")
    }
    # 30 % of reviews come from the five heavy users of the template pool.
    user_pool = list(YELP_POWER_USERS) + [f"user_{i:05d}" for i in range(200)]
    user_p = np.array([0.3 / 5] * 5 + [0.7 / 200] * 200)
    users = g.choice(user_pool, n, p=user_p)
    years = g.choice(np.arange(2007, 2021), n, p=_zipf_probs(14, 0.8)[::-1])
    months = g.integers(1, 13, n)
    days = g.integers(1, 29, n)
    lines = []
    for i in range(n):
        words = list(g.choice(_WORDS, g.integers(15, 40)))
        for m, marker in enumerate(YELP_TEXT_MARKERS):
            if g.random() < 0.25 / (m + 1):
                words.insert(int(g.integers(0, len(words))), marker)
        obj = {
            "review_id": f"rev_{i:07d}",
            "user_id": str(users[i]),
            "business_id": f"biz_{int(g.integers(0, max(10, n // 20))):05d}",
            "stars": int(stars[i]),
            "useful": int(counters["useful"][i]),
            "funny": int(counters["funny"][i]),
            "cool": int(counters["cool"][i]),
            "text": " ".join(words),
            "date": f"{years[i]}-{months[i]:02d}-{days[i]:02d}",
        }
        lines.append(json.dumps(obj))
    schema: Schema = [
        ("review_id", "string"),
        ("user_id", "string"),
        ("business_id", "string"),
        ("stars", "bigint"),
        ("useful", "bigint"),
        ("funny", "bigint"),
        ("cool", "bigint"),
        ("text", "string"),
        ("date", "string"),
    ]
    return Dataset("yelp", tuple(lines), schema)


# 200 message stems behind winlog's `info LIKE <string>` template.
WINLOG_INFO_STEMS = tuple(f"evt{idx:03d}" for idx in range(200))
WINLOG_COMPONENTS = (
    "CBS", "WindowsUpdateAgent", "Defender", "Kernel-Power", "DriverFrameworks",
    "Winlogon", "TaskScheduler", "DNS-Client",
)


def winlog(n: int = 2000, seed: int = 1) -> Dataset:
    """Synthetic Windows event log, one JSON object per line.

    ``time`` is "2016-MM-DD HH:MM:SS,mmm" so the paper's month / day /
    hour / minute / second LIKE templates are plain substring patterns
    ("-09-", "-28 ", " 04:", ":31:", ":07,").
    """
    g = np.random.default_rng(seed)
    months = g.integers(1, 13, n)
    days = g.integers(1, 29, n)
    hours = g.choice(np.arange(24), n, p=_zipf_probs(24, 0.5))
    minutes = g.integers(0, 60, n)
    seconds = g.integers(0, 60, n)
    levels = g.choice(["Info", "Warning", "Error"], n, p=[0.7, 0.2, 0.1])
    stems = g.choice(WINLOG_INFO_STEMS, n, p=_zipf_probs(200, 1.1))
    comps = g.choice(WINLOG_COMPONENTS, n)
    # Controlled-selectivity latent level shared by tag_a/tag_b.
    tag_vals = list(WINLOG_TAG_FREQS) + ["rest"]
    tag_p = list(WINLOG_TAG_FREQS.values())
    tag_p.append(1.0 - sum(tag_p))
    latent = g.choice(tag_vals, n, p=tag_p)
    lines = []
    for i in range(n):
        filler = " ".join(g.choice(_WORDS, g.integers(6, 14)))
        # ~15 % of messages reference a second (head) event stem so that
        # conjunctions of two info-stem predicates are satisfiable — the
        # skewness micro-benchmark queries conjoin two stems.
        if g.random() < 0.15:
            filler += f" after {g.choice(WINLOG_INFO_STEMS[:10])}"
        obj = {
            "time": (
                f"2016-{months[i]:02d}-{days[i]:02d} "
                f"{hours[i]:02d}:{minutes[i]:02d}:{seconds[i]:02d},"
                f"{int(g.integers(0, 1000)):03d}"
            ),
            "level": str(levels[i]),
            "component": str(comps[i]),
            "info": f"{stems[i]} {filler}",
            "tag_a": f"x_{latent[i]}",
            "tag_b": f"y_{latent[i]}",
        }
        lines.append(json.dumps(obj))
    schema: Schema = [
        ("time", "string"),
        ("level", "string"),
        ("component", "string"),
        ("info", "string"),
        ("tag_a", "string"),
        ("tag_b", "string"),
    ]
    return Dataset("winlog", tuple(lines), schema)


YCSB_PHONE_COUNTRIES = ("us", "cn", "de")
YCSB_AGE_GROUPS = ("child", "teen", "adult", "senior")
YCSB_URL_DOMAINS = tuple(
    f"dom{idx:02d}.com" for idx in range(12)
)
YCSB_URL_SITES = tuple(f"site{idx:02d}" for idx in range(14))
YCSB_EMAIL_PROVIDERS = ("@gmail.example", "@yahoo.example")


def ycsb(n: int = 2000, seed: int = 2) -> Dataset:
    """Synthetic fakeit-style customer objects (25 attributes; arrays and
    a nested address stay JSON-only)."""
    g = np.random.default_rng(seed)
    lines = []
    lin = g.integers(0, 100, n)
    wgt = g.choice(np.arange(100), n, p=_zipf_probs(100, 1.2))
    actives = g.random(n) < 0.6
    phone_c = g.choice(YCSB_PHONE_COUNTRIES, n, p=[0.5, 0.3, 0.2])
    ages_g = g.choice(YCSB_AGE_GROUPS, n, p=[0.1, 0.2, 0.5, 0.2])
    age_by = g.choice(np.arange(100), n, p=_zipf_probs(100, 0.9))
    sites = g.choice(YCSB_URL_SITES, n, p=_zipf_probs(14, 0.9))
    domains = g.choice(YCSB_URL_DOMAINS, n, p=_zipf_probs(12, 0.9))
    providers = g.choice(YCSB_EMAIL_PROVIDERS, n, p=[0.7, 0.3])
    for i in range(n):
        obj = {
            "id": f"cust_{i:07d}",
            "guid": f"g-{int(g.integers(0, 1 << 31)):010d}",
            "isActive": bool(actives[i]),
            "balance": round(float(g.random() * 5000), 2),
            "picture": "http://placehold.example/32x32",
            "age": int(g.integers(1, 90)),
            "age_group": str(ages_g[i]),
            "age_by_group": int(age_by[i]),
            "eye_color": str(g.choice(["blue", "brown", "green"])),
            "name": f"Name{int(g.integers(0, 5000)):04d}",
            "gender": str(g.choice(["female", "male", "other"])),
            "company": f"Co{int(g.integers(0, 300)):03d}",
            "email": f"person{i:06d}{providers[i]}",
            "phone_country": str(phone_c[i]),
            "phone": f"+{int(g.integers(1, 99))} {int(g.integers(100, 999))}-{int(g.integers(1000, 9999))}",
            "address": {
                "street": f"{int(g.integers(1, 999))} Main St",
                "city": f"City{int(g.integers(0, 100)):02d}",
                "zip": f"{int(g.integers(10000, 99999))}",
            },
            "about": " ".join(g.choice(_WORDS, g.integers(8, 20))),
            "registered": f"20{int(g.integers(10, 21)):02d}-{int(g.integers(1, 13)):02d}-{int(g.integers(1, 29)):02d}",
            "latitude": round(float(g.random() * 180 - 90), 4),
            "longitude": round(float(g.random() * 360 - 180), 4),
            "url": f"https://{sites[i]}.{domains[i]}/home",
            "linear_score": int(lin[i]),
            "weighted_score": int(wgt[i]),
            "children": int(g.integers(0, 5)),
            "visited_places": [f"pl{int(v):03d}" for v in g.integers(0, 500, g.integers(0, 4))],
        }
        lines.append(json.dumps(obj))
    schema: Schema = [
        ("id", "string"),
        ("isActive", "boolean"),
        ("age_group", "string"),
        ("age_by_group", "bigint"),
        ("name", "string"),
        ("email", "string"),
        ("phone_country", "string"),
        ("url", "string"),
        ("linear_score", "bigint"),
        ("weighted_score", "bigint"),
        ("children", "bigint"),
        ("about", "string"),
    ]
    return Dataset("ycsb", tuple(lines), schema)


DATASETS: dict[str, Callable[..., Dataset]] = {
    "yelp": yelp,
    "winlog": winlog,
    "ycsb": ycsb,
}
