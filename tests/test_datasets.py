"""Tests for the synthetic dataset generators (paper Sec. VII-B stand-ins)."""
import json

import pytest

from repro.data.datasets import (
    DATASETS,
    WINLOG_TAG_FREQS,
    YCSB_AGE_GROUPS,
    YCSB_PHONE_COUNTRIES,
    YELP_POWER_USERS,
    YELP_TEXT_MARKERS,
    winlog,
    ycsb,
    yelp,
)


@pytest.mark.parametrize("name,gen", DATASETS.items(), ids=DATASETS.keys())
class TestCommon:
    def test_row_count(self, name, gen):
        assert len(gen(123, seed=0).lines) == 123

    def test_deterministic(self, name, gen):
        assert gen(60, seed=5).lines == gen(60, seed=5).lines

    def test_seed_changes_data(self, name, gen):
        assert gen(60, seed=5).lines != gen(60, seed=6).lines

    def test_every_line_is_json_object(self, name, gen):
        for ln in gen(80, seed=1).lines:
            obj = json.loads(ln)
            assert isinstance(obj, dict)

    def test_schema_columns_present_in_parsed(self, name, gen):
        ds = gen(50, seed=2)
        parsed = ds.parsed()
        assert list(parsed.columns) == [c for c, _ in ds.schema]
        assert len(parsed) == 50

    def test_avg_line_len_positive(self, name, gen):
        assert gen(30, seed=3).avg_line_len > 50

    def test_name(self, name, gen):
        assert gen(10, seed=0).name == name


class TestYelp:
    def test_domains(self):
        p = yelp(400, seed=7).parsed()
        assert p["stars"].between(1, 5).all()
        assert p["useful"].between(0, 99).all()
        assert p["funny"].between(0, 99).all()
        assert p["cool"].between(0, 99).all()
        assert p["date"].str.match(r"20(0[7-9]|1\d|20)-\d{2}-\d{2}").all()

    def test_power_users_frequent(self):
        p = yelp(1000, seed=7).parsed()
        frac = p["user_id"].isin(YELP_POWER_USERS).mean()
        assert 0.15 < frac < 0.45  # ~30 % by construction

    def test_markers_occur(self):
        p = yelp(1000, seed=7).parsed()
        for marker in YELP_TEXT_MARKERS:
            assert p["text"].str.contains(marker).any()

    def test_first_marker_most_common(self):
        p = yelp(2000, seed=7).parsed()
        f0 = p["text"].str.contains(YELP_TEXT_MARKERS[0]).mean()
        f_last = p["text"].str.contains(YELP_TEXT_MARKERS[-1]).mean()
        assert f0 > f_last


class TestWinlog:
    def test_time_format(self):
        p = winlog(300, seed=7).parsed()
        assert p["time"].str.match(r"2016-\d{2}-\d{2} \d{2}:\d{2}:\d{2},\d{3}").all()

    def test_levels(self):
        p = winlog(300, seed=7).parsed()
        assert set(p["level"].unique()) <= {"Info", "Warning", "Error"}

    def test_tag_frequencies_calibrated(self):
        p = winlog(8000, seed=7).parsed()
        for tag, freq in WINLOG_TAG_FREQS.items():
            got_a = (p["tag_a"] == f"x_{tag}").mean()
            got_b = (p["tag_b"] == f"y_{tag}").mean()
            assert got_a == pytest.approx(freq, abs=0.035)
            assert got_b == pytest.approx(freq, abs=0.035)

    def test_tags_perfectly_correlated(self):
        p = winlog(500, seed=7).parsed()
        assert (p["tag_a"].str[2:] == p["tag_b"].str[2:]).all()

    def test_info_stem_skew(self):
        p = winlog(4000, seed=7).parsed()
        f0 = p["info"].str.startswith("evt000").mean()
        f199 = p["info"].str.startswith("evt199").mean()
        assert f0 > 0.1 > f199


class TestYcsb:
    def test_domains(self):
        p = ycsb(400, seed=7).parsed()
        assert set(p["phone_country"].unique()) <= set(YCSB_PHONE_COUNTRIES)
        assert set(p["age_group"].unique()) <= set(YCSB_AGE_GROUPS)
        assert p["linear_score"].between(0, 99).all()
        assert p["weighted_score"].between(0, 99).all()
        assert p["isActive"].isin([True, False]).all()

    def test_has_25_attributes_in_json(self):
        ds = ycsb(5, seed=7)
        obj = json.loads(ds.lines[0])
        assert len(obj) == 25

    def test_nested_and_array_fields_json_only(self):
        ds = ycsb(5, seed=7)
        obj = json.loads(ds.lines[0])
        assert isinstance(obj["address"], dict)
        assert isinstance(obj["visited_places"], list)
        schema_cols = {c for c, _ in ds.schema}
        assert "address" not in schema_cols and "visited_places" not in schema_cols

    def test_email_provider_split(self):
        p = ycsb(1500, seed=7).parsed()
        gmail = p["email"].str.contains("@gmail.example").mean()
        assert 0.6 < gmail < 0.8
