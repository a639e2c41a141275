"""Tests for the predicate-evaluation cost model (paper Sec. V-D, VII-F)."""
import numpy as np
import pytest

from repro.core import cost_model as cm
from repro.core.predicates import Clause, ExactMatch, KeyValueMatch, SubstringMatch


def _synthetic_samples(model: cm.CostModel, n=40, seed=0, noise=0.0):
    g = np.random.default_rng(seed)
    out = []
    for _ in range(n):
        sel = float(g.uniform(0, 1))
        lp = int(g.integers(2, 30))
        lt = float(g.uniform(50, 800))
        cost = model.predict_simple(sel, lp, lt)
        if noise:
            cost *= float(g.lognormal(0, noise))
        out.append(cm.CalibrationSample(sel, lp, lt, cost))
    return out


TRUE = cm.CostModel(k1=0.01, k2=0.002, k3=0.02, k4=0.004, c=0.3)


class TestModel:
    def test_predict_formula(self):
        m = cm.CostModel(1, 2, 3, 4, 5)
        # sel=1: only the "found" branch; sel=0: only the "missed" branch.
        assert m.predict_simple(1.0, 2, 10) == pytest.approx(1 * 2 + 2 * 10 + 5)
        assert m.predict_simple(0.0, 2, 10) == pytest.approx(3 * 2 + 4 * 10 + 5)

    def test_predict_blends_branches(self):
        m = cm.CostModel(1, 0, 3, 0, 0)
        assert m.predict_simple(0.5, 2, 0) == pytest.approx(0.5 * 2 + 0.5 * 6)

    def test_predict_never_negative(self):
        m = cm.CostModel(-10, -10, -10, -10, -10)
        assert m.predict_simple(0.5, 5, 100) == 0.0

    def test_clause_cost_sums_members(self):
        # Paper: a disjunction's cost is the sum of member costs.
        m = TRUE
        c = Clause.of(ExactMatch("a", "xx"), SubstringMatch("b", "yyy"))
        single = [Clause.of(p) for p in c.preds]
        assert m.clause_cost(c, 0.3, 100.0) == pytest.approx(
            sum(m.clause_cost(s, 0.3, 100.0) for s in single)
        )

    def test_pattern_len(self):
        assert cm.pattern_len(ExactMatch("a", "Bob")) == 5  # "Bob" quoted
        assert cm.pattern_len(SubstringMatch("a", "xyz")) == 3
        assert cm.pattern_len(KeyValueMatch("age", 10)) == 5 + 2  # "age" + 10


class TestRSquared:
    def test_perfect_fit(self):
        y = np.array([1.0, 2.0, 3.0])
        assert cm.r_squared(y, y) == 1.0

    def test_mean_prediction_is_zero(self):
        y = np.array([1.0, 2.0, 3.0])
        assert cm.r_squared(y, np.full(3, y.mean())) == pytest.approx(0.0)

    def test_constant_y(self):
        y = np.array([2.0, 2.0])
        assert cm.r_squared(y, y) == 1.0
        assert cm.r_squared(y, np.array([1.0, 3.0])) == 0.0


class TestCalibration:
    def test_recovers_exact_coefficients(self):
        samples = _synthetic_samples(TRUE)
        model, r2 = cm.calibrate(samples)
        assert r2 == pytest.approx(1.0, abs=1e-9)
        assert model.k1 == pytest.approx(TRUE.k1, rel=1e-6)
        assert model.k4 == pytest.approx(TRUE.k4, rel=1e-6)
        assert model.c == pytest.approx(TRUE.c, rel=1e-6)

    def test_noise_degrades_r2(self):
        clean = cm.calibrate(_synthetic_samples(TRUE))[1]
        noisy = cm.calibrate(_synthetic_samples(TRUE, noise=0.5))[1]
        assert clean > noisy

    def test_too_few_samples_raises(self):
        with pytest.raises(ValueError):
            cm.calibrate(_synthetic_samples(TRUE, n=4))


class TestMeasurement:
    LINES = [
        '{"name": "Bob", "age": 22, "text": "' + "x" * 100 + '"}' for _ in range(200)
    ]

    def test_vectorised_measure_positive(self):
        c = Clause.of(SubstringMatch("text", "zzz"))
        assert cm.measure_clause_cost(c, self.LINES, repeat=1) > 0

    def test_scalar_measure_positive(self):
        c = Clause.of(SubstringMatch("text", "zzz"))
        assert cm.measure_clause_cost(c, self.LINES, repeat=1, scalar=True) > 0

    def test_collect_samples_features(self):
        clauses = [Clause.of(ExactMatch("name", "Bob")), Clause.of(KeyValueMatch("age", 22))]
        samples = cm.collect_samples(clauses, self.LINES, [0.9, 0.5], repeat=1)
        assert len(samples) == 2
        assert samples[0].len_p == 5
        assert samples[1].len_p == 7
        assert all(s.len_t == len(self.LINES[0]) for s in samples)
        assert all(s.cost_us > 0 for s in samples)


class TestPlatformSimulation:
    def test_local_profile_is_identity(self):
        samples = _synthetic_samples(TRUE, noise=0.2)
        replay = cm.simulate_platform(samples, cm.PLATFORMS["local"], seed=1)
        assert [s.cost_us for s in replay] == pytest.approx([s.cost_us for s in samples])

    def test_platform_r2_ordering_matches_table4(self):
        """hpc > local > cloud, the paper Table IV ordering."""
        measured = _synthetic_samples(TRUE, n=120, noise=0.25)
        r2 = {}
        for key, prof in cm.PLATFORMS.items():
            sim = cm.simulate_platform(measured, prof, seed=3)
            r2[key] = cm.calibrate(sim)[1]
        assert r2["hpc"] > r2["local"] > r2["cloud"]

    def test_cloud_spikes_increase_dispersion(self):
        measured = _synthetic_samples(TRUE, n=200, noise=0.0)
        cloud = cm.simulate_platform(measured, cm.PLATFORMS["cloud"], seed=5)
        base = np.array([s.cost_us for s in measured])
        sim = np.array([s.cost_us for s in cloud])
        assert np.std(sim / base) > 0.05

    def test_structural_replay_fits_near_perfectly(self):
        measured = _synthetic_samples(TRUE, n=120, noise=0.4)
        hpc = cm.simulate_platform(measured, cm.PLATFORMS["hpc"], seed=2)
        _, r2 = cm.calibrate(hpc)
        assert r2 > 0.9
