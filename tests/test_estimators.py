"""Tests for the chain estimators (Eqs. 7 and 22)."""
import numpy as np
import pytest

from repro.core.estimators import (
    eq7_accepted_only,
    eq7_estimate,
    eq22_ratio,
    relative_score_estimate,
)


class TestEq7:
    def test_manual_chain(self):
        # n=5, chain deltas [4, 4, 8]: estimate = 16 / (3·4).
        assert np.isclose(eq7_estimate(np.array([4.0, 4.0, 8.0]), 5), 16 / 12)

    def test_constant_chain(self):
        # All states share δ = c ⇒ estimate = c/(n−1) regardless of T.
        for T in (1, 10, 100):
            est = eq7_estimate(np.full(T + 1, 6.0), 7)
            assert np.isclose(est, 1.0)

    def test_zero_chain(self):
        assert eq7_estimate(np.zeros(10), 5) == 0.0

    def test_accepted_only_excludes_rejections(self):
        delta = np.array([2.0, 4.0, 4.0, 6.0])  # v0 then 3 iterations
        accepted = np.array([True, False, True])
        # accepted states: indices 1 and 3 → (4+6)/((3+1)·(5−1))
        assert np.isclose(eq7_accepted_only(delta, accepted, 5), 10 / 16)

    def test_accepted_only_below_ergodic_when_rejections(self):
        rng = np.random.default_rng(0)
        delta = rng.random(101) * 5
        accepted = rng.random(100) < 0.5
        assert eq7_accepted_only(delta, accepted, 20) <= eq7_estimate(delta, 20)

    def test_all_accepted_nearly_matches_ergodic(self):
        delta = np.array([3.0, 5.0, 1.0, 2.0])
        accepted = np.ones(3, dtype=bool)
        erg = eq7_estimate(delta, 6)
        acc = eq7_accepted_only(delta, accepted, 6)
        # differs only by the initial state's term
        assert np.isclose(erg - acc, delta[0] / (4 * 5))


class TestEq22:
    def test_manual_values(self):
        f_on_j = np.array([0.5, 1.0])  # mean 0.75
        f_on_i = np.array([0.25, 0.25])  # mean 0.25
        assert np.isclose(eq22_ratio(f_on_j, f_on_i), 3.0)

    def test_empty_subchain_nan(self):
        assert np.isnan(eq22_ratio(np.array([]), np.array([0.5])))
        assert np.isnan(eq22_ratio(np.array([0.5]), np.array([])))

    def test_zero_denominator_nan(self):
        assert np.isnan(eq22_ratio(np.array([0.5]), np.array([0.0])))

    def test_reciprocal_consistency(self):
        a, b = np.array([0.2, 0.6]), np.array([0.9, 0.3])
        assert np.isclose(eq22_ratio(a, b) * eq22_ratio(b, a), 1.0)


class TestRelativeScore:
    def test_mean(self):
        assert np.isclose(relative_score_estimate(np.array([0.2, 0.4])), 0.3)

    def test_empty_nan(self):
        assert np.isnan(relative_score_estimate(np.array([])))

    def test_bounded(self):
        rng = np.random.default_rng(1)
        assert 0 <= relative_score_estimate(rng.random(50)) <= 1
