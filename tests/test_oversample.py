"""Tests for over-sampling size computation (Sec. 5.3)."""
import math

import pytest

from repro.core.ast import Comparison, Const, Var, parse_rule
from repro.core.unify import parse_ptuple, unify_rule
from repro.sampling.oversample import (
    binom_sf,
    comparison_selectivity,
    min_oversample_size,
    p_prov_estimate,
)


def _binom_sf_naive(k, n, p):
    return sum(
        math.comb(n, i) * p**i * (1 - p) ** (n - i) for i in range(k, n + 1)
    )


class TestBinomSf:
    @pytest.mark.parametrize("k,n,p", [
        (1, 1, 0.5), (2, 5, 0.3), (5, 10, 0.9), (3, 8, 0.05),
        (10, 20, 0.5), (1, 50, 0.01), (25, 30, 0.8),
    ])
    def test_matches_naive(self, k, n, p):
        assert binom_sf(k, n, p) == pytest.approx(_binom_sf_naive(k, n, p), abs=1e-9)

    def test_k_zero_is_one(self):
        assert binom_sf(0, 10, 0.5) == 1.0

    def test_k_gt_n_is_zero(self):
        assert binom_sf(11, 10, 0.5) == 0.0

    def test_p_one(self):
        assert binom_sf(5, 5, 1.0) == 1.0

    def test_p_zero(self):
        assert binom_sf(1, 10, 0.0) == 0.0

    def test_monotone_in_n(self):
        vals = [binom_sf(10, n, 0.5) for n in (10, 20, 40, 80)]
        assert vals == sorted(vals)

    def test_large_n_stable(self):
        v = binom_sf(1000, 2000, 0.5)
        assert 0.4 < v < 0.6


class TestMinOversample:
    def test_p_one_returns_n_s(self):
        assert min_oversample_size(100, 1.0) == 100

    def test_result_satisfies_threshold(self):
        n = min_oversample_size(50, 0.5, 0.999)
        assert binom_sf(50, n, 0.5) >= 0.999
        assert binom_sf(50, n - 1, 0.5) < 0.999  # minimality

    def test_small_p_grows(self):
        assert min_oversample_size(10, 0.01) > min_oversample_size(10, 0.5)

    def test_higher_confidence_grows(self):
        assert min_oversample_size(10, 0.3, 0.9999) >= min_oversample_size(
            10, 0.3, 0.9
        )

    def test_at_least_n_s(self):
        for p in (0.2, 0.9, 1.0):
            assert min_oversample_size(7, p) >= 7

    def test_invalid_p_raises(self):
        with pytest.raises(ValueError):
            min_oversample_size(10, 0.0)
        with pytest.raises(ValueError):
            min_oversample_size(10, 1.5)

    def test_invalid_n_s_raises(self):
        with pytest.raises(ValueError):
            min_oversample_size(0, 0.5)


class TestSelectivity:
    def test_empty_is_one(self):
        assert comparison_selectivity([]) == 1.0

    def test_lt_half(self):
        c = Comparison(Var("X"), "<", Var("Y"))
        assert comparison_selectivity([c]) == 0.5

    def test_multiplies(self):
        c1 = Comparison(Var("X"), "<", Var("Y"))
        c2 = Comparison(Var("Y"), "!=", Var("Z"))
        assert comparison_selectivity([c1, c2]) == pytest.approx(0.475)


class TestPProv:
    def _unified(self):
        r = parse_rule("Q(X, Y) :- R(X, Z), R(Z, Y).")
        return unify_rule(r, parse_ptuple("Q(X, 4)"))

    def test_rex_example(self):
        # Fig. 3: one existing answer (1,4) matches Q(X,4); |D_X| = 6
        u = self._unified()
        p = p_prov_estimate(u, 1, {"X": 6})
        assert p == pytest.approx(1 - 1 / 6)

    def test_no_existing_answers(self):
        u = self._unified()
        assert p_prov_estimate(u, 0, {"X": 6}) == 1.0

    def test_all_existing(self):
        u = self._unified()
        # 6 existing answers over a 6-value head domain → clamp to ~0
        assert p_prov_estimate(u, 6, {"X": 6}) == pytest.approx(1e-12)

    def test_fully_bound_head_missing(self):
        r = parse_rule("Q(X) :- R(X, Z).")
        u = unify_rule(r, parse_ptuple("Q(3)"))
        assert p_prov_estimate(u, 0, {}) == 1.0

    def test_missing_domain_raises(self):
        u = self._unified()
        with pytest.raises(KeyError):
            p_prov_estimate(u, 1, {})
