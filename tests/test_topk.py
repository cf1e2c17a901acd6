"""Tests for the best-first top-k search (Sec. 8.2), validated against
brute force with exact-over-sample scoring on random instances."""
import random

import pytest

from repro.patterns.pattern import Pattern
from repro.summarize.metrics import SampleStore, info_of_set
from repro.summarize.topk import topk_bestfirst, topk_exact, topk_greedy
from tests.test_patterns_pure import mk


def _random_instance(seed, n_rows=40, arity=3, dom=4):
    """A random sample + its LCA patterns with exact cp estimates —
    the realistic search input (estimates consistent with the store)."""
    rng = random.Random(seed)
    rows = [
        (
            tuple(rng.randrange(dom) for _ in range(arity)),
            (rng.random() < 0.7, rng.random() < 0.5),
        )
        for _ in range(n_rows)
    ]
    from repro.patterns.lca import lca_reference
    from repro.patterns.matching import match_reference

    pats = sorted(lca_reference(rows), key=repr)
    counts = match_reference(pats, rows)
    patterns = [
        Pattern(
            rule_id="r",
            var_names=tuple(f"V{i}" for i in range(arity)),
            args=args,
            goals=goals,
            cp=counts[(args, goals)] / len(rows),
            count=counts[(args, goals)],
        )
        for args, goals in pats
    ]
    store = SampleStore()
    store.add_rule("r", rows, 1.0)
    return patterns, store


class TestBestFirst:
    def test_fewer_patterns_than_k(self):
        ps = [mk((1, None), cp=0.4)]
        r = topk_bestfirst(ps, 3)
        assert set(r.patterns) == set(ps)
        assert r.proved_optimal

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            topk_bestfirst([], 3)

    def test_returns_k_patterns(self):
        patterns, _ = _random_instance(0)
        r = topk_bestfirst(patterns[:20], 3)
        assert len(r.patterns) == 3

    def test_bounds_are_ordered(self):
        patterns, _ = _random_instance(1)
        r = topk_bestfirst(patterns[:20], 3)
        assert r.score_lb <= r.score_ub + 1e-9

    @pytest.mark.parametrize("seed", range(6))
    def test_true_score_within_bounds(self, seed):
        patterns, store = _random_instance(seed)
        r = topk_bestfirst(patterns[:15], 3)
        true = store.score_of_set(r.patterns)
        assert r.score_lb - 1e-9 <= true <= r.score_ub + 1e-9

    @pytest.mark.parametrize("seed", range(6))
    def test_close_to_exact_optimum(self, seed):
        # best-first optimizes bound-based scores; its pick must be close
        # to the exact-over-sample optimum (equal in most instances)
        patterns, store = _random_instance(seed, n_rows=25)
        pats = sorted(
            patterns, key=lambda p: (-p.cp, repr(p.args))
        )[:12]
        bf = topk_bestfirst(pats, 2)
        ex = topk_exact(pats, 2, store)
        assert store.score_of_set(bf.patterns) >= 0.9 * ex.score_lb

    def test_k_one_picks_best_singleton(self):
        patterns, store = _random_instance(3)
        r = topk_bestfirst(patterns, 1)
        best = max(patterns, key=lambda p: store.score_of_set([p]))
        assert store.score_of_set(r.patterns) == pytest.approx(
            store.score_of_set([best])
        )

    def test_pop_budget_falls_back(self):
        patterns, _ = _random_instance(4)
        r = topk_bestfirst(patterns[:20], 3, max_pops=5)
        assert len(r.patterns) == 3  # fallback heuristic still answers

    def test_disjoint_patterns_proved(self):
        ps = [
            mk((1, 1), cp=0.3), mk((2, 2), cp=0.3), mk((3, 3), cp=0.2),
            mk((4, 4), cp=0.1), mk((5, 5), cp=0.05),
        ]
        r = topk_bestfirst(ps, 3)
        # all-constant patterns: info 1.0 each, disjoint → exact cp known
        assert r.score_lb == pytest.approx(r.score_ub)
        assert {p.args for p in r.patterns} == {(1, 1), (2, 2), (3, 3)}


class TestGreedy:
    def test_returns_k(self):
        patterns, _ = _random_instance(5)
        r = topk_greedy(patterns, 3)
        assert len(r.patterns) == 3

    def test_handles_small_pool(self):
        r = topk_greedy([mk((1, None), cp=0.2)], 5)
        assert len(r.patterns) == 1


class TestExact:
    def test_beats_or_ties_greedy(self):
        patterns, store = _random_instance(6, n_rows=20)
        pats = patterns[:10]
        ex = topk_exact(pats, 2, store)
        gr = topk_greedy(pats, 2)
        assert ex.score_lb >= store.score_of_set(gr.patterns) - 1e-9

    def test_info_consistency(self):
        patterns, store = _random_instance(7, n_rows=20)
        ex = topk_exact(patterns[:8], 2, store)
        assert store.score_of_set(ex.patterns) == pytest.approx(ex.score_lb)
        assert 0.0 <= info_of_set(ex.patterns) <= 1.0
