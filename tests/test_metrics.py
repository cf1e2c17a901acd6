"""Tests for quality metrics and the driver-side SampleStore."""
import pytest

from repro.summarize.metrics import SampleStore, harmonic, info_of_set
from tests.test_patterns_pure import mk


class TestHarmonic:
    def test_zero(self):
        assert harmonic(0.0, 0.0) == 0.0

    def test_symmetric(self):
        assert harmonic(0.2, 0.8) == harmonic(0.8, 0.2)

    def test_equal_args(self):
        assert harmonic(0.5, 0.5) == pytest.approx(0.5)

    def test_known_value(self):
        assert harmonic(1.0, 0.5) == pytest.approx(2 / 3)

    def test_zero_one_is_zero(self):
        assert harmonic(0.0, 1.0) == 0.0


class TestInfoOfSet:
    def test_empty(self):
        assert info_of_set([]) == 0.0

    def test_average(self):
        ps = [mk((1, 2)), mk((None, None))]  # info 1.0 and 0.0
        assert info_of_set(ps) == pytest.approx(0.5)


def _store():
    store = SampleStore()
    rows = [
        ((2, 1), (False, False)), ((2, 2), (False, False)),
        ((2, 5), (False, False)), ((2, 6), (False, False)),
        ((2, 3), (True, False)), ((2, 4), (True, False)),
    ]
    store.add_rule("rex", rows, 1.0)
    return store


class TestSampleStore:
    def test_cp_of_pattern(self):
        store = _store()
        p = mk((2, None), goals=(False, False))
        assert store.cp_of_pattern(p) == pytest.approx(4 / 6)

    def test_cp_of_set_union_not_sum(self):
        store = _store()
        p1 = mk((2, None), goals=(False, False))
        p2 = mk((None, 1), goals=(False, False))  # subset of p1's matches
        assert store.cp_of_set([p1, p2]) == pytest.approx(4 / 6)

    def test_cp_of_set_disjoint_adds(self):
        store = _store()
        p1 = mk((None, None), goals=(False, False))
        p2 = mk((None, None), goals=(True, False))
        assert store.cp_of_set([p1, p2]) == pytest.approx(1.0)

    def test_mask_cache_consistency(self):
        store = _store()
        p = mk((2, None), goals=(False, False))
        a = store.cp_of_pattern(p)
        b = store.cp_of_pattern(p)
        assert a == b

    def test_weights(self):
        store = SampleStore()
        store.add_rule("a", [((1,), (True,))], 3.0)
        store.add_rule("b", [((1,), (True,)), ((2,), (True,))], 1.0)
        store.normalize_weights()
        pa = mk((None,), goals=(True,), rule_id="a")
        assert store.cp_of_pattern(pa) == pytest.approx(0.75)

    def test_score_of_set(self):
        store = _store()
        p = mk((2, None), goals=(False, False))
        cp = 4 / 6
        info = 0.5
        assert store.score_of_set([p]) == pytest.approx(harmonic(cp, info))

    def test_multi_rule_union(self):
        store = SampleStore()
        store.add_rule("a", [((1,), (True,)), ((2,), (True,))], 0.5)
        store.add_rule("b", [((7,), (False,)), ((8,), (False,))], 0.5)
        pa = mk((1,), goals=(True,), rule_id="a")
        pb = mk((None,), goals=(False,), rule_id="b")
        assert store.cp_of_set([pa, pb]) == pytest.approx(0.5 * 0.5 + 0.5 * 1.0)
