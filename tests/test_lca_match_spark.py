"""Catalyst LCA (Q_lca) and match counting (Q_match) vs the pure-Python
references."""
import pandas as pd
import pytest

from repro.patterns.lca import lca_candidates, lca_reference
from repro.patterns.matching import collect_patterns, match_counts, match_reference


def _sample_df(spark, rows):
    pdf = pd.DataFrame(
        [
            {"X": a[0], "Z": a[1], "g1": g[0], "g2": g[1]}
            for a, g in rows
        ]
    )
    return spark.createDataFrame(pdf)


ROWS_A = [
    ((2, 1), (False, False)), ((2, 2), (False, False)),
    ((3, 1), (False, False)), ((2, 4), (True, False)),
    ((3, 4), (True, False)),
]

ROWS_B = [((i % 3, i % 2), (i % 2 == 0, True)) for i in range(9)]


class TestLcaSpark:
    @pytest.mark.parametrize("rows", [ROWS_A, ROWS_B], ids=["A", "B"])
    def test_matches_reference(self, spark, rows):
        df = _sample_df(spark, rows)
        out = lca_candidates(df, ["X", "Z"], ["g1", "g2"])
        got = {
            ((r["X"], r["Z"]), (r["g1"], r["g2"])) for r in out.collect()
        }
        assert got == lca_reference(sorted(set(rows), key=repr))

    def test_single_row_gives_itself(self, spark):
        df = _sample_df(spark, [((1, 2), (True, True))])
        out = lca_candidates(df, ["X", "Z"], ["g1", "g2"]).collect()
        assert [(r["X"], r["Z"]) for r in out] == [(1, 2)]

    def test_null_encodes_placeholder(self, spark):
        df = _sample_df(spark, [((1, 2), (True, True)), ((1, 3), (True, True))])
        out = lca_candidates(df, ["X", "Z"], ["g1", "g2"]).collect()
        pats = {(r["X"], r["Z"]) for r in out}
        assert (1, None) in pats


class TestMatchSpark:
    def test_counts_match_reference(self, spark):
        rows = sorted(set(ROWS_A), key=repr)
        df = _sample_df(spark, rows)
        lca = lca_candidates(df, ["X", "Z"], ["g1", "g2"])
        got_df = match_counts(lca, df, ["X", "Z"], ["g1", "g2"])
        got = {
            ((r["X"], r["Z"]), (r["g1"], r["g2"])): r["match_count"]
            for r in got_df.collect()
        }
        pats = sorted(lca_reference(rows), key=repr)
        want = match_reference(pats, rows)
        assert got == want

    def test_collect_patterns(self, spark):
        rows = sorted(set(ROWS_A), key=repr)
        df = _sample_df(spark, rows)
        lca = lca_candidates(df, ["X", "Z"], ["g1", "g2"])
        matched = match_counts(lca, df, ["X", "Z"], ["g1", "g2"])
        ps = collect_patterns(matched, "rex", ["X", "Z"], ["g1", "g2"], len(rows))
        assert all(p.rule_id == "rex" for p in ps)
        assert all(0 < p.cp <= 1 for p in ps)
        # the (X, Z)-(F,F) all-placeholder pattern covers the 3 F,F rows
        allp = [p for p in ps if p.args == (None, None) and p.goals == (False, False)]
        assert allp and allp[0].count == 3

    def test_collect_patterns_weight(self, spark):
        rows = sorted(set(ROWS_A), key=repr)
        df = _sample_df(spark, rows)
        lca = lca_candidates(df, ["X", "Z"], ["g1", "g2"])
        matched = match_counts(lca, df, ["X", "Z"], ["g1", "g2"])
        ps = collect_patterns(
            matched, "rex", ["X", "Z"], ["g1", "g2"], len(rows), weight=0.5
        )
        allp = [p for p in ps if p.args == (None, None) and p.goals == (False, False)]
        assert allp[0].cp == pytest.approx(0.5 * 3 / 5)
