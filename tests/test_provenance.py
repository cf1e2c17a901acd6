"""Tests for provenance capture: why derivations, full why-not
enumeration, and goal annotation — pinned to the paper's Fig. 1–3
numbers (2160 Airbnb derivations, the Example 6 annotations, etc.)."""
import pandas as pd
import pytest

from repro.core.ast import parse_program
from repro.core.unify import WHYNOT, PQuestion, parse_ptuple, unify_rule
from repro.datasets.airbnb import airbnb_program, s_airbnb
from repro.datasets.graph_r import graph_r, rex_program
from repro.engine.catalog import Catalog
from repro.engine.eval import evaluate
from repro.provenance.annotate import annotate_goals, anti_join_existing
from repro.provenance.why import why_derivations, why_provenance
from repro.provenance.whynot_full import (
    all_valuations,
    count_all_derivations,
    whynot_full,
    whynot_full_rule,
)


@pytest.fixture(scope="module")
def rex(spark):
    catalog = Catalog(spark, graph_r(spark))
    prog = rex_program()
    dom = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3, 4, 5, 6]}))
    return catalog, prog, {"X": dom, "Z": dom}


@pytest.fixture(scope="module")
def airbnb(spark):
    return Catalog(spark, s_airbnb(spark)), airbnb_program()


class TestWhy:
    def test_rex_why_all_goals_true(self, rex):
        catalog, prog, _ = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        d = why_derivations(catalog, u)
        rows = {(r["X"], r["Z"], r["g1"], r["g2"]) for r in d.collect()}
        # only existing answer matching Qex(X,4) is (1,4) via 1-2-4
        assert rows == {(1, 2, True, True)}

    def test_why_provenance_multi(self, rex):
        catalog, prog, _ = rex
        pairs = why_provenance(catalog, prog, parse_ptuple("Qex(X, Y)"))
        assert len(pairs) == 1
        u, df = pairs[0]
        assert df.count() == 3  # three successful derivations

    def test_airbnb_why(self, airbnb):
        catalog, prog = airbnb
        pairs = why_provenance(catalog, prog, parse_ptuple("AL(N, R)"))
        _, df = pairs[0]
        rows = {tuple(r) for r in df.collect()}
        # two successful derivations: cozy homebase (2445, $45) and
        # modern view (2332, $350)
        assert len(rows) == 2


class TestWhynotFull:
    def test_rex_counts(self, rex):
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        # X < 4 pre-filters X's domain to {1,2,3}; Z keeps 6 values
        assert count_all_derivations(catalog, u, domains) == 18

    def test_rex_all_valuations(self, rex):
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        vals = all_valuations(catalog, u, domains)
        assert vals.count() == 18
        assert set(vals.columns) == {"X", "Z"}

    def test_rex_whynot_is_12(self, rex):
        # 18 valuations minus the 6 derivations of existing answer (1,4)
        catalog, prog, domains = rex
        full = whynot_full(catalog, prog, parse_ptuple("Qex(X, 4)"), domains)
        (_, df), = full
        assert df.count() == 12
        assert {r["X"] for r in df.collect()} == {2, 3}

    def test_example6_annotations(self, rex):
        catalog, prog, domains = rex
        full = whynot_full(catalog, prog, parse_ptuple("Qex(X, 4)"), domains)
        (_, df), = full
        rows = {(r["X"], r["Z"]): (r["g1"], r["g2"]) for r in df.collect()}
        assert rows[(2, 2)] == (False, True)   # R(2,2) missing, R(2,4) exists
        assert rows[(2, 4)] == (True, False)   # R(2,4) exists, R(4,4) missing
        assert rows[(2, 3)] == (True, False)   # R(2,3) exists, R(3,4) missing
        assert rows[(3, 2)] == (False, True)

    def test_airbnb_2160(self, airbnb):
        # Sec. 1: 6·6·3·5·4 = 2160 derivations for AL(N, shared)
        catalog, prog = airbnb
        u = unify_rule(prog.rules[0], parse_ptuple("AL(N, shared)"))
        assert count_all_derivations(catalog, u) == 2160

    def test_airbnb_whynot_complete(self, airbnb):
        # AL(N, shared) has no existing answers → all 2160 are why-not
        catalog, prog = airbnb
        full = whynot_full(catalog, prog, parse_ptuple("AL(N, shared)"))
        (_, df), = full
        assert df.count() == 2160

    def test_airbnb_p1_match_count(self, airbnb):
        # pattern p1 (Fig. 2b): T = apt, goals (T, F) — matches exactly
        # the 8 derivations of the two unavailable shared apartments
        catalog, prog = airbnb
        full = whynot_full(catalog, prog, parse_ptuple("AL(N, shared)"))
        (_, df), = full
        n = df.filter("T = 'apt' AND g1 = true AND g2 = false").count()
        assert n == 8

    def test_budget_guard(self, airbnb):
        catalog, prog = airbnb
        with pytest.raises(ValueError, match="exceeds"):
            whynot_full(
                catalog, prog, parse_ptuple("AL(N, shared)"),
                max_derivations=100,
            )

    def test_fully_bound_missing_head(self, rex):
        catalog, prog, domains = rex
        t = parse_ptuple("Qex(2, 4)")  # missing answer, X bound too
        full = whynot_full(catalog, prog, t, domains)
        (_, df), = full
        assert df.count() == 6  # all Z values, head is missing

    def test_fully_bound_existing_head(self, rex):
        catalog, prog, domains = rex
        t = parse_ptuple("Qex(1, 4)")  # existing answer → empty why-not
        full = whynot_full(catalog, prog, t, domains)
        (_, df), = full
        assert df.count() == 0


class TestAnnotate:
    def test_negated_goal_annotation(self, spark):
        db = {
            "R": spark.createDataFrame(pd.DataFrame({"a": [1, 2]})),
            "S": spark.createDataFrame(pd.DataFrame({"a": [2]})),
        }
        catalog = Catalog(spark, db)
        prog = parse_program("Q(X) :- R(X), not S(X).")
        u = unify_rule(prog.rules[0], parse_ptuple("Q(X)"))
        deriv = spark.createDataFrame(pd.DataFrame({"X": [1, 2, 3]}))
        ann = annotate_goals(catalog, u, deriv)
        rows = {r["X"]: (r["g1"], r["g2"]) for r in ann.collect()}
        # X=1: R(1) exists (T), S(1) missing → ¬S succeeds (T)
        assert rows[1] == (True, True)
        # X=2: R(2) exists, S(2) exists → ¬S fails
        assert rows[2] == (True, False)
        # X=3: R(3) missing, S(3) missing → ¬S succeeds
        assert rows[3] == (False, True)

    def test_no_row_multiplication(self, spark):
        # duplicate-friendly relation: annotation must not duplicate rows
        db = {"R": spark.createDataFrame(pd.DataFrame({"a": [1, 1, 1]}))}
        catalog = Catalog(spark, db)
        prog = parse_program("Q(X) :- R(X).")
        u = unify_rule(prog.rules[0], parse_ptuple("Q(X)"))
        deriv = spark.createDataFrame(pd.DataFrame({"X": [1, 2]}))
        assert annotate_goals(catalog, u, deriv).count() == 2

    def test_anti_join_existing(self, rex):
        catalog, prog, _ = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        result = evaluate(catalog, prog)
        deriv = catalog.spark.createDataFrame(
            pd.DataFrame({"X": [1, 2, 3], "Z": [9, 9, 9]})
        )
        kept = anti_join_existing(deriv, result, u)
        assert {r["X"] for r in kept.collect()} == {2, 3}
