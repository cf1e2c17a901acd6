"""Tests for the single-derivation and Artemis-like baselines."""
import pandas as pd
import pytest

from repro.baselines.artemis import ArtemisTimeout, artemis_explain
from repro.baselines.single_derivation import single_derivation
from repro.core.unify import parse_ptuple
from repro.datasets.airbnb import airbnb_program, s_airbnb
from repro.datasets.graph_r import graph_r, rex_program
from repro.datasets.witness import crimedesc_program, witness_db
from repro.engine.catalog import Catalog
from repro.provenance.whynot_full import whynot_full


@pytest.fixture(scope="module")
def rex(spark):
    catalog = Catalog(spark, graph_r(spark))
    dom = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3, 4, 5, 6]}))
    return catalog, rex_program(), {"X": dom, "Z": dom}


class TestSingleDerivation:
    def test_returns_a_failed_derivation(self, rex):
        catalog, prog, _ = rex
        p = single_derivation(catalog, prog, parse_ptuple("Qex(X, 4)"))
        assert p is not None
        assert p.count == 1
        assert all(a is not None for a in p.args)  # fully constant
        # it must be a real why-not derivation
        (_, full_df), = whynot_full(
            catalog, prog, parse_ptuple("Qex(X, 4)")
        )
        full = {
            ((r["X"], r["Z"]), (r["g1"], r["g2"])) for r in full_df.collect()
        }
        assert (p.args, p.goals) in full

    def test_airbnb(self, spark):
        catalog = Catalog(spark, s_airbnb(spark))
        p = single_derivation(catalog, airbnb_program(), parse_ptuple("AL(N, shared)"))
        assert p is not None and len(p.args) == 5

    def test_existing_answer_returns_none(self, rex):
        catalog, prog, _ = rex
        # Qex(1,4) exists → no why-not derivations at all
        assert single_derivation(catalog, prog, parse_ptuple("Qex(1, 4)")) is None


class TestArtemis:
    def test_explains_rex(self, rex):
        catalog, prog, _ = rex
        exp = artemis_explain(catalog, prog, parse_ptuple("Qex(X, 4)"))
        # without domain overrides X's domain is {1,2,5}∩(<4)={1,2} minus
        # the existing answer 1 → X=2, Z over 6 values = 6 derivations
        assert exp.n_derivations == 6
        assert sum(p.count for p in exp.patterns) == 6
        assert abs(sum(p.cp for p in exp.patterns) - 1.0) < 1e-9

    def test_top_is_most_general(self, rex):
        catalog, prog, _ = rex
        exp = artemis_explain(catalog, prog, parse_ptuple("Qex(X, 4)"))
        top = exp.top()
        assert top.count == max(p.count for p in exp.patterns)

    def test_timeout_guard(self, spark):
        db = witness_db(spark, n=400, seed=0)
        catalog = Catalog(spark, db)
        with pytest.raises(ArtemisTimeout):
            artemis_explain(
                catalog,
                crimedesc_program(),
                parse_ptuple(
                    "CrimeDesc('trespassing', 'Aarongolden', "
                    "'MidnightBlue', 'lavender')"
                ),
                max_derivations=10,
            )

    def test_witness_small(self, spark):
        db = witness_db(spark, n=120, seed=0)
        catalog = Catalog(spark, db)
        exp = artemis_explain(
            catalog,
            crimedesc_program(),
            parse_ptuple(
                "CrimeDesc('trespassing', 'Aarongolden', "
                "'MidnightBlue', 'lavender')"
            ),
            max_derivations=500_000,
        )
        assert exp.n_derivations > 0
        # Artemis' top-1 is the (near) most-general pattern: its
        # informativeness is low (the paper's quality criticism)
        assert exp.top().info() <= 0.5
