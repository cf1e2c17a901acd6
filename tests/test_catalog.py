"""Tests for the EDB catalog and attribute domains."""
import pandas as pd
import pytest

from repro.core.ast import Var, parse_rule
from repro.datasets.airbnb import airbnb_program, s_airbnb
from repro.engine.catalog import Catalog, attrs_of_vars


@pytest.fixture(scope="module")
def airbnb_cat(spark):
    return Catalog(spark, s_airbnb(spark))


class TestCatalog:
    def test_relation_names(self, airbnb_cat):
        assert airbnb_cat.relation_names() == ["AVAILABILITY", "LISTING"]

    def test_unknown_relation_raises(self, airbnb_cat):
        with pytest.raises(KeyError):
            airbnb_cat.df("NOPE")

    def test_columns(self, airbnb_cat):
        assert airbnb_cat.columns("AVAILABILITY") == ["id", "date", "price"]

    def test_attribute_domain(self, airbnb_cat):
        vals = {
            r["value"]
            for r in airbnb_cat.attribute_domain("LISTING", 2).collect()
        }
        assert vals == {"apt", "house", "condo"}

    def test_domain_union(self, airbnb_cat):
        # id occurs in LISTING.0 and AVAILABILITY.0; union = 6 listings
        dom = airbnb_cat.domain([("LISTING", 0), ("AVAILABILITY", 0)])
        assert dom.count() == 6

    def test_domain_size_cached(self, airbnb_cat):
        occs = [("LISTING", 2)]
        assert airbnb_cat.domain_size(occs) == 3
        assert airbnb_cat.domain_size(occs) == 3

    def test_domain_override(self, spark, airbnb_cat):
        cat = Catalog(spark, s_airbnb(spark))
        override = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3]}))
        cat.set_domain("AVAILABILITY", 2, override)
        assert cat.domain_size([("AVAILABILITY", 2)]) == 3

    def test_domain_override_must_be_unary(self, spark):
        cat = Catalog(spark, s_airbnb(spark))
        bad = spark.createDataFrame(pd.DataFrame({"a": [1], "b": [2]}))
        with pytest.raises(ValueError):
            cat.set_domain("LISTING", 0, bad)

    def test_fig1_distinct_value_counts(self, airbnb_cat):
        # bottom row of Fig. 1
        expected = {
            ("LISTING", 0): 6, ("LISTING", 1): 6, ("LISTING", 2): 3,
            ("LISTING", 3): 3, ("LISTING", 4): 3, ("LISTING", 5): 5,
            ("AVAILABILITY", 1): 2, ("AVAILABILITY", 2): 4,
        }
        for (rel, pos), n in expected.items():
            assert airbnb_cat.domain_size([(rel, pos)]) == n, (rel, pos)


class TestAttrsOfVars:
    def test_airbnb_rule(self):
        rule = airbnb_program().rules[0]
        occs = attrs_of_vars(rule)
        assert occs[Var("I")] == [("LISTING", 0), ("AVAILABILITY", 0)]
        assert occs[Var("P")] == [("AVAILABILITY", 2)]
        assert occs[Var("N")] == [("LISTING", 1)]

    def test_negated_atom_contributes(self):
        rule = parse_rule("Q(X) :- R(X, Y), not S(Y).")
        occs = attrs_of_vars(rule)
        assert occs[Var("Y")] == [("R", 1), ("S", 0)]

    def test_repeated_var_one_atom(self):
        rule = parse_rule("Q(X) :- R(X, X).")
        assert attrs_of_vars(rule)[Var("X")] == [("R", 0), ("R", 1)]
