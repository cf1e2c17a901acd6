"""Tests for the batch why-not sampling pipeline (Sec. 5)."""
import pandas as pd
import pytest

from repro.core.unify import parse_ptuple, unify_rule
from repro.datasets.airbnb import airbnb_program, s_airbnb
from repro.datasets.graph_r import graph_r, rex_program
from repro.engine.catalog import Catalog
from repro.sampling.ops import sample_with_replacement, with_row_ids
from repro.sampling.whynot import sample_whynot, sample_whynot_rule


@pytest.fixture(scope="module")
def rex(spark):
    catalog = Catalog(spark, graph_r(spark))
    prog = rex_program()
    dom = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3, 4, 5, 6]}))
    return catalog, prog, {"X": dom, "Z": dom}


@pytest.fixture(scope="module")
def airbnb(spark):
    return Catalog(spark, s_airbnb(spark)), airbnb_program()


class TestOps:
    def test_with_row_ids_dense(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"v": list("abcde")}))
        ids = sorted(r["id"] for r in with_row_ids(df).collect())
        assert ids == [1, 2, 3, 4, 5]

    def test_sample_size(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3]}))
        out = sample_with_replacement(df, 50, seed=3)
        assert out.count() == 50
        assert set(out.columns) == {"v", "id"}

    def test_sample_ids_are_picks(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3]}))
        out = sample_with_replacement(df, 20, seed=3)
        assert sorted(r["id"] for r in out.collect()) == list(range(1, 21))

    def test_sample_values_from_domain(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"v": [10, 20]}))
        vals = {r["v"] for r in sample_with_replacement(df, 30, seed=1).collect()}
        assert vals <= {10, 20}

    def test_sample_with_replacement_covers(self, spark):
        # 200 picks from a 3-value domain hit every value w.h.p.
        df = spark.createDataFrame(pd.DataFrame({"v": [1, 2, 3]}))
        vals = {r["v"] for r in sample_with_replacement(df, 200, seed=5).collect()}
        assert vals == {1, 2, 3}

    def test_empty_domain_raises(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"v": [1]})).filter("v > 5")
        with pytest.raises(ValueError, match="empty"):
            sample_with_replacement(df, 5, seed=0)

    def test_nonpositive_n_raises(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"v": [1]}))
        with pytest.raises(ValueError):
            sample_with_replacement(df, 0, seed=0)


class TestSampleWhynot:
    def test_sample_subset_of_whynot(self, rex):
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        rs = sample_whynot_rule(
            catalog, prog, u, n_s=30, seed=0, domains=domains
        )
        rows = {(r["X"], r["Z"], r["g1"], r["g2"]) for r in rs.sample.collect()}
        assert rows  # non-empty
        from repro.provenance.whynot_full import whynot_full

        (_, full_df), = whynot_full(
            catalog, prog, parse_ptuple("Qex(X, 4)"), domains
        )
        full = {
            (r["X"], r["Z"], r["g1"], r["g2"]) for r in full_df.collect()
        }
        assert rows <= full

    def test_large_sample_covers_everything(self, rex):
        # n_S >> |Whynot| (12): the distinct sampled derivations must
        # converge to the full set
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        rs = sample_whynot_rule(
            catalog, prog, u, n_s=500, seed=1, domains=domains
        )
        assert rs.sample.count() == 12

    def test_predicate_respected(self, rex):
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        rs = sample_whynot_rule(
            catalog, prog, u, n_s=50, seed=2, domains=domains
        )
        assert all(r["X"] < 4 for r in rs.sample.collect())

    def test_no_existing_answer_heads(self, rex):
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        rs = sample_whynot_rule(
            catalog, prog, u, n_s=50, seed=3, domains=domains
        )
        assert all(r["X"] != 1 for r in rs.sample.collect())

    def test_p_prov_and_n_os(self, rex):
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        rs = sample_whynot_rule(
            catalog, prog, u, n_s=10, seed=0, domains=domains
        )
        # one existing answer over the 3-value filtered X domain
        assert rs.p_prov == pytest.approx(1 - 1 / 3)
        assert rs.n_os >= 10
        assert rs.n_all_derivations == 18

    def test_airbnb_sampling(self, airbnb):
        catalog, prog = airbnb
        samples = sample_whynot(
            catalog, prog, parse_ptuple("AL(N, shared)"), n_s=100, seed=0
        )
        assert len(samples) == 1
        rs = samples[0]
        assert rs.p_prov == 1.0  # no existing shared answers
        assert 0 < rs.sample.count() <= 100
        cols = set(rs.sample.columns)
        assert cols == {"N", "I", "T", "E", "P", "g1", "g2"}

    def test_airbnb_annotations_consistent(self, airbnb):
        # every sampled derivation's annotations must match the full
        # enumeration (same derivation → same goal vector)
        catalog, prog = airbnb
        from repro.provenance.whynot_full import whynot_full

        (_, full_df), = whynot_full(catalog, prog, parse_ptuple("AL(N, shared)"))
        full = {
            (r["N"], r["I"], r["T"], r["E"], r["P"]): (r["g1"], r["g2"])
            for r in full_df.collect()
        }
        samples = sample_whynot(
            catalog, prog, parse_ptuple("AL(N, shared)"), n_s=50, seed=4
        )
        for r in samples[0].sample.collect():
            key = (r["N"], r["I"], r["T"], r["E"], r["P"])
            assert full[key] == (r["g1"], r["g2"])

    def test_deterministic_given_seed(self, airbnb):
        catalog, prog = airbnb
        t = parse_ptuple("AL(N, shared)")
        a = sample_whynot(catalog, prog, t, n_s=20, seed=9)[0].sample.collect()
        b = sample_whynot(catalog, prog, t, n_s=20, seed=9)[0].sample.collect()
        assert sorted(map(tuple, a)) == sorted(map(tuple, b))

    def test_sampling_is_roughly_uniform(self, rex):
        # Theorem 1: each of the 12 why-not derivations should appear
        # with similar frequency across repeated small samples
        catalog, prog, domains = rex
        u = unify_rule(prog.rules[0], parse_ptuple("Qex(X, 4)"))
        counts: dict = {}
        for seed in range(12):
            rs = sample_whynot_rule(
                catalog, prog, u, n_s=4, seed=seed * 13, domains=domains
            )
            for r in rs.sample.collect():
                counts[(r["X"], r["Z"])] = counts.get((r["X"], r["Z"]), 0) + 1
        assert len(counts) >= 9  # most derivations were seen at least once
