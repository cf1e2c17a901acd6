"""Smoke tests of the experiment harnesses (tiny scales) — every
table-reproduction entry point must produce well-formed rows."""
import pytest

from repro.core.unify import WHY, WHYNOT
from repro.experiments.common import format_rows, whynot_space
from repro.experiments.comparison import (
    run_artemis_comparison,
    run_single_derivation_comparison,
)
from repro.experiments.completeness import run_completeness
from repro.experiments.perf_scaling import run_perf_scaling
from repro.experiments.quality_error import run_quality_error
from repro.experiments.query_complexity import (
    run_bound_vars,
    run_dblp_hops,
    run_join_scaling,
    run_tpch_bound_vars,
)
from repro.experiments.queries import QUERIES
from repro.experiments.topk_runtime import run_topk_runtime


class TestRegistry:
    def test_all_queries_present(self):
        assert set(QUERIES) == {
            "r1", "r2", "r3", "r4", "r5", "r6", "r9", "r10", "r11", "r12",
        }

    @pytest.mark.parametrize("name", ["r1", "r5"])
    def test_bindings_resolve(self, spark, name):
        spec = QUERIES[name]
        db = spec.build_db(spark, 400, 0)
        from repro.engine.catalog import Catalog

        catalog = Catalog(spark, db)
        prog = spec.program()
        why = spec.why_ptuple(catalog, prog)
        whynot = spec.whynot_ptuple(catalog, prog)
        assert why.pred == whynot.pred == prog.head_pred


class TestPerfScaling:
    def test_whynot_rows(self, spark):
        rows = run_perf_scaling(
            spark, "r1", WHYNOT, sizes=[300], sample_sizes=[30], k=2
        )
        assert len(rows) == 1
        r = rows[0]
        assert r["prov_size"] > 0
        assert r["t_total"] > 0
        assert r["t_sample"] + r["t_pattern"] + r["t_metrics"] + r["t_topk"] <= (
            r["t_total"] + 1e-6
        )

    def test_why_rows(self, spark):
        rows = run_perf_scaling(
            spark, "r1", WHY, sizes=[300], sample_sizes=[30], k=2
        )
        assert rows[0]["completeness"] > 0

    def test_full_timeout_row(self, spark):
        rows = run_perf_scaling(
            spark, "r1", WHYNOT, sizes=[300], sample_sizes=[],
            include_full=True, full_budget=10, k=2,
        )
        assert rows[0]["t_total"] is None  # FULL over budget → timeout row


class TestTopkRuntime:
    def test_rows(self, spark):
        rows = run_topk_runtime(
            spark, "r1", WHYNOT, n=300, n_s=50, ks=[1, 3]
        )
        assert [r["k"] for r in rows] == [1, 3]
        assert all(r["t_topk"] >= 0 for r in rows)
        assert rows[0]["n_patterns"] == rows[1]["n_patterns"]


class TestQueryComplexity:
    def test_chain_joins(self, spark):
        rows = run_join_scaling(
            spark, "chain", [2, 3], n_rows=150, n_s=20, k=2
        )
        assert [r["n_joins"] for r in rows] == [2, 3]
        assert rows[1]["prov_size"] >= rows[0]["prov_size"]

    def test_star_bound_vars(self, spark):
        rows = run_bound_vars(
            spark, "star", 3, [0, 2], n_rows=150, n_s=20, k=2
        )
        assert rows[0]["prov_size"] > rows[1]["prov_size"]

    def test_dblp_hops(self, spark):
        rows = run_dblp_hops(spark, [2], n_edges=200, n_s=20, k=2)
        assert rows[0]["t_total"] > 0

    def test_tpch_bound(self, spark):
        rows = run_tpch_bound_vars(spark, [0, 4], n_rows=400, n_s=20, k=2)
        assert rows[0]["n_existential"] == 16
        assert rows[1]["n_existential"] == 12
        assert rows[0]["prov_size"] > rows[1]["prov_size"]


class TestQualityError:
    def test_why_error_rows(self, spark):
        rows = run_quality_error(
            spark, "r1", WHY, 300, sample_sizes=[30], ks=[2]
        )
        r = rows[0]
        assert 0 <= r["cp_rel_err"]
        assert 0 <= r["sc_rel_err"]

    def test_whynot_error_rows(self, spark):
        rows = run_quality_error(
            spark, "r6", WHYNOT, 300, sample_sizes=[30], ks=[2],
            reference_n_s=100,
        )
        assert rows and rows[0]["cp_ref"] >= 0


class TestCompleteness:
    def test_rows(self, spark):
        rows = run_completeness(
            spark, ["r1"], WHYNOT, 300, ks=[1, 3], n_s=50
        )
        assert [r["k"] for r in rows] == [1, 3]
        assert rows[1]["completeness"] >= rows[0]["completeness"] - 1e-9


class TestComparison:
    def test_artemis(self, spark):
        rows = run_artemis_comparison(
            spark, sizes=[120], artemis_budget=500_000
        )
        r = rows[0]
        assert r["t_pug_summ"] > 0
        assert r["t_artemis"] is None or r["t_artemis"] > 0

    def test_single_derivation(self, spark):
        rows = run_single_derivation_comparison(spark, sizes=[300], n_s=50)
        r = rows[0]
        assert r["found_derivation"]
        assert r["t_single_derivation"] > 0 and r["t_pug_summ"] > 0


class TestCommon:
    def test_whynot_space(self, spark):
        from repro.core.unify import parse_ptuple
        from repro.datasets.graph_r import graph_r, rex_program
        from repro.engine.catalog import Catalog

        catalog = Catalog(spark, graph_r(spark))
        # X domain {1,2,5} filtered by X<4 → 2; Z domain (6 values)
        assert whynot_space(
            catalog, rex_program(), parse_ptuple("Qex(X, 4)")
        ) == 12

    def test_format_rows(self):
        out = format_rows([{"a": 1, "b": None}, {"a": 2.5, "b": "x"}])
        assert "timeout" in out and "2.500" in out

    def test_format_empty(self):
        assert format_rows([]) == "(no rows)"
