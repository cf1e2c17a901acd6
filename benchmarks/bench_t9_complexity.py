"""T9 (Fig. 9) benchmark: summarization vs query complexity — chain and
star join counts, bound variables, DBLP hops, TPC-H r10 bound vars."""
import pytest

from repro.experiments.query_complexity import (
    run_bound_vars,
    run_dblp_hops,
    run_join_scaling,
    run_tpch_bound_vars,
)


@pytest.mark.parametrize("shape,n_joins", [
    ("chain", 2), ("chain", 4), ("star", 2), ("star", 4),
])
def test_t9_joins(benchmark, spark, shape, n_joins):
    rows = benchmark.pedantic(
        run_join_scaling,
        args=(spark, shape, [n_joins]),
        kwargs={"n_rows": 1000, "n_s": 100},
        rounds=1, iterations=1,
    )
    assert rows[0]["t_total"] > 0


@pytest.mark.parametrize("n_bound", [0, 3])
def test_t9_chain_bound_vars(benchmark, spark, n_bound):
    rows = benchmark.pedantic(
        run_bound_vars,
        args=(spark, "chain", 5, [n_bound]),
        kwargs={"n_rows": 1000, "n_s": 100},
        rounds=1, iterations=1,
    )
    assert rows[0]["n_bound"] == n_bound


@pytest.mark.parametrize("hops", [2, 3])
def test_t9_dblp_hops(benchmark, spark, hops):
    rows = benchmark.pedantic(
        run_dblp_hops,
        args=(spark, [hops]),
        kwargs={"n_edges": 2000, "n_s": 100},
        rounds=1, iterations=1,
    )
    assert rows[0]["n_hops"] == hops


@pytest.mark.parametrize("n_bound", [0, 8])
def test_t9_tpch_bound_vars(benchmark, spark, n_bound):
    rows = benchmark.pedantic(
        run_tpch_bound_vars,
        args=(spark, [n_bound]),
        kwargs={"n_rows": 1500, "n_s": 100},
        rounds=1, iterations=1,
    )
    assert rows[0]["n_bound"] == n_bound
