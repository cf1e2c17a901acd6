"""T12 (Fig. 12) benchmark: PUG-Summ vs Artemis (witness DB) and vs the
single-derivation baseline (r1)."""
from repro.experiments.comparison import (
    run_artemis_comparison,
    run_single_derivation_comparison,
)


def test_t12a_artemis(benchmark, spark):
    rows = benchmark.pedantic(
        run_artemis_comparison,
        args=(spark, [300]),
        kwargs={"artemis_budget": 500_000},
        rounds=1, iterations=1,
    )
    assert rows[0]["t_pug_summ"] > 0


def test_t12b_single_derivation(benchmark, spark):
    rows = benchmark.pedantic(
        run_single_derivation_comparison,
        args=(spark, [5000]),
        rounds=1, iterations=1,
    )
    assert rows[0]["found_derivation"]
