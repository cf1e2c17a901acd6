"""T10 (Fig. 10) benchmark: the quality-error harness (sampled summary
vs reference metrics) for r1/why and r6/why-not."""
from repro.core.unify import WHY, WHYNOT
from repro.experiments.quality_error import run_quality_error


def test_t10_r1_why_error(benchmark, spark):
    rows = benchmark.pedantic(
        run_quality_error,
        args=(spark, "r1", WHY, 2000, [100], [3]),
        rounds=1, iterations=1,
    )
    assert rows[0]["cp_rel_err"] >= 0


def test_t10_r6_whynot_error(benchmark, spark):
    rows = benchmark.pedantic(
        run_quality_error,
        args=(spark, "r6", WHYNOT, 2000, [100], [3]),
        kwargs={"reference_n_s": 1000},
        rounds=1, iterations=1,
    )
    assert rows[0]["cp_rel_err"] >= 0
