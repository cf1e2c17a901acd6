"""T11 (Fig. 11) benchmark: completeness-vs-k sweeps for why and
why-not questions."""
from repro.core.unify import WHY, WHYNOT
from repro.experiments.completeness import run_completeness


def test_t11_why(benchmark, spark):
    rows = benchmark.pedantic(
        run_completeness,
        args=(spark, ["r1", "r6"], WHY, 2000, [1, 3, 5, 10]),
        kwargs={"n_s": 300},
        rounds=1, iterations=1,
    )
    assert len(rows) == 8


def test_t11_whynot(benchmark, spark):
    rows = benchmark.pedantic(
        run_completeness,
        args=(spark, ["r1", "r6"], WHYNOT, 2000, [1, 3, 5, 10]),
        kwargs={"n_s": 300},
        rounds=1, iterations=1,
    )
    assert len(rows) == 8
