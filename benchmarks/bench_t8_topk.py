"""T8 (Fig. 8) benchmark: top-k construction alone, patterns given as
input (phases 1–3 run once in the fixture), varying k."""
import pytest

from repro.core.unify import WHYNOT, PQuestion
from repro.engine.catalog import Catalog
from repro.experiments.queries import QUERIES
from repro.summarize.pipeline import pattern_inputs, select_topk


@pytest.fixture(scope="module")
def inputs(spark):
    spec = QUERIES["r1"]
    db = spec.build_db(spark, 20_000, 0)
    catalog = Catalog(spark, db)
    program = spec.program()
    t = spec.whynot_ptuple(catalog, program)
    return pattern_inputs(
        catalog, program, PQuestion(t, WHYNOT), n_s=1000, seed=0
    )


@pytest.mark.parametrize("k", [1, 3, 5, 10])
def test_t8_topk(benchmark, inputs, k):
    result = benchmark.pedantic(select_topk, args=(inputs, k), rounds=1, iterations=1)
    assert len(result.patterns) == min(k, len(inputs.patterns))
