"""T7 (Fig. 7) benchmark: summarization for r2 (license comparison
query), r11 (DirGen), r12 (TomKey) — why and why-not."""
import pytest

from repro.core.unify import WHY, WHYNOT, PQuestion
from repro.engine.catalog import Catalog
from repro.experiments.queries import QUERIES
from repro.summarize.pipeline import summarize

_SIZES = {"r2": 20_000, "r11": 2_000, "r12": 2_000}


@pytest.fixture(scope="module")
def setups(spark):
    out = {}
    for name, n in _SIZES.items():
        spec = QUERIES[name]
        db = spec.build_db(spark, n, 0)
        out[name] = (spec, Catalog(spark, db), spec.program())
    return out


@pytest.mark.parametrize("query", ["r2", "r11", "r12"])
def test_t7_why(benchmark, setups, query):
    spec, catalog, program = setups[query]
    t = spec.why_ptuple(catalog, program)
    benchmark.pedantic(
        lambda: summarize(
            catalog, program, PQuestion(t, WHY), k=3, n_s=100, seed=0
        ),
        rounds=1, iterations=1,
    )


@pytest.mark.parametrize("query", ["r2", "r11", "r12"])
def test_t7_whynot(benchmark, setups, query):
    spec, catalog, program = setups[query]
    t = spec.whynot_ptuple(catalog, program)
    benchmark.pedantic(
        lambda: summarize(
            catalog, program, PQuestion(t, WHYNOT), k=3, n_s=100, seed=0
        ),
        rounds=1, iterations=1,
    )
