"""T6 (Fig. 6) benchmark: end-to-end summarization of why and why-not
provenance for r1 (license) and r3 (movies), per sample size.

Each benchmark measures one full summarize() call at the benchmark
scale (license 20K rows, movies 2K — the SF≈0.1 analogue of the paper's
R_x subsets). One round each: the measured operation is itself a
multi-second Spark pipeline.
"""
import pytest

from repro.core.unify import WHY, WHYNOT, PQuestion
from repro.engine.catalog import Catalog
from repro.experiments.queries import QUERIES
from repro.summarize.pipeline import summarize


@pytest.fixture(scope="module")
def r1_setup(spark):
    spec = QUERIES["r1"]
    db = spec.build_db(spark, 20_000, 0)
    catalog = Catalog(spark, db)
    program = spec.program()
    return spec, catalog, program


@pytest.fixture(scope="module")
def r3_setup(spark):
    spec = QUERIES["r3"]
    db = spec.build_db(spark, 2_000, 0)
    catalog = Catalog(spark, db)
    program = spec.program()
    return spec, catalog, program


@pytest.mark.parametrize("n_s", [100, 1000])
def test_t6_r1_why(benchmark, r1_setup, n_s):
    spec, catalog, program = r1_setup
    t = spec.why_ptuple(catalog, program)
    benchmark.pedantic(
        lambda: summarize(
            catalog, program, PQuestion(t, WHY), k=3, n_s=n_s, seed=0
        ),
        rounds=1, iterations=1,
    )


@pytest.mark.parametrize("n_s", [100, 1000])
def test_t6_r1_whynot(benchmark, r1_setup, n_s):
    spec, catalog, program = r1_setup
    t = spec.whynot_ptuple(catalog, program)
    benchmark.pedantic(
        lambda: summarize(
            catalog, program, PQuestion(t, WHYNOT), k=3, n_s=n_s, seed=0
        ),
        rounds=1, iterations=1,
    )


@pytest.mark.parametrize("n_s", [100])
def test_t6_r3_whynot(benchmark, r3_setup, n_s):
    spec, catalog, program = r3_setup
    t = spec.whynot_ptuple(catalog, program)
    benchmark.pedantic(
        lambda: summarize(
            catalog, program, PQuestion(t, WHYNOT), k=3, n_s=n_s, seed=0
        ),
        rounds=1, iterations=1,
    )


def test_t6_r4_union_whynot(benchmark, spark):
    spec = QUERIES["r4"]
    db = spec.build_db(spark, 1_000, 0)
    catalog = Catalog(spark, db)
    program = spec.program()
    t = spec.whynot_ptuple(catalog, program)
    benchmark.pedantic(
        lambda: summarize(
            catalog, program, PQuestion(t, WHYNOT), k=3, n_s=100, seed=0
        ),
        rounds=1, iterations=1,
    )
