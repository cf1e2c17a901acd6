"""Why-provenance capture via instrumented evaluation (Sec. 4, [20, 22]).

Why(Q, D, t) is the set of *successful* derivations of existing answers
matching t (Def. 3). A successful derivation has every goal annotated T
(Def. 1), so capture = evaluate the unified rule while retaining the
bindings of all unbound variables and annotate every goal with T.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.ast import Program
from repro.core.unify import PTuple, UnifiedRule, unify_program
from repro.engine.catalog import Catalog
from repro.engine.eval import successful_derivations
from repro.provenance.annotate import goal_column_names


def why_derivations(catalog: Catalog, unified: UnifiedRule) -> DataFrame:
    """Annotated why-provenance of one unified rule.

    Columns: one per unbound variable, then ``g1 … gm`` (all True).
    """
    deriv = successful_derivations(catalog, unified.rule)
    for g in goal_column_names(unified.n_goals):
        deriv = deriv.withColumn(g, F.lit(True))
    return deriv


def why_provenance(
    catalog: Catalog, program: Program, t: PTuple
) -> list[tuple[UnifiedRule, DataFrame]]:
    """Why(Q, D, t) per rule: [(unified rule, annotated derivations)]."""
    return [(u, why_derivations(catalog, u)) for u in unify_program(program, t)]
