"""Full why-not enumeration — the paper's "FULL" / naive baseline input.

Whynot(Q, D, t) for one unified rule r_t is materialized as the cross
product of the per-variable domains, filtered by the rule's comparison
predicates, anti-joined with the existing answers matching t, and
goal-annotated. Its size is Θ(Π|𝔻_v|) — exponential in the number of
unbound variables — which is exactly why the paper samples instead; we
keep this implementation for small instances (tests, FULL comparisons)
and guard it with ``max_derivations``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.ast import Comparison, Const, Program, Var
from repro.core.unify import PTuple, UnifiedRule, unify_program
from repro.engine.catalog import Catalog, attrs_of_vars
from repro.engine.eval import comparison_column, evaluate
from repro.provenance.annotate import annotate_goals, anti_join_existing


def split_comparisons(
    unified: UnifiedRule,
) -> tuple[dict[str, list[Comparison]], list[Comparison]]:
    """Partition comparisons into per-variable θ_X (variable vs constant)
    and θ_join (variable vs variable) — Sec. 5.2."""
    per_var: dict[str, list[Comparison]] = {}
    var_var: list[Comparison] = []
    for c in unified.rule.comparisons:
        vs = c.vars()
        if len(vs) == 1:
            per_var.setdefault(vs[0].name, []).append(c)
        else:
            var_var.append(c)
    return per_var, var_var


def variable_domain(
    catalog: Catalog,
    unified: UnifiedRule,
    var: Var,
    domains: dict[str, DataFrame] | None = None,
) -> DataFrame:
    """𝔻 for one unbound variable: explicit override or union of attrs(X),
    with θ_X constant comparisons applied (values that can never satisfy
    them are removed before enumeration/sampling)."""
    per_var, _ = split_comparisons(unified)
    if domains is not None and var.name in domains:
        dom = domains[var.name]
        dom = dom.select(F.col(dom.columns[0]).alias("value")).distinct()
    else:
        occs = attrs_of_vars(unified.rule).get(var)
        if not occs:
            raise ValueError(f"variable {var.name} has no attribute occurrences")
        dom = catalog.domain(occs)
    out = dom.select(F.col("value").alias(var.name))
    for c in per_var.get(var.name, []):
        out = out.filter(comparison_column(c))
    return out


def all_valuations(
    catalog: Catalog,
    unified: UnifiedRule,
    domains: dict[str, DataFrame] | None = None,
) -> DataFrame:
    """All rule derivations of r_t: cross product of variable domains,
    filtered by every comparison. One column per unbound variable."""
    acc: DataFrame | None = None
    for var in unified.unbound:
        d = variable_domain(catalog, unified, var, domains)
        acc = d if acc is None else acc.crossJoin(d)
    if acc is None:  # fully bound rule: a single (empty) valuation
        acc = catalog.spark.range(1).drop("id")
    _, var_var = split_comparisons(unified)
    for c in var_var:
        acc = acc.filter(comparison_column(c))
    return acc


def count_all_derivations(
    catalog: Catalog,
    unified: UnifiedRule,
    domains: dict[str, DataFrame] | None = None,
) -> int:
    """|A(Q, D, t)| ignoring comparisons: product of domain sizes (Sec. 5.3)."""
    total = 1
    for var in unified.unbound:
        total *= variable_domain(catalog, unified, var, domains).count()
    return total


def whynot_full_rule(
    catalog: Catalog,
    program: Program,
    unified: UnifiedRule,
    domains: dict[str, DataFrame] | None = None,
    result: DataFrame | None = None,
    max_derivations: int | None = 5_000_000,
) -> DataFrame:
    """Whynot(Q, D, t) restricted to one rule, fully materializable.

    Raises ``ValueError`` when the derivation space exceeds
    ``max_derivations`` (the stand-in for the paper's FULL timeouts).
    """
    if max_derivations is not None:
        n = count_all_derivations(catalog, unified, domains)
        if n > max_derivations:
            raise ValueError(
                f"full why-not enumeration of {n} derivations exceeds "
                f"max_derivations={max_derivations}"
            )
    vals = all_valuations(catalog, unified, domains)
    if result is None:
        result = evaluate(catalog, program)
    failed = anti_join_existing(vals, result, unified)
    return annotate_goals(catalog, unified, failed).distinct()


def whynot_full(
    catalog: Catalog,
    program: Program,
    t: PTuple,
    domains: dict[str, DataFrame] | None = None,
    max_derivations: int | None = 5_000_000,
) -> list[tuple[UnifiedRule, DataFrame]]:
    """Whynot(Q, D, t) per rule: [(unified rule, annotated derivations)]."""
    result = evaluate(catalog, program)
    return [
        (
            u,
            whynot_full_rule(
                catalog, program, u, domains, result, max_derivations
            ),
        )
        for u in unify_program(program, t)
    ]
